"""Table 6 — edge-bound selectivity sweep on the LJ analog."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_cells  # noqa: E402

from repro.workloads.harness import run_table6  # noqa: E402


def main() -> None:
    spark = get_spark("table6")
    cells = run_table6(spark)
    print(f"{'selectivity':>12}{'config':>10}{'secs':>10}{'rows':>12}"
          f"{'Mm(MB)':>10}{'E_indexed':>12}")
    for c in cells:
        print(
            f"{c.query:>12}{c.config:>10}{c.seconds:>10.3f}{c.rows:>12}"
            f"{c.mm_mb:>10.2f}{c.extra['E_indexed']:>12}"
        )
    save_cells("table6", cells)
    spark.stop()


if __name__ == "__main__":
    main()
