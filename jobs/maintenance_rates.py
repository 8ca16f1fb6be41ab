"""Section 5.5 — single-thread index maintenance rates."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_cells  # noqa: E402

from repro.workloads.harness import run_maintenance  # noqa: E402


def main() -> None:
    spark = get_spark("maintenance")
    cells = run_maintenance(spark)
    print(f"{'dataset':>10}{'config':>12}{'secs':>10}{'inserts/s':>12}")
    for c in cells:
        print(f"{c.dataset:>10}{c.config:>12}{c.seconds:>10.3f}"
              f"{c.extra['edges_per_s']:>12}")
    save_cells("maintenance", cells)
    spark.stop()


if __name__ == "__main__":
    main()
