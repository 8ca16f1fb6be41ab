"""Section 3 — offset-list indirection micro-benchmark."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_cells  # noqa: E402

from repro.workloads.harness import run_indirection  # noqa: E402


def main() -> None:
    spark = get_spark("indirection")
    cells = run_indirection(spark)
    seq = next(c.seconds for c in cells if c.config == "sequential")
    print(f"{'mode':>12}{'secs':>10}{'paths':>14}{'vs sequential':>15}")
    for c in cells:
        print(f"{c.config:>12}{c.seconds:>10.3f}{c.rows:>14}"
              f"{c.seconds / seq:>14.2f}x")
    save_cells("indirection", cells)
    spark.stop()


if __name__ == "__main__":
    main()
