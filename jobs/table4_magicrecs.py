"""Table 4 — MagicRecs under D and D+VB_t."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, print_table, save_cells  # noqa: E402

from repro.workloads.harness import run_table4  # noqa: E402


def main() -> None:
    spark = get_spark("table4")
    datasets = tuple(sys.argv[1].split(",")) if len(sys.argv) > 1 else (
        "brk", "wt", "lj", "ork"
    )
    cells = run_table4(spark, datasets=datasets)
    print_table(cells)
    save_cells("table4", cells)
    spark.stop()


if __name__ == "__main__":
    main()
