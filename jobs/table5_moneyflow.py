"""Table 5 — money-flow fraud queries under D / D+VB_c / D+VB_c+EB_c."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, print_table, save_cells  # noqa: E402

from repro.workloads.harness import run_table5  # noqa: E402


def main() -> None:
    spark = get_spark("table5")
    datasets = tuple(sys.argv[1].split(",")) if len(sys.argv) > 1 else (
        "ork", "lj", "wt"
    )
    cells = run_table5(spark, datasets=datasets)
    print_table(cells)
    save_cells("table5", cells)
    spark.stop()


if __name__ == "__main__":
    main()
