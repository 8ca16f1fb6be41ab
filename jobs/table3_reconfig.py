"""Table 3 — labelled subgraph queries under D / D_s / D_p."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, print_table, save_cells  # noqa: E402

from repro.workloads.harness import run_table3  # noqa: E402


def main() -> None:
    spark = get_spark("table3")
    datasets = tuple(sys.argv[1].split(",")) if len(sys.argv) > 1 else (
        "ork", "lj", "wt", "brk"
    )
    cells = run_table3(spark, datasets=datasets)
    print_table(cells)
    save_cells("table3", cells)
    spark.stop()


if __name__ == "__main__":
    main()
