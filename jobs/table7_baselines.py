"""Table 7 — GF vs TG-like vs N4-like comparator engines."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, print_table, save_cells  # noqa: E402

from repro.workloads.harness import run_table7  # noqa: E402


def main() -> None:
    spark = get_spark("table7")
    cells = run_table7(spark)
    print_table(cells)
    save_cells("table7", cells)
    spark.stop()


if __name__ == "__main__":
    main()
