"""Table 2 — dataset statistics of the synthetic analogs."""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from common import get_spark, save_cells  # noqa: E402

from repro.workloads.harness import run_table2  # noqa: E402


def main() -> None:
    spark = get_spark("table2")
    cells = run_table2(spark)
    print(f"{'Name':8}{'#Vertices':>12}{'#Edges':>12}{'Avg deg':>10}  mirrors")
    for c in cells:
        print(
            f"{c.dataset:8}{c.extra['n_vertices']:>12}{c.rows:>12}"
            f"{c.extra['avg_degree']:>10}  {c.extra['mirrors']}"
        )
    save_cells("table2", cells)
    spark.stop()


if __name__ == "__main__":
    main()
