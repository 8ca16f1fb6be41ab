"""Table 2 benchmark: generation cost + stats of each dataset analog."""
import pytest

from repro.graphs.generators import DATASETS, dataset


@pytest.mark.parametrize("name", list(DATASETS))
def test_generate_dataset(benchmark, spark, bench_scale, name):
    def gen():
        g = dataset(spark, name, scale=bench_scale)
        return g.num_vertices, g.num_edges

    nv, ne = benchmark.pedantic(gen, rounds=1, iterations=1)
    spec = DATASETS[name]
    paper_avg = spec.n_edges / spec.n_vertices
    assert abs(ne / nv - paper_avg) / paper_avg < 0.1
