"""Section-5.5 benchmark: single-thread insert rates for the five
index configurations (load 50%, stream the remaining 50%)."""
import numpy as np
import pytest

from repro.graphs.financial import decorate_time
from repro.graphs.generators import dataset
from repro.storage.maintenance import Edge, build_system
from repro.workloads.harness import scale

CONFIGS = ("Ds", "Dp", "Dps", "Dps+VBt", "Dps+EBt")

_cache: dict = {}


def _edges(spark):
    if "edges" not in _cache:
        g = decorate_time(
            dataset(spark, "brk", scale=scale(), n_vlabels=2, n_elabels=2)
        )
        pdf = g.edges.select("eid", "src", "dst", "elabel", "time").toPandas()
        edges = [Edge(*t) for t in pdf.itertuples(index=False, name=None)]
        times = pdf["time"].to_numpy()
        rng = np.random.default_rng(3)
        i = rng.integers(0, len(times), 100_000)
        j = rng.integers(0, len(times), 100_000)
        diffs = np.sort(times[i] - times[j])
        alpha = float(diffs[int(0.01 * len(diffs))])  # 1% selectivity
        _cache["edges"] = (edges, g.num_vertices, alpha)
    return _cache["edges"]


@pytest.mark.parametrize("config", CONFIGS)
def test_insert_rate(benchmark, spark, config):
    edges, nv, alpha = _edges(spark)
    half = len(edges) // 2

    def setup():
        sys = build_system(
            config, nv, eb_alpha=alpha if config == "Dps+EBt" else None
        )
        for e in edges[:half]:
            sys.insert(e)
        return (sys,), {}

    def stream(sys):
        for e in edges[half:]:
            sys.insert(e)
        return sys.fw.total_entries()

    total = benchmark.pedantic(stream, setup=setup, rounds=1, iterations=1)
    benchmark.extra_info["inserted"] = len(edges) - half
    assert total == len(edges)
