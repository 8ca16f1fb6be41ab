"""Section-3 micro-benchmark: 5-hop enumeration reading ID lists
sequentially vs through list-level vs graph-level indirection.

Paper result (LiveJournal, 100 sources): 6.7s / 12.4s (1.85x) /
63.3s (9.4x).  The *ordering* sequential < list-level << graph-level is
the reproduced claim."""
import numpy as np
import pytest

from repro.core.config import graphflow_default
from repro.graphs.generators import dataset
from repro.storage.csr import build_csr
from repro.storage.indirection import MODES, enumerate_paths, prepare
from repro.workloads.harness import scale

_cache: dict = {}


def _setup(spark):
    if "data" not in _cache:
        g = dataset(spark, "lj", scale=scale())
        csr = build_csr(g, graphflow_default("fw"))
        data = prepare(csr, seed=5)
        rng = np.random.default_rng(5)
        _cache["data"] = (data, rng.integers(0, csr.n_vertices, 100))
    return _cache["data"]


@pytest.mark.parametrize("mode", MODES)
def test_five_hop_enumeration(benchmark, spark, mode):
    data, sources = _setup(spark)
    n, checksum = benchmark.pedantic(
        lambda: enumerate_paths(data, sources, hops=5, mode=mode),
        rounds=1, iterations=1,
    )
    _cache.setdefault("checksums", {})[mode] = (n, checksum)
    benchmark.extra_info["tuples"] = n
    # all modes enumerate the same paths
    assert len(set(_cache["checksums"].values())) == 1
