"""Section-3 indirection micro-benchmark: all three read modes
enumerate the same paths; permutations have the claimed structure."""
import numpy as np
import pytest

from repro.core.config import graphflow_default
from repro.graphs.generators import dataset
from repro.storage.csr import build_csr
from repro.storage.indirection import MODES, enumerate_paths, prepare


@pytest.fixture(scope="module")
def data(spark):
    g = dataset(spark, "brk", scale="tiny")
    csr = build_csr(g, graphflow_default("fw"))
    return prepare(csr, seed=1)


def test_modes_agree_on_counts_and_checksums(data):
    results = {
        m: enumerate_paths(data, np.arange(20), hops=3, mode=m)
        for m in MODES
    }
    assert len({r for r in results.values()}) == 1  # same (count, sum)


def test_hop_growth(data):
    n1, _ = enumerate_paths(data, np.arange(50), hops=1)
    n3, _ = enumerate_paths(data, np.arange(50), hops=3)
    assert n3 > n1 > 0


def test_list_perm_confined_to_lists(data):
    csr = data.csr
    for v in range(csr.n_vertices):
        s, e = csr.indptr[v], csr.indptr[v + 1]
        seg = data.list_perm[s:e]
        assert sorted(seg.tolist()) == list(range(s, e))


def test_graph_perm_is_global_permutation(data):
    assert sorted(data.graph_perm.tolist()) == list(range(data.csr.n_edges))


def test_shuffled_storage_roundtrips(data):
    got = data.nbrs_shuffled[data.graph_perm]
    assert np.array_equal(got, data.csr.nbrs)


def test_bad_mode_raises(data):
    with pytest.raises(ValueError):
        enumerate_paths(data, np.arange(2), mode="nope")


def test_empty_frontier(data):
    n, c = enumerate_paths(data, np.array([], dtype=np.int64), hops=5)
    assert (n, c) == (0, 0)


def test_max_frontier_cap(data):
    n, _ = enumerate_paths(data, np.arange(50), hops=4, max_frontier=100)
    assert n <= 100 * 40  # one expansion past the cap at most


def test_zero_degree_vertices_in_frontier(data):
    """Regression: sinks in the frontier must not corrupt the
    vectorized slot ranges (their zero-length ranges collide)."""
    csr = data.csr
    deg = np.diff(csr.indptr)
    sinks = np.where(deg == 0)[0]
    nonsink = np.where(deg > 0)[0][:5]
    frontier = np.concatenate([sinks[:3], nonsink, sinks[3:6]])
    results = {
        m: enumerate_paths(data, frontier, hops=4, mode=m) for m in MODES
    }
    assert len(set(results.values())) == 1
    n, _ = results["sequential"]
    want, _ = enumerate_paths(data, nonsink, hops=4, mode="sequential")
    assert n == want  # sinks contribute nothing
