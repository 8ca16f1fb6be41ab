"""NumPy CSR model: agrees with the Spark-side default index on
content, canonical order, and offsets."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.config import EDGE, NBR, IndexConfig, graphflow_default
from repro.core.default_index import build_default_index
from repro.graphs.example import example_graph
from repro.graphs.generators import dataset
from repro.storage.csr import build_csr


@pytest.fixture(scope="module")
def g(spark):
    return dataset(spark, "brk", scale="tiny", n_vlabels=2, n_elabels=2).cache()


@pytest.fixture(scope="module")
def csr(g):
    return build_csr(g, graphflow_default("fw"))


def test_edge_count_and_indptr(g, csr):
    assert csr.n_edges == g.num_edges
    assert csr.indptr[0] == 0 and csr.indptr[-1] == csr.n_edges
    assert np.all(np.diff(csr.indptr) >= 0)


def test_dtypes_are_paper_widths(csr):
    assert csr.eids.dtype == np.int64  # 8-byte edge ids
    assert csr.nbrs.dtype == np.int32  # 4-byte neighbour ids


def test_neighbours_match_edge_table(g, csr):
    edges = g.edges.toPandas()
    want = edges.groupby("src")["dst"].apply(sorted).to_dict()
    for v in range(csr.n_vertices):
        got = sorted(csr.neighbours(v).tolist())
        assert got == want.get(v, [])


def test_order_matches_spark_pos(spark, g, csr):
    """The NumPy canonical order equals the Spark flat ``pos`` order,
    so offset lists computed on either layer are interchangeable."""
    idx = build_default_index(g, graphflow_default("fw"))
    rows = idx.flat.select("pk", "pos", "eid").collect()
    for r in rows:
        s = csr.indptr[r["pk"]]
        assert csr.eids[s + r["pos"]] == r["eid"]
    idx.unpersist()


def test_layer_groups_counts(g, csr):
    edges = g.edges.toPandas()
    want = edges.groupby(["src", "elabel"]).ngroups
    assert csr.layer_groups == (want,)


def test_bytes_model(csr):
    assert csr.id_list_bytes() == 12 * csr.n_edges
    assert csr.layer_bytes() == 4 * (csr.n_vertices + 1) + 5 * sum(
        csr.layer_groups
    )
    assert csr.total_bytes() == csr.id_list_bytes() + csr.layer_bytes()


def test_backward_direction(g):
    csr_bw = build_csr(g, graphflow_default("bw"))
    edges = g.edges.toPandas()
    want = edges.groupby("dst")["src"].apply(sorted).to_dict()
    for v in range(csr_bw.n_vertices):
        assert sorted(csr_bw.neighbours(v).tolist()) == want.get(v, [])


def test_two_layer_partitioning(spark):
    g2 = example_graph(spark)
    csr2 = build_csr(
        g2,
        IndexConfig("fw", partition_by=((EDGE, "elabel"), (EDGE, "currency")),
                    sort_by=((NBR, "city"),)),
    )
    assert len(csr2.layer_groups) == 2
    assert csr2.layer_groups[1] >= csr2.layer_groups[0]


def test_unknown_column_raises(g):
    with pytest.raises(ValueError, match="unknown"):
        build_csr(g, IndexConfig("fw", partition_by=((EDGE, "nope"),)))
