"""Default A+ index invariants: content equals the edge table, CSR
order is consistent across flat/lists/vertex_lists, partitioning and
sorting criteria are honoured, and ``pos`` offsets resolve correctly."""
import pytest
from pyspark.sql import functions as F

from repro.core.config import EDGE, NBR, IndexConfig, graphflow_default
from repro.core.default_index import build_default_index
from repro.graphs.example import example_graph
from repro.graphs.financial import decorate_financial
from repro.graphs.generators import dataset


@pytest.fixture(scope="module")
def g(spark):
    return example_graph(spark).cache()


@pytest.fixture(scope="module")
def fw(g):
    return build_default_index(g, graphflow_default("fw"))


@pytest.fixture(scope="module")
def bw(g):
    return build_default_index(g, graphflow_default("bw"))


def test_flat_contains_every_edge_fw(g, fw):
    got = fw.flat.select(
        F.col("pk").alias("src"), F.col("nbr").alias("dst"), "eid"
    ).toPandas().sort_values("eid").reset_index(drop=True)
    want = g.edges.select("src", "dst", "eid").toPandas().sort_values(
        "eid"
    ).reset_index(drop=True)
    assert got[["src", "dst", "eid"]].equals(want[["src", "dst", "eid"]])


def test_flat_contains_every_edge_bw(g, bw):
    assert bw.flat.count() == g.num_edges
    row = bw.flat.where("eid = 13").collect()[0]
    assert (row["pk"], row["nbr"]) == (5, 2)  # t13: v2 -> v5, bw pk is dst


def test_nbr_and_self_props_joined(fw):
    row = fw.flat.where("eid = 13").collect()[0]
    # t13: v2 -> v5; fw: self = v2 (Toronto/CQ), nbr = v5 (Kitchener/CQ)
    assert row["self_city"] == "Toronto"
    assert row["nbr_city"] == "Kitchener"
    assert row["nbr_vlabel"] == "Account"


def test_pos_is_dense_per_vertex(fw):
    bad = (
        fw.flat.groupBy("pk")
        .agg(F.min("pos").alias("lo"), F.max("pos").alias("hi"),
             F.count("*").alias("n"))
        .where((F.col("lo") != 0) | (F.col("hi") != F.col("n") - 1))
        .count()
    )
    assert bad == 0


def test_vertex_list_matches_pos(fw):
    """element_at(vertex_list, pos+1) recovers exactly the flat row."""
    joined = fw.flat.join(
        fw.vertex_lists.select(F.col("pk").alias("p2"), "lst"),
        fw.flat["pk"] == F.col("p2"),
    )
    bad = joined.where(
        F.element_at("lst", F.col("pos") + 1)["eid"] != F.col("eid")
    ).count()
    assert bad == 0


def test_granular_lists_partitioned_by_elabel(fw):
    lists = fw.granular_lists({"elabel": "W"})
    rows = lists.where("pk = 1").collect()
    assert len(rows) == 1
    eids = [s["eid"] for s in rows[0]["lst"]]
    assert set(eids) == {1, 2}  # v1's Wire edges


def test_granular_lists_rejects_non_partition_col(fw):
    with pytest.raises(KeyError):
        fw.granular_lists({"currency": "USD"})


def test_default_sort_by_nbr_id(fw):
    rows = fw.lists.collect()
    for r in rows:
        nbrs = [s["nbr"] for s in r["lst"]]
        assert nbrs == sorted(nbrs)


def test_lists_union_equals_vertex_list(fw):
    sums = (
        fw.lists.groupBy("pk").agg(F.sum(F.size("lst")).alias("n"))
        .join(
            fw.vertex_lists.select("pk", F.size("lst").alias("m")), "pk"
        )
        .where("n != m")
        .count()
    )
    assert sums == 0


def test_reconfigured_sort_criteria(spark, g):
    """RECONFIGURE ... SORT BY v_nbr.city: lists come out city-sorted."""
    idx = build_default_index(
        g,
        IndexConfig(
            direction="fw",
            partition_by=((EDGE, "elabel"),),
            sort_by=((NBR, "city"),),
        ),
    )
    for r in idx.lists.collect():
        cities = [s["nbr_city"] for s in r["lst"]]
        non_null = [c for c in cities if c is not None]
        assert non_null == sorted(non_null)
    idx.unpersist()


def test_nested_partitioning_two_levels(spark, g):
    """Figure 2a: partition by edge label then currency."""
    idx = build_default_index(
        g,
        IndexConfig(
            direction="fw",
            partition_by=((EDGE, "elabel"), (EDGE, "currency")),
            sort_by=((NBR, "city"),),
        ),
    )
    rows = idx.granular_lists({"elabel": "W", "currency": "USD"}).where(
        "pk = 1"
    ).collect()
    assert len(rows) == 1
    assert [s["eid"] for s in rows[0]["lst"]] == [1]  # v1's USD wire
    # every (pk, elabel, currency) group is homogeneous
    for r in idx.lists.where("elabel != 'Owns'").collect():
        assert len({(s["elabel"], s["currency"]) for s in r["lst"]}) == 1
    idx.unpersist()


def test_unknown_partition_column_raises(g):
    with pytest.raises(ValueError, match="not in graph"):
        build_default_index(
            g, IndexConfig(direction="fw", partition_by=((EDGE, "nope"),))
        )


def test_index_on_synthetic_dataset(spark):
    g = dataset(spark, "brk", scale="tiny", n_vlabels=2, n_elabels=2)
    idx = build_default_index(g, graphflow_default("fw"))
    total = idx.lists.select(F.sum(F.size("lst"))).collect()[0][0]
    assert total == g.num_edges
    idx.unpersist()


def test_financial_decoration_roundtrip(spark):
    g = decorate_financial(dataset(spark, "brk", scale="tiny"))
    idx = build_default_index(
        g,
        IndexConfig(
            direction="fw",
            partition_by=((EDGE, "elabel"),),
            sort_by=((NBR, "city"),),
        ),
    )
    r = idx.lists.first()
    cities = [s["nbr_city"] for s in r["lst"]]
    assert all(c is not None for c in cities)
    assert cities == sorted(cities)
    idx.unpersist()
