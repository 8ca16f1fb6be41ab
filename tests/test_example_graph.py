"""The reconstructed Figure-1 graph satisfies every fact the paper
states about it (see module docstring of repro.graphs.example)."""
import pytest
from pyspark.sql import functions as F

from repro.graphs.example import example_graph

TRANSFER_LABELS = ("W", "DD")


@pytest.fixture(scope="module")
def g(spark):
    return example_graph(spark).cache()


def test_counts(g):
    assert g.num_vertices == 8
    assert g.num_edges == 21  # 19 transfers + 2 Owns


def test_alice_is_v7_and_owns_v1(g):
    alice = g.vertices.where("name = 'Alice'").collect()
    assert [r["vid"] for r in alice] == [7]
    owns = g.edges.where("elabel = 'Owns' and src = 7").collect()
    assert [r["dst"] for r in owns] == [1]


def test_labels(g):
    vlabels = {r["vlabel"] for r in g.vertices.select("vlabel").distinct().collect()}
    assert vlabels == {"Account", "Customer"}
    elabels = {r["elabel"] for r in g.edges.select("elabel").distinct().collect()}
    assert elabels == {"W", "DD", "Owns"}


def test_t13_from_v2_to_v5(g):
    t13 = g.edges.where("eid = 13").collect()[0]
    assert (t13["src"], t13["dst"]) == (2, 5)


def test_v2_incoming_outgoing(g):
    incoming = {
        r["eid"]
        for r in g.edges.where(
            (F.col("dst") == 2) & F.col("elabel").isin(*TRANSFER_LABELS)
        ).collect()
    }
    outgoing = {
        r["eid"]
        for r in g.edges.where(
            (F.col("src") == 2) & F.col("elabel").isin(*TRANSFER_LABELS)
        ).collect()
    }
    assert incoming == {5, 6, 17}
    assert outgoing == {7, 8, 13, 15}


def test_t17_adjacency_for_edge_bound_example(g):
    """t1 and t16 end at src(t17), so t17 is in both their DST-FW
    2-path neighbourhoods and passes the MoneyFlow predicate."""
    e = {r["eid"]: r for r in g.edges.collect()}
    assert e[17]["dst"] == 2
    v4 = e[17]["src"]
    assert e[1]["dst"] == v4 and e[16]["dst"] == v4
    for b in (1, 16):
        assert e[b]["date"] < e[17]["date"]
        assert e[17]["amt"] < e[b]["amt"]


def test_dates_ordered_by_transfer_id(g):
    rows = (
        g.edges.where(F.col("elabel").isin(*TRANSFER_LABELS))
        .orderBy("eid")
        .select("date")
        .collect()
    )
    dates = [r["date"] for r in rows]
    assert dates == sorted(dates)
    assert len(set(dates)) == len(dates)


def test_moneyflow_list_of_t13_is_exactly_t19(g):
    """Example 8: the MoneyFlow DST-FW list of t13 contains only t19."""
    e = {r["eid"]: r for r in g.edges.collect()}
    t13 = e[13]
    flow = [
        eid
        for eid, r in e.items()
        if r["elabel"] in TRANSFER_LABELS
        and r["src"] == t13["dst"]
        and r["date"] is not None
        and t13["date"] < r["date"]
        and r["amt"] < t13["amt"]
    ]
    assert flow == [19]


def test_simple_graph(g):
    dup = (
        g.edges.groupBy("src", "dst").count().where("count > 1").count()
    )
    assert dup == 0


def test_account_properties_present(g):
    accounts = g.vertices.where("vlabel = 'Account'")
    assert accounts.where(F.col("city").isNull() | F.col("acc").isNull()).count() == 0
    accs = {r["acc"] for r in accounts.select("acc").distinct().collect()}
    assert accs == {"CQ", "SV"}


def test_wires_from_alices_account(g):
    """Example 2: Alice's account v1 has outgoing Wire transfers."""
    wires = g.edges.where("src = 1 and elabel = 'W'").count()
    assert wires >= 1
    usd_wires = g.edges.where(
        "src = 1 and elabel = 'W' and currency = 'USD'"
    ).count()
    assert usd_wires >= 1  # Example 5 has a non-empty answer
