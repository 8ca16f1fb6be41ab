"""INDEX STORE registry and predicate-subsumption matching."""
import pytest

from repro.core.config import EDGE, NBR, Atom, IndexConfig, graphflow_default
from repro.core.default_index import build_default_index
from repro.core.edge_bound import build_edge_bound
from repro.core.index_store import (
    IndexStore,
    atoms_subsumed,
    canon_atom,
    normalize_nbr_role,
)
from repro.core.vertex_bound import build_vertex_bound
from repro.core.views import DST_FW, SRC_BW, EdgeView, TwoPathView
from repro.graphs.example import example_graph


@pytest.fixture(scope="module")
def store(spark):
    g = example_graph(spark)
    fw = build_default_index(g, graphflow_default("fw"))
    bw = build_default_index(g, graphflow_default("bw"))
    s = IndexStore(fw, bw)
    s.add(
        build_vertex_bound(
            fw,
            EdgeView("usd", (Atom(("e_adj", "currency"), "=", "USD"),)),
            IndexConfig("fw"),
            name="VB.usd",
        )
    )
    s.add(
        build_edge_bound(
            fw,
            TwoPathView(
                "mf", DST_FW,
                (Atom(("e_b", "date"), "<", ("e_adj", "date")),
                 Atom(("e_adj", "amt"), "<", ("e_b", "amt"))),
            ),
            IndexConfig("fw"),
            name="EB.mf",
        )
    )
    yield s
    s.unpersist()


def test_default_lookup(store):
    assert store.default("fw").name == "D.fw"
    assert store.default("bw").name == "D.bw"


def test_by_name(store):
    assert store.by_name("VB.usd").view.name == "usd"
    with pytest.raises(KeyError):
        store.by_name("nope")


def test_add_rejects_unknown_type(store):
    with pytest.raises(TypeError):
        store.add(object())


def test_canon_atom_normalizes_surface_names():
    a = Atom(("e_adj", "label"), "=", "W")
    b = Atom(("e_adj", "elabel"), "=", "W")
    assert canon_atom(a) == canon_atom(b)


def test_normalize_nbr_role():
    a = Atom(("v_d", "city"), "=", "X")
    assert normalize_nbr_role(a, "fw").lhs == ("v_nbr", "city")
    assert normalize_nbr_role(a, "bw").lhs == ("v_d", "city")


def test_atoms_subsumed():
    view = (Atom(("e_adj", "currency"), "=", "USD"),)
    assert atoms_subsumed(view, [Atom(("e_adj", "currency"), "=", "USD"),
                                 Atom(("e_adj", "amt"), ">", 5)])
    assert not atoms_subsumed(view, [Atom(("e_adj", "currency"), "=", "EUR")])
    assert not atoms_subsumed(view, [])


def test_match_vertex_bound(store):
    hit = store.match_vertex_bound(
        "fw", [Atom(("e_adj", "currency"), "=", "USD")]
    )
    assert [vb.name for vb in hit] == ["VB.usd"]
    assert store.match_vertex_bound("bw", [
        Atom(("e_adj", "currency"), "=", "USD")
    ]) == []
    assert store.match_vertex_bound("fw", []) == []


def test_match_edge_bound(store):
    atoms = [
        Atom(("e_b", "date"), "<", ("e_adj", "date")),
        Atom(("e_adj", "amt"), "<", ("e_b", "amt")),
        Atom(("v_nbr", "acc"), "=", "CQ"),
    ]
    assert [eb.name for eb in store.match_edge_bound(DST_FW, atoms)] == [
        "EB.mf"
    ]
    assert store.match_edge_bound(SRC_BW, atoms) == []
    assert store.match_edge_bound(DST_FW, atoms[:1]) == []
