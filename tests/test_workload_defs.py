"""Workload definitions: shapes, labels, and parameters match the
paper's descriptions."""
import pytest

from repro.core.config import Atom
from repro.core.views import RedundantViewError
from repro.workloads.magicrecs import mr_query, mr_workload
from repro.workloads.moneyflow import (
    flow_atoms,
    mf_2path,
    mf_workload,
    moneyflow_view,
)
from repro.workloads.subgraph_queries import CYCLIC, _SHAPES, sq_query, sq_workload


def test_sq_family_size_and_limits():
    assert len(_SHAPES) == 13  # SQ14 omitted, as in Table 3
    for name, shape in _SHAPES.items():
        n_v = max(max(s, d) for s, d in shape)
        assert n_v <= 7 and len(shape) <= 21


def test_sq11_is_densest():
    dens = {n: len(s) for n, s in _SHAPES.items()}
    assert dens["SQ11"] == max(dens.values()) == 10  # 5-clique


def test_sq13_is_five_edge_path():
    shape = _SHAPES["SQ13"]
    assert len(shape) == 5
    assert shape == [(i, i + 1) for i in range(1, 6)]
    assert "SQ13" not in CYCLIC


def test_sq_labels_fixed_and_in_alphabet():
    q = sq_query("SQ10", n_vlabels=4, n_elabels=2)
    for v in q.vertices:
        assert v.vlabel in {f"V{i}" for i in range(4)}
    for e in q.edges:
        assert e.elabel in {"E0", "E1"}
    # deterministic
    q2 = sq_query("SQ10", n_vlabels=4, n_elabels=2)
    assert q == q2


def test_sq_unlabeled_when_single_label():
    q = sq_query("SQ1")
    assert all(v.vlabel is None for v in q.vertices)
    assert all(e.elabel is None for e in q.edges)


def test_sq_workload_complete():
    qs = sq_workload(n_vlabels=8, n_elabels=2)
    assert set(qs) == set(_SHAPES)


def test_mr_structure():
    q = mr_query(3, tau=100)
    assert q.name == "MR2"
    assert len(q.vertices) == 4  # a1, a2, a3, b
    # a1 -> a_i recent edges + b -> a_i follower edges
    outs = [e for e in q.edges if e.src == "a1"]
    ins = [e for e in q.edges if e.src == "b"]
    assert len(outs) == 2 and len(ins) == 2
    time_preds = [a for a in q.preds if a.lhs[1] == "time"]
    assert len(time_preds) == 2
    assert all(a.op == ">" and a.rhs == 100 for a in time_preds)


def test_mr_anchor_restriction():
    q = mr_query(4, tau=1, anchor_max=500)
    assert Atom(("a1", "vid"), "<", 500) in q.preds


def test_mr_workload_keys():
    assert set(mr_workload(tau=5)) == {"MR1", "MR2", "MR3"}


def test_mr_invalid_k():
    with pytest.raises(ValueError):
        mr_query(1, tau=0)


def test_flow_atoms_structure():
    a1, a2, a3 = flow_atoms("e1", "e2", 50.0)
    assert a1 == Atom(("e1", "date"), "<", ("e2", "date"))
    assert a2 == Atom(("e2", "amt"), "<", ("e1", "amt"))
    assert a3 == Atom(("e1", "amt"), "<", ("e2", "amt"), delta=50.0)


def test_moneyflow_view_is_valid_2path():
    v = moneyflow_view(10.0)
    assert v.orientation.name == "dst-fw"
    assert len(v.predicates) == 3


def test_mf_workload_structures():
    qs = mf_workload(25.0, anchor_max=1000, beta_city="C1")
    assert set(qs) == {"MF1", "MF2", "MF3", "MF4", "MF5"}
    mf1 = qs["MF1"]
    # 4-cycle
    assert {(e.src, e.dst) for e in mf1.edges} == {
        ("a1", "a2"), ("a2", "a3"), ("a3", "a4"), ("a4", "a1")
    }
    assert Atom(("a2", "city"), "=", ("a4", "city")) in mf1.preds
    mf5 = qs["MF5"]
    assert len(mf5.edges) == 4
    # three consecutive money-flow windows
    deltas = [a for a in mf5.preds if a.delta]
    assert len(deltas) == 3
    mf3 = qs["MF3"]
    assert Atom(("a3", "vid"), "<", 1000) in mf3.preds
    assert Atom(("a5", "acc"), "=", "SV") in mf3.preds
    mf4 = qs["MF4"]
    assert Atom(("a1", "city"), "=", "C1") in mf4.preds


def test_mf_2path():
    q = mf_2path(5.0)
    assert len(q.edges) == 2 and len(q.preds) == 3
