"""The financial-fraud money-flow workload of Sections 5.3.2/5.4
(Tables 5 and 6), queries MF1..MF5 of Figure 4.

MF1/MF2 are cyclic/diamond flows with city-equality predicates (benefit
from the city-sorted ``VB_c`` via MULTI-EXTEND and WCO intersections);
MF3/MF4/MF5 additionally chain consecutive-edge money-flow predicates
``e_i.date < e_j.date AND e_j.amt < e_i.amt AND e_i.amt < e_j.amt + α``
(benefit from the ``EB_c`` edge-bound 2-path view).  Structures are
reconstructed from the predicate lists printed under Figure 4 and the
MF1/MF3 plan walkthroughs in the text (DESIGN.md §4).

``mf_2path`` is the "simplest money flow query" of Section 5.4 used for
the Table-6 selectivity sweep.
"""
from __future__ import annotations

from repro.core.config import Atom
from repro.core.views import DST_FW, TwoPathView
from repro.engine.patterns import QEdge, QueryGraph, QVertex

#: α window selectivity used in Table 5 (Section 5.4 sets it to 5%)
ALPHA_SELECTIVITY = 0.05


def flow_atoms(e_prev: str, e_next: str, alpha: float) -> tuple[Atom, ...]:
    """The money-flow predicate between two consecutive query edges."""
    return (
        Atom((e_prev, "date"), "<", (e_next, "date")),
        Atom((e_next, "amt"), "<", (e_prev, "amt")),
        Atom((e_prev, "amt"), "<", (e_next, "amt"), delta=alpha),
    )


def moneyflow_view(alpha: float) -> TwoPathView:
    """The EB_c 2-path view (Example 8 + the α predicate of §5.4)."""
    return TwoPathView(
        "MoneyFlow",
        DST_FW,
        (
            Atom(("e_b", "date"), "<", ("e_adj", "date")),
            Atom(("e_adj", "amt"), "<", ("e_b", "amt")),
            Atom(("e_b", "amt"), "<", ("e_adj", "amt"), delta=alpha),
        ),
    )


def _acc(var: str, kind: str) -> Atom:
    return Atom((var, "acc"), "=", kind)


def mf1() -> QueryGraph:
    """Cyclical flow through four chequing accounts; two accounts on
    the path share a city."""
    return QueryGraph(
        "MF1",
        tuple(QVertex(f"a{i}") for i in range(1, 5)),
        (
            QEdge("e1", "a1", "a2"), QEdge("e2", "a2", "a3"),
            QEdge("e3", "a3", "a4"), QEdge("e4", "a4", "a1"),
        ),
        (
            Atom(("a2", "city"), "=", ("a4", "city")),
            *[_acc(f"a{i}", "CQ") for i in range(1, 5)],
        ),
    )


def mf2() -> QueryGraph:
    """Diamond flow: two branches from a1 re-converging in a4, branch
    heads in the same city."""
    return QueryGraph(
        "MF2",
        tuple(QVertex(f"a{i}") for i in range(1, 5)),
        (
            QEdge("e1", "a1", "a2"), QEdge("e2", "a1", "a3"),
            QEdge("e3", "a2", "a4"), QEdge("e4", "a3", "a4"),
        ),
        (
            Atom(("a2", "city"), "=", ("a3", "city")),
            *[_acc(f"a{i}", "CQ") for i in range(1, 5)],
        ),
    )


def mf3(alpha: float, anchor_max: int) -> QueryGraph:
    """Figure 4c: a2.city = a4.city = a5.city, a3.ID < K, one money-flow
    step a1 -e2-> a3 -e3-> a5."""
    return QueryGraph(
        "MF3",
        tuple(QVertex(f"a{i}") for i in range(1, 6)),
        (
            QEdge("e1", "a1", "a2"), QEdge("e2", "a1", "a3"),
            QEdge("e3", "a3", "a5"), QEdge("e4", "a1", "a4"),
        ),
        (
            Atom(("a2", "city"), "=", ("a4", "city")),
            Atom(("a4", "city"), "=", ("a5", "city")),
            Atom(("a3", "vid"), "<", anchor_max),
            *[_acc(f"a{i}", "CQ") for i in range(1, 5)],
            _acc("a5", "SV"),
            *flow_atoms("e2", "e3", alpha),
        ),
    )


def mf4(alpha: float, beta_city: str) -> QueryGraph:
    """Figure 4d: two 2-step flows out of an anchored-city a1."""
    return QueryGraph(
        "MF4",
        tuple(QVertex(f"a{i}") for i in range(1, 6)),
        (
            QEdge("e1", "a1", "a2"), QEdge("e2", "a2", "a3"),
            QEdge("e3", "a1", "a4"), QEdge("e4", "a4", "a5"),
        ),
        (
            Atom(("a1", "city"), "=", beta_city),
            Atom(("a2", "city"), "=", ("a4", "city")),
            _acc("a2", "CQ"), _acc("a3", "CQ"),
            _acc("a4", "SV"), _acc("a5", "SV"),
            *flow_atoms("e1", "e2", alpha),
            *flow_atoms("e3", "e4", alpha),
        ),
    )


def mf5(alpha: float, anchor_max: int) -> QueryGraph:
    """Figure 4e: a 4-step money-flow path through chequing accounts."""
    return QueryGraph(
        "MF5",
        tuple(QVertex(f"a{i}") for i in range(1, 6)),
        tuple(QEdge(f"e{i}", f"a{i}", f"a{i+1}") for i in range(1, 5)),
        (
            Atom(("a1", "vid"), "<", anchor_max),
            *[_acc(f"a{i}", "CQ") for i in range(1, 6)],
            *flow_atoms("e1", "e2", alpha),
            *flow_atoms("e2", "e3", alpha),
            *flow_atoms("e3", "e4", alpha),
        ),
    )


def mf_2path(alpha: float) -> QueryGraph:
    """Section 5.4 / Table 6: the single-step money-flow path."""
    return QueryGraph(
        "MF2path",
        (QVertex("a1"), QVertex("a2"), QVertex("a3")),
        (QEdge("e1", "a1", "a2"), QEdge("e2", "a2", "a3")),
        flow_atoms("e1", "e2", alpha),
    )


def mf_workload(
    alpha: float, *, anchor_max: int, beta_city: str
) -> dict[str, QueryGraph]:
    return {
        "MF1": mf1(),
        "MF2": mf2(),
        "MF3": mf3(alpha, anchor_max),
        "MF4": mf4(alpha, beta_city),
        "MF5": mf5(alpha, anchor_max),
    }
