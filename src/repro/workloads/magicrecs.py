"""The MagicRecs recommendation workload of Section 5.3.1 (Table 4).

For a user ``a1``: the users ``a2..ak`` that ``a1`` started following
*recently* (``time > tau`` on a1's out-edges, tau at 5% selectivity)
and their common follower ``b``, for k = 2, 3, 4 (queries MR1..MR3,
Figure 3).  MR2/MR3 are structurally cyclic, so they also benefit from
the default neighbour-id sorting; the time predicate benefits from the
time-sorted secondary vertex-bound index ``VB_t``.

``anchor_max`` restricts ``a1`` to a fixed vertex set (the paper fixes
a1 to 10000/7000 vertices on LJ/Ork for MR3 "for the queries to run
within a reasonable time").
"""
from __future__ import annotations

from repro.core.config import Atom
from repro.engine.patterns import QEdge, QueryGraph, QVertex

#: fraction of edges selected by the recency predicate (Section 5.3.1)
TIME_SELECTIVITY = 0.05


def mr_query(
    k: int, *, tau: int, anchor_max: int | None = None
) -> QueryGraph:
    """MR_{k-1}: a1 follows a2..ak recently; b follows all of a2..ak."""
    if k < 2:
        raise ValueError("k must be >= 2")
    vertices = [QVertex("a1")] + [QVertex(f"a{i}") for i in range(2, k + 1)]
    vertices.append(QVertex("b"))
    edges = []
    preds: list[Atom] = []
    for i in range(2, k + 1):
        edges.append(QEdge(f"e{i}", "a1", f"a{i}"))
        preds.append(Atom((f"e{i}", "time"), ">", tau))
        edges.append(QEdge(f"f{i}", "b", f"a{i}"))
    if anchor_max is not None:
        preds.append(Atom(("a1", "vid"), "<", anchor_max))
    return QueryGraph(
        f"MR{k - 1}", tuple(vertices), tuple(edges), tuple(preds)
    )


def mr_workload(
    *, tau: int, anchor_max: dict[int, int | None] | None = None
) -> dict[str, QueryGraph]:
    """MR1..MR3 with per-k anchor restrictions."""
    anchor_max = anchor_max or {}
    return {
        f"MR{k - 1}": mr_query(k, tau=tau, anchor_max=anchor_max.get(k))
        for k in (2, 3, 4)
    }
