"""The labelled subgraph query workload of Section 5.2 (Table 3).

The paper takes 14 queries from reference [32] (figure omitted there
too) with up to 7 vertices and 21 edges, mixing acyclic and cyclic,
sparse and dense shapes, and drops SQ14 from the table.  We reconstruct
a 13-query family with the same coverage (DESIGN.md §4): paths, stars,
trees, triangle/diamond/square/house/bowtie cycles, 4- and 5-cliques
(SQ11 the densest, mirroring its dominant runtime in Table 3), and the
long 5-edge path SQ13 that Section 5.6 calls out.

Vertex and edge labels are fixed per query (the paper: "for each query
we fixed the vertex and edge labels"), assigned deterministically
round-robin over the dataset's ``G_{i,j}`` label alphabet.
"""
from __future__ import annotations

from repro.engine.patterns import QEdge, QueryGraph, QVertex

#: query name -> list of (src index, dst index); vertices are 1-based a1..
_SHAPES: dict[str, list[tuple[int, int]]] = {
    "SQ1": [(1, 2), (2, 3), (1, 3)],  # triangle
    "SQ2": [(1, 2), (1, 3), (2, 4), (3, 4)],  # diamond
    "SQ3": [(1, 2), (2, 3), (3, 4), (4, 1)],  # directed 4-cycle
    "SQ4": [(1, 2), (1, 3), (1, 4)],  # out-star
    "SQ5": [(1, 2), (2, 3), (3, 4)],  # 3-path
    "SQ6": [(1, 2), (2, 3), (1, 3), (3, 4)],  # tailed triangle
    "SQ7": [(1, 2), (2, 3), (3, 4), (4, 5)],  # 4-path
    "SQ8": [(1, 2), (2, 3), (3, 4), (4, 5), (5, 1), (2, 5)],  # house
    "SQ9": [(1, 2), (2, 3), (1, 3), (2, 4), (4, 3)],  # bowtie half
    "SQ10": [(1, 2), (1, 3), (1, 4), (2, 3), (2, 4), (3, 4)],  # 4-clique
    "SQ11": [(i, j) for i in range(1, 6) for j in range(i + 1, 6)],  # 5-clique
    "SQ12": [(1, 2), (2, 3), (3, 4), (4, 5), (5, 6), (6, 1)],  # 6-cycle
    "SQ13": [(1, 2), (2, 3), (3, 4), (4, 5), (5, 6)],  # 5-edge path (§5.6)
}

#: structurally cyclic queries (can use WCO intersections)
CYCLIC = {"SQ1", "SQ2", "SQ3", "SQ6", "SQ8", "SQ9", "SQ10", "SQ11", "SQ12"}


def sq_query(
    name: str, *, n_vlabels: int = 1, n_elabels: int = 1
) -> QueryGraph:
    """Build one SQ query with fixed labels over the G_{i,j} alphabet."""
    shape = _SHAPES[name]
    qidx = int(name[2:])
    n_v = max(max(s, d) for s, d in shape)
    vertices = tuple(
        QVertex(f"a{i}", f"V{(qidx + i) % n_vlabels}" if n_vlabels > 1 else None)
        for i in range(1, n_v + 1)
    )
    edges = tuple(
        QEdge(
            f"e{k}", f"a{s}", f"a{d}",
            f"E{(qidx + k) % n_elabels}" if n_elabels > 1 else None,
        )
        for k, (s, d) in enumerate(shape, start=1)
    )
    return QueryGraph(name, vertices, edges)


def sq_workload(*, n_vlabels: int, n_elabels: int) -> dict[str, QueryGraph]:
    """All 13 queries for one dataset's label alphabet."""
    return {
        name: sq_query(name, n_vlabels=n_vlabels, n_elabels=n_elabels)
        for name in _SHAPES
    }
