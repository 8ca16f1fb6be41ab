"""Comparator engines for the Section-5.6 experiment (Table 7).

Neo4j and TigerGraph are closed-source and not installable offline, so
they are simulated as *capability restrictions* of the same engine —
the honest way to reproduce the table's shape on one substrate:

* **GF (GraphflowDB)** — the full system: ``D_p`` default indexes
  (partitioned by edge label and neighbour vertex label, sorted by
  neighbour id) + the complete plan space (WCO intersections,
  MULTI-EXTEND, secondary indexes).
* **TG-like (TigerGraph)** — typed-graph traversal engine: granular
  edge-label lists and filter pushdown, but binary (Extend/Close) joins
  only — no WCO intersections, no sorted lists, no secondary indexes.
* **N4-like (Neo4j)** — EXPAND-then-FILTER pipeline: granular
  edge-label ("relationship type") lists, binary joins, and label /
  property predicates applied as separate FILTER operators at the end
  of the pipeline rather than pushed into the traversal (Cypher's
  Expand(a)→Filter(a:Label) plan shape), no sorted lists.

Absolute gaps to the real systems (e.g. Neo4j's record-at-a-time
interpretation overhead) are *not* simulated; DESIGN.md documents this
substitution and EXPERIMENTS.md flags it next to Table 7.
"""
from __future__ import annotations

from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.engine.optimizer import Optimizer, PlannerOptions
from repro.engine.patterns import QueryGraph
from repro.engine.plans import Plan

GF_OPTIONS = PlannerOptions()

TG_LIKE_OPTIONS = PlannerOptions(
    allow_intersect=False,
    allow_multi_extend=False,
    allow_vertex_bound=False,
    allow_edge_bound=False,
    allow_array_preds=False,
    allow_granular=True,
    push_filters=True,
)

N4_LIKE_OPTIONS = PlannerOptions(
    allow_intersect=False,
    allow_multi_extend=False,
    allow_vertex_bound=False,
    allow_edge_bound=False,
    allow_array_preds=False,
    allow_granular=True,
    push_filters=False,
)

BASELINES = {
    "GF": GF_OPTIONS,
    "TG": TG_LIKE_OPTIONS,
    "N4": N4_LIKE_OPTIONS,
}


def plan_with(
    name: str, ctx: EngineContext, cat: Catalogue, q: QueryGraph
) -> Plan:
    """Plan ``q`` under one of the three engine capability profiles."""
    return Optimizer(ctx, cat, BASELINES[name]).plan(q)
