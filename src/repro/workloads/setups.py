"""Index configurations used across the evaluation (Sections 5.2–5.4).

One builder per configuration named exactly as in the paper:

* ``D``    — the GraphflowDB default: partition by edge label, sort by
  neighbour id, forward + backward.
* ``D_s``  — D's partitioning, sorted first by neighbour vertex label
  then neighbour id (Table 3).
* ``D_p``  — D's sorting, extra partitioning level on neighbour vertex
  label (Table 3).
* ``D+VB_t`` — D plus a forward time-sorted vertex-bound index sharing
  D's partition layers (Table 4).
* ``D+VB_c`` — D plus forward+backward neighbour-city-sorted
  vertex-bound indexes (Table 5).
* ``D+VB_c+EB_c`` — additionally the MoneyFlow edge-bound index
  (Table 5; §5.4 regroups it by the adjacent account type).

Each builder returns a materialized :class:`IndexStore`; callers wrap
it in an :class:`EngineContext`.  ``sel_hints`` helpers give the
optimizer the calibrated selectivities of the α-window and recency
predicates, as the paper fixes those selectivities explicitly.
"""
from __future__ import annotations

from repro.core.config import EDGE, NBR, Atom, IndexConfig, graphflow_default
from repro.core.default_index import build_default_index
from repro.core.edge_bound import build_edge_bound
from repro.core.index_store import IndexStore
from repro.core.vertex_bound import build_vertex_bound
from repro.core.views import EdgeView
from repro.graphs.schema import PropertyGraph
from repro.workloads.magicrecs import TIME_SELECTIVITY
from repro.workloads.moneyflow import moneyflow_view


def _pair(graph: PropertyGraph, fw_cfg: IndexConfig, name: str) -> IndexStore:
    bw_cfg = IndexConfig("bw", fw_cfg.partition_by, fw_cfg.sort_by)
    return IndexStore(
        build_default_index(graph, fw_cfg, name=f"{name}.fw"),
        build_default_index(graph, bw_cfg, name=f"{name}.bw"),
    )


def build_D(graph: PropertyGraph) -> IndexStore:
    return _pair(graph, graphflow_default("fw"), "D")


def build_Ds(graph: PropertyGraph) -> IndexStore:
    cfg = IndexConfig(
        "fw",
        partition_by=((EDGE, "elabel"),),
        sort_by=((NBR, "vlabel"), (NBR, "vid")),
    )
    return _pair(graph, cfg, "Ds")


def build_Dp(graph: PropertyGraph) -> IndexStore:
    cfg = IndexConfig(
        "fw",
        partition_by=((EDGE, "elabel"), (NBR, "vlabel")),
        sort_by=((NBR, "vid"),),
    )
    return _pair(graph, cfg, "Dp")


def add_VBt(store: IndexStore) -> IndexStore:
    """Forward, D's partitioning (shared layers), sorted on time."""
    store.add(
        build_vertex_bound(
            store.default_fw,
            EdgeView("VBt"),
            IndexConfig("fw", partition_by=store.default_fw.config.partition_by,
                        sort_by=((EDGE, "time"),)),
            name="VBt.fw",
        )
    )
    return store


def add_VBc(store: IndexStore) -> IndexStore:
    """Forward + backward, D's partitioning, sorted on neighbour city."""
    for d in ("fw", "bw"):
        base = store.default(d)
        store.add(
            build_vertex_bound(
                base,
                EdgeView("VBc"),
                IndexConfig(d, partition_by=base.config.partition_by,
                            sort_by=((NBR, "city"),)),
                name=f"VBc.{d}",
            )
        )
    return store


def add_EBc(store: IndexStore, alpha: float) -> IndexStore:
    """The MoneyFlow edge-bound index, grouped by the adjacent
    account's type (§5.4) and sorted on neighbour city."""
    store.add(
        build_edge_bound(
            store.default_fw,
            moneyflow_view(alpha),
            IndexConfig("fw", partition_by=((NBR, "acc"),),
                        sort_by=((NBR, "city"),)),
            name="EBc",
        )
    )
    return store


# ---------------------------------------------------------------------------
# optimizer selectivity hints for the calibrated predicates


def flow_sel_hints(alpha: float, target: float) -> dict[Atom, float]:
    """Per-atom selectivities whose product is the calibrated joint
    α-window selectivity (DuckDB-independent: date< is 1/2, amt< is
    ~0.45 after the date condition, the window takes the rest)."""
    win = max(min(target / (0.5 * 0.45), 1.0), 1e-6)
    hints: dict[Atom, float] = {}
    for e1, e2 in [(f"e{i}", f"e{j}") for i in range(1, 5)
                   for j in range(1, 6) if j == i + 1]:
        hints[Atom((e1, "date"), "<", (e2, "date"))] = 0.5
        hints[Atom((e2, "amt"), "<", (e1, "amt"))] = 0.45
        hints[Atom((e1, "amt"), "<", (e2, "amt"), delta=alpha)] = win
    # the same three atoms in view-role space (EB subsumption estimate)
    hints[Atom(("e_b", "date"), "<", ("e_adj", "date"))] = 0.5
    hints[Atom(("e_adj", "amt"), "<", ("e_b", "amt"))] = 0.45
    hints[Atom(("e_b", "amt"), "<", ("e_adj", "amt"), delta=alpha)] = win
    return hints


def time_sel_hints(tau: int, *, k_max: int = 4) -> dict[Atom, float]:
    hints = {}
    for i in range(2, k_max + 1):
        hints[Atom((f"e{i}", "time"), ">", tau)] = TIME_SELECTIVITY
    return hints
