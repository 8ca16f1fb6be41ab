"""Secondary vertex-bound A+ indexes (Section 2.2.1) with offset lists.

A vertex-bound index materializes a global ``EdgeView`` (arbitrary
selection over edges), partitioned primarily by vertex id with its own
secondary partitioning and sorting.  Per Section 3, every list is a
subset of the vertex's default-index neighbourhood, so only *offsets*
(positions ``pos`` in the default CSR order) are stored.

The engine-layer list rows carry both the offset array and a reference
to the vertex's full default ID-list array (``ref``), pre-joined at
build time — the analog of the offset-list page pointing at the
vertex's ID-list page.  Resolving entries (``gather``) happens at
*query* time, so the per-read indirection cost of Section 3 is paid by
every query, as in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import cached_property

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.config import IndexConfig
from repro.core.default_index import DefaultIndex
from repro.core.views import EdgeView


def _canon_prop(prop: str) -> str:
    """Accept the paper's surface names: ``label``→``elabel``, ``ID``→vid."""
    return {"label": "elabel", "ID": "vid", "id": "vid"}.get(prop, prop)


def view_entity_resolver(base: DefaultIndex):
    """Column resolver for EdgeView predicates over a direction's flat DF.

    In a forward index the partitioning vertex *is* ``v_s`` and the
    neighbour is ``v_d``; in a backward index they swap.
    """
    fw = base.direction == "fw"
    self_role, nbr_role = ("v_s", "v_d") if fw else ("v_d", "v_s")

    def resolve(ref: tuple[str, str]) -> Column:
        ent, prop = ref[0], _canon_prop(ref[1])
        if ent == "e_adj":
            return F.col("eid") if prop == "vid" else F.col(prop)
        if ent == self_role:
            return F.col("pk") if prop == "vid" else F.col(f"self_{prop}")
        if ent == nbr_role or ent == "v_nbr":
            return F.col("nbr") if prop == "vid" else F.col(f"nbr_{prop}")
        raise KeyError(f"cannot resolve {ent}.{prop} in edge-view context")

    return resolve


@dataclass
class VertexBoundIndex:
    """One direction of a secondary vertex-bound A+ index."""

    name: str
    view: EdgeView
    config: IndexConfig
    base: DefaultIndex
    lists: DataFrame = field(repr=False)  # pk, part cols…, offsets, ref
    #: row-form (pk, part cols…, sort cols…, pos) for pre-filtered reads
    flat_offsets: DataFrame = field(repr=False, default=None)

    @property
    def direction(self) -> str:
        return self.config.direction

    @property
    def shares_layers(self) -> bool:
        """True when the Section-3 shared-layer storage applies: no view
        predicate and same secondary partitioning as the default index."""
        return (
            not self.view.predicates
            and self.config.partition_by == self.base.config.partition_by
        )

    def granular_lists(self, part_eq: dict[str, object]) -> DataFrame:
        bad = set(part_eq) - set(self.config.partition_cols)
        if bad:
            raise KeyError(
                f"{sorted(bad)} not partition columns of {self.name!r}"
            )
        df = self.lists
        for c, v in part_eq.items():
            df = df.where(F.col(c).eqNullSafe(F.lit(v)))
        return df

    @cached_property
    def num_entries(self) -> int:
        return (
            self.lists.select(F.sum(F.size("offsets")).alias("n"))
            .collect()[0]["n"] or 0
        )

    @cached_property
    def memory_bytes(self) -> int:
        from repro.storage.memory import offset_index_bytes

        return offset_index_bytes(self.lists, n_layer_keys=0 if self.shares_layers
                                  else len(self.config.partition_cols))

    def unpersist(self) -> None:
        self.lists.unpersist()
        if self.flat_offsets is not None:
            self.flat_offsets.unpersist()


def build_vertex_bound(
    base: DefaultIndex,
    view: EdgeView,
    config: IndexConfig,
    *,
    name: str | None = None,
) -> VertexBoundIndex:
    """Materialize a vertex-bound index over ``base``'s direction."""
    if config.direction != base.direction:
        raise ValueError(
            f"vertex-bound config direction {config.direction} must match "
            f"base index direction {base.direction}"
        )
    name = name or f"VB.{view.name}.{config.direction}"
    flat = base.flat
    resolve = view_entity_resolver(base)
    for atom in view.predicates:
        flat = flat.where(atom.to_spark(resolve))

    part_cols = list(config.partition_cols)
    sort_cols = list(config.sort_cols)
    missing = [c for c in (*part_cols, *sort_cols) if c not in flat.columns]
    if missing:
        raise ValueError(f"index {name!r}: unknown columns {missing}")
    entry_fields = list(dict.fromkeys([*sort_cols, "eid", "pos"]))
    entry = F.struct(*[F.col(c) for c in entry_fields])
    sorted_entries = F.sort_array(F.collect_list(entry))
    aggs = [
        F.transform(sorted_entries, lambda s: s["pos"]).alias("offsets")
    ]
    if sort_cols:
        # Sort-key array aligned with the offsets: the engine analog of
        # binary-searching a sorted list — range predicates on the sort
        # keys select positions *before* the ID-list gather, so only
        # qualifying entries are read (Section 2.1.2).
        aggs.append(
            F.transform(
                sorted_entries,
                lambda s: F.struct(*[s[c].alias(c) for c in sort_cols]),
            ).alias("skeys")
        )
    lists = flat.groupBy("pk", *part_cols).agg(*aggs)
    ref = base.vertex_lists.select(
        F.col("pk").alias("__rpk"), F.col("lst").alias("ref")
    )
    lists = (
        lists.join(ref, lists["pk"] == ref["__rpk"], "inner")
        .drop("__rpk")
        .repartition("pk")
        .persist()
    )
    lists.count()
    # Row-form of the offset lists: one row per (list, position), with
    # the sort-key values alongside.  Sorted-list range predicates
    # filter these rows before any per-match work — the vectorized
    # binary-search analog the Extend operator uses (the entry itself
    # is still resolved through the ID-list indirection at read time).
    flat_offsets = (
        flat.select("pk", *part_cols, *sort_cols, "pos")
        .repartition("pk")
        .persist()
    )
    flat_offsets.count()
    return VertexBoundIndex(
        name=name, view=view, config=config, base=base, lists=lists,
        flat_offsets=flat_offsets,
    )
