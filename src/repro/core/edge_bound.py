"""Secondary edge-bound A+ indexes (Section 2.2.2) with offset lists.

An edge-bound index materializes a ``TwoPathView`` — a selection over
2-paths with at least one cross-edge predicate — partitioned primarily
by the **bound edge's id**.  For each bound edge the list stores the
qualifying adjacent edges of the anchor vertex (the bound edge's source
or destination, per the view's orientation) as offsets into that
vertex's default ID list, exactly as Section 3 prescribes:
"an edge-bound list for e=(v_s, v_d) is a subset of either v_s's or
v_d's default ID list".

List rows carry ``bid`` (bound edge id), ``anchor`` (the vertex whose
default list the offsets point into — the paper stores this page
association for maintenance, Section 4.3), the index's own partition
columns, the offset array, and the pre-joined ``ref`` ID-list array.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import cached_property

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.config import IndexConfig
from repro.core.default_index import DefaultIndex
from repro.core.views import TwoPathView
from repro.core.vertex_bound import _canon_prop


def twopath_entity_resolver(anchor: str):
    """Column resolver for TwoPathView predicates over the joined
    (bound edge × adjacent flat edge) DataFrame.

    Bound-edge columns are prefixed ``b_``; adjacent-edge and neighbour
    columns come from the default index's flat layout.  ``v_shared`` is
    the anchor vertex (its properties ride along as ``self_*`` on the
    adjacent edge).
    """

    def resolve(ref: tuple[str, str]) -> Column:
        ent, prop = ref[0], _canon_prop(ref[1])
        if ent == "e_b":
            return F.col("bid") if prop == "vid" else F.col(f"b_{prop}")
        if ent == "e_adj":
            return F.col("eid") if prop == "vid" else F.col(prop)
        if ent == "v_nbr":
            return F.col("nbr") if prop == "vid" else F.col(f"nbr_{prop}")
        if ent == "v_shared":
            return F.col("pk") if prop == "vid" else F.col(f"self_{prop}")
        raise KeyError(f"cannot resolve {ent}.{prop} in 2-path context")

    return resolve


@dataclass
class EdgeBoundIndex:
    """A secondary edge-bound A+ index."""

    name: str
    view: TwoPathView
    config: IndexConfig
    base: DefaultIndex  # default index of the *adjacent* edges' direction
    lists: DataFrame = field(repr=False)  # bid, anchor, part…, offsets, ref
    #: row-form (bid, anchor, part…, sort…, pos) for pre-filtered reads
    flat_offsets: DataFrame = field(repr=False, default=None)

    @property
    def orientation(self):
        return self.view.orientation

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
        """Total indexed 2-paths (|E_indexed| in Table 6)."""
        return (
            self.lists.select(F.sum(F.size("offsets")).alias("n"))
            .collect()[0]["n"] or 0
        )

    @cached_property
    def memory_bytes(self) -> int:
        from repro.storage.memory import offset_index_bytes

        return offset_index_bytes(
            self.lists,
            n_layer_keys=len(self.config.partition_cols),
            per_list_key_bytes=8,  # bound-edge id keys the list (Section 4.3)
        )

    def unpersist(self) -> None:
        self.lists.unpersist()
        if self.flat_offsets is not None:
            self.flat_offsets.unpersist()


def build_edge_bound(
    base: DefaultIndex,
    view: TwoPathView,
    config: IndexConfig,
    *,
    name: str | None = None,
) -> EdgeBoundIndex:
    """Materialize an edge-bound index.

    ``base`` must be the default index of the orientation's adjacent
    direction (fw/bw), because the offsets point into its ID lists.
    """
    o = view.orientation
    if base.direction != o.adj_dir:
        raise ValueError(
            f"edge-bound view {view.name!r} ({o.name}) needs the "
            f"{o.adj_dir} default index, got {base.direction}"
        )
    if config.direction != o.adj_dir:
        raise ValueError(
            "edge-bound config.direction must equal the orientation's "
            f"adjacent direction {o.adj_dir!r}"
        )
    name = name or f"EB.{view.name}"

    graph = base.graph
    eprops = [c for c in graph.edges.columns if c not in ("eid", "src", "dst")]
    bound = graph.edges.select(
        F.col("eid").alias("bid"),
        F.col(o.anchor).alias("__anchor"),
        *[F.col(p).alias(f"b_{p}") for p in eprops],
    )
    joined = bound.join(base.flat, bound["__anchor"] == base.flat["pk"], "inner")
    # Exclude the bound edge itself from its own neighbourhood: a 2-path
    # is two distinct edges (relevant for reciprocal edges in bw lists).
    joined = joined.where(F.col("bid") != F.col("eid"))
    resolve = twopath_entity_resolver(o.anchor)
    for atom in view.predicates:
        joined = joined.where(atom.to_spark(resolve))

    part_cols = list(config.partition_cols)
    sort_cols = list(config.sort_cols)
    missing = [c for c in (*part_cols, *sort_cols) if c not in base.flat.columns]
    if missing:
        raise ValueError(f"index {name!r}: unknown columns {missing}")
    entry_fields = list(dict.fromkeys([*sort_cols, "eid", "pos"]))
    entry = F.struct(*[F.col(c) for c in entry_fields])
    sorted_entries = F.sort_array(F.collect_list(entry))
    aggs = [
        F.transform(sorted_entries, lambda s: s["pos"]).alias("offsets")
    ]
    if sort_cols:
        # aligned sort-key array for pre-gather pruning (see
        # vertex_bound.build_vertex_bound)
        aggs.append(
            F.transform(
                sorted_entries,
                lambda s: F.struct(*[s[c].alias(c) for c in sort_cols]),
            ).alias("skeys")
        )
    lists = joined.groupBy(
        "bid", F.col("__anchor").alias("anchor"), *part_cols
    ).agg(*aggs)
    ref = base.vertex_lists.select(
        F.col("pk").alias("__rpk"), F.col("lst").alias("ref")
    )
    lists = (
        lists.join(ref, lists["anchor"] == ref["__rpk"], "inner")
        .drop("__rpk")
        .repartition("bid")
        .persist()
    )
    lists.count()
    # row-form for pre-filtered reads (see vertex_bound counterpart)
    flat_offsets = (
        joined.select(
            "bid", F.col("__anchor").alias("anchor"),
            *part_cols, *sort_cols, "pos",
        )
        .repartition("bid")
        .persist()
    )
    flat_offsets.count()
    return EdgeBoundIndex(
        name=name, view=view, config=config, base=base, lists=lists,
        flat_offsets=flat_offsets,
    )
