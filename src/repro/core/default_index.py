"""Default A+ indexes (Section 2.1) as materialized Spark DataFrames.

A default index (one per direction) is built in three cached artifacts:

* ``flat`` — one row per adjacent edge: ``pk`` (the partitioning
  vertex), ``nbr``, ``eid``, all edge properties, neighbour vertex
  properties (``nbr_*``), own vertex properties (``self_*``), and
  ``pos`` — the edge's offset within its vertex's full neighbourhood in
  canonical CSR order.  ``pos`` is what secondary indexes' offset lists
  point at (Section 3).
* ``lists`` — the nested-CSR analog: one row per
  ``(pk, partition-col values)`` holding the sorted most-granular list
  as an array of structs.  Partition-column equality predicates become
  *lookup keys* here (constant-time granular-list access); sort columns
  order the array (binary-search-style access via array pruning).
* ``vertex_lists`` — one row per vertex with the full neighbourhood
  array in ``pos`` order (the contiguous CSR neighbourhood that offset
  lists index into).

Canonical order within a vertex is ``(partition cols, sort cols, eid)``
ascending, nulls first (Spark struct comparison places nulls first;
the paper places null partitions last — an ordering convention only,
documented in DESIGN.md).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import cached_property

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.config import IndexConfig
from repro.graphs.schema import PropertyGraph


def _flat_edges(graph: PropertyGraph, direction: str) -> DataFrame:
    """Per-edge rows with pk/nbr endpoints and both vertices' props."""
    e = graph.edges
    pk, nbr = ("src", "dst") if direction == "fw" else ("dst", "src")
    edge_props = [c for c in e.columns if c not in ("eid", "src", "dst")]
    flat = e.select(
        F.col(pk).alias("pk"), F.col(nbr).alias("nbr"), "eid", *edge_props
    )
    vprops = [c for c in graph.vertices.columns if c != "vid"]
    nbr_v = graph.vertices.select(
        F.col("vid").alias("__nv"), *[F.col(p).alias(f"nbr_{p}") for p in vprops]
    )
    self_v = graph.vertices.select(
        F.col("vid").alias("__sv"), *[F.col(p).alias(f"self_{p}") for p in vprops]
    )
    flat = flat.join(nbr_v, flat["nbr"] == nbr_v["__nv"], "left").drop("__nv")
    flat = flat.join(self_v, flat["pk"] == self_v["__sv"], "left").drop("__sv")
    return flat


def canonical_order_cols(config: IndexConfig) -> list[str]:
    """The columns defining a vertex's CSR neighbourhood order."""
    return list(dict.fromkeys([*config.partition_cols, *config.sort_cols, "eid"]))


@dataclass
class DefaultIndex:
    """One direction of the system's default A+ index."""

    name: str
    graph: PropertyGraph
    config: IndexConfig
    flat: DataFrame = field(repr=False)
    lists: DataFrame = field(repr=False)
    vertex_lists: DataFrame = field(repr=False)
    struct_fields: tuple[str, ...] = ()

    @property
    def direction(self) -> str:
        return self.config.direction

    def granular_lists(self, part_eq: dict[str, object]) -> DataFrame:
        """Lists narrowed by equality on partition columns.

        Keys must be partition columns of this index — the analog of
        descending the CSR layers without evaluating predicates.
        """
        bad = set(part_eq) - set(self.config.partition_cols)
        if bad:
            raise KeyError(
                f"{sorted(bad)} are not partition columns of index "
                f"{self.name!r} (has {self.config.partition_cols})"
            )
        df = self.lists
        for c, v in part_eq.items():
            df = df.where(F.col(c).eqNullSafe(F.lit(v)))
        return df

    @cached_property
    def memory_bytes(self) -> int:
        """Structural size per the storage model (for Mm columns)."""
        from repro.storage.memory import default_index_bytes

        return default_index_bytes(self)

    def unpersist(self) -> None:
        for df in (self.flat, self.lists, self.vertex_lists):
            df.unpersist()


def build_default_index(
    graph: PropertyGraph, config: IndexConfig, *, name: str | None = None
) -> DefaultIndex:
    """Build and materialize one default A+ index."""
    name = name or f"D.{config.direction}"
    flat = _flat_edges(graph, config.direction)
    order_cols = canonical_order_cols(config)
    missing = [c for c in order_cols if c not in flat.columns]
    if missing:
        raise ValueError(
            f"index {name!r}: partition/sort columns {missing} not in graph "
            f"(have {sorted(flat.columns)})"
        )
    w = Window.partitionBy("pk").orderBy(
        *[F.col(c).asc_nulls_first() for c in order_cols]
    )
    flat = flat.withColumn("pos", F.row_number().over(w) - F.lit(1))

    # ID lists carry exactly what the paper's lists carry: the edge and
    # neighbour ids plus the partition/sort key values.  Any *other*
    # property read costs a property-store join at query time
    # (operators._fetch_missing_props) — the cost asymmetry that makes
    # partitioning/sorting on a property worth it (Sections 1–2).
    struct_fields = tuple(
        dict.fromkeys(
            [*config.partition_cols, *config.sort_cols, "eid", "nbr"]
        )
    )
    entry = F.struct(*[F.col(c) for c in struct_fields])

    lists = (
        flat.groupBy("pk", *config.partition_cols)
        .agg(F.sort_array(F.collect_list(entry)).alias("lst"))
        # plain neighbour-id arrays, materialized once at build time so
        # WCO intersections read them without per-element lambdas
        .withColumn("nbr_ids", F.expr("transform(lst, s -> s.nbr)"))
    )
    vertex_lists = (
        flat.groupBy("pk")
        .agg(F.sort_array(F.collect_list(entry)).alias("lst"))
    )

    flat = flat.repartition("pk").persist()
    lists = lists.repartition("pk").persist()
    vertex_lists = vertex_lists.repartition("pk").persist()
    # Materialize now so benchmarks time queries, not index builds.
    flat.count(), lists.count(), vertex_lists.count()
    return DefaultIndex(
        name=name,
        graph=graph,
        config=config,
        flat=flat,
        lists=lists,
        vertex_lists=vertex_lists,
        struct_fields=struct_fields,
    )


def gather(vertex_lists_col: Column, offsets_col: Column) -> Column:
    """Resolve an offset list against a vertex's ID-list array.

    ``element_at`` is 1-based; offsets are 0-based positions (``pos``).
    This is the engine-layer analog of reading ID lists through offset
    lists — a per-entry indirection, paid at query time.
    """
    return F.transform(
        offsets_col, lambda o: F.element_at(vertex_lists_col, o + 1)
    )
