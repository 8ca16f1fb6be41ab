"""Shared test helpers: oracle-check an engine result against the
pattern's relational semantics on DuckDB."""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.engine.patterns import QueryGraph, pattern_to_sql
from repro.graphs.schema import PropertyGraph
from repro.oracle import assert_equivalent


def check_pattern(
    df: DataFrame,
    q: QueryGraph,
    g: PropertyGraph,
    *,
    project_vertices: tuple[str, ...] | None = None,
    project_edges: tuple[str, ...] = (),
) -> None:
    """Compare an engine match DataFrame with the DuckDB self-join."""
    pv = project_vertices if project_vertices is not None else q.vertex_names
    sel = df.select(
        *[F.col(v) for v in pv],
        *[F.col(f"{e}__eid").alias(e) for e in project_edges],
    )
    sql = pattern_to_sql(
        q, project_vertices=pv, project_edges=tuple(project_edges)
    )
    assert_equivalent(sel, sql, vertices=g.vertices, edges=g.edges)
