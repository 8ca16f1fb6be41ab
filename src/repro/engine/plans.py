"""Query plans: a sequence of operators folded over a match DataFrame."""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from repro.engine.operators import EngineContext


@dataclass(frozen=True)
class Plan:
    """An executable plan for one :class:`QueryGraph`."""

    name: str
    ops: tuple

    def __post_init__(self) -> None:
        if not self.ops:
            raise ValueError("empty plan")

    def execute(self, ctx: EngineContext) -> DataFrame:
        df: DataFrame | None = None
        for op in self.ops:
            df = op.apply(ctx, df)
        return df

    def count(self, ctx: EngineContext) -> int:
        """Run the plan to completion (the benchmark action)."""
        return self.execute(ctx).count()

    def explain(self) -> str:
        return f"PLAN {self.name}\n  " + "\n  ".join(
            op.describe() for op in self.ops
        )
