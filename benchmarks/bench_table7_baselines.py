"""Table 7 benchmark: GF vs TG-like vs N4-like on the WT analog
(both datasets run in jobs/table7_baselines.py)."""
import pytest

from repro.engine.baselines import BASELINES, plan_with
from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.graphs.generators import dataset
from repro.workloads.harness import scale
from repro.workloads.setups import build_D, build_Dp
from repro.workloads.subgraph_queries import sq_workload

QUERIES = ("SQ1", "SQ2", "SQ3", "SQ13")

_cache: dict = {}


def _setup(spark, engine):
    if "g" not in _cache:
        g = dataset(spark, "wt", scale=scale(), n_vlabels=4, n_elabels=2).cache()
        _cache["g"] = (g, Catalogue.build(g))
    g, cat = _cache["g"]
    if engine not in _cache:
        store = build_Dp(g) if engine == "GF" else build_D(g)
        _cache[engine] = EngineContext(g, store)
    return _cache[engine], cat


@pytest.mark.parametrize("engine", list(BASELINES))
def test_baseline_engines(benchmark, spark, engine):
    ctx, cat = _setup(spark, engine)
    qs = sq_workload(n_vlabels=4, n_elabels=2)
    plans = {n: plan_with(engine, ctx, cat, qs[n]) for n in QUERIES}

    def run_all():
        return {n: p.count(ctx) for n, p in plans.items()}

    counts = benchmark.pedantic(run_all, rounds=1, iterations=1, warmup_rounds=1)
    benchmark.extra_info["result_counts"] = counts
