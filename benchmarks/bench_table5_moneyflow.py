"""Table 5 benchmark: MF1–MF5 under D / D+VB_c / D+VB_c+EB_c on the
LJ analog (the full 3-dataset grid lives in jobs/table5_moneyflow.py)."""
import pytest

from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.engine.optimizer import Optimizer
from repro.graphs.financial import calibrate_alpha
from repro.storage.memory import config_mm_mb
from repro.workloads.harness import mf_dataset
from repro.workloads.moneyflow import ALPHA_SELECTIVITY, mf_workload
from repro.workloads.setups import add_EBc, add_VBc, build_D, flow_sel_hints

_cache: dict = {}

EB_QUERIES = ("MF3", "MF4", "MF5")


def _setup(spark, config):
    if "g" not in _cache:
        g = mf_dataset(spark, "lj")
        alpha = calibrate_alpha(g, ALPHA_SELECTIVITY)
        beta = g.vertices.groupBy("city").count().orderBy(
            "count", ascending=False
        ).first()["city"]
        cat = Catalogue.build(g, flow_sel_hints(alpha, ALPHA_SELECTIVITY))
        _cache["g"] = (g, alpha, beta, cat)
    g, alpha, beta, cat = _cache["g"]
    if config not in _cache:
        store = build_D(g)
        if config != "D":
            add_VBc(store)
        if config == "D+VBc+EBc":
            add_EBc(store, alpha)
        _cache[config] = (EngineContext(g, store), config_mm_mb(store))
    ctx, mm = _cache[config]
    return ctx, alpha, beta, cat, mm


@pytest.mark.parametrize("config", ("D", "D+VBc", "D+VBc+EBc"))
def test_moneyflow(benchmark, spark, config):
    ctx, alpha, beta, cat, mm = _setup(spark, config)
    anchor = max(100, ctx.graph.num_vertices // 4)
    queries = mf_workload(alpha, anchor_max=anchor, beta_city=beta)
    if config == "D+VBc+EBc":
        queries = {k: v for k, v in queries.items() if k in EB_QUERIES}
    plans = {n: Optimizer(ctx, cat).plan(q) for n, q in queries.items()}

    def run_all():
        return {n: p.count(ctx) for n, p in plans.items()}

    counts = benchmark.pedantic(run_all, rounds=1, iterations=1, warmup_rounds=1)
    benchmark.extra_info["mm_mb"] = round(mm, 2)
    benchmark.extra_info["result_counts"] = counts
