"""Table 4 benchmark: MagicRecs MR1–MR3 under D and D+VB_t."""
import pytest

from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.engine.optimizer import Optimizer
from repro.graphs.financial import time_threshold
from repro.storage.memory import config_mm_mb
from repro.workloads.harness import mr_dataset
from repro.workloads.magicrecs import TIME_SELECTIVITY, mr_workload
from repro.workloads.setups import add_VBt, build_D, time_sel_hints

DATASETS = ("brk", "lj")

_cache: dict = {}


def _setup(spark, ds, config):
    key = (ds, config)
    if key not in _cache:
        gkey = ("g", ds)
        if gkey not in _cache:
            g = mr_dataset(spark, ds)
            tau = time_threshold(g, TIME_SELECTIVITY)
            _cache[gkey] = (g, tau, Catalogue.build(g, time_sel_hints(tau)))
        g, tau, cat = _cache[gkey]
        store = build_D(g)
        if config == "D+VBt":
            add_VBt(store)
        _cache[key] = (EngineContext(g, store), tau, cat,
                       config_mm_mb(store))
    return _cache[key]


@pytest.mark.parametrize("config", ("D", "D+VBt"))
@pytest.mark.parametrize("ds", DATASETS)
def test_magicrecs(benchmark, spark, ds, config):
    ctx, tau, cat, mm = _setup(spark, ds, config)
    anchor = {4: max(200, ctx.graph.num_vertices // 3)} if ds == "lj" else {}
    queries = mr_workload(tau=tau, anchor_max=anchor)
    plans = {n: Optimizer(ctx, cat).plan(q) for n, q in queries.items()}

    def run_all():
        return {n: p.count(ctx) for n, p in plans.items()}

    counts = benchmark.pedantic(run_all, rounds=1, iterations=1, warmup_rounds=1)
    benchmark.extra_info["mm_mb"] = round(mm, 2)
    benchmark.extra_info["result_counts"] = counts
