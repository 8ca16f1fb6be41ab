"""Table 3 benchmark: the 13 labelled subgraph queries under the three
default-index configurations (full 4-dataset grid lives in
``jobs/table3_reconfig.py``; the benchmark times the smallest and the
largest dataset)."""
import pytest

from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.engine.optimizer import Optimizer
from repro.storage.memory import config_mm_mb
from repro.workloads.harness import SQ_LABELS, sq_dataset
from repro.workloads.setups import build_D, build_Dp, build_Ds
from repro.workloads.subgraph_queries import sq_workload

DATASETS = ("brk", "ork")
CONFIGS = {"D": build_D, "Ds": build_Ds, "Dp": build_Dp}

_cache: dict = {}


def _setup(spark, ds, config):
    key = (ds, config)
    if key not in _cache:
        gkey = ("g", ds)
        if gkey not in _cache:
            g = sq_dataset(spark, ds)
            _cache[gkey] = (g, Catalogue.build(g))
        g, cat = _cache[gkey]
        store = CONFIGS[config](g)
        _cache[key] = (EngineContext(g, store), cat, config_mm_mb(store))
    return _cache[key]


@pytest.mark.parametrize("config", list(CONFIGS))
@pytest.mark.parametrize("ds", DATASETS)
def test_sq_workload(benchmark, spark, ds, config):
    ctx, cat, mm = _setup(spark, ds, config)
    i, j = SQ_LABELS[ds]
    queries = sq_workload(n_vlabels=i, n_elabels=j)
    plans = {n: Optimizer(ctx, cat).plan(q) for n, q in queries.items()}

    def run_all():
        return {n: p.count(ctx) for n, p in plans.items()}

    counts = benchmark.pedantic(run_all, rounds=1, iterations=1, warmup_rounds=1)
    benchmark.extra_info["mm_mb"] = round(mm, 2)
    benchmark.extra_info["result_counts"] = counts
    assert sum(counts.values()) > 0
