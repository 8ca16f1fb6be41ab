"""Table 6 benchmark: the 2-edge money-flow query on the LJ analog,
D vs D+EB_c, with the α window at 25% / 5% / 0.05% selectivity."""
import pytest

from repro.engine.catalogue import Catalogue
from repro.engine.operators import EngineContext
from repro.engine.optimizer import Optimizer
from repro.graphs.financial import calibrate_alpha
from repro.storage.memory import config_mm_mb
from repro.workloads.harness import mf_dataset
from repro.workloads.moneyflow import mf_2path
from repro.workloads.setups import add_EBc, build_D, flow_sel_hints

_cache: dict = {}

SELECTIVITIES = (0.25, 0.05, 0.0005)


def _setup(spark, sel, config):
    if "g" not in _cache:
        _cache["g"] = mf_dataset(spark, "lj")
    g = _cache["g"]
    key = (sel, config)
    if key not in _cache:
        alpha = calibrate_alpha(g, sel)
        store = build_D(g)
        if config == "D+EBc":
            add_EBc(store, alpha)
        cat = Catalogue.build(g, flow_sel_hints(alpha, sel))
        n_idx = store.edge_bound[0].num_entries if store.edge_bound else 0
        _cache[key] = (EngineContext(g, store), alpha, cat,
                       config_mm_mb(store), n_idx)
    return _cache[key]


@pytest.mark.parametrize("config", ("D", "D+EBc"))
@pytest.mark.parametrize("sel", SELECTIVITIES)
def test_selectivity_sweep(benchmark, spark, sel, config):
    ctx, alpha, cat, mm, n_idx = _setup(spark, sel, config)
    plan = Optimizer(ctx, cat).plan(mf_2path(alpha))
    n = benchmark.pedantic(lambda: plan.count(ctx), rounds=1, iterations=1, warmup_rounds=1)
    benchmark.extra_info.update(
        mm_mb=round(mm, 2), E_indexed=n_idx, alpha=alpha, rows=n
    )
