"""Memory model (Mm columns): identities against the byte widths of
Sections 3–4.3 and the paper's headline ratios on analog data."""
import pytest
from pyspark.sql import functions as F

from repro.core.config import EDGE, NBR, IndexConfig, graphflow_default
from repro.core.default_index import build_default_index
from repro.core.edge_bound import build_edge_bound
from repro.core.index_store import IndexStore
from repro.core.vertex_bound import build_vertex_bound
from repro.core.views import DST_FW, EdgeView, TwoPathView
from repro.core.config import Atom
from repro.graphs.financial import decorate_financial
from repro.graphs.generators import dataset
from repro.storage.csr import build_csr
from repro.storage.memory import (
    config_mm_mb,
    copied_id_index_bytes,
    default_index_bytes,
    offset_index_bytes,
    store_bytes,
)


@pytest.fixture(scope="module")
def g(spark):
    return decorate_financial(dataset(spark, "brk", scale="tiny")).cache()


@pytest.fixture(scope="module")
def fw(g):
    return build_default_index(g, graphflow_default("fw"))


@pytest.fixture(scope="module")
def bw(g):
    return build_default_index(g, graphflow_default("bw"))


def test_default_bytes_identity(g, fw):
    """12 B per edge + 4 B per vertex offset + 5 B per layer cell."""
    e, v = g.num_edges, g.num_vertices
    groups = fw.flat.select("pk", "elabel").distinct().count()
    assert default_index_bytes(fw) == 12 * e + 4 * (v + 1) + 5 * groups


def test_default_bytes_match_csr_model(g, fw):
    csr = build_csr(g, fw.config)
    assert default_index_bytes(fw) == csr.total_bytes()


def test_reconfigured_sort_costs_nothing(g, fw):
    """D_s: changing only the sort criteria has zero memory cost."""
    ds = build_default_index(
        g,
        IndexConfig("fw", partition_by=((EDGE, "elabel"),),
                    sort_by=((NBR, "city"),)),
    )
    assert default_index_bytes(ds) == default_index_bytes(fw)
    ds.unpersist()


def test_added_partition_layer_is_minor(g, fw):
    """D_p: one extra layer costs a few percent (paper: 1.05–1.15x)."""
    dp = build_default_index(
        g,
        IndexConfig("fw", partition_by=((EDGE, "elabel"), (NBR, "acc")),
                    sort_by=((NBR, "vid"),)),
    )
    ratio = default_index_bytes(dp) / default_index_bytes(fw)
    assert 1.0 < ratio < 1.25
    dp.unpersist()


@pytest.fixture(scope="module")
def vb(fw):
    return build_vertex_bound(
        fw, EdgeView("all"),
        IndexConfig("fw", partition_by=((EDGE, "elabel"),),
                    sort_by=((EDGE, "date"),)),
    )


def test_vb_overhead_matches_paper_regime(g, fw, bw, vb):
    """A forward-only no-predicate VB index over D(fw+bw) costs ~1.08x
    total (Table 4's Mm column: 1.07–1.08x)."""
    d_total = default_index_bytes(fw) + default_index_bytes(bw)
    overhead = vb.memory_bytes / d_total
    assert 0.03 < overhead < 0.15


def test_vb_offsets_far_cheaper_than_copied_ids(vb):
    assert vb.memory_bytes < 0.25 * copied_id_index_bytes(vb.lists)


def test_offset_bytes_formula(spark, vb):
    rows = vb.lists.select(
        F.size("offsets").alias("n"),
        F.coalesce(F.array_max("offsets"), F.lit(0)).alias("mx"),
    ).collect()
    want = 0
    for r in rows:
        width = 1 if r["mx"] < 256 else (2 if r["mx"] < 65536 else 4)
        want += 1 + r["n"] * width
    assert offset_index_bytes(vb.lists, n_layer_keys=0) == want


def test_eb_overhead_larger_but_bounded(g, fw, bw):
    eb = build_edge_bound(
        fw,
        TwoPathView(
            "mf", DST_FW,
            (Atom(("e_b", "date"), "<", ("e_adj", "date")),
             Atom(("e_adj", "amt"), "<", ("e_b", "amt"))),
        ),
        IndexConfig("fw", sort_by=((NBR, "city"),)),
    )
    d_total = default_index_bytes(fw) + default_index_bytes(bw)
    ratio = (d_total + eb.memory_bytes) / d_total
    # Table 5 regime: EB roughly doubles memory when it indexes ~4x the
    # edges; our no-label analog indexes ~25% of 2-paths
    assert 1.05 < ratio < 4.0
    eb.unpersist()


def test_store_bytes_and_mm(g, fw, bw, vb):
    store = IndexStore(fw, bw)
    store.add(vb)
    per = store_bytes(store)
    assert set(per) == {"D.fw", "D.bw", vb.name}
    assert config_mm_mb(store) == pytest.approx(sum(per.values()) / 1e6)
