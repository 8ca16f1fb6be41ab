"""Section-4.4 maintenance: buffered inserts, tombstoned deletes, and
VB/EB delta maintenance converge to the bulk-built state."""
import numpy as np
import pytest

from repro.storage.maintenance import (
    BUFFER_FRAC,
    Edge,
    EdgeBoundPages,
    MaintenanceSystem,
    VertexBoundPages,
    VertexPages,
    build_system,
)


def _edges(n, n_vertices, seed=0):
    rng = np.random.default_rng(seed)
    out = []
    for i in range(n):
        u, v = rng.integers(0, n_vertices, 2)
        while v == u:
            v = rng.integers(0, n_vertices)
        out.append(Edge(i, int(u), int(v),
                        f"E{int(rng.integers(0, 2))}",
                        int(rng.integers(0, 1000))))
    return out


def test_insert_then_read():
    pages = VertexPages(100, "fw")
    pages.insert(Edge(0, 1, 2, "E0", 10))
    pages.insert(Edge(1, 1, 3, "E0", 5))
    got = pages.neighbourhood(1)
    assert sorted(t[1] for t in got) == [0, 1]


def test_merge_triggered_and_sorted():
    pages = VertexPages(64, "fw")
    es = _edges(200, 10)
    for e in es:
        pages.insert(e)
    assert pages.merges > 0
    pages.flush()
    for v in range(10):
        lst = pages.neighbourhood(v)
        nbrs = [t[0] for t in lst]  # sort key = nbr id by default
        assert nbrs == sorted(nbrs)
    assert pages.total_entries() == 200


def test_delete_tombstone():
    pages = VertexPages(64, "fw")
    e = Edge(7, 1, 2, "E0", 0)
    pages.insert(e)
    pages.delete(e)
    # tombstone may still sit in the buffer; a merged read hides it
    assert all(t[1] != 7 for t in pages.neighbourhood(1))


def test_backward_direction_partitions_by_dst():
    pages = VertexPages(64, "bw")
    pages.insert(Edge(0, 1, 2, "E0", 0))
    assert [t[1] for t in pages.neighbourhood(2)] == [0]
    assert pages.neighbourhood(1) == []


def test_buffer_cap_tracks_page_size():
    pages = VertexPages(64, "fw")
    for e in _edges(500, 5, seed=2):
        pages.insert(e)
    page = pages.pages[0]
    assert page.cap == max(8, int(BUFFER_FRAC * page.size))


def test_vertex_bound_predicate_filters():
    fw = VertexPages(64, "fw")
    vb = VertexBoundPages(fw, pred=lambda e: e.time < 100,
                          sortkey=lambda e, nbr: e.time)
    n_pass = 0
    for e in _edges(300, 20, seed=3):
        fw.insert(e)
        vb.insert(e)
        n_pass += e.time < 100
    assert vb.indexed == n_pass > 0


def test_vb_offsets_resolve_into_base():
    fw = VertexPages(64, "fw")
    vb = VertexBoundPages(fw, sortkey=lambda e, nbr: e.time)
    es = _edges(300, 10, seed=4)
    for e in es:
        fw.insert(e)
        vb.insert(e)
    for page in vb.pages:
        vb._merge(page)
    for page in vb.pages:
        for v, groups in page.lists.items():
            base = [t[1] for t in fw.neighbourhood(v)]
            for _, eid, off in groups[None]:
                if off >= 0:
                    assert base[off] == eid


def test_eb_matches_bruteforce():
    """After streaming inserts, EB lists equal the bulk 2-path join."""
    alpha = 200
    sys = build_system("Dps+EBt", 64, eb_alpha=alpha)
    es = _edges(400, 12, seed=5)
    for e in es:
        sys.insert(e)
    want = set()
    for eb in es:
        for ea in es:
            if ea.eid == eb.eid:
                continue
            if ea.src == eb.src and eb.time < ea.time + alpha:
                want.add((eb.eid, ea.eid))
    got = {
        (bid, t[1])
        for anchor, per_bid in sys.eb.lists.items()
        for bid, lst in per_bid.items()
        for t in lst
    }
    assert got == want


def test_build_system_variants():
    for name in ("Ds", "Dp", "Dps", "Dps+VBt"):
        s = build_system(name, 64)
        for e in _edges(100, 8, seed=6):
            s.insert(e)
        assert s.fw.total_entries() == 100
    with pytest.raises(ValueError):
        build_system("Dps+EBt", 64)
    with pytest.raises(KeyError):
        build_system("nope", 64)


def test_eb_is_much_more_work_than_vb():
    """§5.5 shape: EB maintenance does O(degree) predicate work per
    insert, so it processes far more candidate pairs."""
    import time

    es = _edges(3000, 50, seed=7)
    t0 = time.perf_counter()
    s1 = build_system("Dps", 50)
    for e in es:
        s1.insert(e)
    t_base = time.perf_counter() - t0
    t0 = time.perf_counter()
    s2 = build_system("Dps+EBt", 50, eb_alpha=10)
    for e in es:
        s2.insert(e)
    t_eb = time.perf_counter() - t0
    assert t_eb > 2 * t_base
