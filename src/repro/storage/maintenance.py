"""Index maintenance (Section 4.4): update-buffered pages, tombstones,
and delta-query maintenance of secondary indexes.

Spark DataFrames are immutable, so single-edge maintenance — the thing
Section 5.5 benchmarks — is implemented on the NumPy/Python page model
that mirrors the paper's physical design: vertex-grouped pages (64
vertices per page), an update buffer per data page sized at 20% of the
page, merges when the buffer fills, deletions as tombstones applied at
merge.  Vertex-bound indexes run their view predicate per insert and
buffer offset-list updates; edge-bound indexes run the two
*delta queries* per insert (the new edge as an adjacent edge of
existing bound edges, and a new list for the new edge as a bound edge).
"""
from __future__ import annotations

import bisect
from collections import namedtuple
from dataclasses import dataclass, field
from typing import Callable

#: the edge record used throughout maintenance
Edge = namedtuple("Edge", ["eid", "src", "dst", "elabel", "time"])

GROUP = 64  # vertices per data page (Section 4.3)
BUFFER_FRAC = 0.2  # update buffer = 20% of data page (Section 4.4)
MIN_CAP = 8


@dataclass
class _Page:
    lists: dict = field(default_factory=dict)  # vid -> gkey -> sorted list
    size: int = 0
    buf: list = field(default_factory=list)
    cap: int = MIN_CAP


class VertexPages:
    """One direction of a default A+ index under maintenance.

    ``partition`` maps an edge to its secondary-partition key (or a
    constant); ``sortkey`` maps (edge, nbr) to the in-list sort key —
    by default the neighbour id, the system's default sort.
    """

    def __init__(
        self,
        n_vertices: int,
        direction: str,
        partition: Callable[[Edge], object] | None = None,
        sortkey: Callable[[Edge, int], object] | None = None,
    ) -> None:
        self.direction = direction
        self.partition = partition or (lambda e: None)
        self.sortkey = sortkey or (lambda e, nbr: nbr)
        self.pages = [_Page() for _ in range(n_vertices // GROUP + 1)]
        self.merges = 0

    def _endpoints(self, e: Edge) -> tuple[int, int]:
        return (e.src, e.dst) if self.direction == "fw" else (e.dst, e.src)

    def insert(self, e: Edge) -> None:
        pk, nbr = self._endpoints(e)
        page = self.pages[pk // GROUP]
        page.buf.append(("ins", pk, self.partition(e),
                         self.sortkey(e, nbr), e.eid, nbr))
        if len(page.buf) >= page.cap:
            self._merge(page)

    def delete(self, e: Edge) -> None:
        """Deletions leave a tombstone until the next merge."""
        pk, _ = self._endpoints(e)
        page = self.pages[pk // GROUP]
        page.buf.append(("del", pk, self.partition(e), None, e.eid, None))
        if len(page.buf) >= page.cap:
            self._merge(page)

    def flush(self) -> None:
        """Merge every pending buffer (deterministic reads in tests)."""
        for page in self.pages:
            if page.buf:
                self._merge(page)

    def _merge(self, page: _Page) -> None:
        self.merges += 1
        for op, pk, gkey, sk, eid, nbr in page.buf:
            groups = page.lists.setdefault(pk, {})
            lst = groups.setdefault(gkey, [])
            if op == "ins":
                bisect.insort(lst, (sk, eid, nbr))
                page.size += 1
            else:  # tombstone: drop the entry if present
                for i, (_, e2, _) in enumerate(lst):
                    if e2 == eid:
                        del lst[i]
                        page.size -= 1
                        break
        page.buf.clear()
        page.cap = max(MIN_CAP, int(BUFFER_FRAC * page.size))

    def neighbourhood(self, v: int) -> list[tuple[object, int, int]]:
        """Merged read (data page + pending buffer) of v's full list."""
        page = self.pages[v // GROUP]
        out = [
            t for groups in (page.lists.get(v, {}),)
            for lst in groups.values() for t in lst
        ]
        pending_del = set()
        for op, pk, _, sk, eid, nbr in page.buf:
            if pk != v:
                continue
            if op == "ins":
                out.append((sk, eid, nbr))
            else:
                pending_del.add(eid)
        return [t for t in out if t[1] not in pending_del]

    def total_entries(self) -> int:
        return sum(p.size + sum(1 for b in p.buf if b[0] == "ins")
                   for p in self.pages)


class VertexBoundPages:
    """A secondary vertex-bound index under maintenance: runs the view
    predicate per insert, then buffers offset-list updates (offsets are
    resolved against the base index at merge time)."""

    def __init__(
        self,
        base: VertexPages,
        pred: Callable[[Edge], bool] | None = None,
        sortkey: Callable[[Edge, int], object] | None = None,
    ) -> None:
        self.base = base
        self.pred = pred
        self.sortkey = sortkey or (lambda e, nbr: nbr)
        self.pages = [_Page() for _ in range(len(base.pages))]
        self.indexed = 0

    def insert(self, e: Edge) -> None:
        if self.pred is not None and not self.pred(e):
            return
        pk, nbr = self.base._endpoints(e)
        page = self.pages[pk // GROUP]
        page.buf.append(("ins", pk, None, self.sortkey(e, nbr), e.eid, nbr))
        self.indexed += 1
        if len(page.buf) >= page.cap:
            self._merge(page)

    def _merge(self, page: _Page) -> None:
        touched = set()
        for op, pk, gkey, sk, eid, nbr in page.buf:
            lst = page.lists.setdefault(pk, {}).setdefault(None, [])
            bisect.insort(lst, (sk, eid, nbr))
            page.size += 1
            touched.add(pk)
        # resolve offsets against the base ID lists (realistic extra
        # work: position lookup per touched vertex)
        for v in touched:
            base_pos = {eid: i for i, (_, eid, _)
                        in enumerate(self.base.neighbourhood(v))}
            lst = page.lists[v][None]
            page.lists[v][None] = [
                (sk, eid, base_pos.get(eid, -1)) for sk, eid, _ in lst
            ]
        page.buf.clear()
        page.cap = max(MIN_CAP, int(BUFFER_FRAC * page.size))


class EdgeBoundPages:
    """A secondary edge-bound index under maintenance (Section 4.4).

    Per insert e=(u, v) it runs two delta queries: (1) find bound edges
    whose lists must gain ``e`` (loop the anchor vertex's default list
    in the bound direction, run the 2-path predicate per candidate);
    (2) build the new list for ``e`` as a bound edge (loop the anchor's
    adjacent list).  Lists are organized per anchor vertex, as the
    paper stores all edge lists pointing at a vertex's ID list on that
    vertex's page.
    """

    def __init__(
        self,
        fw: VertexPages,
        bw: VertexPages,
        edge_by_id: dict[int, Edge],
        pred: Callable[[Edge, Edge], bool],
        anchor: str = "dst",
        adj_dir: str = "fw",
    ) -> None:
        self.fw, self.bw = fw, bw
        self.edge_by_id = edge_by_id
        self.pred = pred
        self.anchor = anchor
        self.adj_dir = adj_dir
        #: anchor vid -> bound eid -> sorted list of (sortkey, eid, nbr)
        self.lists: dict[int, dict[int, list]] = {}
        self.indexed = 0

    def _anchor_of(self, e: Edge) -> int:
        return e.dst if self.anchor == "dst" else e.src

    def _adj_list(self, v: int):
        pages = self.fw if self.adj_dir == "fw" else self.bw
        return pages.neighbourhood(v)

    def _bound_list(self, v: int):
        pages = self.bw if self.anchor == "dst" else self.fw
        return pages.neighbourhood(v)

    def insert(self, e: Edge) -> None:
        # delta query 1: e as an adjacent edge of existing bound edges.
        # e lives in the adj_dir list of vertex w:
        w = e.src if self.adj_dir == "fw" else e.dst
        for _, beid, _ in self._bound_list(w):
            if beid == e.eid:
                continue
            e_b = self.edge_by_id.get(beid)
            if e_b is not None and self.pred(e_b, e):
                self._add(w, beid, e)
        # delta query 2: a new list for e as a bound edge.
        v = self._anchor_of(e)
        for _, aeid, _ in self._adj_list(v):
            if aeid == e.eid:
                continue
            e_adj = self.edge_by_id.get(aeid)
            if e_adj is not None and self.pred(e, e_adj):
                self._add(v, e.eid, e_adj)

    def _add(self, anchor_v: int, bid: int, e_adj: Edge) -> None:
        nbr = e_adj.dst if self.adj_dir == "fw" else e_adj.src
        lst = self.lists.setdefault(anchor_v, {}).setdefault(bid, [])
        bisect.insort(lst, (e_adj.time, e_adj.eid, nbr))
        self.indexed += 1


@dataclass
class MaintenanceSystem:
    """One index configuration under maintenance (a §5.5 row)."""

    name: str
    fw: VertexPages
    bw: VertexPages
    vb: VertexBoundPages | None = None
    eb: EdgeBoundPages | None = None
    edge_by_id: dict[int, Edge] = field(default_factory=dict)

    def insert(self, e: Edge) -> None:
        self.edge_by_id[e.eid] = e
        self.fw.insert(e)
        self.bw.insert(e)
        if self.vb is not None:
            self.vb.insert(e)
        if self.eb is not None:
            self.eb.insert(e)


def build_system(
    name: str, n_vertices: int, *, eb_alpha: float | None = None
) -> MaintenanceSystem:
    """The five §5.5 configurations.

    ``Ds``: no partitioning, sort by neighbour id.  ``Dp``: partition by
    edge label.  ``Dps``: partition + sort.  ``Dps+VBt``: adds a
    time-sorted vertex-bound index.  ``Dps+EBt``: adds an edge-bound
    index for the 2-path with predicate
    ``e_b.time < e_adj.time + alpha`` (alpha set by the caller to hit
    the paper's 1% selectivity).
    """
    by_label = (lambda e: e.elabel)
    by_time = (lambda e, nbr: e.time)
    if name == "Ds":
        fw = VertexPages(n_vertices, "fw")
        bw = VertexPages(n_vertices, "bw")
        return MaintenanceSystem(name, fw, bw)
    fw = VertexPages(n_vertices, "fw", partition=by_label)
    bw = VertexPages(n_vertices, "bw", partition=by_label)
    sys = MaintenanceSystem(name, fw, bw)
    if name in ("Dp", "Dps"):
        return sys
    if name == "Dps+VBt":
        sys.vb = VertexBoundPages(fw, pred=None, sortkey=by_time)
        return sys
    if name == "Dps+EBt":
        if eb_alpha is None:
            raise ValueError("Dps+EBt needs eb_alpha")
        sys.eb = EdgeBoundPages(
            fw, bw, sys.edge_by_id,
            pred=lambda eb, ea: eb.time < ea.time + eb_alpha,
            anchor="src", adj_dir="fw",
        )
        return sys
    raise KeyError(name)
