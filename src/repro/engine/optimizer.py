"""Dynamic-programming join optimizer with i-cost (Section 4.1).

For each k the optimizer finds the cheapest plan for every sub-query
over k query vertices, extending smaller sub-queries by

* an E/I operator (``Extend`` for one connecting edge, WCO-style
  ``IntersectExtend`` for z≥2 connecting edges on neighbour-id-sorted
  lists, or Extend+``CloseExtend`` when intersection is unavailable), or
* a ``MultiExtend`` operator when z≥2 *new* query vertices are linked
  by equality predicates on a common property and property-sorted lists
  exist for all of them (the paper's structurally-acyclic WCO plans).

For every extension the INDEX STORE is consulted for vertex- and
edge-bound indexes whose view predicates are subsumed by the
extension's predicates; every candidate access yields a plan
alternative.  The cost metric is **i-cost**: the estimated total length
of adjacency lists accessed.  A list narrowed by index partitioning, a
stored view predicate, or sorted-array pruning counts only its narrowed
length, while predicates evaluated per edge (``post_preds``) do not
shrink the accessed length — this asymmetry is what makes the optimizer
prefer A+ indexes that subsume predicates, as in the paper.

``PlannerOptions`` switches restrict the plan space; the Section-5.6
baseline engines are expressed as restrictions in
``repro.engine.baselines``.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, replace

from repro.core.config import NBR, Atom, propref_col
from repro.core.index_store import canon_atom, normalize_nbr_role
from repro.core.vertex_bound import _canon_prop
from repro.core.views import ORIENTATIONS
from repro.engine.catalogue import Catalogue
from repro.engine.operators import (
    CloseExtend,
    EngineContext,
    Extend,
    ExtTarget,
    FetchProps,
    Filter,
    IntersectExtend,
    ListAccess,
    MultiExtend,
    Scan,
)
from repro.engine.patterns import QEdge, QueryGraph
from repro.engine.plans import Plan

_EPS = 1e-9


@dataclass(frozen=True)
class PlannerOptions:
    """Plan-space switches (all on for the full A+ system)."""

    allow_intersect: bool = True
    allow_multi_extend: bool = True
    allow_vertex_bound: bool = True
    allow_edge_bound: bool = True
    allow_array_preds: bool = True  # sorted-list pruning
    allow_granular: bool = True  # partition-column lookup keys
    push_filters: bool = True  # False: defer all non-structural filters


@dataclass(frozen=True)
class AccessCand:
    """One way to read the adjacency list of an extension."""

    access: ListAccess
    from_var: str  # vertex var, or bound-edge var for edge-bound access
    est_accessed: float  # avg list length touched per partial match
    est_out: float  # avg entries surviving all predicates
    satisfied: frozenset  # canon forms of the query atoms it enforces
    post_atoms: tuple[Atom, ...]
    id_sorted: bool  # usable in neighbour-id intersections
    sort_field: str | None  # effective leading sort field after pruning


@dataclass(frozen=True)
class PState:
    bound_v: frozenset
    bound_e: frozenset
    props_v: frozenset  # vertex vars whose property columns are bound
    applied: frozenset  # canon atoms already enforced
    ops: tuple
    cost: float
    card: float


class Optimizer:
    def __init__(
        self,
        ctx: EngineContext,
        catalogue: Catalogue,
        options: PlannerOptions = PlannerOptions(),
    ) -> None:
        self.ctx = ctx
        self.cat = catalogue
        self.opt = options

    # ------------------------------------------------------------------
    def plan(self, q: QueryGraph) -> Plan:
        best: dict[frozenset, PState] = {}
        for v in q.vertices:
            st = self._scan_state(q, v.name)
            if st.bound_v not in best or st.cost < best[st.bound_v].cost:
                best[st.bound_v] = st
        for size in range(1, len(q.vertices)):
            for key in [k for k in best if len(k) == size]:
                for nxt in self._transitions(q, best[key]):
                    k2 = nxt.bound_v
                    if k2 not in best or nxt.cost < best[k2].cost:
                        best[k2] = nxt
        full = frozenset(q.vertex_names)
        if full not in best:
            raise ValueError(
                f"no plan found for query {q.name!r} (disconnected pattern "
                "or a predicate no allowed access path can enforce)"
            )
        final = self._apply_pending(q, best[full], force_all=True)
        remaining = [a for a in q.preds if canon_atom(a) not in final.applied]
        if remaining:
            raise ValueError(
                f"query {q.name!r}: predicates "
                f"{[str(a) for a in remaining]} reference variables no "
                "operator bound (e.g. closing-edge properties after an "
                "intersection)"
            )
        return Plan(q.name, final.ops)

    # ------------------------------------------------------------------
    def _scan_state(self, q: QueryGraph, var: str) -> PState:
        qv = q.vertex(var)
        if not self.opt.push_filters:
            return PState(
                frozenset({var}), frozenset(), frozenset({var}),
                frozenset(), (Scan(var),), 0.0,
                float(max(self.cat.n_vertices, 1)),
            )
        local = [
            a for a in q.preds if a.entities() == {var} and not a.rhs_is_ref
        ]
        card = self.cat.n_vertices * self.cat.vlabel_sel(qv.vlabel)
        for a in local:
            card *= self.cat.atom_sel(a)
        applied = {canon_atom(a) for a in local}
        if qv.vlabel is not None:
            applied.add(canon_atom(Atom((var, "vlabel"), "=", qv.vlabel)))
        return PState(
            frozenset({var}), frozenset(), frozenset({var}),
            frozenset(applied),
            (Scan(var, qv.vlabel, tuple(local)),),
            0.0, max(card, _EPS),
        )

    # ------------------------------------------------------------------
    def _transitions(self, q: QueryGraph, st: PState):
        one_edge: dict[str, list[QEdge]] = {}
        for x in (v for v in q.vertex_names if v not in st.bound_v):
            conn = [
                e for e in q.edges
                if (e.src == x and e.dst in st.bound_v)
                or (e.dst == x and e.src in st.bound_v)
            ]
            if conn:
                one_edge[x] = conn
                yield from self._extend_transitions(q, st, x, conn)
        if self.opt.allow_multi_extend:
            yield from self._multi_transitions(q, st, one_edge)

    # -- single-vertex E/I ---------------------------------------------
    def _extend_transitions(self, q, st, x, conn):
        cand_sets = [self._edge_candidates(q, st, c, x) for c in conn]
        if any(not cs for cs in cand_sets):
            return
        if len(conn) == 1:
            for cand in cand_sets[0]:
                evar = conn[0].name
                op = Extend(cand.from_var, x, evar, cand.access,
                            post_preds=cand.post_atoms)
                nxt = PState(
                    st.bound_v | {x}, st.bound_e | {evar},
                    st.props_v | {x}, st.applied | cand.satisfied,
                    st.ops + (op,),
                    st.cost + st.card * cand.est_accessed,
                    st.card * max(cand.est_out, _EPS),
                )
                yield self._apply_pending(q, nxt)
            return
        # z >= 2 WCO intersection: all lists id-sorted; predicates on the
        # closing edges must be enforced by the accesses (the new
        # vertex's own predicates can still be filtered afterwards).
        if self.opt.allow_intersect:
            usable = []
            for cs in cand_sets:
                ok = [
                    c for c in cs
                    if c.id_sorted
                    and all(a.entities() == {x} for a in c.post_atoms)
                ]
                usable.append(ok)
            if all(usable):
                picks = [min(cs, key=lambda c: c.est_accessed) for cs in usable]
                sources = tuple((c.from_var, c.access) for c in picks)
                acc = sum(c.est_accessed for c in picks)
                out = 1.0
                sat: set = set()
                for c in picks:
                    out *= max(c.est_out, _EPS)
                    # post atoms are NOT applied by the intersection
                    sat |= c.satisfied - {canon_atom(a) for a in c.post_atoms}
                out /= max(1, self.cat.n_vertices) ** (len(picks) - 1)
                nxt = PState(
                    st.bound_v | {x}, st.bound_e, st.props_v,
                    st.applied | frozenset(sat),
                    st.ops + (IntersectExtend(x, sources),),
                    st.cost + st.card * acc,
                    st.card * max(out, _EPS),
                )
                yield self._apply_pending(q, nxt)
        # fallback: Extend the cheapest edge, CloseExtend the rest
        picks = [min(cs, key=lambda c: c.est_accessed) for cs in cand_sets]
        first = min(range(len(conn)), key=lambda i: picks[i].est_accessed)
        c0 = picks[first]
        ops = [Extend(c0.from_var, x, conn[first].name, c0.access,
                      post_preds=c0.post_atoms)]
        cost = st.cost + st.card * c0.est_accessed
        card = st.card * max(c0.est_out, _EPS)
        sat = set(c0.satisfied)
        bound_e = set(st.bound_e) | {conn[first].name}
        for i, c in enumerate(conn):
            if i == first:
                continue
            ci = picks[i]
            ops.append(CloseExtend(ci.from_var, x, c.name, ci.access,
                                   post_preds=ci.post_atoms))
            cost += card * ci.est_accessed
            card *= max(ci.est_out, _EPS) / max(1, self.cat.n_vertices)
            sat |= ci.satisfied
            bound_e.add(c.name)
        nxt = PState(
            st.bound_v | {x}, frozenset(bound_e), st.props_v | {x},
            st.applied | frozenset(sat), st.ops + tuple(ops),
            cost, max(card, _EPS),
        )
        yield self._apply_pending(q, nxt)

    # -- MULTI-EXTEND ---------------------------------------------------
    def _multi_transitions(self, q, st, one_edge):
        singles = {x for x, es in one_edge.items() if len(es) == 1}
        if len(singles) < 2:
            return
        links: dict[str, set[frozenset]] = {}
        for a in q.preds:
            if a.op == "=" and a.rhs_is_ref and not a.delta:
                va, pa = a.lhs[0], _canon_prop(a.lhs[1])
                vb, pb = a.rhs[0], _canon_prop(a.rhs[1])
                if pa == pb and va in singles and vb in singles and va != vb:
                    links.setdefault(pa, set()).add(frozenset((va, vb)))
        for prop, pairs in links.items():
            nodes = sorted({v for p in pairs for v in p})
            for z in (2, 3):
                for T in itertools.combinations(nodes, z):
                    if self._eq_connected(T, pairs):
                        yield from self._multi_state(q, st, T, prop, pairs)

    @staticmethod
    def _eq_connected(T, pairs) -> bool:
        seen = {T[0]}
        grew = True
        while grew:
            grew = False
            for p in pairs:
                a, b = tuple(p)
                if a in seen and b in T and b not in seen:
                    seen.add(b)
                    grew = True
                if b in seen and a in T and a not in seen:
                    seen.add(a)
                    grew = True
        return set(T) <= seen

    def _multi_state(self, q, st, T, prop, pairs):
        field_name = f"nbr_{prop}"
        targets, sat, acc, out = [], set(), 0.0, 1.0
        posts: list[Atom] = []
        for x in T:
            conn = [
                e for e in q.edges
                if (e.src == x and e.dst in st.bound_v)
                or (e.dst == x and e.src in st.bound_v)
            ]
            if len(conn) != 1:
                return
            c = conn[0]
            cands = [
                k for k in self._edge_candidates(q, st, c, x)
                if k.sort_field == field_name
            ]
            if not cands:
                return
            k = min(cands, key=lambda cc: cc.est_accessed)
            targets.append(ExtTarget(k.from_var, x, c.name, k.access))
            sat |= k.satisfied
            posts.extend(k.post_atoms)
            acc += k.est_accessed
            out *= max(k.est_out, _EPS)
        eq_atoms = [
            a for a in q.preds
            if a.op == "=" and a.rhs_is_ref and not a.delta
            and _canon_prop(a.lhs[1]) == prop
            and _canon_prop(a.rhs[1]) == prop
            and {a.lhs[0], a.rhs[0]} <= set(T)
        ]
        sat |= {canon_atom(a) for a in eq_atoms}
        out *= self.cat.prop_eq_sel(prop) ** (len(T) - 1)
        op = MultiExtend(tuple(targets), field_name, post_preds=tuple(posts))
        nxt = PState(
            st.bound_v | set(T),
            st.bound_e | {t.edge_var for t in targets},
            st.props_v | set(T),
            st.applied | frozenset(sat),
            st.ops + (op,),
            st.cost + st.card * acc,
            st.card * max(out, _EPS),
        )
        yield self._apply_pending(q, nxt)

    # -- candidate accesses for one connecting edge ---------------------
    def _edge_candidates(self, q, st, c: QEdge, x: str) -> list[AccessCand]:
        u = c.src if c.dst == x else c.dst
        d = "fw" if c.src == u else "bw"
        evar = c.name
        nbr_role = "v_d" if d == "fw" else "v_s"
        src_role = "v_s" if d == "fw" else "v_d"

        # query-space atoms this extension could enforce locally
        local_q: list[Atom] = []
        if c.elabel is not None:
            local_q.append(Atom((evar, "elabel"), "=", c.elabel))
        if q.vertex(x).vlabel is not None:
            local_q.append(Atom((x, "vlabel"), "=", q.vertex(x).vlabel))
        for a in q.preds:
            if canon_atom(a) in st.applied:
                continue
            if a.entities() <= {evar, x} and not a.rhs_is_ref:
                local_q.append(a)

        v_rolemap = {evar: "e_adj", x: nbr_role, u: src_role}
        pairs_v = [(a, self._translate(a, v_rolemap)) for a in local_q]

        cands: list[AccessCand] = []
        cands += self._index_cands(
            self.ctx.store.default(d), u, d, pairs_v
        )
        if self.opt.allow_vertex_bound:
            role_atoms = [ra for _, ra in pairs_v]
            for vb in self.ctx.store.match_vertex_bound(d, role_atoms):
                cands += self._index_cands(
                    vb, u, d, pairs_v, view_atoms=vb.view.predicates
                )
        if self.opt.allow_edge_bound:
            for bvar in st.bound_e:
                qb = q.edge(bvar)
                for anch in ("dst", "src"):
                    if getattr(qb, anch) != u:
                        continue
                    ori = next(
                        (o for o in ORIENTATIONS.values()
                         if o.anchor == anch and o.adj_dir == d), None,
                    )
                    if ori is None:
                        continue
                    ebmap = {bvar: "e_b", evar: "e_adj", x: "v_nbr",
                             u: "v_shared"}
                    pairs_eb = [(a, self._translate(a, ebmap))
                                for a in local_q]
                    for a in q.preds:
                        if canon_atom(a) in st.applied:
                            continue
                        ents = a.entities()
                        if bvar in ents and ents <= {bvar, evar, x, u}:
                            pairs_eb.append((a, self._translate(a, ebmap)))
                    role_atoms = [ra for _, ra in pairs_eb]
                    for eb in self.ctx.store.match_edge_bound(ori, role_atoms):
                        cands += self._index_cands(
                            eb, bvar, d, pairs_eb,
                            view_atoms=eb.view.predicates,
                        )
        return cands

    @staticmethod
    def _translate(a: Atom, rolemap: dict[str, str]) -> Atom:
        lhs = (rolemap[a.lhs[0]], a.lhs[1])
        rhs = (rolemap[a.rhs[0]], a.rhs[1]) if a.rhs_is_ref else a.rhs
        return Atom(lhs, a.op, rhs, a.delta)

    def _index_cands(
        self, idx, from_var, d, pairs, view_atoms=()
    ) -> list[AccessCand]:
        """Build the access candidate for one concrete index.

        ``pairs`` is [(query atom, role atom)].  Atoms enforced by the
        index's *view* are free; partition-column equalities become
        lookup keys; leading-sort-column literals become array
        predicates; the rest run as per-edge post predicates.
        """
        view_canon = {
            canon_atom(normalize_nbr_role(v, d)) for v in view_atoms
        }
        satisfied: set = set()
        rest: list[tuple[Atom, Atom]] = []
        for qa, ra in pairs:
            if canon_atom(normalize_nbr_role(ra, d)) in view_canon:
                satisfied.add(canon_atom(qa))
            else:
                rest.append((qa, ra))

        cfg = idx.config
        part_eq: list[tuple[str, object]] = []
        if self.opt.allow_granular:
            for ref in cfg.partition_by:
                col = propref_col(ref)
                hit = next(
                    ((qa, ra) for qa, ra in rest
                     if ra.op == "=" and not ra.rhs_is_ref
                     and self._role_col(ra, d) == col),
                    None,
                )
                if hit is None:
                    break
                part_eq.append((col, hit[0].rhs))
                satisfied.add(canon_atom(hit[0]))
                rest.remove(hit)

        array_preds: list[tuple[str, str, object]] = []
        sort_field = propref_col(cfg.sort_by[0]) if cfg.sort_by else None
        if self.opt.allow_array_preds and cfg.sort_by:
            for i, ref in enumerate(cfg.sort_by):
                col = propref_col(ref)
                hits = [
                    (qa, ra) for qa, ra in rest
                    if not ra.rhs_is_ref and self._role_col(ra, d) == col
                ]
                for qa, ra in hits:
                    array_preds.append((col, ra.op, qa.rhs))
                    satisfied.add(canon_atom(qa))
                    rest.remove((qa, ra))
                if not any(ra.op == "=" for _, ra in hits):
                    break
                sort_field = (
                    propref_col(cfg.sort_by[i + 1])
                    if i + 1 < len(cfg.sort_by) else None
                )

        if self.opt.push_filters:
            post = tuple(qa for qa, _ in rest)
            satisfied |= {canon_atom(qa) for qa in post}
        else:
            post = ()

        id_sorted = bool(cfg.sort_by) and cfg.sort_by[-1] == (NBR, "vid")
        if id_sorted and len(cfg.sort_by) > 1:
            eq_bound = {col for col, op, _ in array_preds if op == "="}
            id_sorted = all(
                propref_col(r) in eq_bound for r in cfg.sort_by[:-1]
            )

        accessed, out = self._estimate(d, part_eq, array_preds,
                                       view_atoms, post)
        return [
            AccessCand(
                access=ListAccess(idx.name, tuple(part_eq),
                                  tuple(array_preds)),
                from_var=from_var,
                est_accessed=accessed,
                est_out=out,
                satisfied=frozenset(satisfied),
                post_atoms=post,
                id_sorted=id_sorted,
                sort_field=sort_field,
            )
        ]

    @staticmethod
    def _role_col(ra: Atom, d: str) -> str | None:
        """List-table column a role-space reference addresses, if any."""
        ent, prop = ra.lhs[0], _canon_prop(ra.lhs[1])
        if ent == "e_adj":
            return "eid" if prop == "vid" else prop
        nbr = "v_d" if d == "fw" else "v_s"
        if ent in ("v_nbr", nbr):
            return "nbr" if prop == "vid" else f"nbr_{prop}"
        return None

    def _estimate(self, d, part_eq, array_preds, view_atoms, post):
        elab = next((v for c, v in part_eq if c == "elabel"), None)
        vlab = next((v for c, v in part_eq if c == "nbr_vlabel"), None)
        stored = self.cat.avg_len(d, elab, vlab)
        for a in view_atoms:
            if _canon_prop(a.lhs[1]) == "elabel" and a.op == "=" and elab:
                continue
            stored *= self.cat.atom_sel(a)
        accessed = stored
        for col, op, val in array_preds:
            prop = col[4:] if col.startswith("nbr_") else col
            accessed *= self.cat.atom_sel(Atom(("x", prop), op, val))
        out = accessed
        for a in post:
            out *= self.cat.atom_sel(a)
        return accessed, out

    # -- filter application --------------------------------------------
    def _apply_pending(self, q, st: PState, force_all: bool = False) -> PState:
        if not self.opt.push_filters and not force_all:
            return st
        ops = list(st.ops)
        applied = set(st.applied)
        props_v = set(st.props_v)
        card = st.card
        changed = True
        while changed:
            changed = False
            for a in q.preds:
                ca = canon_atom(a)
                if ca in applied:
                    continue
                need_v = {e for e in a.entities() if e in q.vertex_names}
                need_e = {e for e in a.entities() if e in q.edge_names}
                if not need_v <= st.bound_v or not need_e <= st.bound_e:
                    continue
                for v in sorted(need_v):
                    uses_prop = (
                        (a.lhs[0] == v and _canon_prop(a.lhs[1]) != "vid")
                        or (a.rhs_is_ref and a.rhs[0] == v
                            and _canon_prop(a.rhs[1]) != "vid")
                    )
                    if uses_prop and v not in props_v:
                        ops.append(FetchProps(v))
                        props_v.add(v)
                ops.append(Filter((a,)))
                applied.add(ca)
                card *= self.cat.atom_sel(a)
                changed = True
        if force_all:
            for v in q.vertices:
                if v.vlabel is None:
                    continue
                la = Atom((v.name, "vlabel"), "=", v.vlabel)
                if canon_atom(la) in applied:
                    continue
                if v.name not in props_v:
                    ops.append(FetchProps(v.name))
                    props_v.add(v.name)
                ops.append(Filter((la,)))
                applied.add(canon_atom(la))
            for e in q.edges:
                if e.elabel is None or e.name not in st.bound_e:
                    continue
                la = Atom((e.name, "elabel"), "=", e.elabel)
                if canon_atom(la) not in applied:
                    ops.append(Filter((la,)))
                    applied.add(canon_atom(la))
        return replace(
            st, ops=tuple(ops), applied=frozenset(applied),
            props_v=frozenset(props_v), card=card,
        )
