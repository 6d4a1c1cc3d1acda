"""Frameworks: VBBMC (vertex-oriented), EBBMC (edge-oriented) and HBBMC
(hybrid), plus the named-algorithm registry used by every evaluation table.

Edge-oriented branching (Algorithms 2–4 of the paper) is implemented in the
*rank-threshold* form: a branch carries the rank ``r`` of the edge that
created it, and the lazy invariant

    E(g_C) = { edges among V(g_C) with rank > r }

holds at every depth (DESIGN.md §3), so Eq.(2)'s shrinking edge sets never
need to be materialized. The sub-branch of edge e = (a, b) with rank r_e has

    C' = { w ∈ C ∩ N(a) ∩ N(b) : rank(a,w) > r_e and rank(b,w) > r_e }
    X' = ((C ∪ X) ∩ N(a) ∩ N(b)) \\ C'

— every common G-neighbor of S' lands in C' or X', so maximality checks stay
exact. Zero-degree candidates (no compat edge to another candidate) are the
Eq.(3) branches: ``S ∪ {v}`` is emitted iff no other common neighbor is
G-adjacent to v.

``d`` controls how many edge-oriented levels run before switching to the
vertex-oriented kernel (Table IV); ``d=1`` is HBBMC, ``d=None`` is pure
EBBMC.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from .kernels import Enumerator, kernel_fn, _pair
from .localgraph import LocalGraph
from .ordering import degeneracy_order, edge_order_rank
from .reduction import reduce_graph
from .stats import BranchStats


@dataclass
class MceRun:
    """Result of one MCE run: the cliques (sorted tuples, or None when not
    collected), counters, and wall time in seconds (includes GR + ordering,
    as the paper's reported times do)."""

    cliques: list[tuple[int, ...]] | None
    stats: BranchStats
    seconds: float

    @property
    def n_cliques(self) -> int:
        return self.stats.cliques + self.stats.gr_cliques


def _ebb(
    enum: Enumerator,
    S: list[int],
    C: set[int],
    X: set[int],
    r: int | None,
    depth: int,
    d: int | None,
    kernel,
) -> None:
    """Edge-oriented recursion (Eq. 2 + Eq. 3); switches to ``kernel`` once
    ``depth`` reaches ``d``."""
    st = enum.stats
    st.calls += 1
    if not C and not X:
        enum.emit(S)
        return
    if d is not None and depth >= d:
        # Hand over to the vertex-oriented kernel under this branch's rank
        # threshold (dual adjacency; see repro.core.kernels docstring).
        old_r = enum.cur_r
        enum.cur_r = r
        kernel(S, C, X)
        enum.cur_r = old_r
        return
    adj = enum.adj
    rank = enum.rank
    edges: list[tuple[int, int, int]] = []
    for u in C:
        au = adj[u]
        for v in C & au:
            if u < v:
                rr = rank[(u, v)]
                if r is None or rr > r:
                    edges.append((rr, u, v))
    edges.sort()
    for re_, a, b in edges:
        ca, cb = adj[a], adj[b]
        common_c = C & ca & cb
        C2 = {
            w
            for w in common_c
            if rank[(a, w) if a < w else (w, a)] > re_
            and rank[(b, w) if b < w else (w, b)] > re_
        }
        X2 = (X & ca & cb) | (common_c - C2)
        # Prune dead sub-branches at creation (the paper's call counts on
        # large graphs — fewer calls than edges — imply the same): an empty
        # candidate set emits at most S', and an exclusion vertex adjacent to
        # every candidate blocks every clique of the sub-branch.
        if not C2:
            if not X2:
                enum.emit(S + [a, b])
            continue
        if any(C2 <= adj[x] for x in X2):
            continue
        _ebb(enum, S + [a, b], C2, X2, re_, depth + 1, d, kernel)
    # Eq.(3): candidates with no compat edge left — their only clique in this
    # branch is S ∪ {v}, maximal iff nothing else common-adjacent touches v.
    for v in sorted(C):
        av = adj[v]
        cn = C & av
        if r is None:
            has_compat = bool(cn)
        else:
            has_compat = any(rank[_pair(v, z)] > r for z in cn)
        if has_compat:
            continue
        if not (((C | X) - {v}) & av):
            enum.emit(S + [v])


def run_mce(
    g: LocalGraph,
    *,
    framework: str = "hybrid",
    kernel: str = "tomita",
    root: str = "degeneracy",
    edge_order: str = "truss",
    d: int | None = 1,
    et_t: int = 3,
    gr: bool = True,
    collect: bool = True,
    on_clique=None,
) -> MceRun:
    """Run one configuration end to end on ``g``.

    framework: ``"hybrid"`` (edge-oriented root, Table II's HBBMC), ``"edge"``
    (pure EBBMC, d edge levels everywhere — ``d=None`` means all the way
    down), or ``"vertex"`` (VBBMC).
    root (vertex framework): ``"degeneracy"`` (BK_Degen-style initial
    branching) or ``"global"`` (single root branch, BK_Pivot/BK_Ref-style).
    """
    t0 = time.perf_counter()
    red = reduce_graph(g, enabled=gr)
    g2 = red.reduced
    enum = Enumerator(
        g2.adj, et_t=et_t, blocked=red.blocked, collect=collect, on_clique=on_clique
    )
    enum.stats.gr_cliques = len(red.cliques)

    if framework in ("hybrid", "edge"):
        enum.rank = edge_order_rank(g2, edge_order)
        enum.stats.root_branches = len(enum.rank)
        if framework == "hybrid":
            if d is None or d < 1:
                raise ValueError("hybrid framework needs d >= 1")
            depth_limit = d
        else:  # pure EBBMC: edge-oriented branching all the way down
            depth_limit = None
        _ebb(
            enum,
            [],
            set(g2.adj),
            set(),
            None,
            0,
            depth_limit,
            kernel_fn(enum, kernel),
        )
    elif framework == "vertex":
        kfn = kernel_fn(enum, kernel)
        if root == "global":
            enum.stats.root_branches = 1
            kfn([], set(g2.adj), set())
        elif root == "degeneracy":
            dg = degeneracy_order(g2)
            pos = dg.pos
            enum.stats.root_branches = len(dg.order)
            adj = g2.adj
            for i, v in enumerate(dg.order):
                C = {u for u in adj[v] if pos[u] > i}
                X = {u for u in adj[v] if pos[u] < i}
                kfn([v], C, X)
        else:
            raise ValueError(f"unknown root {root!r}")
    else:
        raise ValueError(f"unknown framework {framework!r}")

    seconds = time.perf_counter() - t0
    cliques = None
    if collect:
        assert enum.out is not None
        cliques = sorted(enum.out + [tuple(sorted(c)) for c in red.cliques])
    return MceRun(cliques=cliques, stats=enum.stats, seconds=seconds)


#: Named configurations for every algorithm that appears in Tables II–VI.
ALGORITHMS: dict[str, dict] = {
    # Table II: ours vs. the four state-of-the-art VBBMC+GR baselines [15].
    "HBBMC++": dict(framework="hybrid", kernel="tomita", d=1, et_t=3, gr=True),
    "RRef": dict(framework="vertex", kernel="ref", root="global", et_t=0, gr=True),
    "RDegen": dict(framework="vertex", kernel="tomita", root="degeneracy", et_t=0, gr=True),
    "RRcd": dict(framework="vertex", kernel="rcd", root="degeneracy", et_t=0, gr=True),
    "RFac": dict(framework="vertex", kernel="fac", root="degeneracy", et_t=0, gr=True),
    # Table III: ablation + hybrid with other VBBMC kernels.
    "HBBMC+": dict(framework="hybrid", kernel="tomita", d=1, et_t=0, gr=True),
    "Ref++": dict(framework="hybrid", kernel="ref", d=1, et_t=3, gr=True),
    "Rcd++": dict(framework="hybrid", kernel="rcd", d=1, et_t=3, gr=True),
    "Fac++": dict(framework="hybrid", kernel="fac", d=1, et_t=3, gr=True),
    # Table VI: initial-branch ordering variants (all with ET + GR).
    "VBBMC-dgn": dict(framework="vertex", kernel="tomita", root="degeneracy", et_t=3, gr=True),
    "HBBMC-dgn": dict(framework="hybrid", kernel="tomita", d=1, et_t=3, gr=True, edge_order="dgn"),
    "HBBMC-mdg": dict(framework="hybrid", kernel="tomita", d=1, et_t=3, gr=True, edge_order="mdg"),
}


def run_named(g: LocalGraph, name: str, **overrides) -> MceRun:
    """Run a named algorithm (Tables II–VI row/column labels), with optional
    parameter overrides (e.g. ``d=2`` for Table IV, ``et_t=1`` for Table V)."""
    if name not in ALGORITHMS:
        raise ValueError(f"unknown algorithm {name!r}; one of {sorted(ALGORITHMS)}")
    cfg = dict(ALGORITHMS[name])
    cfg.update(overrides)
    return run_mce(g, **cfg)
