"""Deterministic synthetic graph generators (numpy, seeded).

Each generator returns a canonical edge array of shape (m, 2) with
``u < v`` and no duplicates; ``to_local`` / Spark wrappers build the
structures the kernels and DataFrame jobs consume. Models:

- ``er_edges``            Erdős–Rényi G(n, m) (Appendix D's ER model)
- ``ba_edges``            Barabási–Albert preferential attachment (BA model)
- ``powerlaw_cluster_edges``  Holme–Kim: BA plus triangle-closure steps —
                          power-law degrees with high clustering (web graphs)
- ``caveman_edges``       ring of k-cliques with optional extra random
                          chords (collaboration / mesh-like graphs)
"""
from __future__ import annotations

import numpy as np

from ..core.localgraph import LocalGraph


def _canon(pairs: list[tuple[int, int]]) -> np.ndarray:
    """Dedup + canonicalize (u < v) an edge list; stable order for
    determinism."""
    seen: set[tuple[int, int]] = set()
    out: list[tuple[int, int]] = []
    for u, v in pairs:
        if u == v:
            continue
        e = (u, v) if u < v else (v, u)
        if e not in seen:
            seen.add(e)
            out.append(e)
    if not out:
        return np.empty((0, 2), dtype=np.int64)
    return np.asarray(out, dtype=np.int64)


def er_edges(n: int, m: int, seed: int = 0) -> np.ndarray:
    """G(n, m): m distinct uniform edges (the paper's ER generator)."""
    rng = np.random.default_rng(seed)
    max_m = n * (n - 1) // 2
    m = min(m, max_m)
    seen: set[tuple[int, int]] = set()
    out: list[tuple[int, int]] = []
    while len(out) < m:
        k = (m - len(out)) * 2 + 16
        us = rng.integers(0, n, k)
        vs = rng.integers(0, n, k)
        for u, v in zip(us.tolist(), vs.tolist()):
            if u == v:
                continue
            e = (u, v) if u < v else (v, u)
            if e not in seen:
                seen.add(e)
                out.append(e)
                if len(out) == m:
                    break
    return np.asarray(out, dtype=np.int64)


def ba_edges(n: int, m_attach: int, seed: int = 0) -> np.ndarray:
    """Barabási–Albert: each new vertex attaches to ``m_attach`` existing
    vertices chosen by preferential attachment (repeated-nodes trick)."""
    rng = np.random.default_rng(seed)
    m0 = max(m_attach, 2)
    pairs: list[tuple[int, int]] = [(i, i + 1) for i in range(m0 - 1)]
    repeated: list[int] = [v for e in pairs for v in e]
    for v in range(m0, n):
        targets: set[int] = set()
        while len(targets) < min(m_attach, v):
            t = repeated[rng.integers(0, len(repeated))]
            targets.add(int(t))
        for t in targets:
            pairs.append((t, v))
            repeated.extend((t, v))
    return _canon(pairs)


def powerlaw_cluster_edges(
    n: int, m_attach: int, p_triad: float, seed: int = 0
) -> np.ndarray:
    """Holme–Kim powerlaw-cluster graph: BA growth where, after each
    preferential attachment to ``t``, with probability ``p_triad`` the next
    link closes a triangle by attaching to a random neighbor of ``t``."""
    rng = np.random.default_rng(seed)
    m0 = max(m_attach, 2)
    adj: dict[int, set[int]] = {i: set() for i in range(m0)}
    pairs: list[tuple[int, int]] = []

    def add(u: int, v: int) -> None:
        if u != v and v not in adj[u]:
            adj[u].add(v)
            adj[v].add(u)
            pairs.append((u, v))
            repeated.extend((u, v))

    repeated: list[int] = []
    for i in range(m0 - 1):
        adj.setdefault(i, set())
        adj.setdefault(i + 1, set())
        add(i, i + 1)
    for v in range(m0, n):
        adj[v] = set()
        links = 0
        last_t: int | None = None
        while links < m_attach:
            if (
                last_t is not None
                and rng.random() < p_triad
                and (cands := list(adj[last_t] - adj[v] - {v}))
            ):
                t = int(cands[rng.integers(0, len(cands))])
            else:
                t = int(repeated[rng.integers(0, len(repeated))])
            if t != v and t not in adj[v]:
                add(v, t)
                links += 1
                last_t = t
    return _canon(pairs)


def caveman_edges(
    n_caves: int,
    cave_size: int,
    n_chords: int = 0,
    seed: int = 0,
) -> np.ndarray:
    """Ring of ``n_caves`` cliques of ``cave_size`` vertices, consecutive
    caves bridged by one edge, plus ``n_chords`` random cross edges."""
    rng = np.random.default_rng(seed)
    pairs: list[tuple[int, int]] = []
    n = n_caves * cave_size
    for c in range(n_caves):
        base = c * cave_size
        for i in range(cave_size):
            for j in range(i + 1, cave_size):
                pairs.append((base + i, base + j))
        nxt = ((c + 1) % n_caves) * cave_size
        pairs.append((base, nxt + 1 if cave_size > 1 else nxt))
    for _ in range(n_chords):
        u = int(rng.integers(0, n))
        v = int(rng.integers(0, n))
        pairs.append((u, v))
    return _canon(pairs)


def social_edges(
    n: int,
    m_attach: int,
    seed: int = 0,
    *,
    p_triad: float = 0.0,
    caves: tuple[int, int, int] | None = None,
    core: tuple[int, float] | None = None,
    bicore: tuple[int, int, float] | None = None,
    chords: int = 0,
) -> np.ndarray:
    """Composite model used for the Table I surrogates (DESIGN.md §4).

    A scale-free background (BA, or Holme–Kim when ``p_triad`` > 0) over
    vertices ``0..n-1``, optionally overlaid with:

    - ``caves = (count, k, n_rm)``: ``count`` communities of ``k`` fresh
      vertices each, complete minus a random matching of ``n_rm`` pairs —
      i.e. 2-plexes with 2^n_rm maximal cliques each, the dense pockets that
      real social graphs owe their clique mass to (and the structure early
      termination exploits);
    - ``core = (K, p)``: one G(K, p) Erdős–Rényi community over existing
      vertices — it carries a large degeneracy but only a small truss bound,
      reproducing the paper's δ ≫ τ regime;
    - ``bicore = (A, B, p)``: one dense random *bipartite* community over
      existing vertices — degeneracy without triangles, the strongest form
      of the δ ≫ τ regime (real web/social graphs owe much of their high
      degeneracy to such triangle-poor hub structures);
    - ``chords``: extra uniform random edges.
    """
    rng = np.random.default_rng(seed + 1_000_003)
    if p_triad > 0:
        pairs = [tuple(e) for e in powerlaw_cluster_edges(n, m_attach, p_triad, seed).tolist()]
    else:
        pairs = [tuple(e) for e in ba_edges(n, m_attach, seed).tolist()]
    nxt = n
    if caves is not None:
        count, k, n_rm = caves
        assert 2 * n_rm <= k, "cannot remove a matching larger than k/2"
        for _ in range(count):
            ids = list(range(nxt, nxt + k))
            nxt += k
            pairs.append((int(rng.integers(0, n)), ids[0]))
            perm = rng.permutation(k)
            removed = set()
            for i in range(n_rm):
                a, b = int(perm[2 * i]), int(perm[2 * i + 1])
                removed.add((min(a, b), max(a, b)))
            for i in range(k):
                for j in range(i + 1, k):
                    if (i, j) not in removed:
                        pairs.append((ids[i], ids[j]))
    if core is not None:
        K, p = core
        members = rng.choice(n, size=min(K, n), replace=False)
        for i in range(len(members)):
            for j in range(i + 1, len(members)):
                if rng.random() < p:
                    pairs.append((int(members[i]), int(members[j])))
    if bicore is not None:
        A, B, p = bicore
        members = rng.choice(n, size=min(A + B, n), replace=False)
        left, right = members[:A], members[A:]
        for a in left:
            for b in right:
                if rng.random() < p:
                    pairs.append((int(a), int(b)))
    for _ in range(chords):
        pairs.append((int(rng.integers(0, nxt)), int(rng.integers(0, nxt))))
    return _canon(pairs)


def to_local(edges: np.ndarray, n: int | None = None) -> LocalGraph:
    """Edge array -> LocalGraph; ``n`` adds isolated vertices 0..n-1."""
    return LocalGraph.from_edges(
        (tuple(e) for e in edges.tolist()),
        vertices=range(n) if n is not None else None,
    )


GENERATORS = {
    "er": er_edges,
    "ba": ba_edges,
    "plc": powerlaw_cluster_edges,
    "caveman": caveman_edges,
    "social": social_edges,
}


def generate(model: str, **params) -> np.ndarray:
    """Dispatch by model name; parameters are generator-specific."""
    try:
        fn = GENERATORS[model]
    except KeyError:
        raise ValueError(f"unknown model {model!r}; one of {sorted(GENERATORS)}") from None
    return fn(**params)
