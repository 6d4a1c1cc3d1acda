"""Trusted reference for maximal clique enumeration, used only by tests.

``reference_mce`` is the plain Bron–Kerbosch recursion (no pivot, no
orderings, no reductions) — small enough to audit by eye. It is itself
validated against ``brute_force_mce`` (subset enumeration) on tiny graphs,
and every production algorithm is fuzzed against it.
"""
from __future__ import annotations

from itertools import combinations

from .core.localgraph import LocalGraph


def reference_mce(g: LocalGraph) -> list[tuple[int, ...]]:
    """All maximal cliques, sorted, via textbook Bron–Kerbosch."""
    adj = g.adj
    out: list[tuple[int, ...]] = []

    def rec(S: list[int], C: set[int], X: set[int]) -> None:
        if not C and not X:
            if S:
                out.append(tuple(sorted(S)))
            return
        Cc, Xc = set(C), set(X)
        for v in sorted(C):
            rec(S + [v], Cc & adj[v], Xc & adj[v])
            Cc.discard(v)
            Xc.add(v)

    rec([], set(adj), set())
    return sorted(out)


def brute_force_mce(g: LocalGraph) -> list[tuple[int, ...]]:
    """Subset enumeration — only for graphs with <= ~16 vertices."""
    vs = g.vertices()
    if len(vs) > 18:
        raise ValueError("brute force limited to tiny graphs")
    adj = g.adj
    cliques = []
    for k in range(1, len(vs) + 1):
        for sub in combinations(vs, k):
            if all(b in adj[a] for a, b in combinations(sub, 2)):
                cliques.append(set(sub))
    maximal = [
        tuple(sorted(c))
        for c in cliques
        if not any(c < other for other in cliques)
    ]
    return sorted(maximal)


def verify_cliques(g: LocalGraph, cliques: list[tuple[int, ...]]) -> None:
    """Assert ``cliques`` is exactly the set of maximal cliques of ``g``:
    each is a clique, each is maximal, no duplicates, none missing."""
    adj = g.adj
    seen = set()
    for c in cliques:
        assert len(c) >= 1, "empty clique emitted"
        key = frozenset(c)
        assert key not in seen, f"duplicate clique {c}"
        seen.add(key)
        for a, b in combinations(c, 2):
            assert b in adj[a], f"{c} is not a clique: missing edge ({a},{b})"
        blockers = set(adj[c[0]])
        for v in c[1:]:
            blockers &= adj[v]
        blockers -= set(c)
        assert not blockers, f"{c} is not maximal: extendable by {sorted(blockers)}"
    expected = {frozenset(c) for c in reference_mce(g)}
    missing = expected - seen
    extra = seen - expected
    assert not missing, f"missing cliques, e.g. {sorted(next(iter(missing)))}"
    assert not extra, f"extra cliques, e.g. {sorted(next(iter(extra)))}"
