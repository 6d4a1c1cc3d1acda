"""Graph reduction (GR): peel degree <= 2 vertices, emitting their maximal
cliques directly.

A simplified-but-exact variant of the reduction rules of Deng et al.
(VLDB'24) [15]: a vertex of degree <= 2 participates only in maximal cliques
of size <= 3, all of which are enumerable by inspecting its current
neighborhood. Peeling cascades (removals can push neighbors under the
threshold).

Exactness bookkeeping (DESIGN.md §3): when v is removed, every *future*
clique that is a nonempty clique-subset of N(v) (necessarily of size <= 2)
has v as a phantom blocker and must never be emitted, by the peel itself or
by the later branch-and-bound run on the reduced graph. Those subsets are
recorded in ``blocked``; all size <= 2 emissions are filtered against it.
A phantom blocker of a size >= 3 clique would have had degree >= 3 at its
removal time — impossible here — so size <= 2 filtering is exact.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field

from .localgraph import LocalGraph


@dataclass
class Reduction:
    reduced: LocalGraph
    cliques: list[tuple[int, ...]] = field(default_factory=list)
    blocked: set[frozenset[int]] = field(default_factory=set)
    removed: int = 0


def reduce_graph(g: LocalGraph, *, enabled: bool = True) -> Reduction:
    """Apply GR; with ``enabled=False`` returns the graph untouched (so
    runners can treat GR uniformly as a pipeline stage)."""
    if not enabled:
        return Reduction(reduced=g.copy())
    h = g.copy()
    adj = h.adj
    blocked: set[frozenset[int]] = set()
    cliques: list[tuple[int, ...]] = []
    removed = 0

    def emit(c: tuple[int, ...]) -> None:
        if len(c) <= 2 and frozenset(c) in blocked:
            return
        cliques.append(tuple(sorted(c)))

    heap = [(len(nbrs), v) for v, nbrs in adj.items() if len(nbrs) <= 2]
    heapq.heapify(heap)
    gone: set[int] = set()
    while heap:
        d, v = heapq.heappop(heap)
        if v in gone or len(adj[v]) != d or len(adj[v]) > 2:
            continue
        nbrs = sorted(adj[v])
        if d == 0:
            emit((v,))
        elif d == 1:
            (u,) = nbrs
            emit((v, u))
            blocked.add(frozenset((u,)))
        else:
            a, b = nbrs
            if b in adj[a]:
                emit((v, a, b))
                blocked.update(
                    (frozenset((a,)), frozenset((b,)), frozenset((a, b)))
                )
            else:
                emit((v, a))
                emit((v, b))
                blocked.update((frozenset((a,)), frozenset((b,))))
        gone.add(v)
        removed += 1
        h.remove_vertex(v)
        for u in nbrs:
            if u not in gone and len(adj[u]) <= 2:
                heapq.heappush(heap, (len(adj[u]), u))
    return Reduction(reduced=h, cliques=cliques, blocked=blocked, removed=removed)
