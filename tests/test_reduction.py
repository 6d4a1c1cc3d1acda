"""Tests for graph reduction (GR) and its blocked-set bookkeeping."""
import pytest

from repro.core.localgraph import LocalGraph
from repro.core.reduction import reduce_graph
from repro.graphs.generators import ba_edges, er_edges, to_local
from repro.reference import reference_mce


def full_output(g, red, extra=()):
    """GR cliques + cliques of the reduced graph (filtered by blocked),
    which is what the runners assemble."""
    rest = [
        c
        for c in reference_mce(red.reduced)
        if not (len(c) <= 2 and frozenset(c) in red.blocked)
    ]
    return sorted(list(red.cliques) + rest)


@pytest.mark.parametrize("seed", range(8))
def test_reduction_plus_rest_equals_reference(seed):
    g = to_local(ba_edges(60, 2, seed), 60)
    red = reduce_graph(g)
    assert red.removed > 0  # BA(m=2) has plenty of low-degree vertices
    assert full_output(g, red) == reference_mce(g)


@pytest.mark.parametrize("seed", range(8))
def test_reduction_on_denser_graphs(seed):
    g = to_local(er_edges(50, 140, seed), 50)
    red = reduce_graph(g)
    assert full_output(g, red) == reference_mce(g)


def test_disabled_reduction_is_identity():
    g = to_local(er_edges(30, 60, 0), 30)
    red = reduce_graph(g, enabled=False)
    assert red.removed == 0 and red.cliques == [] and red.blocked == set()
    assert red.reduced.adj == g.adj


def test_isolated_vertex():
    g = LocalGraph.from_edges([], vertices=[7])
    red = reduce_graph(g)
    assert red.cliques == [(7,)]
    assert red.reduced.n == 0


def test_pendant_edge_chain():
    # path 0-1-2-3: maximal cliques are the three edges
    g = LocalGraph.from_edges([(0, 1), (1, 2), (2, 3)])
    red = reduce_graph(g)
    assert full_output(g, red) == [(0, 1), (1, 2), (2, 3)]


def test_triangle_with_pendant():
    # triangle {1,2,3} + pendant 0-1: cliques {0,1}, {1,2,3}
    g = LocalGraph.from_edges([(1, 2), (2, 3), (1, 3), (0, 1)])
    red = reduce_graph(g)
    assert full_output(g, red) == [(0, 1), (1, 2, 3)]


def test_blocked_pair_suppression():
    """Degree-2 triangle rule: after removing v from triangle {v,a,b}, a
    later emission of exactly {a,b} must be suppressed (phantom blocker v).
    Chain: z-v-a triangle... build K3 {0,1,2} plus K3 {1,2,3}: removing 0
    (deg 2) emits {0,1,2} and blocks {1,2}; removing 3 emits {1,2,3}; the
    remaining edge (1,2) must NOT be emitted."""
    g = LocalGraph.from_edges([(0, 1), (0, 2), (1, 2), (3, 1), (3, 2)])
    red = reduce_graph(g)
    assert full_output(g, red) == [(0, 1, 2), (1, 2, 3)]


def test_star_graph():
    # star center 0 with leaves 1..4: cliques are the 4 edges
    g = LocalGraph.from_edges([(0, i) for i in range(1, 5)])
    red = reduce_graph(g)
    assert full_output(g, red) == [(0, 1), (0, 2), (0, 3), (0, 4)]
    assert red.reduced.n == 0  # fully peeled (cascade)


def test_two_triangles_sharing_an_edge_cascade():
    """Bowtie minus center... K4 minus one edge: vertices 0..3, missing
    (0,3): cliques {0,1,2} and {1,2,3}."""
    g = LocalGraph.from_edges([(0, 1), (0, 2), (1, 2), (1, 3), (2, 3)])
    red = reduce_graph(g)
    assert full_output(g, red) == [(0, 1, 2), (1, 2, 3)]
