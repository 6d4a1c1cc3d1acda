"""Unit tests for the LocalGraph adjacency structure."""
import pytest

from repro.core.localgraph import LocalGraph


@pytest.fixture
def tri():
    return LocalGraph.from_edges([(0, 1), (1, 2), (0, 2)])


def test_from_edges_basic(tri):
    assert tri.n == 3
    assert tri.m == 3
    assert tri.adj[0] == {1, 2}


def test_from_edges_drops_self_loops():
    g = LocalGraph.from_edges([(0, 0), (0, 1)])
    assert g.m == 1
    assert 0 not in g.adj[0]


def test_from_edges_dedups_reversed():
    g = LocalGraph.from_edges([(0, 1), (1, 0), (0, 1)])
    assert g.m == 1


def test_isolated_vertices_via_vertices_param():
    g = LocalGraph.from_edges([(0, 1)], vertices=[0, 1, 5])
    assert g.n == 3
    assert g.degree(5) == 0


def test_vertices_sorted():
    g = LocalGraph.from_edges([(3, 1), (2, 1)])
    assert g.vertices() == [1, 2, 3]


def test_edges_canonical(tri):
    assert sorted(tri.edges()) == [(0, 1), (0, 2), (1, 2)]


def test_has_edge(tri):
    assert tri.has_edge(0, 1) and tri.has_edge(1, 0)
    assert not tri.has_edge(0, 99)


def test_subgraph_keeps_isolated(tri):
    sub = tri.subgraph([0, 1])
    assert sub.m == 1
    sub2 = LocalGraph.from_edges([(0, 1), (2, 3)]).subgraph([0, 2])
    assert sub2.n == 2 and sub2.m == 0


def test_copy_is_independent(tri):
    c = tri.copy()
    c.remove_vertex(0)
    assert tri.n == 3 and c.n == 2


def test_remove_vertex_updates_neighbors(tri):
    tri.remove_vertex(1)
    assert tri.adj[0] == {2}
    assert tri.m == 1


def test_density(tri):
    assert tri.density() == pytest.approx(1.0)
    assert LocalGraph({}).density() == 0.0


def test_degree(tri):
    assert tri.degree(0) == 2
