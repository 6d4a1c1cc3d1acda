"""Distributed analytics substrate vs DuckDB oracle and the exact local
peels: triangles, per-edge support, k-core (δ), k-truss (τ)."""
import pytest

from repro.analytics.kcore import core_numbers, degeneracy
from repro.analytics.triangles import edge_support, triangle_count, triangles
from repro.analytics.truss import tau, truss_numbers
from repro.core.ordering import degeneracy_order, truss_order
from repro.graphs.edgelist import edges_df
from repro.graphs.generators import ba_edges, er_edges, to_local
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def graph_pair(spark):
    """A small ER graph as (edge DataFrame, LocalGraph)."""
    e = er_edges(30, 110, seed=2)
    return edges_df(spark, e).cache(), to_local(e, 30)


def _local_triangles(g):
    return sorted(
        (u, v, w)
        for u in g.adj
        for v in g.adj[u]
        if u < v
        for w in g.adj[u] & g.adj[v]
        if v < w
    )


def test_triangles_match_local(graph_pair):
    edf, g = graph_pair
    got = sorted(map(tuple, triangles(edf).toPandas().values.tolist()))
    assert got == _local_triangles(g)


def test_triangle_count_vs_oracle(spark, graph_pair):
    edf, g = graph_pair
    cnt_df = spark.createDataFrame([(triangle_count(edf),)], "n_triangles long")
    assert_equivalent(
        cnt_df,
        """
        select count(*) as n_triangles
        from edges e1
        join edges e2 on e1.dst = e2.src and e1.src < e2.src
        join edges e3 on e3.src = e1.src and e3.dst = e2.dst
        """,
        edges=edf,
    )


def test_edge_support_vs_local(graph_pair):
    edf, g = graph_pair
    sup = {
        (int(r.src), int(r.dst)): int(r.support)
        for r in edge_support(edf).collect()
    }
    assert set(sup) == set(g.edges())
    for (u, v), s in sup.items():
        assert s == len(g.adj[u] & g.adj[v])


def test_edge_support_vs_oracle(spark, graph_pair):
    edf, _ = graph_pair
    got = edge_support(edf)
    assert_equivalent(
        got,
        """
        with und as (
            select src, dst from edges union all select dst, src from edges
        )
        select e.src, e.dst, count(b.dst) as support
        from edges e
        left join und a on a.src = e.src
        left join und b on b.src = e.dst and b.dst = a.dst
        group by e.src, e.dst
        """,
        edges=edf,
    )


@pytest.mark.parametrize("seed,n,m", [(0, 25, 70), (1, 30, 120)])
def test_core_numbers_match_local_peel(spark, seed, n, m):
    e = er_edges(n, m, seed)
    edf = edges_df(spark, e)
    g = to_local(e, n)
    got = {int(r.v): int(r.core) for r in core_numbers(edf).collect()}
    want = degeneracy_order(g).core
    # isolated vertices are absent from an edge list; compare on endpoints
    want = {v: c for v, c in want.items() if g.adj[v]}
    assert got == want


def test_degeneracy_matches_local(spark):
    e = ba_edges(60, 3, seed=4)
    edf = edges_df(spark, e)
    assert degeneracy(edf) == degeneracy_order(to_local(e, 60)).delta


@pytest.mark.parametrize("seed,n,m", [(3, 20, 60), (4, 24, 90)])
def test_truss_numbers_match_local_peel(spark, seed, n, m):
    e = er_edges(n, m, seed)
    edf = edges_df(spark, e)
    g = to_local(e, n)
    got = {(int(r.src), int(r.dst)): int(r.truss) for r in truss_numbers(edf).collect()}
    want = truss_order(g).truss
    assert got == want


def test_tau_matches_local(spark):
    e = er_edges(30, 140, seed=5)
    edf = edges_df(spark, e)
    assert tau(edf) == truss_order(to_local(e, 30)).tau


def test_tau_triangle_free(spark):
    # a path graph has no triangles: tau = 0
    import numpy as np

    edf = edges_df(spark, np.array([(i, i + 1) for i in range(10)]))
    assert tau(edf) == 0
