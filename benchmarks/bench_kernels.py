"""Micro-benchmarks of the substrate pieces: orderings, GR, and one full
HBBMC++ run — useful to attribute where table time goes."""
import pytest

from repro.core.hbbmc import run_named
from repro.core.ordering import degeneracy_order, truss_order
from repro.core.reduction import reduce_graph
from repro.graphs.datasets import load_local


@pytest.fixture(scope="module")
def dg_graph():
    return load_local("DG", "bench")


def test_truss_order(benchmark, dg_graph):
    r = benchmark.pedantic(lambda: truss_order(dg_graph), rounds=3, iterations=1)
    assert r.tau > 0


def test_degeneracy_order(benchmark, dg_graph):
    r = benchmark.pedantic(lambda: degeneracy_order(dg_graph), rounds=3, iterations=1)
    assert r.delta > 0


def test_graph_reduction(benchmark, dg_graph):
    r = benchmark.pedantic(lambda: reduce_graph(dg_graph), rounds=3, iterations=1)
    assert r.reduced.n > 0


def test_hbbmcpp_full_run(benchmark, dg_graph):
    r = benchmark.pedantic(
        lambda: run_named(dg_graph, "HBBMC++", collect=False), rounds=1, iterations=1
    )
    assert r.n_cliques > 0
