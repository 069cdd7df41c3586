"""Truss decomposition, τ and the truss-based edge ordering (Section 4.2)."""
import pytest

from repro.graph import generators as G
from repro.graph.core import degeneracy
from repro.graph.loader import to_spark
from repro.graph.truss import tau, truss_decomposition, truss_decomposition_from_spark


def test_complete_graph_truss():
    td = truss_decomposition(G.complete_graph(6))
    # Every edge of K6 sits in the 6-truss: support n-2 = 4, tau = 4.
    assert td.tau == 4
    assert td.k_max == 6
    assert all(t == 6 for t in td.truss_number.values())


def test_bipartite_tau_zero():
    """The paper's δ/τ gap example: K_{p,p} has δ = p but τ = 0."""
    g = G.complete_bipartite(6, 6)
    assert tau(g) == 0
    assert degeneracy(g) == 6


def test_triangle_free_tau_zero():
    assert tau(G.cycle_graph(10)) == 0
    assert tau(G.star_graph(8)) == 0


def test_empty_graph():
    td = truss_decomposition(G.complete_graph(1))
    assert td.tau == 0 and td.order == []


@pytest.mark.parametrize("seed", range(5))
def test_lemma_4_1_tau_strictly_less_than_delta(seed):
    """Lemma 4.1: τ(g) < δ(g) for every graph with at least one edge."""
    for g in (
        G.erdos_renyi(40, 0.3, seed=seed),
        G.barabasi_albert(120, 5, seed=seed),
        G.planted_cliques(80, 0.05, [10], seed=seed),
    ):
        assert tau(g) < degeneracy(g)


def test_ordering_is_permutation_of_edges():
    g = G.erdos_renyi(30, 0.3, seed=2)
    td = truss_decomposition(g)
    assert sorted(td.order) == g.edge_list()
    assert len(td.rank) == g.m


def test_greedy_min_support_property():
    """Eq. (4): each removed edge has the minimum number of common
    neighbors in the remaining graph at its removal step."""
    g = G.erdos_renyi(18, 0.45, seed=3)
    td = truss_decomposition(g)
    adj = {v: set(nb) for v, nb in g.adj.items()}
    for u, v in td.order:
        my_common = len(adj[u] & adj[v])
        others = [
            len(adj[a] & adj[b])
            for a in adj
            for b in adj[a]
            if a < b
        ]
        assert my_common == min(others)
        adj[u].discard(v)
        adj[v].discard(u)


def test_truss_numbers_monotone_in_removal_order():
    g = G.barabasi_albert(80, 4, seed=4)
    td = truss_decomposition(g)
    values = [td.truss_number[e] for e in td.order]
    assert values == sorted(values)


def test_tau_from_spark_matches_local(spark):
    g = G.erdos_renyi(35, 0.3, seed=6)
    td_spark = truss_decomposition_from_spark(to_spark(spark, g))
    td_local = truss_decomposition(g)
    assert td_spark.tau == td_local.tau
    assert td_spark.truss_number == td_local.truss_number


def test_planted_clique_tau():
    g = G.planted_cliques(100, 0.01, [12], seed=7)
    assert tau(g) == 10  # clique of size c gives tau = c - 2
