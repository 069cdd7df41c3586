"""Maximum clique size ω (Table 1's last column)."""
import pytest

from repro.graph import generators as G
from repro.graph.maxclique import max_clique_size
from repro.core.bruteforce import brute_force_count


@pytest.mark.parametrize(
    "g,expected",
    [
        (G.complete_graph(8), 8),
        (G.complete_bipartite(5, 5), 2),
        (G.cycle_graph(3), 3),
        (G.cycle_graph(9), 2),
        (G.star_graph(6), 2),
    ],
)
def test_known_graphs(g, expected):
    assert max_clique_size(g) == expected


def test_empty_graph():
    assert max_clique_size(G.complete_graph(1)) == 0


@pytest.mark.parametrize("seed", range(6))
def test_matches_brute_force(seed):
    g = G.erdos_renyi(22, 0.5, seed=seed)
    omega = max_clique_size(g)
    assert brute_force_count(g, omega) >= 1
    assert brute_force_count(g, omega + 1) == 0


def test_planted_clique_found():
    g = G.planted_cliques(150, 0.02, [14, 9], seed=1)
    assert max_clique_size(g) == 14


def test_ring_of_cliques():
    assert max_clique_size(G.ring_of_cliques(6, 7)) == 7
