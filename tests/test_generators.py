"""Synthetic graph generators: determinism and structural guarantees."""
import pytest

from repro.graph import generators as G
from repro.graph.plex import plexity


def test_complete_graph():
    g = G.complete_graph(6)
    assert g.n == 6 and g.m == 15
    assert all(len(nb) == 5 for nb in g.adj.values())


def test_complete_bipartite():
    g = G.complete_bipartite(3, 4)
    assert g.n == 7 and g.m == 12
    # No edge inside either side.
    for i in range(3):
        assert g.adj[i] == {3, 4, 5, 6}


def test_cycle_graph():
    g = G.cycle_graph(8)
    assert g.n == 8 and g.m == 8
    assert all(len(nb) == 2 for nb in g.adj.values())


def test_star_graph():
    g = G.star_graph(5)
    assert g.n == 6 and g.m == 5
    assert g.degree(0) == 5


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_erdos_renyi_deterministic(seed):
    a = G.erdos_renyi(30, 0.3, seed=seed)
    b = G.erdos_renyi(30, 0.3, seed=seed)
    assert a.edge_list() == b.edge_list()


def test_erdos_renyi_density():
    g = G.erdos_renyi(60, 0.5, seed=3)
    expected = 0.5 * 60 * 59 / 2
    assert 0.8 * expected < g.m < 1.2 * expected


def test_barabasi_albert_edges():
    g = G.barabasi_albert(100, 3, seed=1)
    # Each of the 97 non-seed vertices adds exactly 3 distinct edges.
    assert g.m == 97 * 3
    assert g.n <= 100


def test_barabasi_albert_rejects_bad_n():
    with pytest.raises(ValueError):
        G.barabasi_albert(3, 5)


def test_barabasi_albert_deterministic():
    assert G.barabasi_albert(50, 4, seed=7).edge_list() == G.barabasi_albert(50, 4, seed=7).edge_list()


def test_chung_lu_deterministic_and_sized():
    a = G.chung_lu(300, avg_deg=6, seed=2)
    b = G.chung_lu(300, avg_deg=6, seed=2)
    assert a.edge_list() == b.edge_list()
    assert 300 * 2 < a.m < 300 * 9  # weighted sampling overshoots a bit


def test_gnm_random():
    g = G.gnm_random(1000, 3000, seed=4)
    assert g.m == 3000
    assert g.n <= 1000
    assert G.gnm_random(1000, 3000, seed=4).edge_list() == g.edge_list()


def test_planted_cliques_contains_cliques():
    from repro.graph.maxclique import max_clique_size

    g = G.planted_cliques(200, 0.01, [15, 8], seed=5)
    assert max_clique_size(g) == 15


def test_planted_cliques_too_many_raises():
    with pytest.raises(ValueError):
        G.planted_cliques(10, 0.0, [8, 8], seed=0)


def test_ring_of_cliques():
    g = G.ring_of_cliques(5, 4)
    # 5 cliques of C(4,2)=6 edges + 5 ring edges.
    assert g.m == 5 * 6 + 5
    assert g.n == 20


def test_random_t_plex_is_t_plex():
    for t in (2, 3, 4):
        g = G.random_t_plex(10, t, seed=1)
        assert plexity(set(g.adj), g.adj) <= t


def test_random_t_plex_removes_edges():
    g = G.random_t_plex(8, 2, seed=0)
    assert g.m < 8 * 7 / 2
