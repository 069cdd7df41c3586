"""Early-termination procedures kC2Plex / kCtPlex vs brute force."""
import pytest

from repro.core.bruteforce import brute_force_in_subset
from repro.core.etplex import (
    default_t_threshold,
    list_cliques_2plex,
    list_cliques_tplex,
    try_early_terminate,
)
from repro.graph import generators as G


def _norm(cliques):
    return sorted(tuple(sorted(c)) for c in cliques)


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("n", [4, 7, 10])
def test_kc2plex_matches_brute_force(seed, n):
    g = G.random_t_plex(n, 2, seed=seed)
    verts = set(g.adj)
    for l in range(1, n + 1):
        got = []
        list_cliques_2plex((), verts, g.adj, l, got.append)
        assert _norm(got) == _norm(brute_force_in_subset(g, verts, l))


def test_kc2plex_on_pure_clique():
    g = G.complete_graph(7)
    got = []
    list_cliques_2plex((), set(g.adj), g.adj, 4, got.append)
    assert len(got) == 35  # C(7,4)
    assert len(set(_norm(got))) == 35


def test_kc2plex_prepends_s():
    g = G.complete_graph(4)
    got = []
    list_cliques_2plex((100, 200), set(g.adj), g.adj, 2, got.append)
    assert all(set(c) >= {100, 200} and len(c) == 4 for c in got)
    assert len(got) == 6


def test_kc2plex_l_zero_emits_s():
    got = []
    list_cliques_2plex((1, 2), set(), {}, 0, got.append)
    assert got == [(1, 2)]


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("t", [3, 4, 5])
def test_kctplex_matches_brute_force(seed, t):
    g = G.random_t_plex(10, t, seed=seed)
    verts = set(g.adj)
    for l in range(1, 9):
        got = []
        list_cliques_tplex((), verts, g.adj, l, got.append)
        assert _norm(got) == _norm(brute_force_in_subset(g, verts, l))


def test_kctplex_handles_all_adjacent_set():
    """A clique is the extreme case: I = V, all output comes from the
    combinatorial completion."""
    g = G.complete_graph(6)
    got = []
    list_cliques_tplex((), set(g.adj), g.adj, 3, got.append)
    assert len(got) == 20  # C(6,3)


def test_kctplex_on_sparse_2plex_still_correct():
    g = G.random_t_plex(8, 2, seed=3)
    got = []
    list_cliques_tplex((), set(g.adj), g.adj, 4, got.append)
    assert _norm(got) == _norm(brute_force_in_subset(g, set(g.adj), 4))


def test_try_early_terminate_disabled():
    g = G.complete_graph(5)
    assert not try_early_terminate((), set(g.adj), g.adj, 3, 0, lambda c: None)


def test_try_early_terminate_rejects_sparse():
    g = G.cycle_graph(8)  # plexity 6
    assert not try_early_terminate((), set(g.adj), g.adj, 3, 3, lambda c: None)


def test_try_early_terminate_dispatches_2plex():
    g = G.random_t_plex(8, 2, seed=1)
    got = []
    assert try_early_terminate((), set(g.adj), g.adj, 3, 2, got.append)
    assert _norm(got) == _norm(brute_force_in_subset(g, set(g.adj), 3))


def test_try_early_terminate_dispatches_tplex():
    g = G.random_t_plex(9, 4, seed=2)
    got = []
    assert try_early_terminate((), set(g.adj), g.adj, 3, 4, got.append)
    assert _norm(got) == _norm(brute_force_in_subset(g, set(g.adj), 3))


def test_try_early_terminate_superset_adjacency():
    """Adjacency values may be supersets of verts — they are restricted."""
    g = G.complete_graph(8)
    verts = set(range(5))
    got = []
    assert try_early_terminate((), verts, g.adj, 3, 2, got.append)
    assert len(got) == 10  # C(5,3)


def test_default_t_threshold_policy():
    assert default_t_threshold(4, 20) == 2  # k <= tau/2
    assert default_t_threshold(11, 20) == 3
    assert default_t_threshold(10, 20) == 2
