"""VBBkC baselines (Degen / DDegree / DDegCol / SDegree / BitCol) vs
brute force, including the '+' (Rule 2) and +ET variants and the EP/NP
top-branch decompositions."""
import pytest

from repro.core.bruteforce import check_cliques
from repro.core.vbbkc import (
    vbbkc,
    vbbkc_prepare,
    vbbkc_top_branch_edge,
    vbbkc_top_branch_vertex,
)
from repro.graph import generators as G


GRAPHS = {
    "er_dense": G.erdos_renyi(22, 0.5, seed=1),
    "er_sparse": G.erdos_renyi(40, 0.15, seed=2),
    "ba": G.barabasi_albert(60, 5, seed=3),
    "k8": G.complete_graph(8),
    "bipartite": G.complete_bipartite(5, 5),
    "planted": G.planted_cliques(50, 0.08, [9], seed=5),
}

VARIANTS = ["degen", "ddegree", "ddegcol", "sdegree", "bitcol"]


def _run(g, k, **kw):
    got = []
    vbbkc(g, k, got.append, **kw)
    return got


@pytest.mark.parametrize("gname", sorted(GRAPHS))
@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("k", [3, 5, 7])
def test_variant_exact(gname, variant, k):
    g = GRAPHS[gname]
    check_cliques(g, k, _run(g, k, variant=variant))


@pytest.mark.parametrize("variant", ["ddegcol", "bitcol"])
def test_rule2_plus_variants(variant):
    g = GRAPHS["er_dense"]
    for k in (4, 5, 6):
        check_cliques(g, k, _run(g, k, variant=variant, rule2=True))


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("et_t", [2, 3])
def test_et_variants(variant, et_t):
    g = GRAPHS["ba"]
    for k in (4, 5):
        check_cliques(g, k, _run(g, k, variant=variant, et_t=et_t))


def test_unknown_variant_raises():
    with pytest.raises(ValueError):
        vbbkc(GRAPHS["k8"], 3, lambda c: None, variant="nope")


def test_k_edge_cases():
    g = GRAPHS["er_sparse"]
    assert sorted(_run(g, 1)) == [(v,) for v in g.vertices]
    assert sorted(tuple(sorted(c)) for c in _run(g, 2)) == g.edge_list()
    assert _run(g, 0) == []


def _dag(g):
    dec = vbbkc_prepare(g)
    rank = dec.rank
    dag = {v: [] for v in g.adj}
    for u, v in zip(g.us.tolist(), g.vs.tolist()):
        if rank[u] < rank[v]:
            dag[u].append(v)
        else:
            dag[v].append(u)
    return dec, dag


@pytest.mark.parametrize("variant", ["ddegcol", "bitcol"])
def test_np_decomposition_covers_all(variant):
    g = GRAPHS["er_dense"]
    dec, dag = _dag(g)
    got = []
    for v in dec.order:
        vbbkc_top_branch_vertex(g, dag, v, 5, got.append, variant=variant)
    check_cliques(g, 5, got)


@pytest.mark.parametrize("variant", ["ddegree", "ddegcol", "sdegree", "bitcol"])
def test_ep_decomposition_covers_all(variant):
    g = GRAPHS["er_dense"]
    dec, dag = _dag(g)
    got = []
    for u in g.adj:
        for v in dag[u]:
            vbbkc_top_branch_edge(g, dag, u, v, 5, got.append, variant=variant)
    check_cliques(g, 5, got)


def test_ep_with_et_covers_all():
    g = GRAPHS["planted"]
    dec, dag = _dag(g)
    got = []
    for u in g.adj:
        for v in dag[u]:
            vbbkc_top_branch_edge(g, dag, u, v, 6, got.append,
                                  variant="ddegcol", et_t=3)
    check_cliques(g, 6, got)


def test_all_variants_same_count_on_larger_graph():
    g = G.barabasi_albert(150, 6, seed=9)
    counts = {len(_run(g, 5, variant=v)) for v in VARIANTS}
    assert len(counts) == 1
