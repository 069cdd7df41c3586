"""Brute-force k-clique oracle for tests.

Enumerates all k-subsets of the vertex set and keeps those that induce
a clique — exponential, so only for the small randomized graphs the
test suite uses. Returns cliques as sorted tuples, which is also the
canonical clique representation everywhere else in this repo.
"""
from __future__ import annotations

from itertools import combinations

from repro.graph.loader import LocalGraph

Clique = tuple[int, ...]


def brute_force_kcliques(g: LocalGraph, k: int) -> list[Clique]:
    """All k-cliques of g as sorted tuples (sorted list, each unique).

    Recursive candidate-restricted enumeration — far cheaper than raw
    ``combinations(V, k)`` but still exact.
    """
    if k <= 0:
        return []
    out: list[Clique] = []
    verts = g.vertices
    if k == 1:
        return [(v,) for v in verts]

    def extend(prefix: list[int], cand: list[int]) -> None:
        if len(prefix) == k:
            out.append(tuple(prefix))
            return
        need = k - len(prefix)
        for i, v in enumerate(cand):
            if len(cand) - i < need:
                break
            nxt = [w for w in cand[i + 1 :] if w in g.adj[v]]
            extend(prefix + [v], nxt)

    extend([], verts)
    return out


def brute_force_count(g: LocalGraph, k: int) -> int:
    """Number of k-cliques of g."""
    return len(brute_force_kcliques(g, k))


def brute_force_in_subset(g: LocalGraph, verts: set[int], k: int) -> list[Clique]:
    """All k-cliques of the subgraph induced by ``verts``."""
    sub_pairs = [
        (u, v)
        for u, v in zip(g.us.tolist(), g.vs.tolist())
        if u in verts and v in verts
    ]
    sub = LocalGraph.from_pairs(sub_pairs)
    # from_pairs drops isolated vertices; re-add them for k = 1 fidelity.
    for v in verts:
        sub.adj.setdefault(v, set())
    return brute_force_kcliques(sub, k)


def is_clique(g_adj: dict[int, set[int]], verts) -> bool:
    """True iff ``verts`` induces a clique under ``g_adj``."""
    vs = list(verts)
    return all(
        vs[j] in g_adj[vs[i]]
        for i in range(len(vs))
        for j in range(i + 1, len(vs))
    )


def check_cliques(g: LocalGraph, k: int, got: list[Clique]) -> None:
    """Assert ``got`` is exactly the set of k-cliques of g (any order)."""
    expected = sorted(brute_force_kcliques(g, k))
    got_sorted = sorted(tuple(sorted(c)) for c in got)
    assert len(got_sorted) == len(set(got_sorted)), "duplicate cliques emitted"
    assert got_sorted == expected, (
        f"clique mismatch for k={k}: got {len(got_sorted)}, "
        f"expected {len(expected)}"
    )
