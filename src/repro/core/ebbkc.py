"""EBBkC — the paper's edge-oriented branching BB framework (Section 4).

Three instantiations over the edge ordering:

* :func:`ebbkc_t` — truss-based edge ordering (Algorithm 3). A branch
  is represented implicitly as ``(S, verts, min_rank, l)``: its edge
  set is every adjacency pair inside ``verts`` whose global truss rank
  exceeds ``min_rank`` (the lazy equivalent of the VSet/ESet
  intersections in Algorithm 3).
* :func:`ebbkc_c` — color-based edge ordering over the color DAG
  (Algorithm 4) with pruning Rules (1) and (2).
* :func:`ebbkc_h` — hybrid (Algorithm 5): truss ordering at the initial
  branch, per-branch re-coloring + color DAG below.

Every function takes an ``out`` sink receiving each k-clique as a
sorted tuple (listing semantics — output cost is part of the measured
work, as in the paper), plus an ``et_t`` early-termination threshold
(0 disables ET; see `etplex`). ``*_top_branch`` entry points process a
single initial-branch sub-problem so the distributed engine can fan
them out (the paper's EP parallel scheme).
"""
from __future__ import annotations

from typing import Callable

from repro.graph.coloring import ColorOrdering, color_ordering, subgraph_color_ordering
from repro.graph.loader import LocalGraph
from repro.graph.truss import TrussDecomposition, truss_decomposition

from .etplex import try_early_terminate

Out = Callable[[tuple[int, ...]], None]
Edge = tuple[int, int]


def _trivial_small_k(g: LocalGraph, k: int, out: Out) -> bool:
    """Handle k ≤ 2 (the paper assumes k ≥ 3): 1-cliques are vertices,
    2-cliques are edges. Returns True when it consumed the call."""
    if k <= 0:
        return True
    if k == 1:
        for v in g.vertices:
            out((v,))
        return True
    if k == 2:
        for u, v in zip(g.us.tolist(), g.vs.tolist()):
            out((int(u), int(v)))
        return True
    return False


# --------------------------------------------------------------------------
# EBBkC-T (Algorithm 3)
# --------------------------------------------------------------------------


def _erank(er: dict[Edge, int], u: int, v: int) -> int:
    return er[(u, v)] if u < v else er[(v, u)]


def _rec_t(
    s: tuple[int, ...],
    verts: set[int],
    min_rank: int,
    l: int,
    adj: dict[int, set[int]],
    er: dict[Edge, int],
    et_t: int,
    out: Out,
) -> None:
    """List l-cliques of the branch graph (verts, edges with rank > min_rank),
    each merged with S. Pruning, termination and branching follow
    Algorithm 2/3 with the inherited global edge ordering."""
    if len(verts) < l:
        return
    if l == 1:
        for v in verts:
            out(s + (v,))
        return
    # Branch adjacency: only edges ordered after min_rank survive (the
    # ESet intersection of Algorithm 3, computed lazily in O(|g|^2)).
    adj2 = {
        v: {w for w in adj[v] & verts if _erank(er, v, w) > min_rank}
        for v in verts
    }
    if l == 2:
        for v in verts:
            for w in adj2[v]:
                if v < w:
                    out(s + (v, w))
        return
    if try_early_terminate(s, verts, adj2, l, et_t, out):
        return
    # No sort needed: each sub-branch is fully determined by the rank
    # filters below, not by the processing order of the edges.
    edges = [
        (_erank(er, v, w), v, w)
        for v in verts
        for w in adj2[v]
        if v < w
    ]
    child_l = l - 2
    for r, u, v in edges:
        v2 = {
            w
            for w in adj2[u] & adj2[v]
            if _erank(er, u, w) > r and _erank(er, v, w) > r
        }
        _rec_t(s + (u, v), v2, r, child_l, adj, er, et_t, out)


def ebbkc_t_prepare(g: LocalGraph) -> TrussDecomposition:
    """Preprocessing for EBBkC-T/H: the truss decomposition of G."""
    return truss_decomposition(g)


def ebbkc_t_top_branch(
    g: LocalGraph,
    er: dict[Edge, int],
    edge: Edge,
    k: int,
    out: Out,
    et_t: int = 0,
) -> None:
    """Process the initial-branch sub-problem for one edge of π_τ(G)."""
    u, v = edge
    r = er[edge]
    verts = {
        w
        for w in g.adj[u] & g.adj[v]
        if _erank(er, u, w) > r and _erank(er, v, w) > r
    }
    _rec_t((u, v), verts, r, k - 2, g.adj, er, et_t, out)


def ebbkc_t(
    g: LocalGraph,
    k: int,
    out: Out,
    *,
    truss: TrussDecomposition | None = None,
    et_t: int = 0,
) -> None:
    """EBBkC with the truss-based edge ordering — O(δm + km(τ/2)^(k-2))."""
    if _trivial_small_k(g, k, out):
        return
    td = truss if truss is not None else ebbkc_t_prepare(g)
    er = td.rank
    for edge in td.order:
        ebbkc_t_top_branch(g, er, edge, k, out, et_t)


# --------------------------------------------------------------------------
# EBBkC-C (Algorithm 4)
# --------------------------------------------------------------------------


def _distinct_colors(cand: set[int], col: dict[int, int]) -> int:
    return len({col[w] for w in cand})


def _expand_edge_c(
    s: tuple[int, ...],
    cand: set[int],
    l: int,
    u: int,
    v: int,
    co_out: dict[int, set[int]],
    col: dict[int, int],
    vid: dict[int, int],
    und: dict[int, set[int]],
    et_t: int,
    rule1: bool,
    rule2: bool,
    out: Out,
) -> None:
    """Branch on edge u→v (vid(u) < vid(v), hence col(u) ≥ col(v)) of the
    color DAG inside candidate set ``cand``: apply Rules (1)/(2), build
    the common-out-neighbor sub-branch, recurse with l − 2."""
    if rule1 and (col[u] < l or col[v] < l - 1):
        return
    cand2 = co_out[u] & co_out[v] & cand
    if rule2 and _distinct_colors(cand2, col) < l - 2:
        return
    _rec_c(s + (u, v), cand2, l - 2, co_out, col, vid, und, et_t, rule1, rule2, out)


def _rec_c(
    s: tuple[int, ...],
    cand: set[int],
    l: int,
    co_out: dict[int, set[int]],
    col: dict[int, int],
    vid: dict[int, int],
    und: dict[int, set[int]],
    et_t: int,
    rule1: bool,
    rule2: bool,
    out: Out,
) -> None:
    """EBBkC-C_Rec: the branch graph is the subgraph induced by ``cand``
    (the DAG orientation encodes edge exclusion, so no rank filter)."""
    if len(cand) < l:
        return
    if l == 1:
        for w in cand:
            out(s + (w,))
        return
    if l == 2:
        for w in cand:
            for x in co_out[w] & cand:
                out(s + (w, x))
        return
    if et_t > 0 and try_early_terminate(s, cand, und, l, et_t, out):
        return
    # Iteration order is free: the DAG orientation already encodes the
    # exclude-previous-edges semantics, so no per-branch sort is needed.
    for u in cand:
        ou = co_out[u] & cand
        for v in ou:
            if rule1 and (col[u] < l or col[v] < l - 1):
                continue
            cand2 = co_out[v] & ou
            if rule2 and _distinct_colors(cand2, col) < l - 2:
                continue
            _rec_c(s + (u, v), cand2, l - 2, co_out, col, vid, und, et_t, rule1, rule2, out)


def ebbkc_c_prepare(g: LocalGraph) -> ColorOrdering:
    """Preprocessing for EBBkC-C: global coloring, ordering and DAG."""
    return color_ordering(g)


def ebbkc_c(
    g: LocalGraph,
    k: int,
    out: Out,
    *,
    co: ColorOrdering | None = None,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool = True,
) -> None:
    """EBBkC with the color-based edge ordering — O(km(Δ/2)^(k-2)), with
    Rules (1)/(2) pruning. ``rule2=False`` gives the paper's
    "EBBkC (stc)" ablation variant."""
    if _trivial_small_k(g, k, out):
        return
    c = co if co is not None else ebbkc_c_prepare(g)
    _rec_c(
        (), set(g.adj), k, c.out, c.col, c.vid, g.adj, et_t, rule1, rule2, out
    )


# --------------------------------------------------------------------------
# EBBkC-H (Algorithm 5)
# --------------------------------------------------------------------------


def ebbkc_h_top_branch(
    g: LocalGraph,
    er: dict[Edge, int],
    edge: Edge,
    k: int,
    out: Out,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool = True,
) -> None:
    """One initial-branch sub-problem of EBBkC-H: slice the truss-ordered
    branch graph g_i, re-color it, and run the color recursion inside."""
    u, v = edge
    r = er[edge]
    verts = {
        w
        for w in g.adj[u] & g.adj[v]
        if _erank(er, u, w) > r and _erank(er, v, w) > r
    }
    l = k - 2
    if len(verts) < l:
        return
    # Branch-graph adjacency keeps only edges ordered after e_i.
    adj2 = {
        w: {x for x in g.adj[w] & verts if _erank(er, w, x) > r}
        for w in verts
    }
    if l == 1:
        for w in verts:
            out((u, v, w))
        return
    if try_early_terminate((u, v), verts, adj2, l, et_t, out):
        return
    co = subgraph_color_ordering(verts, adj2)
    _rec_c((u, v), verts, l, co.out, co.col, co.vid, adj2, et_t, rule1, rule2, out)


def ebbkc_h(
    g: LocalGraph,
    k: int,
    out: Out,
    *,
    truss: TrussDecomposition | None = None,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool = True,
) -> None:
    """EBBkC with the hybrid edge ordering — the paper's default EBBkC.

    Truss ordering bounds every initial sub-branch by τ (so the
    complexity matches EBBkC-T); color pruning applies below.
    """
    if _trivial_small_k(g, k, out):
        return
    td = truss if truss is not None else ebbkc_t_prepare(g)
    er = td.rank
    for edge in td.order:
        ebbkc_h_top_branch(g, er, edge, k, out, et_t, rule1, rule2)
