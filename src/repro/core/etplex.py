"""Early-termination procedures (Section 5).

* :func:`list_cliques_2plex` — kC2Plex (Algorithm 6): when the branch
  graph is a clique or 2-plex, partition its vertices into F / L / R
  (each inducing a clique; L[i]–R[i] are the non-adjacent pairs) and
  enumerate l-cliques combinatorially — nearly output-optimal.
* :func:`list_cliques_tplex` — kCtPlex (Algorithm 7): when the branch
  graph is a t-plex (t ≥ 3), branch on the sparse *inverse* graph,
  with the all-adjacent vertex set I completed combinatorially.
* :func:`try_early_terminate` — the dispatch used inside the BB
  kernels: checks the branch graph's plexity against the threshold t
  and runs the matching procedure, returning True when it consumed the
  branch.

All procedures *enumerate* every clique (the paper's task is listing,
and reported times include output), emitting sorted tuples to ``out``.
"""
from __future__ import annotations

from itertools import combinations
from typing import Callable

from repro.graph.plex import inverse_adj, partition_2plex, plexity

Out = Callable[[tuple[int, ...]], None]


def list_cliques_2plex(
    s: tuple[int, ...],
    verts: set[int],
    adj: dict[int, set[int]],
    l: int,
    out: Out,
) -> None:
    """kC2Plex: emit S ∪ C for every l-clique C of the 2-plex (verts, adj).

    ``adj`` is the *branch* adjacency (already restricted; values may be
    supersets — they are intersected with ``verts``).
    """
    if l <= 0:
        if l == 0:
            out(s)
        return
    f, left, right = partition_2plex(verts, adj)
    if len(f) + len(left) < l:
        return
    n_pairs = len(left)
    n_f = len(f)
    # Loop order puts the (C-implemented) F-combinations innermost and
    # hoists the pair bookkeeping: r_avail depends only on the chosen
    # L-subset, and c1 is determined by (c2, c3).
    for c2 in range(0, min(l, n_pairs) + 1):
        for idxs in combinations(range(n_pairs), c2):
            l_sub = tuple(left[i] for i in idxs)
            chosen = set(idxs)
            # R minus the partners of the chosen L vertices — any subset
            # of what remains closes a clique.
            r_avail = [right[i] for i in range(n_pairs) if i not in chosen]
            for c3 in range(0, min(l - c2, len(r_avail)) + 1):
                c1 = l - c2 - c3
                if c1 > n_f:
                    continue
                for r_sub in combinations(r_avail, c3):
                    base = l_sub + r_sub
                    for f_sub in combinations(f, c1):
                        out(s + f_sub + base)


def list_cliques_tplex(
    s: tuple[int, ...],
    verts: set[int],
    adj: dict[int, set[int]],
    l: int,
    out: Out,
) -> None:
    """kCtPlex: emit S ∪ C for every l-clique C of the t-plex (verts, adj),
    branching on the inverse graph (Eq. 9) with the all-adjacent set I
    handled by direct combination enumeration."""
    if l <= 0:
        if l == 0:
            out(s)
        return
    inv = inverse_adj(verts, adj)
    i_set = sorted(v for v in verts if not inv[v])
    c0 = sorted(verts - set(i_set))

    def rec(s2: tuple[int, ...], c: list[int], l2: int) -> None:
        if l2 == 0:
            out(s2)
            return
        if len(i_set) >= l2:
            for i_sub in combinations(i_set, l2):
                out(s2 + i_sub)
        for i, v in enumerate(c):
            non_nb = inv[v]
            ci = [w for w in c[i + 1 :] if w not in non_nb]
            if len(ci) + len(i_set) >= l2 - 1:
                rec(s2 + (v,), ci, l2 - 1)

    rec(s, c0, l)


def try_early_terminate(
    s: tuple[int, ...],
    verts: set[int],
    adj: dict[int, set[int]],
    l: int,
    t_max: int,
    out: Out,
) -> bool:
    """If (verts, adj) is a t-plex with t ≤ ``t_max``, list its l-cliques
    with the matching specialized procedure and return True.

    ``t_max`` ≤ 0 disables early termination entirely. The paper's
    default policy (Section 6.1) is t = 2 for k ≤ τ/2 and t = 3 for
    larger k; Experiment 6 sweeps t ∈ {1..5}.
    """
    if t_max <= 0 or not verts:
        return False
    # Early-exit scan: g is a t_max-plex iff every induced degree is
    # ≥ |V| − t_max. Most branches fail on the first vertex, making the
    # check cheap (the paper maintains min degree during construction
    # for the same O(|V(g)|) effect).
    need = len(verts) - t_max
    min_deg = len(verts)
    for w in verts:
        d = len(adj[w] & verts)
        if d < need:
            return False
        if d < min_deg:
            min_deg = d
    t = len(verts) - min_deg
    if t <= 2:
        list_cliques_2plex(s, verts, adj, l, out)
    else:
        list_cliques_tplex(s, verts, adj, l, out)
    return True


def default_t_threshold(k: int, tau_val: int) -> int:
    """The paper's ET threshold policy: t = 2 when k ≤ τ/2, else t = 3."""
    return 2 if k <= tau_val / 2 else 3
