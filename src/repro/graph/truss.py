"""Truss decomposition, the truss-based edge ordering π_τ, and τ.

The paper's Section 4.2: iteratively remove the edge whose endpoints
have the fewest common neighbors in the remaining graph and append it
to the ordering (Eq. 4) — exactly the classic truss-decomposition peel
[Wang & Cheng, VLDB'12]. The quantity τ is the largest sub-branch size
the ordering ever produces, i.e. the maximum support-at-removal, and
relates to the maximum truss number k_max by k_max = τ + 2 (footnote 2).

Initial per-edge supports come from the distributed triangle dataflow
(`triangles.edge_support_df`); the peel itself is the sequential bucket
loop below (O(m^1.5) with set intersections), run on the driver.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from .loader import LocalGraph, collect_local
from .triangles import edge_support_df, local_edge_support

Edge = tuple[int, int]


@dataclass
class TrussDecomposition:
    """``order`` is π_τ (edges in removal order, canonical u < v);
    ``truss_number`` maps edge → its classic truss number t(e) (max k
    with e in the k-truss, ≥ 2); ``tau`` = k_max − 2 = max
    support-at-removal; ``rank`` maps edge → position in π_τ.
    """

    order: list[Edge]
    truss_number: dict[Edge, int]
    tau: int

    @property
    def rank(self) -> dict[Edge, int]:
        return {e: i for i, e in enumerate(self.order)}

    @property
    def k_max(self) -> int:
        return self.tau + 2


def truss_decomposition(
    g: LocalGraph, support: dict[Edge, int] | None = None
) -> TrussDecomposition:
    """Bucket-queue truss peel.

    Repeatedly removes a minimum-support edge; when (u, v) goes, the
    support of (u, w) and (v, w) drops for every remaining common
    neighbor w. Support-at-removal is monotone under the running max,
    which yields both the truss numbers and τ.
    """
    if g.m == 0:
        return TrussDecomposition(order=[], truss_number={}, tau=0)
    if support is None:
        support = local_edge_support(g)
    sup = {e: int(s) for e, s in support.items()}
    max_sup = max(sup.values())
    buckets: list[set[Edge]] = [set() for _ in range(max_sup + 1)]
    for e, s in sup.items():
        buckets[s].add(e)
    adj = {v: set(nb) for v, nb in g.adj.items()}
    order: list[Edge] = []
    truss_number: dict[Edge, int] = {}
    tau = 0
    d = 0
    for _ in range(g.m):
        while d <= max_sup and not buckets[d]:
            d += 1
        e = buckets[d].pop()
        u, v = e
        tau = max(tau, d)
        truss_number[e] = tau + 2
        order.append(e)
        adj[u].discard(v)
        adj[v].discard(u)
        for w in adj[u] & adj[v]:
            for f in ((min(u, w), max(u, w)), (min(v, w), max(v, w))):
                s = sup[f]
                buckets[s].discard(f)
                sup[f] = s - 1
                buckets[s - 1].add(f)
        d = max(0, d - 1)
    return TrussDecomposition(order=order, truss_number=truss_number, tau=tau)


def truss_decomposition_from_spark(edges: DataFrame) -> TrussDecomposition:
    """Distributed supports (DataFrame triangle joins) + driver peel."""
    g = collect_local(edges)
    sup_pdf = edge_support_df(edges).toPandas()
    support = {
        (int(r.u), int(r.v)): int(r.support) for r in sup_pdf.itertuples()
    }
    return truss_decomposition(g, support)


def tau(g: LocalGraph) -> int:
    """τ(G): the largest sub-branch size under the truss edge ordering."""
    return truss_decomposition(g).tau
