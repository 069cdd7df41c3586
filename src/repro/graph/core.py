"""Degrees, k-core decomposition and the degeneracy ordering.

Degrees are computed distributed (DataFrame groupBy over the symmetric
edge view). The peel itself — repeatedly remove a minimum-degree vertex —
is inherently sequential, so it runs on the driver with an O(n + m)
bucket queue over the collected (small) graph, exactly as every
published distributed k-clique system does for its preprocessing.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .loader import LocalGraph


def degrees_df(edges: DataFrame) -> DataFrame:
    """Per-vertex degree of a normalized edge table → (v, degree)."""
    sym = edges.select(F.col("u").alias("v")).unionAll(
        edges.select(F.col("v").alias("v"))
    )
    return sym.groupBy("v").agg(F.count("*").cast("long").alias("degree"))


def max_degree(edges: DataFrame) -> int:
    """Δ — the maximum degree (0 for an empty graph)."""
    row = degrees_df(edges).agg(F.max("degree").alias("d")).collect()[0]
    return int(row["d"]) if row["d"] is not None else 0


@dataclass
class CoreDecomposition:
    """Result of the degeneracy peel.

    ``order`` lists vertices in removal order (the *degeneracy
    ordering*); ``core_number`` maps each vertex to its core number;
    ``degeneracy`` is δ = max core number; ``rank`` maps vertex → its
    position in ``order``.
    """

    order: list[int]
    core_number: dict[int, int]
    degeneracy: int

    @property
    def rank(self) -> dict[int, int]:
        return {v: i for i, v in enumerate(self.order)}


def core_decomposition(g: LocalGraph) -> CoreDecomposition:
    """O(n + m) bucket-queue peel (Batagelj–Zaveršnik).

    Repeatedly removes a vertex of minimum remaining degree; the core
    number of a vertex is the max degree threshold in force when it is
    removed, and δ is the max over all vertices.
    """
    if g.n == 0:
        return CoreDecomposition(order=[], core_number={}, degeneracy=0)
    verts = g.vertices
    deg = {v: g.degree(v) for v in verts}
    max_deg = max(deg.values())
    buckets: list[set[int]] = [set() for _ in range(max_deg + 1)]
    for v, d in deg.items():
        buckets[d].add(v)
    removed: set[int] = set()
    order: list[int] = []
    core_number: dict[int, int] = {}
    cur_core = 0
    d = 0
    for _ in range(len(verts)):
        while d <= max_deg and not buckets[d]:
            d += 1
        v = buckets[d].pop()
        cur_core = max(cur_core, d)
        core_number[v] = cur_core
        order.append(v)
        removed.add(v)
        for w in g.adj[v]:
            if w in removed:
                continue
            dw = deg[w]
            buckets[dw].discard(w)
            deg[w] = dw - 1
            buckets[dw - 1].add(w)
        d = max(0, d - 1)
    return CoreDecomposition(
        order=order, core_number=core_number, degeneracy=cur_core
    )


def degeneracy(g: LocalGraph) -> int:
    """δ of the graph (max k with a non-empty k-core)."""
    return core_decomposition(g).degeneracy


def k_core(g: LocalGraph, k: int) -> set[int]:
    """Vertex set of the k-core (possibly empty)."""
    dec = core_decomposition(g)
    return {v for v, c in dec.core_number.items() if c >= k}


def degeneracy_dag(g: LocalGraph) -> tuple[list[int], dict[int, list[int]]]:
    """Orient edges along the degeneracy ordering.

    Returns ``(order, out)`` where ``out[v]`` lists the neighbors of v
    that come *after* v in the degeneracy ordering — each |out[v]| ≤ δ,
    the bound VBBkC's complexity rests on.
    """
    dec = core_decomposition(g)
    rank = dec.rank
    out: dict[int, list[int]] = {v: [] for v in g.adj}
    for u, v in zip(g.us.tolist(), g.vs.tolist()):
        if rank[u] < rank[v]:
            out[u].append(v)
        else:
            out[v].append(u)
    for v in out:
        out[v].sort(key=rank.__getitem__)
    return dec.order, out


def oriented_edges_df(edges: DataFrame, rank: dict[int, int]) -> DataFrame:
    """DataFrame DAG view: each undirected edge oriented low-rank → high-rank.

    ``rank`` is any total vertex order (degeneracy or color position).
    Used by the pure-DataFrame lister and the triangle dataflow.
    """
    spark = edges.sparkSession
    import pandas as pd

    rank_df = spark.createDataFrame(
        pd.DataFrame(
            {"vtx": list(rank.keys()), "rnk": list(rank.values())},
            dtype="int64",
        ),
        schema="vtx long, rnk long",
    )
    e = (
        edges.join(rank_df.withColumnRenamed("vtx", "u").withColumnRenamed("rnk", "ru"), "u")
        .join(rank_df.withColumnRenamed("vtx", "v").withColumnRenamed("rnk", "rv"), "v")
    )
    return e.select(
        F.when(F.col("ru") < F.col("rv"), F.col("u")).otherwise(F.col("v")).alias("src"),
        F.when(F.col("ru") < F.col("rv"), F.col("v")).otherwise(F.col("u")).alias("dst"),
    )
