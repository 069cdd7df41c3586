"""Triangle dataflow over Spark DataFrames.

Standard oriented-join triangle listing (Catalyst shuffle joins; the
fixture disables broadcast): orient each edge along a degeneracy-style
rank, join wedges ``src→a, src→b`` and close them against the oriented
edge table. Every triangle is produced exactly once. Per-edge *support*
(triangle counts per edge) feeds the truss decomposition.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .core import core_decomposition, oriented_edges_df
from .loader import LocalGraph, collect_local


def triangles_df(edges: DataFrame, rank: dict[int, int] | None = None) -> DataFrame:
    """All triangles of a normalized edge table → (a, b, c), rank-ascending.

    ``rank`` defaults to the degeneracy ordering of the collected graph;
    pass one to avoid recomputation.
    """
    if rank is None:
        rank = core_decomposition(collect_local(edges)).rank
    dag = oriented_edges_df(edges, rank)
    e1 = dag.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    e2 = dag.select(F.col("src").alias("a"), F.col("dst").alias("c"))
    wedges = e1.join(e2, "a").where(F.col("b") != F.col("c"))
    closing = dag.select(F.col("src").alias("b"), F.col("dst").alias("c"))
    tri = wedges.join(closing, ["b", "c"])
    # b, c are both out-neighbors of a; the closing edge fixes b before c
    # in rank order, so (a, b, c) is rank-ascending and unique.
    return tri.select("a", "b", "c")


def triangle_count(edges: DataFrame) -> int:
    """Number of triangles in the graph."""
    return triangles_df(edges).count()


def edge_support_df(edges: DataFrame, rank: dict[int, int] | None = None) -> DataFrame:
    """Per-edge triangle support → (u, v, support), canonical u < v.

    Edges in no triangle appear with support 0 (left join against the
    edge table), so the truss peel sees every edge.
    """
    tri = triangles_df(edges, rank)
    sides = (
        tri.select(F.col("a").alias("x"), F.col("b").alias("y"))
        .unionAll(tri.select(F.col("a").alias("x"), F.col("c").alias("y")))
        .unionAll(tri.select(F.col("b").alias("x"), F.col("c").alias("y")))
    )
    per_edge = sides.select(
        F.least("x", "y").alias("u"), F.greatest("x", "y").alias("v")
    ).groupBy("u", "v").agg(F.count("*").cast("long").alias("support"))
    return (
        edges.join(per_edge, ["u", "v"], "left")
        .select("u", "v", F.coalesce("support", F.lit(0)).cast("long").alias("support"))
    )


def local_edge_support(g: LocalGraph) -> dict[tuple[int, int], int]:
    """Driver-side per-edge support via adjacency-set intersections.

    Same result as :func:`edge_support_df`; used by tests as a second
    implementation and by the truss peel when no SparkSession is around.
    """
    return {
        (int(u), int(v)): len(g.adj[u] & g.adj[v])
        for u, v in zip(g.us.tolist(), g.vs.tolist())
    }
