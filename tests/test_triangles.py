"""Distributed triangle dataflow vs local computation and the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro.graph import generators as G
from repro.graph.core import core_decomposition
from repro.graph.loader import to_spark
from repro.graph.triangles import (
    edge_support_df,
    local_edge_support,
    triangle_count,
    triangles_df,
)
from repro.oracle import assert_equivalent


def _local_triangle_count(g):
    return sum(local_edge_support(g).values()) // 3


@pytest.mark.parametrize(
    "g,expected",
    [
        (G.complete_graph(5), 10),
        (G.complete_bipartite(4, 4), 0),
        (G.cycle_graph(3), 1),
        (G.cycle_graph(6), 0),
    ],
)
def test_triangle_count_known(spark, g, expected):
    assert triangle_count(to_spark(spark, g)) == expected


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_triangle_count_random_vs_local(spark, seed):
    g = G.erdos_renyi(35, 0.3, seed=seed)
    assert triangle_count(to_spark(spark, g)) == _local_triangle_count(g)


def test_triangles_unique_and_rank_ascending(spark):
    g = G.erdos_renyi(25, 0.4, seed=3)
    rank = core_decomposition(g).rank
    rows = triangles_df(to_spark(spark, g), rank).collect()
    seen = set()
    for r in rows:
        a, b, c = int(r["a"]), int(r["b"]), int(r["c"])
        assert rank[a] < rank[b] < rank[c]
        assert b in g.adj[a] and c in g.adj[a] and c in g.adj[b]
        key = (a, b, c)
        assert key not in seen
        seen.add(key)
    assert len(rows) == _local_triangle_count(g)


def test_triangles_df_oracle(spark):
    """Same oriented triangle join executed by DuckDB over the DAG table."""
    from repro.graph.core import oriented_edges_df

    g = G.barabasi_albert(60, 4, seed=4)
    rank = core_decomposition(g).rank
    dag = oriented_edges_df(to_spark(spark, g), rank)
    tri = triangles_df(to_spark(spark, g), rank)
    sql = (
        "SELECT e1.src AS a, e1.dst AS b, e2.dst AS c "
        "FROM dag e1 JOIN dag e2 ON e1.src = e2.src AND e1.dst <> e2.dst "
        "JOIN dag e3 ON e3.src = e1.dst AND e3.dst = e2.dst"
    )
    assert_equivalent(tri, sql, dag=dag)


def test_edge_support_matches_local(spark):
    g = G.erdos_renyi(30, 0.35, seed=5)
    pdf = edge_support_df(to_spark(spark, g)).toPandas()
    got = {(int(r.u), int(r.v)): int(r.support) for r in pdf.itertuples()}
    assert got == local_edge_support(g)


def test_edge_support_includes_zero_support_edges(spark):
    g = G.cycle_graph(8)  # triangle-free
    df = edge_support_df(to_spark(spark, g))
    assert df.count() == g.m
    assert df.agg(F.max("support")).collect()[0][0] == 0


def test_local_edge_support_complete():
    g = G.complete_graph(6)
    sup = local_edge_support(g)
    assert all(s == 4 for s in sup.values())
