"""Edge-list normalization and LocalGraph round-trips."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.loader import (
    LocalGraph,
    collect_local,
    edges_from_pairs,
    edges_from_pandas,
    normalize_edges,
    to_spark,
)


def test_normalize_drops_self_loops(spark):
    e = edges_from_pairs(spark, [(1, 1), (1, 2), (3, 3)])
    assert sorted(map(tuple, e.collect())) == [(1, 2)]


def test_normalize_dedupes_both_directions(spark):
    e = edges_from_pairs(spark, [(1, 2), (2, 1), (2, 1), (1, 2)])
    assert sorted(map(tuple, e.collect())) == [(1, 2)]


def test_normalize_canonical_order(spark):
    e = edges_from_pairs(spark, [(5, 3), (2, 7), (9, 1)])
    rows = sorted(map(tuple, e.collect()))
    assert rows == [(1, 9), (2, 7), (3, 5)]
    assert all(u < v for u, v in rows)


def test_normalize_casts_to_long(spark):
    pdf = pd.DataFrame({"u": np.array([1, 2], dtype="int32"), "v": np.array([2, 3], dtype="int32")})
    e = normalize_edges(spark.createDataFrame(pdf))
    assert dict(e.dtypes) == {"u": "bigint", "v": "bigint"}


def test_normalize_custom_columns(spark):
    pdf = pd.DataFrame({"a": [3, 1], "b": [1, 3]})
    e = normalize_edges(spark.createDataFrame(pdf), src="a", dst="b")
    assert sorted(map(tuple, e.collect())) == [(1, 3)]


def test_edges_from_pairs_empty(spark):
    e = edges_from_pairs(spark, [])
    assert e.count() == 0


def test_edges_from_pandas(spark):
    e = edges_from_pandas(spark, pd.DataFrame({"u": [1, 2], "v": [2, 3]}))
    assert e.count() == 2


def test_local_graph_from_pairs_basic():
    g = LocalGraph.from_pairs([(2, 1), (1, 2), (3, 3), (2, 3)])
    assert g.m == 2
    assert g.n == 3
    assert g.adj[2] == {1, 3}
    assert g.has_edge(1, 2) and not g.has_edge(1, 3)


def test_local_graph_edge_list_sorted():
    g = LocalGraph.from_pairs([(5, 4), (1, 9), (2, 3)])
    assert g.edge_list() == [(1, 9), (2, 3), (4, 5)]


def test_local_graph_degree():
    g = LocalGraph.from_pairs([(1, 2), (1, 3), (1, 4)])
    assert g.degree(1) == 3
    assert g.degree(2) == 1


def test_collect_local_round_trip(spark):
    pairs = [(1, 2), (2, 3), (1, 3), (4, 5)]
    e = edges_from_pairs(spark, pairs)
    g = collect_local(e)
    assert g.edge_list() == sorted(pairs)
    back = to_spark(spark, g)
    assert sorted(map(tuple, back.collect())) == sorted(pairs)


def test_collect_local_empty(spark):
    g = collect_local(edges_from_pairs(spark, []))
    assert g.n == 0 and g.m == 0


def test_vertices_property():
    g = LocalGraph.from_pairs([(3, 1), (2, 5)])
    assert g.vertices == [1, 2, 3, 5]
