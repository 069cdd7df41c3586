"""Distributed engine: EP/NP fan-out over the Spark cluster vs brute force."""
import pytest

from repro.core.bruteforce import brute_force_count, brute_force_kcliques, check_cliques
from repro.core.engine import (
    ALGORITHMS,
    count_kcliques,
    list_kcliques,
    run_local,
    structure_bytes,
)
from repro.graph import generators as G
from repro.graph.loader import to_spark


@pytest.fixture(scope="module")
def graph():
    return G.erdos_renyi(30, 0.35, seed=7)


@pytest.fixture(scope="module")
def edges(spark, graph):
    df = to_spark(spark, graph)
    df.cache().count()
    return df


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_count_matches_brute_force(spark, graph, edges, algo):
    for k in (3, 4, 5):
        assert count_kcliques(spark, edges, k, algo) == brute_force_count(graph, k)


def test_count_with_et(spark, graph, edges):
    assert count_kcliques(spark, edges, 4, "ebbkc-h", et_t=2) == brute_force_count(graph, 4)


def test_count_np_scheme(spark, graph, edges):
    assert count_kcliques(spark, edges, 4, "ddegcol", scheme="np") == brute_force_count(graph, 4)


def test_count_various_task_counts(spark, graph, edges):
    exp = brute_force_count(graph, 4)
    for n_tasks in (1, 2, 8):
        assert count_kcliques(spark, edges, 4, "ebbkc-h", n_tasks=n_tasks) == exp


def test_count_k1_k2(spark, graph, edges):
    assert count_kcliques(spark, edges, 1) == graph.n
    assert count_kcliques(spark, edges, 2) == graph.m


def test_count_distributed_preprocess(spark, graph, edges):
    got = count_kcliques(spark, edges, 4, "ebbkc-t", distributed_preprocess=True)
    assert got == brute_force_count(graph, 4)


def test_list_kcliques_exact(spark, graph, edges):
    rows = list_kcliques(spark, edges, 4, "ebbkc-h").collect()
    got = [tuple(r["clique"]) for r in rows]
    check_cliques(graph, 4, got)


def test_list_kcliques_sorted_members(spark, graph, edges):
    for r in list_kcliques(spark, edges, 3, "bitcol").collect():
        c = list(r["clique"])
        assert c == sorted(c)


def test_list_empty_result(spark):
    g = G.cycle_graph(12)
    df = to_spark(spark, g)
    assert list_kcliques(spark, df, 3, "ebbkc-h").count() == 0


def test_unknown_algorithm_raises(spark, edges):
    with pytest.raises(ValueError):
        count_kcliques(spark, edges, 3, "nope")


def test_bad_scheme_raises(spark, edges):
    with pytest.raises(ValueError):
        count_kcliques(spark, edges, 3, "ddegcol", scheme="xx")


@pytest.mark.parametrize("algo", ["ebbkc-h", "ddegcol", "bitcol"])
def test_run_local_matches_distributed(spark, graph, edges, algo):
    assert run_local(graph, 4, algo) == count_kcliques(spark, edges, 4, algo)


def test_run_local_collect_mode(graph):
    got = run_local(graph, 4, "ebbkc-h", collect=True)
    check_cliques(graph, 4, got)


def test_run_local_all_algorithms_agree(graph):
    counts = {run_local(graph, 5, a, et_t=2) for a in ALGORITHMS}
    assert counts == {brute_force_count(graph, 5)}


def test_structure_bytes_positive(graph):
    for algo in ("ebbkc-h", "ebbkc-c", "ddegcol"):
        b = structure_bytes(graph, algo)
        assert b > 0
    # EBBkC carries the edge-ordering structures -> at least as large as
    # the degeneracy-only payload (paper experiment 8's observation).
    assert structure_bytes(graph, "ebbkc-h") >= structure_bytes(graph, "degen") * 0.5
