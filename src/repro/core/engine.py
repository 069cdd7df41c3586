"""Distributed k-clique listing engine.

Follows the paper's parallelization (Section 6.2, experiment 7): the
initial branch at (∅, G, k) yields independent sub-branches — one per
*edge* (EP: EBBkC's natural unit, or VBBkC with the first two branching
steps fused) or per *vertex* (NP). The engine:

1. collects the normalized edge table, computes the algorithm's
   preprocessing on the driver (truss peel / coloring / degeneracy DAG;
   per-edge supports can come from the distributed triangle dataflow),
2. broadcasts the adjacency + ordering structures,
3. ships the top-branch units as a DataFrame, round-robin repartitioned
   across ``n_tasks`` partitions for load balance, and
4. runs the pure-Python kernels inside ``mapInPandas``, aggregating
   counts (or collecting cliques) back through Catalyst.

``run_local`` is the sequential entry point used by the single-thread
experiments (the paper's experiments 1–6 are sequential too).
"""
from __future__ import annotations

import pickle
from types import SimpleNamespace
from typing import Callable, Iterable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.core import core_decomposition
from repro.graph.loader import LocalGraph, collect_local
from repro.graph.truss import truss_decomposition, truss_decomposition_from_spark

from . import ebbkc as _e
from . import vbbkc as _v

Out = Callable[[tuple[int, ...]], None]

EBBKC_ALGOS = ("ebbkc-t", "ebbkc-c", "ebbkc-h")
VBBKC_ALGOS = _v._VARIANTS
ALGORITHMS = EBBKC_ALGOS + VBBKC_ALGOS


def _degeneracy_dag_out(g: LocalGraph) -> tuple[list[int], dict[int, list[int]]]:
    dec = core_decomposition(g)
    rank = dec.rank
    out: dict[int, list[int]] = {v: [] for v in g.adj}
    for u, v in zip(g.us.tolist(), g.vs.tolist()):
        if rank[u] < rank[v]:
            out[u].append(v)
        else:
            out[v].append(u)
    return dec.order, out


def prepare(g: LocalGraph, algo: str, *, edges_df: DataFrame | None = None):
    """Algorithm preprocessing (the part the paper's reported times
    include). For truss-ordered algorithms, per-edge supports come from
    the distributed triangle dataflow when ``edges_df`` is given."""
    if algo in ("ebbkc-t", "ebbkc-h"):
        td = (
            truss_decomposition_from_spark(edges_df)
            if edges_df is not None
            else truss_decomposition(g)
        )
        return {"kind": "truss", "order": td.order, "rank": td.rank}
    if algo == "ebbkc-c":
        co = _e.ebbkc_c_prepare(g)
        return {"kind": "color", "out": co.out, "col": co.col, "vid": co.vid}
    if algo in VBBKC_ALGOS:
        order, dag_out = _degeneracy_dag_out(g)
        return {"kind": "degen", "order": order, "dag_out": dag_out}
    raise ValueError(f"unknown algorithm {algo!r}")


def _units(algo: str, scheme: str, prep) -> list[tuple[int, int]]:
    """Top-branch units as (a, b) pairs; NP units use b = -1."""
    if algo in ("ebbkc-t", "ebbkc-h"):
        return [(u, v) for u, v in prep["order"]]
    if algo == "ebbkc-c":
        vid = prep["vid"]
        units = [
            (u, v)
            for u, nbrs in prep["out"].items()
            for v in nbrs
        ]
        units.sort(key=lambda e: (vid[e[0]], vid[e[1]]))
        return units
    if scheme == "np":
        return [(v, -1) for v in prep["order"]]
    dag_out = prep["dag_out"]
    return [(u, v) for u in prep["order"] for v in dag_out[u]]


def _run_units(
    gshim,
    prep,
    algo: str,
    k: int,
    units: Iterable[tuple[int, int]],
    out: Out,
    *,
    et_t: int,
    rule1: bool,
    rule2: bool,
) -> None:
    """Run the kernel for each top-branch unit against sink ``out``."""
    if algo == "ebbkc-t":
        er = prep["rank"]
        for u, v in units:
            _e.ebbkc_t_top_branch(gshim, er, (u, v), k, out, et_t)
    elif algo == "ebbkc-h":
        er = prep["rank"]
        for u, v in units:
            _e.ebbkc_h_top_branch(gshim, er, (u, v), k, out, et_t, rule1, rule2)
    elif algo == "ebbkc-c":
        co_out, col, vid = prep["out"], prep["col"], prep["vid"]
        allv = set(co_out)
        for u, v in units:
            _e._expand_edge_c(
                (), allv, k, u, v, co_out, col, vid, gshim.adj,
                et_t, rule1, rule2, out,
            )
    else:
        dag_out = prep["dag_out"]
        for u, v in units:
            if v < 0:
                _v.vbbkc_top_branch_vertex(
                    gshim, dag_out, u, k, out,
                    variant=algo, rule2=rule2, et_t=et_t,
                )
            else:
                _v.vbbkc_top_branch_edge(
                    gshim, dag_out, u, v, k, out,
                    variant=algo, rule2=rule2, et_t=et_t,
                )


def run_local(
    g: LocalGraph,
    k: int,
    algo: str = "ebbkc-h",
    *,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool | None = None,
    collect: bool = False,
    prep=None,
):
    """Sequential end-to-end run on the driver.

    Returns the clique count, or the list of cliques when ``collect``.
    ``rule2`` defaults to True for color-pruned EBBkC and False for
    VBBkC (where True gives the paper's "+" ablation variants).
    """
    if algo not in ALGORITHMS:
        raise ValueError(f"unknown algorithm {algo!r}")
    r2 = rule2 if rule2 is not None else algo in ("ebbkc-c", "ebbkc-h")
    sink: list[tuple[int, ...]] = []
    n = 0

    def count_out(c):
        nonlocal n
        n += 1

    out = sink.append if collect else count_out
    if k <= 2:
        if _e._trivial_small_k(g, k, out):
            return sink if collect else n
    if algo == "degen":
        # Degen uses one global ordering — run it whole, not per-unit.
        _v.vbbkc(g, k, out, variant="degen", rule2=False, et_t=et_t)
        return sink if collect else n
    if prep is None:
        prep = prepare(g, algo)
    units = _units(algo, "ep" if algo.startswith("ebbkc") else "np", prep)
    _run_units(g, prep, algo, k, units, out, et_t=et_t, rule1=rule1, rule2=r2)
    return sink if collect else n


def _task_iterator_factory(bc, collect: bool):
    """Build the mapInPandas worker: runs kernels over each batch of
    top-branch units against the broadcast graph + orderings."""

    def fn(batches):
        payload = bc.value
        gshim = SimpleNamespace(adj=payload["adj"])
        prep = payload["prep"]
        algo, k = payload["algo"], payload["k"]
        et_t, rule1, rule2 = payload["et_t"], payload["rule1"], payload["rule2"]
        for pdf in batches:
            units = list(zip(pdf["a"].tolist(), pdf["b"].tolist()))
            if collect:
                cliques: list[list[int]] = []
                _run_units(
                    gshim, prep, algo, k, units,
                    lambda c: cliques.append(sorted(c)),
                    et_t=et_t, rule1=rule1, rule2=rule2,
                )
                yield pd.DataFrame({"clique": cliques if cliques else pd.Series(dtype="object")})
            else:
                cnt = 0

                def out(c):
                    nonlocal cnt
                    cnt += 1

                _run_units(gshim, prep, algo, k, units, out,
                           et_t=et_t, rule1=rule1, rule2=rule2)
                yield pd.DataFrame({"n": [cnt]})

    return fn


def _distribute(
    spark: SparkSession,
    edges: DataFrame,
    k: int,
    algo: str,
    *,
    scheme: str,
    n_tasks: int | None,
    et_t: int,
    rule1: bool,
    rule2: bool | None,
    collect: bool,
    distributed_preprocess: bool,
):
    if algo not in ALGORITHMS:
        raise ValueError(f"unknown algorithm {algo!r}")
    if scheme not in ("ep", "np"):
        raise ValueError("scheme must be 'ep' or 'np'")
    g = collect_local(edges)
    r2 = rule2 if rule2 is not None else algo in ("ebbkc-c", "ebbkc-h")
    prep = prepare(g, algo, edges_df=edges if distributed_preprocess else None)
    units = _units(algo, scheme, prep)
    sc = spark.sparkContext
    n_tasks = n_tasks or sc.defaultParallelism
    bc = sc.broadcast(
        {
            "adj": g.adj,
            "prep": prep,
            "algo": algo,
            "k": k,
            "et_t": et_t,
            "rule1": rule1,
            "rule2": r2,
        }
    )
    pdf = pd.DataFrame(units, columns=["a", "b"], dtype="int64")
    units_df = spark.createDataFrame(pdf, schema="a long, b long").repartition(
        max(1, n_tasks)
    )
    schema = "clique array<long>" if collect else "n long"
    return units_df.mapInPandas(_task_iterator_factory(bc, collect), schema=schema)


def count_kcliques(
    spark: SparkSession,
    edges: DataFrame,
    k: int,
    algo: str = "ebbkc-h",
    *,
    scheme: str = "ep",
    n_tasks: int | None = None,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool | None = None,
    distributed_preprocess: bool = False,
) -> int:
    """Distributed k-clique count. ``scheme`` picks EP or NP top-branch
    units for VBBkC algorithms (EBBkC is edge-parallel by nature)."""
    if k == 1:
        return collect_local(edges).n
    if k == 2:
        return collect_local(edges).m
    res = _distribute(
        spark, edges, k, algo, scheme=scheme, n_tasks=n_tasks, et_t=et_t,
        rule1=rule1, rule2=rule2, collect=False,
        distributed_preprocess=distributed_preprocess,
    )
    row = res.agg(F.sum("n").alias("total")).collect()[0]
    return int(row["total"] or 0)


def list_kcliques(
    spark: SparkSession,
    edges: DataFrame,
    k: int,
    algo: str = "ebbkc-h",
    *,
    scheme: str = "ep",
    n_tasks: int | None = None,
    et_t: int = 0,
    rule1: bool = True,
    rule2: bool | None = None,
    distributed_preprocess: bool = False,
) -> DataFrame:
    """Distributed k-clique listing → DataFrame[clique: array<long>],
    each clique sorted ascending."""
    return _distribute(
        spark, edges, k, algo, scheme=scheme, n_tasks=n_tasks, et_t=et_t,
        rule1=rule1, rule2=rule2, collect=True,
        distributed_preprocess=distributed_preprocess,
    )


def structure_bytes(g: LocalGraph, algo: str) -> int:
    """Pickled size of the broadcast structures (experiment 8's space
    proxy): adjacency + the algorithm's ordering artifacts."""
    prep = prepare(g, algo)
    return len(pickle.dumps({"adj": g.adj, "prep": prep}))
