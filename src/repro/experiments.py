"""Experiment harnesses — one per table/figure of the evaluation section.

Each ``expN_rows(...)`` returns a list of row dicts (dataset, k,
algorithm label, wall-clock seconds, clique count) reproducing the
comparison structure of the paper's experiment N; ``format_rows``
renders them as the printed table. Jobs (`jobs/expN_*.py`) and
benchmarks (`benchmarks/bench_expN_*.py`) are thin wrappers over these.

Protocol notes carried over from the paper (Section 6.1):
* reported times include preprocessing and ordering generation
  (``run_local``/``count_kcliques`` recompute them per run);
* the ET threshold policy is t = 2 for k ≤ τ/2 and t = 3 otherwise;
* k starts at 4 (k = 3 reduces to triangle listing).
"""
from __future__ import annotations

import time
from functools import lru_cache

from pyspark.sql import SparkSession

from repro.core.engine import count_kcliques, run_local, structure_bytes
from repro.core.etplex import default_t_threshold
from repro.graph.datasets import DATASETS, load
from repro.graph.loader import LocalGraph, to_spark
from repro.graph.maxclique import max_clique_size
from repro.graph.truss import truss_decomposition


@lru_cache(maxsize=32)
def graph_info(name: str) -> dict:
    """Dataset graph + the structural numbers the sweeps depend on."""
    g = load(name)
    return {
        "g": g,
        "tau": truss_decomposition(g).tau,
        "omega": max_clique_size(g),
    }


def policy_t(name: str, k: int) -> int:
    """The paper's default ET threshold for dataset/k."""
    return default_t_threshold(k, graph_info(name)["tau"])


def sweep_ks(name: str) -> list[int]:
    """The k values benchmarked for a dataset: the full 4..ω sweep
    (every other value) for small-ω graphs; small k plus near-ω k for
    large-ω graphs — the paper's protocol."""
    omega = graph_info(name)["omega"]
    if DATASETS[name].group == "small":
        ks = list(range(4, omega + 1, 2))
        if ks[-1] != omega:
            ks.append(omega)
        return ks
    return [4, 5, 6] + [k for k in range(omega - 4, omega + 1) if k > 6]


def timed_local(name: str, k: int, algo: str, **opts) -> dict:
    """One sequential measurement (prep included, as in the paper)."""
    g = graph_info(name)["g"]
    t0 = time.perf_counter()
    count = run_local(g, k, algo, **opts)
    return {
        "dataset": name,
        "k": k,
        "seconds": time.perf_counter() - t0,
        "count": count,
    }


# --------------------------------------------------------------------------
# Algorithm line-ups
# --------------------------------------------------------------------------


def _main_lineup(name: str, k: int):
    """Experiments 1/2: EBBkC+ET vs the four VBBkC baselines."""
    return [
        ("EBBkC+ET", "ebbkc-h", {"et_t": policy_t(name, k)}),
        ("DDegCol", "ddegcol", {}),
        ("DDegree", "ddegree", {}),
        ("SDegree", "sdegree", {}),
        ("BitCol", "bitcol", {}),
    ]


def _ablation_lineup(name: str, k: int):
    """Experiment 3: EBBkC±ET vs the Rule-2-augmented VBBkC SOTA."""
    return [
        ("EBBkC+ET", "ebbkc-h", {"et_t": policy_t(name, k)}),
        ("EBBkC", "ebbkc-h", {}),
        ("DDegCol+", "ddegcol", {"rule2": True}),
        ("BitCol+", "bitcol", {"rule2": True}),
    ]


def _ordering_lineup(name: str, k: int):
    """Experiment 4: the three edge orderings, all pruned, all +ET."""
    t = policy_t(name, k)
    return [
        ("EBBkC-T+ET", "ebbkc-t", {"et_t": t}),
        ("EBBkC-C+ET", "ebbkc-c", {"et_t": t}),
        ("EBBkC-H+ET", "ebbkc-h", {"et_t": t}),
    ]


def _rule2_lineup(name: str, k: int):
    """Experiment 5: with vs without the paper's new Rule (2)."""
    t = policy_t(name, k)
    return [
        ("EBBkC+ET", "ebbkc-h", {"et_t": t, "rule2": True}),
        ("EBBkC(stc)+ET", "ebbkc-h", {"et_t": t, "rule2": False}),
    ]


def _ks_for(name: str, ks) -> list[int]:
    """Resolve a sweep's k values: ``ks`` may be None (default sweep),
    a dict {dataset: [k, ...]}, or a callable name → [k, ...]."""
    if ks is None:
        return sweep_ks(name)
    if isinstance(ks, dict):
        return ks[name]
    return ks(name)


def _sweep(datasets, ks, lineup_fn) -> list[dict]:
    rows = []
    for name in datasets:
        for k in _ks_for(name, ks):
            for label, algo, opts in lineup_fn(name, k):
                rows.append({**timed_local(name, k, algo, **opts), "algo": label})
    return rows


# --------------------------------------------------------------------------
# The experiments
# --------------------------------------------------------------------------


def exp1_rows(datasets=("wk", "po", "cn", "ba"), ks=None) -> list[dict]:
    """Experiment 1 (Fig. 4): small-ω comparison, k = 4..ω."""
    return _sweep(datasets, ks, _main_lineup)


def exp2_rows(datasets=("st", "or", "db"), ks=None) -> list[dict]:
    """Experiment 2 (Fig. 5): large-ω comparison, small k + near-ω k."""
    return _sweep(datasets, ks, _main_lineup)


def exp3_rows(datasets=("wk", "st"), ks=None) -> list[dict]:
    """Experiment 3 (Fig. 6/14): ablation of framework vs ET."""
    return _sweep(datasets, ks, _ablation_lineup)


def exp4_rows(datasets=("wk", "or"), ks=None) -> list[dict]:
    """Experiment 4 (Fig. 7): truss vs color vs hybrid edge ordering."""
    return _sweep(datasets, ks, _ordering_lineup)


def exp5_rows(datasets=("wk", "or"), ks=None) -> list[dict]:
    """Experiment 5 (Fig. 8/15): effect of pruning Rule (2)."""
    return _sweep(datasets, ks, _rule2_lineup)


def exp6_rows(datasets=("wk", "cn"), ks=None, ts=(1, 2, 3, 4, 5)) -> list[dict]:
    """Experiment 6 (Fig. 9): ET threshold sweep t ∈ {1..5}."""
    rows = []
    for name in datasets:
        for k in _ks_for(name, ks):
            for t in ts:
                rows.append(
                    {**timed_local(name, k, "ebbkc-h", et_t=t), "algo": f"t={t}"}
                )
    return rows


def table2_rows(datasets=("wk", "po", "st", "or")) -> list[dict]:
    """Table 2: truss-ordering vs degeneracy-ordering generation time."""
    from repro.graph.core import core_decomposition

    paper = {"wk": (0.2, 0.1), "po": (10.7, 7.3), "st": (1.1, 0.6), "or": (60.4, 53.3)}
    rows = []
    for name in datasets:
        g = load(name)
        t0 = time.perf_counter()
        truss_decomposition(g)
        truss_s = time.perf_counter() - t0
        t0 = time.perf_counter()
        core_decomposition(g)
        degen_s = time.perf_counter() - t0
        p = paper.get(name, (None, None))
        rows.append(
            {
                "dataset": name,
                "truss_s": truss_s,
                "degen_s": degen_s,
                "paper_truss_s": p[0],
                "paper_degen_s": p[1],
            }
        )
    return rows


def exp7_rows(
    spark: SparkSession,
    dataset: str = "cn",
    k: int = 12,
    task_counts=(1, 2, 4, 8, 16),
) -> list[dict]:
    """Experiment 7 (Fig. 10): parallel schemes — EBBkC+ET (edge units)
    vs VBBkC+ET with EP and NP units — across task counts."""
    info = graph_info(dataset)
    edges = to_spark(spark, info["g"]).cache()
    edges.count()
    t = default_t_threshold(k, info["tau"])
    rows = []
    for n_tasks in task_counts:
        for label, algo, scheme in [
            ("EBBkC+ET", "ebbkc-h", "ep"),
            ("VBBkC+ET (EP)", "ddegcol", "ep"),
            ("VBBkC+ET (NP)", "ddegcol", "np"),
        ]:
            t0 = time.perf_counter()
            count = count_kcliques(
                spark, edges, k, algo, scheme=scheme, n_tasks=n_tasks, et_t=t
            )
            rows.append(
                {
                    "dataset": dataset,
                    "k": k,
                    "algo": label,
                    "n_tasks": n_tasks,
                    "seconds": time.perf_counter() - t0,
                    "count": count,
                }
            )
    edges.unpersist()
    return rows


def exp8_rows(datasets=("wk", "po", "st", "or")) -> list[dict]:
    """Experiment 8 (Fig. 11): space proxy — broadcast-structure bytes
    per algorithm next to the raw graph size."""
    rows = []
    for name in datasets:
        g = load(name)
        graph_bytes = int(g.us.nbytes + g.vs.nbytes)
        for label, algo in [
            ("EBBkC+ET", "ebbkc-h"),
            ("DDegCol", "ddegcol"),
            ("BitCol", "bitcol"),
            ("Degen", "degen"),
        ]:
            rows.append(
                {
                    "dataset": name,
                    "algo": label,
                    "bytes": structure_bytes(g, algo),
                    "graph_bytes": graph_bytes,
                }
            )
    return rows


def exp9_rows(
    spark: SparkSession,
    datasets=("uk", "cw", "wp"),
    n_tasks: int = 16,
) -> list[dict]:
    """Experiment 9 (Fig. 12): scalability on the three largest graphs,
    EP scheme, max parallelism, small-k and near-ω workloads."""
    rows = []
    for name in datasets:
        info = graph_info(name)
        edges = to_spark(spark, info["g"]).cache()
        edges.count()
        omega = info["omega"]
        for k in (4, omega - 4):
            for label, algo, opts in [
                ("EBBkC+ET", "ebbkc-h", {"et_t": default_t_threshold(k, info["tau"])}),
                ("BitCol", "bitcol", {}),
            ]:
                t0 = time.perf_counter()
                count = count_kcliques(
                    spark, edges, k, algo, scheme="ep", n_tasks=n_tasks, **opts
                )
                rows.append(
                    {
                        "dataset": name,
                        "k": k,
                        "algo": label,
                        "n_tasks": n_tasks,
                        "seconds": time.perf_counter() - t0,
                        "count": count,
                    }
                )
        edges.unpersist()
    return rows


# --------------------------------------------------------------------------
# Rendering
# --------------------------------------------------------------------------


def format_rows(rows: list[dict], columns=None) -> str:
    """Fixed-width table of experiment rows."""
    if not rows:
        return "(no rows)"
    columns = columns or list(rows[0])
    widths = {
        c: max(len(str(c)), max(len(_fmt(r.get(c))) for r in rows)) for c in columns
    }
    lines = ["  ".join(str(c).ljust(widths[c]) for c in columns)]
    lines.append("  ".join("-" * widths[c] for c in columns))
    for r in rows:
        lines.append("  ".join(_fmt(r.get(c)).ljust(widths[c]) for c in columns))
    return "\n".join(lines)


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.3f}"
    return str(v)
