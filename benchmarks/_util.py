"""Shared helpers for the pytest-benchmark suite.

Each benchmark case runs once (``pedantic(rounds=1)``): the kernels are
deterministic and the matrices are large, so repeated rounds would
multiply wall-clock for no variance benefit. The benchmark name encodes
(dataset, k, algorithm) so ``bench_output.txt`` reads like the paper's
tables.
"""
from __future__ import annotations

from repro.core.engine import run_local
from repro.experiments import graph_info


def bench_local(benchmark, name: str, k: int, algo: str, **opts):
    """Benchmark one sequential (dataset, k, algorithm) cell."""
    g = graph_info(name)["g"]
    result = benchmark.pedantic(
        lambda: run_local(g, k, algo, **opts), rounds=1, iterations=1
    )
    assert result >= 0
    return result
