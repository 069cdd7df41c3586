"""Experiment 6 (Fig. 9): early-termination threshold t ∈ {1..5}."""
import pytest

from benchmarks._util import bench_local

CASES = {"wk": (8, 12), "cn": (15,)}


@pytest.mark.parametrize("t", [1, 2, 3, 4, 5], ids=[f"t={t}" for t in range(1, 6)])
@pytest.mark.parametrize(
    "name,k", [(n, k) for n, ks in CASES.items() for k in ks]
)
def test_exp6(benchmark, name, k, t):
    bench_local(benchmark, name, k, "ebbkc-h", et_t=t)
