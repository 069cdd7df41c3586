"""Experiment 5 (Fig. 8/15): pruning Rule (2) on vs off
(EBBkC+ET vs EBBkC(stc)+ET)."""
import pytest

from benchmarks._util import bench_local
from repro.experiments import policy_t

CASES = {"wk": (8, 12), "or": (28,)}


@pytest.mark.parametrize("rule2", [True, False], ids=["rule2-on", "rule2-off"])
@pytest.mark.parametrize(
    "name,k", [(n, k) for n, ks in CASES.items() for k in ks]
)
def test_exp5(benchmark, name, k, rule2):
    bench_local(
        benchmark, name, k, "ebbkc-h", et_t=policy_t(name, k), rule2=rule2
    )
