"""Experiment 4 (Fig. 7): edge-ordering comparison — EBBkC-T vs -C vs
-H, all with pruning and ET."""
import pytest

from benchmarks._util import bench_local
from repro.experiments import policy_t

CASES = {"wk": (8, 12), "or": (28,)}

ORDERINGS = [
    ("EBBkC-T+ET", "ebbkc-t"),
    ("EBBkC-C+ET", "ebbkc-c"),
    ("EBBkC-H+ET", "ebbkc-h"),
]


@pytest.mark.parametrize("label,algo", ORDERINGS, ids=[o[0] for o in ORDERINGS])
@pytest.mark.parametrize(
    "name,k", [(n, k) for n, ks in CASES.items() for k in ks]
)
def test_exp4(benchmark, name, k, label, algo):
    bench_local(benchmark, name, k, algo, et_t=policy_t(name, k))
