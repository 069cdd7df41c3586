"""Experiment 1 (Fig. 4): small-ω comparison — EBBkC+ET vs the four
VBBkC baselines on representative k values."""
import pytest

from benchmarks._util import bench_local
from repro.experiments import policy_t

CASES = {
    "wk": (4, 8, 12),
    "po": (4, 8, 13),
    "cn": (6, 15),
    "ba": (4, 6),
}

ALGOS = [
    ("EBBkC+ET", "ebbkc-h", True),
    ("DDegCol", "ddegcol", False),
    ("DDegree", "ddegree", False),
    ("SDegree", "sdegree", False),
    ("BitCol", "bitcol", False),
]


@pytest.mark.parametrize("label,algo,et", ALGOS, ids=[a[0] for a in ALGOS])
@pytest.mark.parametrize(
    "name,k", [(n, k) for n, ks in CASES.items() for k in ks]
)
def test_exp1(benchmark, name, k, label, algo, et):
    opts = {"et_t": policy_t(name, k)} if et else {}
    bench_local(benchmark, name, k, algo, **opts)
