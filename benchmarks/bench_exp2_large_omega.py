"""Experiment 2 (Fig. 5): large-ω comparison — small k plus k near ω,
where the paper reports 1–2 orders of magnitude wins for EBBkC+ET."""
import pytest

from benchmarks._util import bench_local
from repro.experiments import policy_t

# ω: st=30, or=32, db=34 (substitutes).
CASES = {
    "st": (4, 26, 30),
    "or": (4, 28, 32),
    "db": (4, 30, 34),
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
def test_exp2(benchmark, name, k, label, algo, et):
    opts = {"et_t": policy_t(name, k)} if et else {}
    bench_local(benchmark, name, k, algo, **opts)
