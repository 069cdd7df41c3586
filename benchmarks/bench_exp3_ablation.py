"""Experiment 3 (Fig. 6/14): ablation — EBBkC+ET vs EBBkC vs DDegCol+
vs BitCol+ (the VBBkC SOTA with Rule 2, no SIMD)."""
import pytest

from benchmarks._util import bench_local
from repro.experiments import policy_t

CASES = {"wk": (8, 12), "st": (26, 30)}

VARIANTS = [
    ("EBBkC+ET", "ebbkc-h", {"et": True}),
    ("EBBkC", "ebbkc-h", {}),
    ("DDegCol+", "ddegcol", {"rule2": True}),
    ("BitCol+", "bitcol", {"rule2": True}),
]


@pytest.mark.parametrize("label,algo,flags", VARIANTS, ids=[v[0] for v in VARIANTS])
@pytest.mark.parametrize(
    "name,k", [(n, k) for n, ks in CASES.items() for k in ks]
)
def test_exp3(benchmark, name, k, label, algo, flags):
    opts = {}
    if flags.get("et"):
        opts["et_t"] = policy_t(name, k)
    if flags.get("rule2"):
        opts["rule2"] = True
    bench_local(benchmark, name, k, algo, **opts)
