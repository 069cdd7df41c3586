"""Hypothesis property tests: on arbitrary random graphs, every
algorithm in the repo lists exactly the brute-force clique set, and the
structural lemmas of the paper hold."""
from hypothesis import given, settings, strategies as st

from repro.core.bruteforce import brute_force_count
from repro.core.ebbkc import ebbkc_c, ebbkc_h, ebbkc_t
from repro.core.vbbkc import vbbkc
from repro.graph.core import degeneracy
from repro.graph.loader import LocalGraph
from repro.graph.truss import tau


@st.composite
def graphs(draw, max_n=14):
    n = draw(st.integers(min_value=3, max_value=max_n))
    pairs = draw(
        st.lists(
            st.tuples(
                st.integers(min_value=0, max_value=n - 1),
                st.integers(min_value=0, max_value=n - 1),
            ),
            min_size=1,
            max_size=n * 3,
        )
    )
    return LocalGraph.from_pairs(pairs)


@given(graphs(), st.integers(min_value=3, max_value=6))
@settings(max_examples=60, deadline=None)
def test_all_algorithms_agree_with_brute_force(g, k):
    expected = brute_force_count(g, k)
    for fn, kw in [
        (ebbkc_t, {}),
        (ebbkc_c, {}),
        (ebbkc_h, {"et_t": 2}),
    ]:
        got = []
        fn(g, k, got.append, **kw)
        assert len(got) == expected
        assert len({tuple(sorted(c)) for c in got}) == expected
    for variant in ("degen", "ddegcol", "bitcol"):
        got = []
        vbbkc(g, k, got.append, variant=variant, et_t=2)
        assert len(got) == expected


@given(graphs(max_n=20))
@settings(max_examples=60, deadline=None)
def test_lemma_4_1_property(g):
    if g.m > 0:
        assert tau(g) < degeneracy(g)
