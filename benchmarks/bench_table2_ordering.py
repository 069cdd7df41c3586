"""Table 2: truss-based edge ordering vs degeneracy ordering generation
time on the four default datasets."""
import pytest

from repro.experiments import graph_info
from repro.graph.core import core_decomposition
from repro.graph.datasets import DEFAULT_DATASETS
from repro.graph.truss import truss_decomposition


@pytest.mark.parametrize("name", DEFAULT_DATASETS)
def test_truss_ordering(benchmark, name):
    g = graph_info(name)["g"]
    td = benchmark.pedantic(lambda: truss_decomposition(g), rounds=1, iterations=1)
    assert len(td.order) == g.m


@pytest.mark.parametrize("name", DEFAULT_DATASETS)
def test_degeneracy_ordering(benchmark, name):
    g = graph_info(name)["g"]
    dec = benchmark.pedantic(lambda: core_decomposition(g), rounds=1, iterations=1)
    assert len(dec.order) == g.n
