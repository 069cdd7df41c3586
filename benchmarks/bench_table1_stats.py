"""Table 1: dataset statistics for the default datasets (the full
19-graph table is printed by ``jobs/table1_stats.py``)."""
import pytest

from repro.experiments import graph_info
from repro.graph.datasets import DEFAULT_DATASETS
from repro.graph.stats import compute_stats


@pytest.mark.parametrize("name", DEFAULT_DATASETS)
def test_table1_stats(benchmark, name):
    g = graph_info(name)["g"]
    stats = benchmark.pedantic(lambda: compute_stats(g), rounds=1, iterations=1)
    assert stats["tau"] < stats["delta"]  # Lemma 4.1 on the substitute
