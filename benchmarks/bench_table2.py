"""Table 2 benchmarks: lite-graph generation + statistics (the dataset
suite of `python jobs/table2_datasets.py`)."""
import pytest

from repro.bench.table2 import graph_stats
from repro.synth_data import graph_edges


@pytest.mark.parametrize("name", ["AM", "GO", "CT"])
def test_generate_graph(benchmark, name):
    benchmark(graph_edges, name)


def test_stats_am(benchmark):
    benchmark(graph_stats, "AM")
