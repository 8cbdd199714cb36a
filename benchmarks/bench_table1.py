"""Benchmark: regenerating Table 1's statistics row per analog graph."""
import pytest

from repro.evalx.datasets import ALL, ref_graph
from repro.evalx.table1 import table1_ref


@pytest.mark.parametrize("name", ALL)
def test_table1_row(benchmark, name):
    ref_graph(name, 1.0)  # build/cache the dataset outside the timer
    row = benchmark.pedantic(
        lambda: table1_ref([name], 1.0)[0], rounds=1, iterations=1
    )
    assert row["n"] > 0 and row["gamma_max"] > 0
