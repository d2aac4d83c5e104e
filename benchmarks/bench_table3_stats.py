"""Benchmark for Table III: graph statistics (loops + triangles) on analogs.

One benchmark per representative analog; `jobs/table3_graph_stats.py`
produces the full 13-row table.
"""
import pytest

from repro.graphs.generators import build_analog
from repro.graphs.stats import table3_row


@pytest.mark.parametrize("name,expect_loops", [("AD", True), ("WN", True), ("TW", False)])
def test_table3_stats(benchmark, spark, name, expect_loops):
    g = build_analog(spark, name)
    row = benchmark.pedantic(lambda: table3_row(g), rounds=1, iterations=1)
    assert row["V"] > 0 and row["E"] > 0
    assert (row["loops"] > 0) == expect_loops
    g.unpersist()
