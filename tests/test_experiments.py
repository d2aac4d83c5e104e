"""Smoke tests for the per-table experiment drivers (tiny scales)."""
import math

import pytest

from repro.experiments import table2, table3, table4, table5


def test_table2_run(spark):
    result = table2.run(spark, include_distributed=False)
    assert result["sequential_entries"] == result["paper_entries"] == 26
    out = table2.format_table(result)
    assert "v1" in out and "(v3,l1,l2)" in out.replace("','", ",")


def test_table3_run_tiny(spark):
    rows = table3.run(spark, ["AD"], scale=0.2)
    (row,) = rows
    assert row["name"] == "AD"
    assert row["V"] > 0 and row["E"] > 0 and row["L"] <= 3
    assert row["paper"] == (6000, 51000, 3, 4000, 98000)
    assert "Table III" in table3.format_table(rows)


def test_table4_run_tiny(spark):
    rows = table4.run(
        spark, ["AD"], scale=0.15, etc_budget_seconds=300, etc_budget_rows=10_000_000
    )
    (row,) = rows
    assert row["rlc_seq_entries"] > 0
    assert row["etc_it"] is not None and row["etc_entries"] > row["rlc_seq_entries"]
    assert "Table IV" in table4.format_table(rows)


def test_table4_etc_budget_exhaustion(spark):
    rows = table4.run(spark, ["AD"], scale=0.15, etc_budget_rows=10)
    (row,) = rows
    assert row["etc_it"] is None and "etc_fail" in row
    assert "-" in table4.format_table(rows)


def test_table5_run_tiny(spark):
    result = table5.run(
        spark, scale=0.06, k=3, n_queries=6, spark_engine_queries=1, seed=1
    )
    assert result["index_entries"] > 0
    for qtype in ("Q1", "Q2", "Q3", "Q4"):
        assert result["per_query"][("RLC", qtype)] > 0
        for eng in ("Sys1", "Sys2", "Virtuoso"):
            su, bep = result["su_bep"][(eng, qtype)]
            assert su > 0 and (bep > 0 or math.isinf(bep))
    assert "Table V" in table5.format_table(result)
