"""Tests for Table III graph statistics (loops, triangles) with DuckDB oracle."""
import pandas as pd
import pytest

from repro.core.graph import LabeledGraph
from repro.graphs.stats import loop_count, table3_row, triangle_count
from repro.oracle import assert_equivalent


def graph(spark, triples):
    return LabeledGraph.from_edge_list(spark, triples)


def test_single_triangle(spark):
    g = graph(spark, [(0, "a", 1), (1, "a", 2), (2, "a", 0)])
    assert triangle_count(g) == 1
    assert loop_count(g) == 0


def test_two_triangles_sharing_an_edge(spark):
    g = graph(spark, [(0, "a", 1), (1, "a", 2), (2, "a", 0), (1, "b", 3), (3, "a", 0)])
    assert triangle_count(g) == 2


def test_bidirectional_edge_is_not_a_triangle(spark):
    g = graph(spark, [(0, "a", 1), (1, "a", 0)])
    assert triangle_count(g) == 0


def test_parallel_labels_counted_once(spark):
    # Same structural cycle with two label variants is one triangle.
    g = graph(spark, [(0, "a", 1), (0, "b", 1), (1, "a", 2), (2, "a", 0)])
    assert triangle_count(g) == 1


def test_loops_excluded_from_triangles(spark):
    g = graph(spark, [(0, "a", 0), (0, "a", 1), (1, "a", 2), (2, "a", 0)])
    assert loop_count(g) == 1
    assert triangle_count(g) == 1


def test_loop_count_distinct_vertices(spark):
    # Two differently-labeled self loops on one vertex: one looping vertex.
    g = graph(spark, [(0, "a", 0), (0, "b", 0), (1, "a", 1)])
    assert loop_count(g) == 2  # vertices 0 and 1


def test_table3_row_keys(spark):
    g = graph(spark, [(0, "a", 1), (1, "b", 2), (2, "a", 0), (0, "a", 0)])
    row = table3_row(g)
    assert row == {"V": 3, "E": 4, "L": 2, "loops": 1, "triangles": 1}


@pytest.mark.parametrize("seed", [0, 1])
def test_triangle_count_oracle(spark, seed):
    from repro.graphs.generators import er_graph

    g = er_graph(spark, n_vertices=30, n_edges=200, n_labels=3, seed=seed)
    got = spark.createDataFrame([(triangle_count(g),)], "triangles bigint")
    sql = """
    WITH arcs AS (SELECT DISTINCT src, dst FROM edges WHERE src <> dst)
    SELECT CAST(COUNT(*) / 3 AS BIGINT) AS triangles
    FROM arcs e1 JOIN arcs e2 ON e1.dst = e2.src AND e1.src <> e2.dst
                 JOIN arcs e3 ON e2.dst = e3.src AND e3.dst = e1.src
    """
    assert_equivalent(got, sql, edges=g.edges)


def test_loop_count_oracle(spark):
    from repro.graphs.generators import er_graph

    g = er_graph(spark, n_vertices=30, n_edges=100, n_labels=3, n_loops=10, seed=2)
    got = spark.createDataFrame([(loop_count(g),)], "loops bigint")
    sql = "SELECT CAST(COUNT(DISTINCT src) AS BIGINT) AS loops FROM edges WHERE src = dst"
    assert_equivalent(got, sql, edges=g.edges)
