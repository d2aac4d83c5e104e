"""Graph statistics for Table III: loop and triangle counts.

Following Table III's terminology: a *loop* is a cycle of length 1 (a self
loop) and a *triangle* is a directed cycle of length 3. Both are counted on
the label-stripped distinct arc set (labels encode relationship types; the
cycle structure the indexing cost depends on is structural).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

from repro.core.graph import LabeledGraph


def arcs(graph: LabeledGraph) -> DataFrame:
    """Distinct label-stripped arcs ``(src, dst)``."""
    return graph.edges.select("src", "dst").distinct()


def loop_count(graph: LabeledGraph) -> int:
    """Number of vertices with a self loop (length-1 cycles)."""
    return arcs(graph).where(F.col("src") == F.col("dst")).count()


def triangle_count(graph: LabeledGraph) -> int:
    """Number of directed 3-cycles ``a -> b -> c -> a`` (each counted once).

    Two joins build length-2 paths and a third closes the cycle; every
    3-cycle is discovered from each of its 3 rotations, hence the ``/ 3``.
    Self loops are excluded so loop-heavy graphs don't inflate the count.
    """
    e = arcs(graph).where(F.col("src") != F.col("dst"))
    ab = e.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    bc = e.select(F.col("src").alias("b"), F.col("dst").alias("c"))
    ca = e.select(F.col("src").alias("c"), F.col("dst").alias("a"))
    paths = ab.join(bc, "b").where(F.col("a") != F.col("c"))
    closed = paths.join(ca, ["c", "a"]).count()
    return closed // 3


def table3_row(graph: LabeledGraph) -> dict[str, int]:
    """One measured Table III row for ``graph``."""
    return {
        "V": graph.num_vertices(),
        "E": graph.num_edges(),
        "L": len(graph.labels()),
        "loops": loop_count(graph),
        "triangles": triangle_count(graph),
    }
