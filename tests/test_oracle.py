"""Plumbing tests: the provided TPC-H-lite generators + DuckDB oracle work
in this environment (they back the dataset discipline used by the graph
generators: deterministic seeds, oracle-checked results)."""
import pyspark.sql.functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_groupby_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
    )
    sql = """
    SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty
    FROM lineitem GROUP BY l_returnflag
    """
    assert_equivalent(got, sql, lineitem=li)


def test_join_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    sql = """
    SELECT o_orderpriority, COUNT(*) AS n
    FROM lineitem JOIN orders ON l_orderkey = o_orderkey
    GROUP BY o_orderpriority
    """
    assert_equivalent(got, sql, lineitem=li, orders=o)


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    assert a.equals(b)
