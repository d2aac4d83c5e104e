"""spark-submit entrypoint: reproduce Table IV (indexing time/size, RLC vs ETC).

Usage:
  spark-submit jobs/table4_indexing.py [--datasets AD,EP,TW,WN,WS] [--k 2]
      [--scale F] [--etc-budget-seconds 120] [--distributed AD]

``--distributed`` lists analogs on which the (slow at this scale) dataflow
builder is also run; default none.
"""
import argparse
import os
import sys

from pyspark.sql import SparkSession

from repro.experiments import table4


def main(argv=None) -> str:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=",".join(table4.DEFAULT_NAMES))
    ap.add_argument("--k", type=int, default=2)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--etc-budget-seconds", type=float, default=120.0)
    ap.add_argument("--etc-budget-rows", type=int, default=3_000_000)
    ap.add_argument("--distributed", default="",
                    help="comma-separated analogs to also build with the dataflow builder")
    args = ap.parse_args(argv)
    spark = SparkSession.builder.appName("table4").getOrCreate()
    rows = table4.run(
        spark,
        names=args.datasets.split(","),
        k=args.k,
        scale=args.scale,
        etc_budget_seconds=args.etc_budget_seconds,
        etc_budget_rows=args.etc_budget_rows,
        distributed_names=[s for s in args.distributed.split(",") if s],
    )
    out = table4.format_table(rows)
    print(out)
    return out


if __name__ == "__main__":
    main()
    sys.stdout.flush()
    # Skip normal JVM teardown: a budget-cancelled Spark task can
    # zombie the shutdown hook (observed with the ETC closure).
    os._exit(0)
