"""spark-submit entrypoint: reproduce Table III (graph overview statistics).

Usage: spark-submit jobs/table3_graph_stats.py [--datasets AD,EP,...] [--scale F]
"""
import argparse
import os
import sys

from pyspark.sql import SparkSession

from repro.experiments import table3


def main(argv=None) -> str:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=",".join(table3.DEFAULT_NAMES),
                    help="comma-separated Table III abbreviations")
    ap.add_argument("--scale", type=float, default=1.0,
                    help="extra downscale factor applied to every analog")
    args = ap.parse_args(argv)
    spark = SparkSession.builder.appName("table3").getOrCreate()
    rows = table3.run(spark, args.datasets.split(","), scale=args.scale)
    out = table3.format_table(rows)
    print(out)
    return out


if __name__ == "__main__":
    main()
    sys.stdout.flush()
    # Skip normal JVM teardown: a budget-cancelled Spark task can
    # zombie the shutdown hook (observed with the ETC closure).
    os._exit(0)
