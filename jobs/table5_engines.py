"""spark-submit entrypoint: reproduce Table V (speed-ups over graph engines).

Usage: spark-submit jobs/table5_engines.py [--dataset WN] [--scale 0.25]
           [--k 3] [--queries 40] [--spark-engine-queries 3]
"""
import argparse
import os
import sys

from pyspark.sql import SparkSession

from repro.experiments import table5


def main(argv=None) -> str:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="WN")
    ap.add_argument("--scale", type=float, default=0.25,
                    help="analog downscale; 1.0 = the full WN analog (slow with k=3)")
    ap.add_argument("--k", type=int, default=3)
    ap.add_argument("--queries", type=int, default=40)
    ap.add_argument("--spark-engine-queries", type=int, default=3)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args(argv)
    spark = SparkSession.builder.appName("table5").getOrCreate()
    result = table5.run(
        spark,
        dataset=args.dataset,
        scale=args.scale,
        k=args.k,
        n_queries=args.queries,
        spark_engine_queries=args.spark_engine_queries,
        seed=args.seed,
    )
    out = table5.format_table(result)
    print(out)
    return out


if __name__ == "__main__":
    main()
    sys.stdout.flush()
    # Skip normal JVM teardown: a budget-cancelled Spark task can
    # zombie the shutdown hook (observed with the ETC closure).
    os._exit(0)
