#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T10 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t10_madlib.py [options]
or plain:
    python jobs/t10_madlib.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t10_madlib


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--n-rows', dest='n_rows', type=int, default=10_000)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t10_madlib")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t10_madlib(spark, n_rows=args.n_rows)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
