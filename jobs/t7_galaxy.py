#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T7 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t7_galaxy.py [options]
or plain:
    python jobs/t7_galaxy.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t7_galaxy


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--n-iters', dest='n_iters', type=int, default=3)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t7_galaxy")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t7_galaxy(spark, n_iters=args.n_iters)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
