#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T5 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t5_size_scaling.py [options]
or plain:
    python jobs/t5_size_scaling.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t5_size_scaling


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--n-iters', dest='n_iters', type=int, default=2)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t5_size_scaling")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t5_size_scaling(spark, n_iters=args.n_iters)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
