#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T6 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t6_parallelism.py [options]
or plain:
    python jobs/t6_parallelism.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t6_parallelism


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.05)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t6_parallelism")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t6_parallelism(spark, sf=args.sf)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
