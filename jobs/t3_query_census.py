#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T3 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t3_query_census.py [options]
or plain:
    python jobs/t3_query_census.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t3_query_census


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.005)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t3_query_census")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t3_query_census(spark, sf=args.sf)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
