#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T11 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t11_parallelism_ablation.py [options]
or plain:
    python jobs/t11_parallelism_ablation.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t11_parallelism_ablation


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.02)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t11_parallelism_ablation")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t11_parallelism_ablation(spark, sf=args.sf)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
