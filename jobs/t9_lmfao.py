#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T9 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t9_lmfao.py [options]
or plain:
    python jobs/t9_lmfao.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t9_lmfao


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.02)
    p.add_argument('--max-leaves', dest='max_leaves', type=int, default=6)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t9_lmfao")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t9_lmfao(spark, sf=args.sf, max_leaves=args.max_leaves)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
