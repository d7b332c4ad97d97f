#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T1 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t1_random_forest.py [options]
or plain:
    python jobs/t1_random_forest.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t1_random_forest


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.5)
    p.add_argument('--n-trees', dest='n_trees', type=int, default=8)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t1_random_forest")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t1_random_forest(spark, sf=args.sf, n_trees=args.n_trees)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
