#!/usr/bin/env python
"""spark-submit entrypoint reproducing table T2 of EXPERIMENTS.md.

Usage:
    spark-submit jobs/t2_gradient_boosting.py [options]
or plain:
    python jobs/t2_gradient_boosting.py [options]
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments.tables import t2_gradient_boosting


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument('--sf', type=float, default=0.5)
    p.add_argument('--n-iters', dest='n_iters', type=int, default=6)
    args = p.parse_args()
    spark = (
        SparkSession.builder.appName("t2_gradient_boosting")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    res = t2_gradient_boosting(spark, sf=args.sf, n_iters=args.n_iters)
    print(res.format())
    out = res.save()
    print(f"rows saved to {out}")
    spark.stop()


if __name__ == "__main__":
    main()
