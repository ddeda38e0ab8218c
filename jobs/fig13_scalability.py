#!/usr/bin/env python
"""Reproduce Fig. 13: scalability over time-prefix samples of each dataset.

Usage: spark-submit jobs/fig13_scalability.py [--sf 0.5] [--seed 0]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = SparkSession.builder.appName("fig13").getOrCreate()
    df = experiments.fig13_scalability(spark, sf=args.sf, seed=args.seed)
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
