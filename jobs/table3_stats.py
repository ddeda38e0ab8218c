#!/usr/bin/env python
"""Reproduce Table 3: dataset statistics of the three synthetic networks.

Usage: spark-submit jobs/table3_stats.py [--sf 0.5] [--seed 0]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = SparkSession.builder.appName("table3_stats").getOrCreate()
    print(experiments.table3(spark, sf=args.sf, seed=args.seed).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
