#!/usr/bin/env python
"""Reproduce Fig. 8: runtime of the two-phase algorithm vs the join baseline.

Usage: spark-submit jobs/fig8_join_vs_twophase.py [--sf 0.5] [--seed 0]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--motifs", nargs="*", default=["M(3,2)", "M(3,3)", "M(4,3)"])
    args = ap.parse_args()
    spark = SparkSession.builder.appName("fig8").getOrCreate()
    df = experiments.fig8(spark, sf=args.sf, seed=args.seed, motifs=args.motifs)
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
