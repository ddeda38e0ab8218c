#!/usr/bin/env python
"""Reproduce Figs. 11/12: flow of the k-th instance; DP module vs heap top-1.

Usage: spark-submit jobs/fig11_12_topk.py [--sf 0.5] [--seed 0]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = SparkSession.builder.appName("fig11_12").getOrCreate()
    print("=== Fig. 11: flow of the k-th instance ===")
    print(experiments.fig11_topk(spark, sf=args.sf, seed=args.seed).to_string(index=False))
    print("\n=== Fig. 12: top-1 via heap vs DP module ===")
    print(experiments.fig12_dp(spark, sf=args.sf, seed=args.seed).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
