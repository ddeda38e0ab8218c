#!/usr/bin/env python
"""Reproduce Figs. 9/10: #instances and runtime vs delta and vs phi.

Usage: spark-submit jobs/fig9_10_sensitivity.py [--sf 0.5] [--seed 0]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = SparkSession.builder.appName("fig9_10").getOrCreate()
    print("=== Fig. 9: sensitivity to delta (phi at default) ===")
    print(experiments.fig9_delta(spark, sf=args.sf, seed=args.seed).to_string(index=False))
    print("\n=== Fig. 10: sensitivity to phi (delta at default) ===")
    print(experiments.fig10_phi(spark, sf=args.sf, seed=args.seed).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
