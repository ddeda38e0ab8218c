#!/usr/bin/env python
"""Reproduce Table 4: structural matches and phase-P1 runtime per motif.

Usage: spark-submit jobs/table4_phase1.py [--sf 0.5] [--seed 0] [--motifs M(3,2) ...]
"""
import argparse

from pyspark.sql import SparkSession

from repro import experiments
from repro.core.motif import MOTIF_ORDER


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=experiments.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--motifs", nargs="*", default=list(MOTIF_ORDER))
    args = ap.parse_args()
    spark = SparkSession.builder.appName("table4_phase1").getOrCreate()
    df = experiments.table4(spark, sf=args.sf, seed=args.seed, motifs=args.motifs)
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
