#!/usr/bin/env python
"""Run every table/figure harness at one scale factor and dump the frames.

Produces the measured numbers recorded in EXPERIMENTS.md.

Usage: spark-submit jobs/run_all_experiments.py [--sf 0.5] [--seed 0]
       [--out experiments_raw.txt]
"""
import argparse
import sys

from pyspark.sql import SparkSession

from repro import experiments as ex


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=ex.DEFAULT_SF)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    out = open(args.out, "w") if args.out else sys.stdout

    spark = SparkSession.builder.appName("run_all_experiments").getOrCreate()

    def emit(title, df):
        print(f"\n=== {title} (sf={args.sf}, seed={args.seed}) ===", file=out)
        print(df.to_string(index=False), file=out)
        out.flush()

    emit("Table 3", ex.table3(spark, sf=args.sf, seed=args.seed))
    emit("Table 4", ex.table4(spark, sf=args.sf, seed=args.seed))
    emit("Fig 8", ex.fig8(spark, sf=args.sf, seed=args.seed))
    emit("Fig 8 intermediates", ex.fig8_intermediates(spark, sf=args.sf, seed=args.seed))
    emit("Fig 9 (delta)", ex.fig9_delta(spark, sf=args.sf, seed=args.seed))
    emit("Fig 10 (phi)", ex.fig10_phi(spark, sf=args.sf, seed=args.seed))
    emit("Fig 11 (topk)", ex.fig11_topk(spark, sf=args.sf, seed=args.seed))
    emit("Fig 12 (dp)", ex.fig12_dp(spark, sf=args.sf, seed=args.seed))
    emit("Fig 12 (dp, kernel-only)", ex.fig12_kernel(spark, sf=args.sf, seed=args.seed))
    emit("Fig 13 (scalability)", ex.fig13_scalability(spark, sf=args.sf, seed=args.seed))
    emit("Fig 14 (significance)", ex.fig14_significance(spark, sf=args.sf, seed=args.seed))
    spark.stop()
    if args.out:
        out.close()


if __name__ == "__main__":
    main()
