"""Shared fixtures for the table/figure benchmarks.

Datasets are generated once per session at BENCH_SF (env override;
default 0.5 — see EXPERIMENTS.md) and cached in Spark memory so benchmarks
time the algorithms, not the generator.
"""
import os

import pytest

from repro import experiments

BENCH_SF = float(os.environ.get("BENCH_SF", experiments.DEFAULT_SF))
SEED = int(os.environ.get("BENCH_SEED", "0"))


@pytest.fixture(scope="session")
def datasets(spark):
    """kind -> cached Spark DataFrame, materialized up front."""
    out = {}
    for kind in ("bitcoin", "facebook", "passenger"):
        df = experiments.load(spark, kind, sf=BENCH_SF, seed=SEED)
        df.count()  # materialize the cache before timing anything
        out[kind] = df
    return out
