"""The distributed two-phase flow-motif search (the paper's § 4 + § 5).

Pipeline (all DataFrame-level until the per-match kernel):

1. **P1** — ``structural_matches_df``: Catalyst shuffle-join plan over the
   distinct-pair table.
2. **Attach series** — one join per motif edge against the time-series
   graph, producing a wide row per structural match carrying the aligned
   ``ts``/``fs`` arrays of every motif edge.
3. **P2** — ``mapInPandas`` runs the pure-Python per-match kernel
   (Algorithm 1, the top-k heap, or the Algorithm 2 DP) on executor-side
   Arrow batches; instances come back as a DataFrame.

The per-match kernel is inherently sequential/recursive, which is why P2 is
a DataFrame -> DataFrame transformation over grouped data rather than a
Catalyst operator (DESIGN.md § 2); everything before and after it is a
plain Catalyst plan.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    IntegerType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.core.dp import max_flow as dp_max_flow
from repro.core.instances import Series, enumerate_instances
from repro.core.motif import Motif
from repro.core.topk import topk_instances_match
from repro.spark.graph import distinct_pairs, timeseries_graph
from repro.spark.structural import node_columns, structural_matches_df


def matches_with_series(edges: DataFrame, motif: Motif) -> DataFrame:
    """P1 matches joined with the interaction series of every motif edge.

    Output columns: ``v0..v{n-1}``, then ``ts{i}``/``fs{i}`` for each motif
    edge i. Each join is 1:1 (one series per connected pair), so the row
    count equals the structural match count.
    """
    ts_graph = timeseries_graph(edges)
    out = structural_matches_df(distinct_pairs(edges), motif)
    for i, (a, b) in enumerate(motif.edges):
        step = ts_graph.select(
            F.col("src").alias(f"_a{i}"),
            F.col("dst").alias(f"_b{i}"),
            F.col("ts").alias(f"ts{i}"),
            F.col("fs").alias(f"fs{i}"),
        )
        out = out.join(
            step,
            on=(F.col(f"v{a}") == F.col(f"_a{i}"))
            & (F.col(f"v{b}") == F.col(f"_b{i}")),
            how="inner",
        ).drop(f"_a{i}", f"_b{i}")
    return out


def _row_series(row, m: int) -> list[Series]:
    """Rebuild the per-edge Series list from a wide match row."""
    return [
        Series(zip(row[f"ts{i}"], row[f"fs{i}"]))
        for i in range(m)
    ]


def _instances_schema(motif: Motif) -> StructType:
    fields = [StructField(c, LongType()) for c in node_columns(motif)]
    fields += [
        StructField("flow", DoubleType()),
        StructField("t_start", DoubleType()),
        StructField("t_end", DoubleType()),
        StructField("n_interactions", IntegerType()),
        StructField("ranges", StringType()),
        # per-edge (first, last) timestamps — the instance's edge windows,
        # comparable 1:1 with the join baseline's interval columns
        StructField("edge_windows", StringType()),
    ]
    return StructType(fields)


_PD_DTYPES = {
    "long": "int64",
    "integer": "int32",
    "double": "float64",
    "string": "object",
}


def _typed_frame(schema: StructType, rows: list[tuple]) -> pd.DataFrame:
    """Rows -> pandas frame with explicit dtypes.

    Empty batches must still carry the right dtypes or the Arrow conversion
    back to Spark rejects the (object-typed) empty columns.
    """
    cols = [f.name for f in schema.fields]
    if rows:
        return pd.DataFrame(rows, columns=cols)
    return pd.DataFrame(
        {f.name: pd.Series(dtype=_PD_DTYPES[f.dataType.typeName()]) for f in schema.fields}
    )


def _repartitioned(df: DataFrame, parallelism: int | None) -> DataFrame:
    if parallelism is None:
        parallelism = df.sparkSession.sparkContext.defaultParallelism * 2
    return df.repartition(parallelism)


def find_instances(
    edges: DataFrame,
    motif: Motif,
    delta: float,
    phi: float,
    *,
    parallelism: int | None = None,
) -> DataFrame:
    """All maximal instances of ``motif``: one row per instance.

    Columns: the match binding ``v0..v{n-1}``, Equation 1's ``flow``, the
    instance span ``t_start``/``t_end``, the number of interactions used,
    and the per-edge index ranges serialized as a string (for exact
    comparison against the pure-Python reference in tests).
    """
    wide = _repartitioned(matches_with_series(edges, motif), parallelism)
    vcols = node_columns(motif)
    m = motif.m

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows: list[tuple] = []
            for row in pdf.itertuples(index=False):
                rd = row._asdict()
                series = _row_series(rd, m)
                for inst in enumerate_instances(series, delta, phi):
                    windows = tuple(
                        (float(r.ts[s]), float(r.ts[e]))
                        for r, (s, e) in zip(series, inst.ranges)
                    )
                    rows.append(
                        tuple(int(rd[c]) for c in vcols)
                        + (
                            float(inst.flow),
                            float(inst.t_start),
                            float(inst.t_end),
                            int(sum(e - s + 1 for s, e in inst.ranges)),
                            repr(inst.ranges),
                            repr(windows),
                        )
                    )
            yield _typed_frame(_instances_schema(motif), rows)

    return wide.mapInPandas(kernel, schema=_instances_schema(motif))


def count_instances(
    edges: DataFrame, motif: Motif, delta: float, phi: float, **kw
) -> int:
    """Number of maximal instances in the graph (Figs. 9/10/13/14)."""
    return find_instances(edges, motif, delta, phi, **kw).count()


def topk_flows(
    edges: DataFrame,
    motif: Motif,
    delta: float,
    k: int,
    *,
    parallelism: int | None = None,
) -> list[float]:
    """Flows of the global top-k instances, best first (Fig. 11).

    Each executor runs the floating-threshold heap per match (phi = 0 plus
    the k-th-best-so-far prune of § 5), emitting at most k flows per match;
    the global top-k is a Catalyst sort-limit over those candidates.
    """
    wide = _repartitioned(matches_with_series(edges, motif), parallelism)
    m = motif.m
    schema = StructType([StructField("flow", DoubleType())])

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            flows: list[float] = []
            for row in pdf.itertuples(index=False):
                rd = row._asdict()
                series = _row_series(rd, m)
                flows.extend(
                    f for f, _ in topk_instances_match(series, delta, k)
                )
            yield pd.DataFrame({"flow": pd.Series(flows, dtype="float64")})

    out = wide.mapInPandas(kernel, schema=schema)
    return [
        r.flow for r in out.orderBy(F.desc("flow")).limit(k).collect()
    ]


def max_flow(
    edges: DataFrame,
    motif: Motif,
    delta: float,
    *,
    parallelism: int | None = None,
) -> float:
    """Top-1 instance flow via the Algorithm 2 DP module (Fig. 12)."""
    wide = _repartitioned(matches_with_series(edges, motif), parallelism)
    m = motif.m
    schema = StructType([StructField("flow", DoubleType())])

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            flows = []
            for row in pdf.itertuples(index=False):
                rd = row._asdict()
                flows.append(dp_max_flow(_row_series(rd, m), delta))
            yield pd.DataFrame({"flow": pd.Series(flows, dtype="float64")})

    out = wide.mapInPandas(kernel, schema=schema)
    row = out.agg(F.max("flow").alias("mf")).collect()[0]
    return float(row.mf) if row.mf is not None else 0.0


def phase1_count_and_time(
    spark: SparkSession, edges: DataFrame, motif: Motif
) -> tuple[int, float]:
    """Table 4 helper: structural match count and wall-clock P1 seconds."""
    import time

    t0 = time.perf_counter()
    n = structural_matches_df(distinct_pairs(edges), motif).count()
    return n, time.perf_counter() - t0
