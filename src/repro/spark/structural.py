"""Phase P1, distributed: structural matching as a Catalyst join plan.

The motif's spanning path is unrolled into a chain of self-joins over the
distinct-pair edge table of G_T: one join per motif edge, plus equality
predicates where the path revisits a bound node and pairwise inequality
predicates enforcing the bijection of Definition 3.2 (distinct motif nodes
map to distinct graph vertices). Broadcast joins are disabled session-wide
(conftest), so this exercises Spark's shuffle-join path.

``matches_sql`` emits the equivalent SQL text, which tests run on DuckDB via
``repro.oracle.assert_equivalent`` — the same plan checked by an independent
engine — and which also cross-checks the pure-Python DFS matcher.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.motif import Motif


def node_columns(motif: Motif) -> list[str]:
    """Output column names v0..v{n-1}, one per distinct motif node."""
    return [f"v{i}" for i in range(motif.n_nodes)]


def structural_matches_df(pairs: DataFrame, motif: Motif) -> DataFrame:
    """All structural matches of ``motif`` over the distinct-pair table.

    Returns one row per match with columns ``v0..v{n-1}`` — the graph
    vertex bound to each motif node (canonical numbering).
    """
    path = motif.path
    out = pairs.select(
        F.col("src").alias(f"v{path[0]}"), F.col("dst").alias(f"v{path[1]}")
    )
    bound = {path[0], path[1]}
    for i in range(1, motif.m):
        a, b = path[i], path[i + 1]
        step = pairs.select(
            F.col("src").alias("_sa"), F.col("dst").alias("_sb")
        )
        out = out.join(step, on=F.col(f"v{a}") == F.col("_sa"), how="inner")
        if b in bound:
            out = out.filter(F.col("_sb") == F.col(f"v{b}"))
        else:
            out = out.withColumn(f"v{b}", F.col("_sb"))
            bound.add(b)
        out = out.drop("_sa", "_sb")
    for i in range(motif.n_nodes):
        for j in range(i + 1, motif.n_nodes):
            out = out.filter(F.col(f"v{i}") != F.col(f"v{j}"))
    return out.select(*node_columns(motif))


def matches_sql(motif: Motif, table: str = "pairs") -> str:
    """SQL equivalent of :func:`structural_matches_df` (DuckDB oracle)."""
    froms = ", ".join(f"{table} e{k}" for k in range(motif.m))
    # Bind v_i from the first edge that touches it, via a lateral-style
    # projection: simpler to express by projecting from e0..e{m-1} directly.
    select_parts: list[str] = []
    seen: set[int] = set()
    for k, (a, b) in enumerate(motif.edges):
        if a not in seen:
            select_parts.append(f"e{k}.src AS v{a}")
            seen.add(a)
        if b not in seen:
            select_parts.append(f"e{k}.dst AS v{b}")
            seen.add(b)
    join_conds: list[str] = []
    # Consecutive edges chain head-to-tail; revisits force equality with the
    # edge that first bound the node.
    first_bind: dict[int, str] = {}
    for k, (a, b) in enumerate(motif.edges):
        for node, col in ((a, f"e{k}.src"), (b, f"e{k}.dst")):
            if node in first_bind:
                join_conds.append(f"{col} = {first_bind[node]}")
            else:
                first_bind[node] = col
    distinct = [
        f"v{i} <> v{j}"
        for i in range(motif.n_nodes)
        for j in range(i + 1, motif.n_nodes)
    ]
    inner = (
        f"SELECT {', '.join(select_parts)} FROM {froms} "
        f"WHERE {' AND '.join(join_conds) if join_conds else 'TRUE'}"
    )
    return (
        f"SELECT * FROM ({inner}) v "
        f"WHERE {' AND '.join(distinct) if distinct else 'TRUE'}"
    )


def count_matches(pairs: DataFrame, motif: Motif) -> int:
    """Number of structural matches (Table 4's first row per dataset)."""
    return structural_matches_df(pairs, motif).count()
