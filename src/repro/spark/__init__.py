"""Distributed (PySpark) layer of the reproduction.

:mod:`graph` — multigraph / time-series-graph DataFrames and Table 3 stats;
:mod:`structural` — phase P1 as a Catalyst join plan;
:mod:`search` — the full two-phase pipeline (instances, top-k, DP top-1);
:mod:`join_baseline` — the paper's § 6.2.1 competitor as interval joins;
:mod:`significance` — § 6.3 flow permutation and z-scores.
"""
