"""Phase P2 of the paper's two-phase search: Algorithm 1 plus maximality.

Given one structural match ``G_s`` — represented as one interaction
:class:`Series` per motif edge — enumerate all *maximal* flow-motif
instances (Definitions 3.2/3.3) under a duration constraint ``delta`` and a
flow constraint ``phi``.

The paper's Algorithm 1 slides a window of length ``delta`` anchored at the
interactions of the first motif edge and recursively splits the window into
prefixes, one per motif edge (procedure FindInstances). A maximal instance
assigns to each motif edge a *contiguous* run of that edge's interactions
(any skipped interior interaction could be added back without violating the
ordering or the duration, contradicting maximality), so instances are
represented compactly as per-edge index ranges into the series.

Algorithm 1 can emit candidates that a later window subsumes; we keep its
candidate generation verbatim and apply an O(m) maximality check per
candidate straight from Definition 3.3. ``tests/test_bruteforce_crosscheck``
proves the output equals the definition-direct brute force.
"""
from __future__ import annotations

from bisect import bisect_right
from dataclasses import dataclass
from itertools import accumulate
from typing import Callable, Iterable, Sequence

NEG_INF = float("-inf")


class Series:
    """One edge's interaction time series ``R(u, v)``, sorted by time.

    Timestamps within a series are unique (the input multigraph annotates
    every edge with a unique timestamp, paper § 3). Prefix sums give O(1)
    range flow aggregation, the hot operation of Algorithm 1.
    """

    __slots__ = ("ts", "fs", "_cum")

    def __init__(self, pairs: Iterable[tuple[float, float]]) -> None:
        pts = sorted(pairs)
        self.ts: tuple[float, ...] = tuple(t for t, _ in pts)
        self.fs: tuple[float, ...] = tuple(f for _, f in pts)
        if len(set(self.ts)) != len(self.ts):
            raise ValueError("duplicate timestamps within one edge series")
        self._cum: tuple[float, ...] = (0.0, *accumulate(self.fs))

    def __len__(self) -> int:
        return len(self.ts)

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"Series({list(zip(self.ts, self.fs))})"

    def pairs(self) -> tuple[tuple[float, float], ...]:
        """The series as (t, f) tuples, time-ordered."""
        return tuple(zip(self.ts, self.fs))

    def range_sum(self, i: int, j: int) -> float:
        """Total flow of elements ``i..j`` inclusive."""
        return self._cum[j + 1] - self._cum[i]

    def first_after(self, t: float) -> int:
        """Index of the first element with timestamp strictly greater than t."""
        return bisect_right(self.ts, t)

    def last_at_or_before(self, t: float) -> int:
        """Index of the last element with timestamp <= t, or -1."""
        return bisect_right(self.ts, t) - 1


Ranges = tuple[tuple[int, int], ...]  # per motif edge: (start, end) inclusive


@dataclass(frozen=True)
class Instance:
    """A maximal flow-motif instance within one structural match.

    ``ranges[i]`` is the inclusive index range of motif edge ``e_{i+1}``'s
    edge-set inside that edge's :class:`Series`; ``flow`` is Equation 1's
    min-over-edges aggregated flow; ``t_start``/``t_end`` delimit the span.
    """

    ranges: Ranges
    flow: float
    t_start: float
    t_end: float

    def edge_sets(self, series: Sequence[Series]) -> tuple[tuple[tuple[float, float], ...], ...]:
        """Materialize the per-edge (t, f) sets, for display and tests."""
        return tuple(
            tuple(zip(r.ts[s : e + 1], r.fs[s : e + 1]))
            for r, (s, e) in zip(series, self.ranges)
        )


def instance_flow(series: Sequence[Series], ranges: Ranges) -> float:
    """Equation 1: minimum over motif edges of the edge-set flow sum."""
    return min(r.range_sum(s, e) for r, (s, e) in zip(series, ranges))


def is_valid(series: Sequence[Series], ranges: Ranges, delta: float, phi: float) -> bool:
    """Definition 3.2 checks for a range-shaped candidate (used in tests)."""
    m = len(series)
    for i, (r, (s, e)) in enumerate(zip(series, ranges)):
        if not (0 <= s <= e < len(r)):
            return False
        if r.range_sum(s, e) < phi:
            return False
        if i + 1 < m:
            nr, (ns, _) = series[i + 1], ranges[i + 1]
            if not r.ts[e] < nr.ts[ns]:
                return False
    t_start = series[0].ts[ranges[0][0]]
    t_end = series[-1].ts[ranges[-1][1]]
    return t_end - t_start <= delta


def is_maximal(series: Sequence[Series], ranges: Ranges, delta: float) -> bool:
    """Definition 3.3: no single interaction can be added to any edge-set.

    Because edge-sets are contiguous runs, the only addable elements are the
    ones adjacent to each run. Ordering with the neighbouring motif edges
    constrains middle edges; the duration constraint only bites when
    extending the first edge-set backwards or the last edge-set forwards
    (any other addition lies strictly inside the instance's span). Flow can
    never be violated by an addition (phi is a lower bound and flows are
    positive), so maximality is independent of phi.
    """
    m = len(series)
    t_start = series[0].ts[ranges[0][0]]
    t_end = series[-1].ts[ranges[-1][1]]
    for i, (r, (s, e)) in enumerate(zip(series, ranges)):
        if s > 0:
            t = r.ts[s - 1]
            order_ok = i == 0 or t > series[i - 1].ts[ranges[i - 1][1]]
            span_ok = i > 0 or t_end - t <= delta
            if order_ok and span_ok:
                return False
        if e + 1 < len(r):
            t = r.ts[e + 1]
            order_ok = i == m - 1 or t < series[i + 1].ts[ranges[i + 1][0]]
            span_ok = i < m - 1 or t - t_start <= delta
            if order_ok and span_ok:
                return False
    return True


def _find_instances(
    series: Sequence[Series],
    edge_i: int,
    start_idx: int,
    hi: float,
    phi_fn: Callable[[], float],
    out: list[Ranges],
    prefix: Ranges,
) -> None:
    """Procedure FindInstances of Algorithm 1 (recursive over the path).

    ``start_idx`` is the first eligible element of ``series[edge_i]`` (the
    one right after the previous edge-set's last timestamp), ``hi`` the
    inclusive window end. ``phi_fn`` is re-read at every prune point so the
    top-k variant can tighten it while enumeration is in flight.
    """
    r = series[edge_i]
    last = r.last_at_or_before(hi)
    if start_idx > last:
        return
    if edge_i == len(series) - 1:
        # Last motif edge takes every remaining element in the window
        # (anything less would not be maximal).
        if r.range_sum(start_idx, last) >= phi_fn():
            out.append(prefix + ((start_idx, last),))
        return
    for e in range(start_idx, last + 1):
        if r.range_sum(start_idx, e) >= phi_fn():  # phi prefix-pruning (line 16)
            _find_instances(
                series,
                edge_i + 1,
                series[edge_i + 1].first_after(r.ts[e]),
                hi,
                phi_fn,
                out,
                prefix + ((start_idx, e),),
            )


def enumerate_instances(
    series: Sequence[Series],
    delta: float,
    phi: float,
    *,
    phi_fn: Callable[[], float] | None = None,
) -> list[Instance]:
    """All maximal instances of the motif within one structural match.

    Windows of length ``delta`` are anchored at every interaction of the
    first motif edge (a maximal instance's temporally first element belongs
    to ``R(e_1)``); candidates from FindInstances are then filtered through
    the Definition 3.3 maximality check. Results are sorted by
    (t_start, ranges) for determinism.
    """
    if any(len(r) == 0 for r in series):
        return []
    get_phi = phi_fn if phi_fn is not None else (lambda: phi)
    first = series[0]
    results: dict[Ranges, Instance] = {}
    for k in range(len(first)):
        a = first.ts[k]
        candidates: list[Ranges] = []
        _find_instances(series, 0, k, a + delta, get_phi, candidates, ())
        for ranges in candidates:
            if ranges in results:
                continue
            if is_maximal(series, ranges, delta):
                results[ranges] = Instance(
                    ranges=ranges,
                    flow=instance_flow(series, ranges),
                    t_start=series[0].ts[ranges[0][0]],
                    t_end=series[-1].ts[ranges[-1][1]],
                )
    return sorted(results.values(), key=lambda x: (x.t_start, x.ranges))


def count_instances(series: Sequence[Series], delta: float, phi: float) -> int:
    """Number of maximal instances (the quantity plotted in Figs. 9/10/13)."""
    return len(enumerate_instances(series, delta, phi))
