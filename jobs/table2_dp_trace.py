#!/usr/bin/env python
"""Reproduce Table 2: the DP-module trace on the Figure 7 structural match.

Pure-driver job (no cluster work — the DP trace is a single-match
computation); prints our Equation 2 table next to the paper's cells and
flags the documented inconsistencies (DESIGN.md § 3).

Usage: python jobs/table2_dp_trace.py
"""
from repro.core.dp import dp_window_table, max_flow_window
from repro.core.instances import Series

FIG7 = [
    Series([(10, 5), (13, 2), (15, 3)]),
    Series([(9, 4), (11, 3), (16, 3)]),
    Series([(14, 4), (19, 6)]),
]

# Paper Table 2 cells (columns t=10..19 as printed). None = blank cell.
PAPER = {
    1: {10: 5, 11: 5, 13: 7, 14: 7, 15: 7, 16: 7, 18: 10, 19: 10},
    2: {11: 3, 13: 3, 14: 3, 15: 3, 16: 5, 18: 5, 19: 5},
    3: {13: 0, 14: 4, 15: 4, 16: 4, 18: 4, 19: 5},
}


def main() -> None:
    ts, table = dp_window_table(FIG7, 10, 20)
    print("Table 2 reproduction — window [10, 20], Figure 7 prose series")
    print(f"timestamps: {ts}")
    for kappa, row in enumerate(table, start=1):
        ours = {int(t): v for t, v in zip(ts, row)}
        print(f"kappa={kappa}: ours={ours}")
        paper_row = {t: v for t, v in PAPER[kappa].items() if t in ours}
        print(f"         paper={PAPER[kappa]}")
        diff = {t: (ours[t], p) for t, p in paper_row.items() if ours[t] != p}
        if diff:
            print(f"         mismatch (ours, paper): {diff}  "
                  "[paper-internal inconsistency — see DESIGN.md]")
    best = max_flow_window(FIG7, 10, 20)
    print(f"top-1 flow in window: ours={best}  paper=5")
    assert best == 5


if __name__ == "__main__":
    main()
