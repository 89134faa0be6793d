"""Reproduce Table 4 (EDR / ER_F1 / ED_F1 on the four real datasets).

Usage:
    python jobs/table4.py [--scale 1.0] [--budget 300]

Prints the measured table in the paper's layout next to the published
numbers. "n/a" rows = budget exhausted (the paper's 24 h rule).
"""
from __future__ import annotations

import argparse

from repro.harness.paper_numbers import PAPER_TABLE4
from repro.harness.session import get_spark
from repro.harness.table4 import run_table4
from repro.repair import ALGORITHMS


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--budget", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("table4")
    df = run_table4(
        spark, scale=args.scale, seed=args.seed, budget_s=args.budget
    )
    metric_cols = {"EDR": "edr", "ER_F1": "er_f1", "ED_F1": "ed_f1"}
    for metric, col in metric_cols.items():
        print(f"\n=== Table 4 — {metric} (measured | paper) ===")
        header = "dataset".ljust(10) + "".join(
            a.rjust(22) for a in ALGORITHMS
        )
        print(header)
        for ds in ("hospital", "flights", "beers", "rayyan"):
            sub = df[df.dataset == ds].set_index("algorithm")
            cells = []
            for a in ALGORITHMS:
                got = sub.loc[a, col] if a in sub.index else float("nan")
                status = sub.loc[a, "status"] if a in sub.index else "n/a"
                paper = PAPER_TABLE4[metric][ds][a]
                g = "n/a" if status != "ok" else f"{got:+.3f}"
                p = "n/a" if paper is None else f"{paper:+.3f}"
                cells.append(f"{g}|{p}".rjust(22))
            print(ds.ljust(10) + "".join(cells))
    print("\nRuntimes (s):")
    print(
        df.pivot(index="dataset", columns="algorithm", values="seconds")
        .round(1)
        .to_string()
    )
    spark.stop()


if __name__ == "__main__":
    main()
