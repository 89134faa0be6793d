"""Reproduce Table 6 (runtime scaling on nested Tax prefixes).

Usage:
    python jobs/table6.py [--sizes 10000,20000] [--budget 300]

The paper's sizes are 10k..50k with a 24 h timeout; pass smaller sizes /
budgets to bound wall-clock. "n/a" = budget exhausted.
"""
from __future__ import annotations

import argparse

from repro.harness.paper_numbers import PAPER_TABLE6
from repro.harness.session import get_spark
from repro.harness.table6 import PAPER_SIZES, run_table6
from repro.repair import ALGORITHMS


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sizes", type=str, default=None)
    ap.add_argument("--budget", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    sizes = (
        tuple(int(x) for x in args.sizes.split(","))
        if args.sizes
        else PAPER_SIZES
    )
    spark = get_spark("table6")
    df = run_table6(
        spark, sizes=sizes, seed=args.seed, budget_s=args.budget
    )
    print("=== Table 6 — runtime seconds (measured | paper) ===")
    print("size".ljust(10) + "".join(a.rjust(20) for a in ALGORITHMS))
    for k in sizes:
        sub = df[df["size"] == k].set_index("algorithm")
        cells = []
        for a in ALGORITHMS:
            got = sub.loc[a, "seconds"] if a in sub.index else None
            paper = PAPER_TABLE6.get(k, {}).get(a)
            g = "n/a" if got is None else f"{got:.0f}"
            p = "n/a" if paper is None else f"{paper:.0f}"
            cells.append(f"{g}|{p}".rjust(20))
        print(f"tax-{k // 1000}k".ljust(10) + "".join(cells))
    spark.stop()


if __name__ == "__main__":
    main()
