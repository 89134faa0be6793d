"""Reproduce Table 5 (dataset characteristics audit).

Usage:
    python jobs/table5.py [--scale 1.0] [--tax-scale 0.25]
"""
from __future__ import annotations

import argparse

from repro.harness.paper_numbers import PAPER_TABLE5
from repro.harness.session import get_spark
from repro.harness.table5 import run_table5


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--tax-scale", type=float, default=0.25)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("table5")
    df = run_table5(
        spark, scale=args.scale, tax_scale=args.tax_scale, seed=args.seed
    )
    print("=== Table 5 — measured | paper ===")
    print(
        f"{'dataset':10s}{'tuples':>16s}{'attrs':>12s}"
        f"{'err rate':>18s}  types"
    )
    for _, r in df.iterrows():
        pn, pa, pr, pt = PAPER_TABLE5[r.dataset]
        print(
            f"{r.dataset:10s}{f'{r.n_tuples}|{pn}':>16s}"
            f"{f'{r.n_attrs}|{pa}':>12s}"
            f"{f'{r.error_rate:.3f}|{pr:.2f}':>18s}  "
            f"{r.error_types} | {','.join(pt)}"
        )
    spark.stop()


if __name__ == "__main__":
    main()
