"""Figure 6-shaped sweep: optimization ratio (guarded EDR - raw EDR).

Usage:
    python jobs/sweep_optimization.py --dataset hospital \
        [--rates 0.1,0.3,0.5] [--kind mixed]
"""
from __future__ import annotations

import argparse

from repro.harness.session import get_spark
from repro.harness.sweeps import run_error_sweep


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="hospital")
    ap.add_argument("--kind", default="mixed", choices=["mixed", "inner", "outer"])
    ap.add_argument("--rates", default="0.1,0.3,0.5")
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--budget", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("sweep_optimization")
    df = run_error_sweep(
        spark,
        dataset=args.dataset,
        kind=args.kind,
        rates=tuple(float(x) for x in args.rates.split(",")),
        scale=args.scale,
        seed=args.seed,
        budget_s=args.budget,
        optimization=True,
    )
    for col in ("edr", "edr_guarded", "optimization_ratio"):
        print(f"\n=== {col} ===")
        print(
            df.pivot(index="rate", columns="algorithm", values=col)
            .round(4)
            .to_string()
        )
    spark.stop()


if __name__ == "__main__":
    main()
