"""Figure 7/9-shaped experiment: downstream task scores on dirty vs
repaired vs clean variants.

Usage:
    python jobs/downstream_eval.py --dataset hospital \
        --task classification --model mlp [--rates 0.1,0.3,0.5]
"""
from __future__ import annotations

import argparse

from repro.harness.downstream_eval import run_downstream
from repro.harness.session import get_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="hospital")
    ap.add_argument(
        "--task", default="classification",
        choices=["classification", "regression"],
    )
    ap.add_argument("--model", default="mlp", choices=["mlp", "xgboost"])
    ap.add_argument("--rates", default="0.1,0.3,0.5")
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--budget", type=float, default=None)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("downstream_eval")
    df = run_downstream(
        spark,
        dataset=args.dataset,
        task=args.task,
        model=args.model,
        rates=tuple(float(x) for x in args.rates.split(",")),
        scale=args.scale,
        seed=args.seed,
        budget_s=args.budget,
    )
    print(
        df.pivot(index="rate", columns="variant", values="score")
        .round(4)
        .to_string()
    )
    spark.stop()


if __name__ == "__main__":
    main()
