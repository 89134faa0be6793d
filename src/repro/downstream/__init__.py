"""Downstream analysis models (Section 4.5): numpy MLP and boosted
stumps (XGBoost substitute), plus the classification/regression harness.
"""
from repro.downstream.encode import Encoder
from repro.downstream.models import GBTStumps, MLP, NaiveBayes
from repro.downstream.tasks import evaluate_downstream

__all__ = ["Encoder", "GBTStumps", "MLP", "NaiveBayes", "evaluate_downstream"]
