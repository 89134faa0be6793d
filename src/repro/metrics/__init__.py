"""EDR and precision/recall/F1 metrics (Section 4.1 "Evaluation Metrics")."""
from repro.metrics.edr import RepairScores, cell_outcomes, score_repair

__all__ = ["RepairScores", "cell_outcomes", "score_repair"]
