"""The 12 data-repair algorithms (Section 3), registered by paper name.

Importing this package populates ``repro.core.context.REGISTRY``:
Holistic, BigDansing, Horizon, Nadeef, MLNClean, Daisy (rule-driven);
Scare, Baran (data-driven); HoloClean, Unified, Relative
(rule&data-driven); BoostClean (model-driven).
"""
from repro.core.context import REGISTRY
from repro.repair import (  # noqa: F401  (import for registration side effect)
    baran,
    bigdansing,
    boostclean,
    daisy,
    holistic,
    holoclean,
    horizon,
    mlnclean,
    nadeef,
    relative,
    scare,
    unified,
)

#: Paper order (Table 4 column order).
ALGORITHMS = (
    "BigDansing",
    "Holistic",
    "Nadeef",
    "Daisy",
    "MLNClean",
    "Horizon",
    "Baran",
    "Scare",
    "HoloClean",
    "Unified",
    "Relative",
    "BoostClean",
)

CATEGORY = {
    "BigDansing": "Rule-Driven",
    "Holistic": "Rule-Driven",
    "Nadeef": "Rule-Driven",
    "Daisy": "Rule-Driven",
    "MLNClean": "Rule-Driven",
    "Horizon": "Rule-Driven",
    "Baran": "Data-Driven",
    "Scare": "Data-Driven",
    "HoloClean": "Rule&Data-Driven",
    "Unified": "Rule&Data-Driven",
    "Relative": "Rule&Data-Driven",
    "BoostClean": "Model-Driven",
}

__all__ = ["ALGORITHMS", "CATEGORY", "REGISTRY"]
