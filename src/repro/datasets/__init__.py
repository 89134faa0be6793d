"""Synthetic equivalents of the paper's five datasets (Table 5).

The real Hospital/Flights/Beers/Rayyan corpora (and BART's Tax) are not
redistributable offline; each generator here reproduces the *structural
profile* the paper's findings depend on — schema width, tuple count,
redundancy, rule set, native error rate and error-type mix. See DESIGN.md
§2 for the substitution argument.
"""
from repro.datasets.base import Dataset
from repro.datasets.registry import DATASETS, load

__all__ = ["Dataset", "DATASETS", "load"]
