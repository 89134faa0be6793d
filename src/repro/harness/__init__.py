"""Experiment harnesses reproducing the paper's evaluation tables."""
from repro.harness.table4 import run_table4
from repro.harness.table5 import run_table5
from repro.harness.table6 import run_table6

__all__ = ["run_table4", "run_table5", "run_table6"]
