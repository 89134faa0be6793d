"""Error detection substrate: rule violations, outliers, Raha-lite.

Raha (Mahdavi et al., SIGMOD'19) is the paper's detector of record — it
feeds the data-driven repair algorithms (Table 3's ADR/PDR inputs) and
powers the §4.4 optimization strategy. ``raha_lite`` reproduces its
architecture: an ensemble of cheap base detectors featurizes every cell,
and a per-column classifier trained from ~20 labeled tuples turns the
feature vectors into error flags.
"""
from repro.detect.outliers import outlier_cells
from repro.detect.raha_lite import raha_lite
from repro.detect.violations import rule_violation_cells

__all__ = ["outlier_cells", "raha_lite", "rule_violation_cells"]
