"""Inner/outer error generation (Section 4.1 "Error Generation")."""
from repro.errors.inject import (
    ErrorSpec,
    inject,
    inner_spec,
    mixed_spec,
    outer_spec,
    observed_error_rate,
)

__all__ = [
    "ErrorSpec",
    "inject",
    "inner_spec",
    "mixed_spec",
    "outer_spec",
    "observed_error_rate",
]
