"""Synthetic Entity-Resolution dataset substrate.

The paper evaluates on 9 real-world Clean-Clean ER datasets and 5 synthetic
Dirty ER datasets, none of which are available offline. This package builds
deterministic synthetic analogs that exercise the exact same code paths:
textual entity profiles whose token overlap encodes duplicates, a known
ground truth, and tunable noise/size/skew so each analog lands in the same
blocking regime as its paper counterpart (see DESIGN.md §4).
"""
from repro.er_data.generator import ERConfig, clean_clean, dirty  # noqa: F401
from repro.er_data.datasets import (  # noqa: F401
    CLEAN_CLEAN_ANALOGS,
    SCALABILITY_ANALOGS,
    load_analog,
)
