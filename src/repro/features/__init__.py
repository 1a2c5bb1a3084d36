"""Weighting-scheme feature generation (paper Section 4).

Eight schemes are computed per candidate pair, all as DataFrame algebra over
the block-assignment relation: the original four of [21] (CF-IBF, RACCB, JS,
LCP) and the four new ones of this paper (EJS, WJS, RS, NRS). LCP applies to
an individual entity, so it contributes two columns (``lcp_1``, ``lcp_2``)
but counts as one feature in subset enumeration, exactly as in the paper.
"""
from repro.features.stats import block_stats, entity_stats, global_stats  # noqa: F401
from repro.features.schemes import (  # noqa: F401
    FEATURE_COLUMNS,
    FEATURE_NAMES,
    compute_features,
)
