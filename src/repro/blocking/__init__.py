"""Blocking substrate: Token Blocking -> Block Purging -> Block Filtering
-> distinct candidate pairs, all as DataFrame operations.

The paper applies exactly this pipeline (Section 5.1, "Blocking") before
meta-blocking; it is redundancy-positive, parameter-free except for the
Block Filtering ratio (0.8, i.e. drop each entity from its largest 20% of
blocks).
"""
from repro.blocking.token_blocking import token_blocking  # noqa: F401
from repro.blocking.purging import block_purging  # noqa: F401
from repro.blocking.filtering import block_filtering  # noqa: F401
from repro.blocking.candidates import candidate_pairs  # noqa: F401
from repro.blocking.pipeline import build_blocks  # noqa: F401
