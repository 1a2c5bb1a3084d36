"""Deterministic generators for synthetic ER collections.

Model: every *true entity* owns a bag of ``tokens_per_entity`` descriptive
tokens drawn from a Zipf-skewed vocabulary. Each observed record is a noisy
copy of its true entity's bag: tokens are independently dropped with
``p_drop`` and replaced by a random vocabulary token with ``p_noise``; a few
tokens from a small *common pool* (stop-word-like, very frequent) are
appended to create the oversized blocks that Block Purging/Filtering must
remove. Duplicate records share surviving descriptive tokens, which is
exactly the redundancy-positive signal Token Blocking and the weighting
schemes rely on.

Everything is vectorised NumPy, deterministic in ``seed``, and returned as
pandas frames (callers lift them into Spark with ``to_spark``).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class ERConfig:
    """Knobs for one synthetic ER collection.

    ``n_matches`` true entities appear in both sources (Clean-Clean) or twice
    in one collection (Dirty); ``n_only1``/``n_only2`` are source-exclusive.
    """

    n_matches: int
    n_only1: int = 0
    n_only2: int = 0
    vocab_size: int = 3000
    tokens_per_entity: int = 6
    zipf_alpha: float = 0.9
    p_drop: float = 0.15
    p_noise: float = 0.05
    common_pool: int = 15
    common_per_record: int = 2
    seed: int = 7
    # Extra descriptive tokens in source-2 records (models the verbose-source
    # asymmetry of e.g. ScholarDblp / WalmartAmazon).
    extra_tokens_2: int = 0
    metadata: dict = field(default_factory=dict, compare=False)


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1) ** alpha
    return w / w.sum()


def _token_matrix(g: np.random.Generator, cfg: ERConfig, n_rows: int, k: int) -> np.ndarray:
    """(n_rows, k) token ids drawn from the Zipf-skewed vocabulary."""
    w = _zipf_weights(cfg.vocab_size, cfg.zipf_alpha)
    return g.choice(cfg.vocab_size, size=(n_rows, k), p=w)


def _noisy_copy(g: np.random.Generator, cfg: ERConfig, base: np.ndarray) -> np.ndarray:
    """Noisy record copy: per-token drop (marked -1) and substitution."""
    out = base.copy()
    drop = g.random(out.shape) < cfg.p_drop
    subst = g.random(out.shape) < cfg.p_noise
    rand_tok = g.integers(0, cfg.vocab_size, out.shape)
    out = np.where(subst, rand_tok, out)
    return np.where(drop, -1, out)


def _rows_to_text(tokens: np.ndarray, commons: np.ndarray) -> list[str]:
    """Render token-id rows (−1 = dropped) + common-pool ids as text."""
    out = []
    for row, crow in zip(tokens, commons):
        toks = [f"t{t:05d}" for t in row if t >= 0]
        toks += [f"c{c:03d}" for c in crow]
        out.append(" ".join(toks))
    return out


def _common_matrix(g: np.random.Generator, cfg: ERConfig, n_rows: int) -> np.ndarray:
    if cfg.common_per_record == 0 or cfg.common_pool == 0:
        return np.empty((n_rows, 0), dtype=np.int64)
    return g.integers(0, cfg.common_pool, size=(n_rows, cfg.common_per_record))


def clean_clean(cfg: ERConfig) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Generate a Clean-Clean ER task.

    Returns ``(entities, ground_truth)``: entities has columns
    ``entity_id, source, text`` (ids globally unique: source 1 gets
    ``0..n1-1``, source 2 gets ``n1..n1+n2-1``); ground truth has
    ``id1, id2`` with ``id1`` from source 1.
    """
    g = np.random.default_rng(cfg.seed)
    n1 = cfg.n_matches + cfg.n_only1
    n2 = cfg.n_matches + cfg.n_only2
    n_true = cfg.n_matches + cfg.n_only1 + cfg.n_only2
    base = _token_matrix(g, cfg, n_true, cfg.tokens_per_entity)

    # Source 1: matched trues [0, n_matches) then exclusives [n_matches, n1).
    src1_base = base[:n1]
    src1 = _noisy_copy(g, cfg, src1_base)
    # Source 2: the same matched trues, then its own exclusives.
    src2_idx = np.concatenate(
        [np.arange(cfg.n_matches), np.arange(n1, n_true)]
    )
    src2_base = base[src2_idx]
    src2 = _noisy_copy(g, cfg, src2_base)
    if cfg.extra_tokens_2 > 0:
        extra = _token_matrix(g, cfg, n2, cfg.extra_tokens_2)
        src2 = np.concatenate([src2, extra], axis=1)

    entities = pd.DataFrame(
        {
            "entity_id": np.concatenate([np.arange(n1), n1 + np.arange(n2)]),
            "source": np.concatenate(
                [np.ones(n1, dtype=np.int32), np.full(n2, 2, dtype=np.int32)]
            ),
            "text": _rows_to_text(src1, _common_matrix(g, cfg, n1))
            + _rows_to_text(src2, _common_matrix(g, cfg, n2)),
        }
    )
    gt = pd.DataFrame(
        {
            "id1": np.arange(cfg.n_matches, dtype=np.int64),
            "id2": n1 + np.arange(cfg.n_matches, dtype=np.int64),
        }
    )
    return entities, gt


def dirty(cfg: ERConfig) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Generate a Dirty ER task: one collection with duplicate pairs.

    ``n_matches`` true entities yield two records each; ``n_only1`` yield one.
    Returns ``(entities, ground_truth)`` with ``source=1`` everywhere and
    ``id1 < id2`` in the ground truth.
    """
    g = np.random.default_rng(cfg.seed)
    n_true = cfg.n_matches + cfg.n_only1
    base = _token_matrix(g, cfg, n_true, cfg.tokens_per_entity)
    first = _noisy_copy(g, cfg, base)  # one record per true entity
    second = _noisy_copy(g, cfg, base[: cfg.n_matches])  # dup copies
    n = n_true + cfg.n_matches
    entities = pd.DataFrame(
        {
            "entity_id": np.arange(n, dtype=np.int64),
            "source": np.ones(n, dtype=np.int32),
            "text": _rows_to_text(first, _common_matrix(g, cfg, n_true))
            + _rows_to_text(second, _common_matrix(g, cfg, cfg.n_matches)),
        }
    )
    gt = pd.DataFrame(
        {
            "id1": np.arange(cfg.n_matches, dtype=np.int64),
            "id2": n_true + np.arange(cfg.n_matches, dtype=np.int64),
        }
    )
    return entities, gt


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a generated pandas frame into Spark (Arrow path)."""
    return spark.createDataFrame(pdf)
