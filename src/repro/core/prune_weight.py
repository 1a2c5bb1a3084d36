"""Weight-based supervised pruning algorithms (paper Section 3.1).

Every function maps a scored pair frame ``(id1, id2, p)`` to the retained
subset ``(id1, id2)``. A pair is *valid* iff p >= 0.5 (Definition 2); each
algorithm then applies its weight threshold over the valid pairs:

- BCl   — the [21] baseline: keep every valid pair (global 0.5 threshold).
- WEP   — keep pairs with p >= global mean of valid probabilities (Alg. 1).
- WNP   — keep pairs beating the mean of *either* endpoint entity (Alg. 2).
- RWNP  — keep pairs beating the mean of *both* endpoints.
- BLAST — keep pairs with p >= r * (max_i + max_j) using per-entity maxima
  (Alg. 3, r = 0.35 in the paper's experiments).

Per-entity aggregates are computed by exploding each pair into its two
endpoints and grouping — pure DataFrame algebra, no UDFs.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

def _valid(scored: DataFrame) -> DataFrame:
    """The valid pairs of Definition 2: probability >= 0.5."""
    return scored.filter(F.col("p") >= 0.5)


def _per_entity(valid: DataFrame, agg: F.Column, name: str) -> DataFrame:
    """Aggregate valid probabilities per endpoint entity."""
    exploded = valid.select(F.col("id1").alias("entity_id"), "p").unionAll(
        valid.select(F.col("id2").alias("entity_id"), "p")
    )
    return exploded.groupBy("entity_id").agg(agg.alias(name))


def bcl(scored: DataFrame) -> DataFrame:
    """Binary-classifier pruning of [21]: retain all valid pairs."""
    return _valid(scored).select("id1", "id2")


def wep(scored: DataFrame) -> DataFrame:
    """Supervised Weighted Edge Pruning (Algorithm 1)."""
    valid = _valid(scored)
    mean_row = valid.agg(F.avg("p").alias("m")).collect()[0]
    if mean_row["m"] is None:  # no valid pairs at all
        return scored.select("id1", "id2").limit(0)
    return valid.filter(F.col("p") >= float(mean_row["m"])).select("id1", "id2")


def _node_pruning(scored: DataFrame, *, reciprocal: bool) -> DataFrame:
    valid = _valid(scored)
    means = _per_entity(valid, F.avg("p"), "thr")
    j = (
        valid.join(means.withColumnRenamed("entity_id", "id1"), "id1")
        .withColumnRenamed("thr", "thr1")
        .join(means.withColumnRenamed("entity_id", "id2"), "id2")
        .withColumnRenamed("thr", "thr2")
    )
    beats1 = F.col("p") >= F.col("thr1")
    beats2 = F.col("p") >= F.col("thr2")
    cond = (beats1 & beats2) if reciprocal else (beats1 | beats2)
    return j.filter(cond).select("id1", "id2")


def wnp(scored: DataFrame) -> DataFrame:
    """Supervised Weighted Node Pruning (Algorithm 2): beat either mean."""
    return _node_pruning(scored, reciprocal=False)


def rwnp(scored: DataFrame) -> DataFrame:
    """Reciprocal WNP: beat both endpoint means (deeper pruning)."""
    return _node_pruning(scored, reciprocal=True)


def blast(scored: DataFrame, *, r: float = 0.35) -> DataFrame:
    """Supervised BLAST (Algorithm 3): p >= r * (max_i + max_j)."""
    valid = _valid(scored)
    maxima = _per_entity(valid, F.max("p"), "mx")
    j = (
        valid.join(maxima.withColumnRenamed("entity_id", "id1"), "id1")
        .withColumnRenamed("mx", "mx1")
        .join(maxima.withColumnRenamed("entity_id", "id2"), "id2")
        .withColumnRenamed("mx", "mx2")
    )
    return j.filter(
        F.col("p") >= F.lit(float(r)) * (F.col("mx1") + F.col("mx2"))
    ).select("id1", "id2")
