"""Distinct candidate-pair extraction from block assignments.

Aggregating the per-block comparisons into a distinct set removes all
*redundant* comparisons (paper Section 2): each pair of entities sharing at
least one block appears exactly once in the output, regardless of how many
blocks they share.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def pair_block_relation(assignments: DataFrame, task: str) -> DataFrame:
    """``(id1, id2, token)``: one row per co-occurrence of a pair in a block.

    Clean-Clean: ``id1`` from source 1, ``id2`` from source 2. Dirty:
    ``id1 < id2``. This relation (with multiplicity over tokens) feeds the
    co-occurrence aggregations of the weighting schemes.
    """
    a = assignments.alias("a")
    b = assignments.alias("b")
    if task == "clean":
        return (
            a.filter(F.col("a.source") == 1)
            .join(
                b.filter(F.col("b.source") == 2),
                F.col("a.token") == F.col("b.token"),
            )
            .select(
                F.col("a.entity_id").alias("id1"),
                F.col("b.entity_id").alias("id2"),
                F.col("a.token").alias("token"),
            )
        )
    if task == "dirty":
        return (
            a.join(
                b,
                (F.col("a.token") == F.col("b.token"))
                & (F.col("a.entity_id") < F.col("b.entity_id")),
            ).select(
                F.col("a.entity_id").alias("id1"),
                F.col("b.entity_id").alias("id2"),
                F.col("a.token").alias("token"),
            )
        )
    raise ValueError(f"task must be 'clean' or 'dirty', got {task!r}")


def candidate_pairs(assignments: DataFrame, task: str) -> DataFrame:
    """The distinct comparison set C: ``(id1, id2)``."""
    return pair_block_relation(assignments, task).select("id1", "id2").distinct()
