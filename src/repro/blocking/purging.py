"""Block Purging: drop blocks covering more than half of all profiles.

Parameter-free (paper Section 5.1): a block whose size exceeds
``n_entities / 2`` corresponds to a stop-word-like signature with no
distinguishing power and is removed wholesale.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def block_purging(assignments: DataFrame, n_entities: int) -> DataFrame:
    """Remove oversized blocks from the assignment relation.

    ``n_entities`` is the total number of input profiles (|E1|+|E2| for
    Clean-Clean, |E| for Dirty).
    """
    sizes = assignments.groupBy("token").agg(F.count("*").alias("_block_size"))
    keep = sizes.filter(F.col("_block_size") <= n_entities / 2).select("token")
    return assignments.join(keep, "token", "inner").select(
        "token", "entity_id", "source"
    )
