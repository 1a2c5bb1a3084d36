"""Token Blocking: one block per distinct token of any attribute value.

Schema-agnostic: the ``text`` column is the concatenation of all attribute
values, so every token anywhere in the profile becomes a blocking signature
(paper Example 1). Output is the *block-assignment* relation
``(token, entity_id, source)`` — a block is the group of rows sharing a
token. Assignments are distinct: an entity repeating a token still joins
that block once.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def token_blocking(entities: DataFrame) -> DataFrame:
    """Tokenise ``entities(entity_id, source, text)`` into block assignments.

    Tokens are lower-cased, split on any non-alphanumeric run, and empty
    tokens are dropped.
    """
    return (
        entities.select(
            "entity_id",
            "source",
            F.explode(F.split(F.lower(F.col("text")), r"[^0-9a-z]+")).alias("token"),
        )
        .filter(F.col("token") != "")
        .distinct()
    )
