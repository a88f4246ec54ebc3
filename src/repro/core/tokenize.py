"""Schema-agnostic Token Blocking: entity -> (eid, token) pairs.

Token Blocking (Papadakis et al., the paper's fixed blocking function)
treats every token of every attribute value as a blocking key (BK). A
block is the set of entities sharing one token; we represent a block
collection as a ``(token, _eid)`` pair DataFrame — the relational
encoding of the paper's hash index TBI — because every downstream
stage (Block-Join, purging, filtering, pair generation) is then a
Catalyst join/aggregation rather than driver-side dict manipulation.

The Spark-side tokenizer MUST agree exactly with the driver-side
``similarity.tokenize_value`` — QBI and TBI are built "via the same
blocking function" (Sec. 6.1) and the planner's comparison estimation
tokenises WHERE-clause literals on the driver.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

EID = "_eid"


def attribute_columns(entities: DataFrame) -> list[str]:
    """All non-internal columns, i.e. the entity's attributes A_E."""
    return [c for c in entities.columns if not c.startswith("_")]


def tokenize_entities(
    entities: DataFrame, *, min_token_len: int = 2
) -> DataFrame:
    """Distinct ``(token, _eid)`` pairs over all attributes of each entity.

    Mirrors ``similarity.tokenize_value``: lower-case, split on
    non-alphanumeric, keep tokens of length >= ``min_token_len`` plus
    pure digits. Distinct because Token Blocking places an entity in a
    block once, however many times the token occurs in its values.
    """
    attrs = attribute_columns(entities)
    if not attrs:
        raise ValueError("entity collection has no attribute columns")
    blob = F.concat_ws(" ", *[F.coalesce(F.col(a).cast("string"), F.lit("")) for a in attrs])
    toks = F.split(F.lower(blob), r"[^a-z0-9]+")
    out = (
        entities.select(F.col(EID), F.explode(toks).alias("token"))
        .where(
            (F.length("token") >= min_token_len)
            | (F.col("token").rlike(r"^[0-9]+$") & (F.length("token") >= 1))
        )
        .where(F.length("token") >= 1)
        .distinct()
    )
    return out


def block_stats(block_pairs: DataFrame) -> DataFrame:
    """Per-block size |b| and cardinality ||b|| = |b|(|b|-1)/2.

    Input: a ``(token, _eid)`` block collection. Output one row per
    block: ``(token, size, card)``. This is the relational form of the
    metadata the paper keeps alongside the TBI (blocks sorted by size).
    """
    return (
        block_pairs.groupBy("token")
        .agg(F.count("*").alias("size"))
        .withColumn("card", (F.col("size") * (F.col("size") - 1) / 2).cast("double"))
    )
