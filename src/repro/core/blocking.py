"""Query Blocking and Block-Join (stages i–ii of the Deduplicate operator).

* ``query_block_index`` builds QBI_{QE_E}: the block collection of just
  the entities selected by the query that are not already resolved in
  LI_E. Because QBI and TBI must be produced by the same blocking
  function (Sec. 6.1) we *derive* QBI by restricting the cached TBI
  pairs to QE ids — bit-identical to re-tokenising QE and cheaper.
* ``block_join`` enriches QBI with every entity of E that shares a
  blocking key: a hash-join between the BKs of QBI and TBI (the paper's
  Block-Join [1]), yielding EQBI — the superset of blocks that
  approximately answers the query (false positives possible, false
  negatives not).
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .indices import TableIndex
from .tokenize import EID


def query_block_index(ti: TableIndex, qe_ids: DataFrame) -> DataFrame:
    """QBI_{QE_E}: ``(token, _eid)`` pairs of the unresolved QE entities.

    ``qe_ids`` is a one-column ``_eid`` DataFrame. Entities already in
    LI_E are excluded — their link-sets were computed by an earlier
    query (the progressive-resolution property of Sec. 6.1).
    """
    unresolved = qe_ids.select(EID).distinct()
    if ti.li.resolved_ids:
        unresolved = unresolved.join(
            ti.li.resolved_df(), EID, "left_anti"
        )
    return ti.tbi.join(unresolved, EID, "left_semi")


def block_join(ti: TableIndex, qbi: DataFrame) -> DataFrame:
    """EQBI: the TBI blocks whose keys occur in QBI, with full membership.

    A hash-join on the blocking keys; the result contains, for every
    block touched by the query, *all* entities of E in that block —
    this is what lets the operator find duplicates outside the query's
    selection (the paper's \\overline{QE}_E).
    """
    keys = qbi.select("token").distinct()
    return ti.tbi.join(keys, "token", "left_semi")


def blocks_of(block_pairs: DataFrame, ids: DataFrame) -> DataFrame:
    """Restrict a block collection to rows whose entity is in ``ids``."""
    return block_pairs.join(ids.select(EID).distinct(), EID, "left_semi")


def collection_cardinality(block_pairs: DataFrame) -> float:
    """||B|| of a ``(token, _eid)`` block collection."""
    row = (
        block_pairs.groupBy("token")
        .agg(F.count("*").alias("s"))
        .agg(F.sum(F.col("s") * (F.col("s") - 1) / 2).alias("c"))
        .collect()[0]
    )
    return float(row["c"] or 0.0)
