"""ER-specific statistics for the cost-based planner (Sec. 7.2.1).

Three estimators, all computed from the in-memory indices without
running any Jaro-Winkler comparison (the cost the planner is trying to
minimise):

* ``estimate_selection`` — S_E ≈ QE_E from the WHERE clause's string
  literals, read as blocking keys of the TBI (the paper's WB blocks).
* ``estimate_comparisons`` — the post-BP/BF comparison count
  C = Σ_b |q_b| · (|S_b| − (|q_b| + 1)/2); the paper deliberately
  stops the estimation at Block Filtering because estimating Edge
  Pruning's output costs as much as running it.
* ``duplication_factor`` / ``join_percentage`` — |DR_E| and join-size
  estimators from an eagerly cleaned sample and a precomputed
  key-overlap table, used for join ordering.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .config import ERConfig
from .indices import TableIndex
from .similarity import tokenize_value
from .tokenize import EID


def estimate_selection(ti: TableIndex, literals: list[str]) -> DataFrame:
    """S_E: ids of entities in any WB block (blocks keyed by a literal's
    tokens). Disjunctive reading — a superset estimate of QE_E for
    equality predicates, which is the safe direction for cost bounds."""
    toks = sorted(
        {
            t
            for lit in literals
            for t in tokenize_value(lit, min_len=ti.config.min_token_len)
        }
    )
    if not toks:
        return ti.entities.select(EID)  # no usable literal: whole table
    tok_df = ti.spark.createDataFrame([(t,) for t in toks], schema="token string")
    return (
        ti.tbi.join(tok_df, "token", "left_semi").select(EID).distinct()
    )


def estimate_comparisons(
    ti: TableIndex, s_ids: DataFrame, *, config: ERConfig | None = None
) -> float:
    """Estimated number of comparisons a Deduplicate over ``s_ids`` would
    execute, after simulating Block-Join + BP + BF on the indices.

    Entities already resolved in LI_E are excluded first — the paper's
    "∀ e ∈ S_E \\ LI_E" — which is also why this estimate (and the
    plans built from it) improve as the Link Index fills up.
    """
    cfg = config or ti.config
    ids = s_ids.select(EID).distinct()
    if ti.li.resolved_ids:
        ids = ids.join(ti.li.resolved_df(), EID, "left_anti")

    # SB ≈ EQBI: every block containing an unresolved S_E entity, with
    # full membership (via the ITBI -> TBI round trip).
    qbi = ti.tbi.join(ids, EID, "left_semi")
    keys = qbi.select("token").distinct()
    sb = ti.tbi.join(keys, "token", "left_semi")

    # BP/BF approximation = the same once-off kept set the Deduplicate
    # operator restricts against, so the estimate tracks execution.
    if cfg.block_purging or cfg.block_filtering:
        sb = sb.join(ti.meta_collection(cfg), ["token", EID], "left_semi")

    q_flag = sb.join(
        ids.withColumn("_is_q", F.lit(1)), EID, "left"
    ).fillna({"_is_q": 0})
    per_block = q_flag.groupBy("token").agg(
        F.sum("_is_q").alias("q"), F.count("*").alias("s")
    )
    row = per_block.agg(
        F.sum(
            F.col("q") * (F.col("s") - (F.col("q") + 1) / 2.0)
        ).alias("c")
    ).collect()[0]
    return float(row["c"] or 0.0)


def duplication_factor(
    ti: TableIndex,
    *,
    sample_fraction: float = 0.1,
    seed: int = 7,
    config: ERConfig | None = None,
) -> float:
    """df: |DR_S| / |S| from an eagerly cleaned sample (Sec. 7.2.1).

    Computed once at data-loading time; the planner multiplies a
    query's |QE_E| by df to estimate |DR_E|. Imported lazily to avoid a
    circular import with the Deduplicate operator."""
    from .dedup import deduplicate  # local: dedup imports nothing from stats

    cfg = config or ti.config
    sample = ti.entities.sample(
        withReplacement=False, fraction=sample_fraction, seed=seed
    )
    n = sample.count()
    if n == 0:
        return 1.0
    # Resolve the sample against itself only (a standalone mini-table),
    # so the eager cleaning touches no full-table state — and restore
    # the LI to its pre-sampling state to keep queries unaffected.
    saved_ids = set(ti.li.resolved_ids)
    saved_links = set(ti.li.links)
    try:
        dr = deduplicate(ti, sample, config=cfg)
        return dr.metrics.dr_size / n
    finally:
        ti.li.resolved_ids = saved_ids
        ti.li.links = saved_links


def join_percentage(
    left: TableIndex, right: TableIndex, left_attr: str, right_attr: str
) -> tuple[float, float]:
    """Pre-computed per table pair: the fraction of each side's entities
    whose join key appears on the other side (Sec. 7.2.1)."""
    lk = left.entities.select(
        F.col(EID), F.col(left_attr).cast("string").alias("_k")
    ).where(F.col("_k").isNotNull())
    rk = right.entities.select(
        F.col(EID), F.col(right_attr).cast("string").alias("_k")
    ).where(F.col("_k").isNotNull())
    l_match = lk.join(rk.select("_k").distinct(), "_k", "left_semi").count()
    r_match = rk.join(lk.select("_k").distinct(), "_k", "left_semi").count()
    ln = max(1, left.n_entities)
    rn = max(1, right.n_entities)
    return l_match / ln, r_match / rn
