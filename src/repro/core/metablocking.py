"""Meta-Blocking: Block Purging, Block Filtering, Edge Pruning (Sec. 4, 6.1).

Applied in the paper's strict order BP -> BF -> EP: the coarse
block-level methods first (cheap, shrink the blocking graph), the
comparison-level graph pruning last.

Representation: a block collection is a ``(token, _eid)`` pair
DataFrame; the blocking graph is a ``(e1, e2, weight)`` DataFrame with
e1 < e2 and weight = CBS (common-blocks scheme — the number of blocks
the pair co-occurs in after BP/BF).

Determinism notes (these carry the DQ-Correctness argument):

* Block Purging's threshold is computed from the block collection it is
  given (EQBI for a query, the full TBI for batch) via the paper's
  smoothing-factor rule with SF = 1.025.
* Block Filtering ranks each entity's blocks by their *global* TBI
  size (the paper pre-sorts ITBI by |b| ascending), so whether an
  entity's block list is seen through a query's EQBI or the full TBI,
  the same blocks survive — this containment is what makes the
  query-time pipeline return the same links the batch pipeline would.
* Edge Pruning is Weighted Edge Pruning: discard edges lighter than the
  mean weight of the graph it sees.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from .config import ERConfig
from .tokenize import EID


# ---------------------------------------------------------------- purging
def purge_threshold(card_by_size: list[tuple[float, float, float]], smoothing: float) -> float:
    """Comparison threshold t for Block Purging.

    ``card_by_size`` holds one row per distinct block cardinality,
    ascending: (cardinality, cumulative comparisons CC, cumulative
    block assignments BA). Scanning ascending, t is the last
    cardinality for which the marginal gain in assignments justifies
    the comparisons: we stop where CC_i * BA_{i-1} >= SF * CC_{i-1} * BA_i
    (the paper's inequality, Sec. 7.2.1); blocks with ||b|| > t are
    purged.
    """
    if not card_by_size:
        return float("inf")
    # Scan from the largest cardinality down: purge a level while its
    # cumulative-comparison growth outpaces SF x its assignment growth,
    # and stop at the first proportionate level — that cardinality is t.
    # (Scanning upward instead would stop at the first noisy step among
    # the small blocks and purge nearly everything.)
    for i in range(len(card_by_size) - 1, 0, -1):
        card_i, cc_i, ba_i = card_by_size[i]
        _, cc_prev, ba_prev = card_by_size[i - 1]
        if cc_prev == 0:
            # Everything below is comparison-free (singleton blocks);
            # proportionality is undefined — keep this level.
            return card_i
        if cc_i * ba_prev < smoothing * cc_prev * ba_i:
            return card_i
    return card_by_size[0][0]


def block_purging(block_pairs: DataFrame, cfg: ERConfig) -> tuple[DataFrame, float]:
    """Drop oversized blocks (low-discriminativeness tokens such as
    "Entity" in the motivating example). Returns (purged collection, t)."""
    stats = (
        block_pairs.groupBy("token")
        .agg(F.count("*").alias("size"))
        .withColumn("card", (F.col("size") * (F.col("size") - 1) / 2).cast("double"))
    )
    per_card = (
        stats.groupBy("card")
        .agg(F.sum("card").alias("cc_part"), F.sum("size").alias("ba_part"))
        .orderBy("card")
        .collect()
    )
    rows, cc, ba = [], 0.0, 0.0
    for r in per_card:
        cc += float(r["cc_part"])
        ba += float(r["ba_part"])
        rows.append((float(r["card"]), cc, ba))
    t = purge_threshold(rows, cfg.purge_smoothing)
    keep = stats.where(F.col("card") <= F.lit(t)).select("token")
    return block_pairs.join(keep, "token", "left_semi"), t


# --------------------------------------------------------------- filtering
def block_filtering(
    block_pairs: DataFrame, global_stats: DataFrame, cfg: ERConfig
) -> DataFrame:
    """Keep each entity only in the smallest ``filter_ratio`` fraction of
    its blocks.

    ``global_stats`` is the full-table ``(token, size, card)`` frame
    (TBI metadata): ranking against global sizes keeps the query-time
    and batch pipelines consistent (see module docstring). Per entity,
    its blocks are ordered by (global size, token) ascending — the
    token tiebreak makes the cut deterministic — and the first
    ceil(p * n_blocks) survive, where n_blocks counts the entity's
    blocks *in the collection being filtered*.
    """
    sized = block_pairs.join(global_stats.select("token", "size"), "token")
    w = Window.partitionBy(EID).orderBy(F.col("size").asc(), F.col("token").asc())
    ranked = (
        sized.withColumn("_rank", F.row_number().over(w))
        .withColumn("_n", F.count("*").over(Window.partitionBy(EID)))
    )
    keep = ranked.where(
        F.col("_rank") <= F.ceil(F.lit(cfg.filter_ratio) * F.col("_n"))
    )
    return keep.select("token", EID)


# ------------------------------------------------------------ pair graph
def candidate_pairs(
    block_pairs: DataFrame, left_ids: DataFrame | None = None
) -> DataFrame:
    """Blocking-graph edges ``(e1, e2, weight)`` with e1 < e2.

    weight = number of blocks the pair co-occurs in (CBS). When
    ``left_ids`` is given, only edges touching at least one of those
    ids are produced — the Comparison-Execution restriction that a
    Dedupe query resolves QE entities only, not every pair in a block.
    """
    a = block_pairs.select(F.col("token"), F.col(EID).alias("e1"))
    b = block_pairs.select(F.col("token"), F.col(EID).alias("e2"))
    edges = (
        a.join(b, "token")
        .where(F.col("e1") < F.col("e2"))
        .groupBy("e1", "e2")
        .agg(F.count("*").alias("weight"))
    )
    if left_ids is not None:
        ids = left_ids.select(F.col(EID)).distinct()
        touch_left = edges.join(ids.withColumnRenamed(EID, "e1"), "e1", "left_semi")
        touch_right = edges.join(ids.withColumnRenamed(EID, "e2"), "e2", "left_semi")
        edges = touch_left.unionByName(touch_right).distinct()
    return edges


def edge_pruning(
    edges: DataFrame, threshold: float | None = None
) -> DataFrame:
    """Weighted Edge Pruning: keep edges with weight >= mean weight.

    ``threshold`` lets the caller supply a precomputed mean (QueryER
    uses the *full-table* graph's mean, a once-off table statistic —
    see ``TableIndex.ep_threshold``) so the query-time and batch
    pipelines prune every edge identically; computing the mean on the
    query-restricted graph instead would make EP's decision depend on
    the query and void the DQ-Correctness argument.
    """
    if threshold is None:
        row = edges.agg(F.avg("weight").alias("m")).collect()[0]
        threshold = float(row["m"]) if row["m"] is not None else 0.0
    return edges.where(F.col("weight") >= F.lit(threshold))


# ------------------------------------------------------------- pipeline
def meta_block(
    block_pairs: DataFrame,
    global_stats: DataFrame,
    cfg: ERConfig,
    *,
    left_ids: DataFrame | None = None,
    ep_threshold: float | None = None,
    keep: DataFrame | None = None,
) -> tuple[DataFrame, DataFrame]:
    """Full meta-blocking pass in the paper's strict BP -> BF -> EP order.

    Returns ``(surviving block collection, surviving edges)`` where
    edges are the comparisons handed to Comparison-Execution.

    ``keep`` — a precomputed kept ``(token, _eid)`` set (the table's
    ``meta_collection``) — replaces the per-collection BP/BF decisions
    with a single semi-join restriction; QueryER's Deduplicate operator
    and the batch baseline both pass it so coarse Meta-Blocking is a
    query-independent table statistic (see ``TableIndex.meta_collection``).
    ``ep_threshold`` is the table-level pruning weight (see
    ``edge_pruning``); None falls back to this collection's own mean.
    """
    out = block_pairs
    if keep is not None:
        if cfg.block_purging or cfg.block_filtering:
            out = out.join(keep, ["token", EID], "left_semi")
    else:
        if cfg.block_purging:
            out, _ = block_purging(out, cfg)
        if cfg.block_filtering:
            out = block_filtering(out, global_stats, cfg)
    edges = candidate_pairs(out, left_ids)
    if cfg.edge_pruning:
        edges = edge_pruning(edges, ep_threshold)
    return out, edges
