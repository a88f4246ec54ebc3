"""Meta-Blocking stages: Block Purging, Block Filtering, Edge Pruning."""
from __future__ import annotations

import pyspark.sql.functions as F
import pytest

from repro.core.config import ERConfig
from repro.core.metablocking import (
    block_filtering,
    block_purging,
    candidate_pairs,
    edge_pruning,
    meta_block,
    purge_threshold,
)
from repro.core.tokenize import EID, block_stats


def _pairs(spark, pairs):
    return spark.createDataFrame(
        [(t, e) for t, e in pairs], schema=f"token string, {EID} long"
    )


# ----------------------------------------------------- purge threshold
def test_purge_threshold_empty():
    assert purge_threshold([], 1.025) == float("inf")


def test_purge_threshold_keeps_all_when_uniform():
    rows = [(1.0, 10.0, 20.0)]
    assert purge_threshold(rows, 1.025) == 1.0


def test_purge_threshold_cuts_oversized_tail():
    # Small blocks dominate assignments; one huge block adds most of the
    # comparisons -> threshold must land below the huge cardinality.
    rows = [
        (1.0, 100.0, 200.0),  # 100 blocks of card 1
        (3.0, 130.0, 230.0),
        (1000.0, 1130.0, 275.0),  # one oversized block
    ]
    t = purge_threshold(rows, 1.025)
    assert t < 1000.0


def test_purge_threshold_monotone_input_order_matters():
    # Called with ascending cardinalities per contract.
    rows = [(1.0, 10.0, 20.0), (2.0, 14.0, 24.0)]
    assert purge_threshold(rows, 1.025) in (1.0, 2.0)


# ------------------------------------------------------- block purging
def test_block_purging_drops_stopword_block(spark):
    # 'entity' block holds everyone (motivating example's
    # low-discriminativeness token); pair blocks hold 2 entities.
    pairs = [("entity", i) for i in range(1, 21)]
    pairs += [(f"tok{i}", i) for i in range(1, 21)]
    pairs += [(f"tok{i}", i + 1) for i in range(1, 20, 2)]
    bp = _pairs(spark, pairs)
    purged, t = block_purging(bp, ERConfig())
    kept = {r["token"] for r in purged.select("token").distinct().collect()}
    assert "entity" not in kept
    assert "tok1" in kept
    assert t < 190.0  # ||entity|| = C(20,2)


def test_block_purging_no_op_on_uniform_blocks(spark):
    pairs = [("a", 1), ("a", 2), ("b", 3), ("b", 4)]
    purged, _ = block_purging(_pairs(spark, pairs), ERConfig())
    assert purged.count() == 4


# ----------------------------------------------------- block filtering
def test_block_filtering_keeps_smallest_blocks(spark):
    # Entity 1 sits in 5 blocks with global sizes 1..5; ratio 0.8 keeps
    # ceil(0.8*5)=4 -> the largest block is dropped for entity 1.
    pairs = [(f"b{s}", 1) for s in range(1, 6)]
    for s in range(2, 6):
        pairs += [(f"b{s}", 100 + i) for i in range(s - 1)]
    bp = _pairs(spark, pairs)
    stats = block_stats(bp)
    out = block_filtering(bp, stats, ERConfig(filter_ratio=0.8))
    kept_for_1 = {
        r["token"] for r in out.where(F.col(EID) == 1).collect()
    }
    assert kept_for_1 == {"b1", "b2", "b3", "b4"}


def test_block_filtering_ratio_one_keeps_everything(spark):
    pairs = [("a", 1), ("b", 1), ("a", 2)]
    bp = _pairs(spark, pairs)
    out = block_filtering(bp, block_stats(bp), ERConfig(filter_ratio=1.0))
    assert out.count() == 3


def test_block_filtering_uses_global_sizes(spark):
    """Ranking is against the full-table block sizes even when filtering
    a query-restricted collection — the DQ/BA consistency device."""
    full = _pairs(
        spark,
        [("big", i) for i in range(1, 6)] + [("small", 1), ("small", 2)],
    )
    stats = block_stats(full)
    # Query view: entity 1 appears in both blocks, each with 2 members.
    view = _pairs(spark, [("big", 1), ("big", 2), ("small", 1), ("small", 2)])
    out = block_filtering(view, stats, ERConfig(filter_ratio=0.5))
    kept_for_1 = {r["token"] for r in out.where(F.col(EID) == 1).collect()}
    assert kept_for_1 == {"small"}  # globally smaller block wins


# ------------------------------------------------------ candidate pairs
def test_candidate_pairs_canonical_and_weighted(spark):
    bp = _pairs(spark, [("a", 1), ("a", 2), ("b", 1), ("b", 2), ("c", 2), ("c", 3)])
    edges = {
        (r["e1"], r["e2"]): r["weight"]
        for r in candidate_pairs(bp).collect()
    }
    assert edges == {(1, 2): 2, (2, 3): 1}


def test_candidate_pairs_no_self_pairs(spark):
    bp = _pairs(spark, [("a", 1), ("b", 1)])
    assert candidate_pairs(bp).count() == 0


def test_candidate_pairs_restricted_to_left_ids(spark):
    bp = _pairs(spark, [("a", 1), ("a", 2), ("b", 2), ("b", 3), ("c", 3), ("c", 4)])
    ids = spark.createDataFrame([(1,)], schema=f"{EID} long")
    edges = {
        (r["e1"], r["e2"]) for r in candidate_pairs(bp, ids).collect()
    }
    assert edges == {(1, 2)}  # 2-3 and 3-4 do not touch entity 1


def test_candidate_pairs_restriction_keeps_either_side(spark):
    bp = _pairs(spark, [("a", 1), ("a", 2), ("b", 2), ("b", 3)])
    ids = spark.createDataFrame([(2,)], schema=f"{EID} long")
    edges = {
        (r["e1"], r["e2"]) for r in candidate_pairs(bp, ids).collect()
    }
    assert edges == {(1, 2), (2, 3)}


# -------------------------------------------------------- edge pruning
def test_edge_pruning_mean_cut(spark):
    edges = spark.createDataFrame(
        [(1, 2, 3), (3, 4, 1), (5, 6, 1), (7, 8, 1)],
        schema="e1 long, e2 long, weight long",
    )
    # mean = 1.5 -> only the weight-3 edge survives
    kept = {(r["e1"], r["e2"]) for r in edge_pruning(edges).collect()}
    assert kept == {(1, 2)}


def test_edge_pruning_uniform_weights_keep_all(spark):
    edges = spark.createDataFrame(
        [(1, 2, 2), (3, 4, 2)], schema="e1 long, e2 long, weight long"
    )
    assert edge_pruning(edges).count() == 2


def test_edge_pruning_empty(spark):
    edges = spark.createDataFrame(
        [], schema="e1 long, e2 long, weight long"
    )
    assert edge_pruning(edges).count() == 0


# ------------------------------------------------------------ pipeline
def test_meta_block_stage_toggles(spark):
    bp = _pairs(
        spark,
        [("a", 1), ("a", 2), ("b", 1), ("b", 2), ("c", 2), ("c", 3)],
    )
    stats = block_stats(bp)
    cfg_none = ERConfig().with_stages(bp=False, bf=False, ep=False)
    _, edges = meta_block(bp, stats, cfg_none)
    assert edges.count() == 2  # (1,2) and (2,3), nothing pruned

    cfg_ep = ERConfig().with_stages(bp=False, bf=False, ep=True)
    _, edges_ep = meta_block(bp, stats, cfg_ep)
    kept = {(r["e1"], r["e2"]) for r in edges_ep.collect()}
    assert kept == {(1, 2)}  # weight 2 vs mean 1.5


def test_meta_block_never_invents_pairs(spark, people_data):
    """Meta-blocking only removes comparisons (Sec. 4): every surviving
    edge must co-occur in some raw block."""
    from repro.core.tokenize import tokenize_entities

    df, _ = people_data
    bp = tokenize_entities(df.limit(80))
    stats = block_stats(bp)
    _, edges = meta_block(bp, stats, ERConfig())
    raw = {
        (r["e1"], r["e2"])
        for r in candidate_pairs(bp).select("e1", "e2").collect()
    }
    survived = {(r["e1"], r["e2"]) for r in edges.select("e1", "e2").collect()}
    assert survived <= raw
