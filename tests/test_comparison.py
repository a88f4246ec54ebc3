"""Comparison-Execution: Spark-side scoring must equal the driver-side
matcher, and the counters must be exact."""
from __future__ import annotations

import pytest

from repro.core.comparison import execute_comparisons, score_pairs
from repro.core.config import ERConfig
from repro.core.similarity import entity_similarity
from repro.core.tokenize import EID


@pytest.fixture(scope="module")
def entities(spark):
    return spark.createDataFrame(
        [
            (1, "Collective Entity Resolution", "EDBT"),
            (2, "Collective Entity Resolutionn", "EDBT"),
            (3, "Something Else Entirely", "CIDR"),
            (4, None, None),
        ],
        schema=f"{EID} long, title string, venue string",
    )


def _edges(spark, *pairs):
    return spark.createDataFrame(
        [(a, b, 1) for a, b in pairs], schema="e1 long, e2 long, weight long"
    )


def test_score_matches_driver_matcher(spark, entities):
    cfg = ERConfig()
    edges = _edges(spark, (1, 2), (1, 3), (2, 3))
    got = {
        (r["e1"], r["e2"]): r["sim"]
        for r in score_pairs(edges, entities, ["title", "venue"], cfg).collect()
    }
    rows = {r[EID]: {"title": r["title"], "venue": r["venue"]} for r in entities.collect()}
    for (a, b), sim in got.items():
        expected = entity_similarity(
            rows[a], rows[b], jw_weight=cfg.jw_weight
        )
        assert sim == pytest.approx(expected)


def test_score_handles_null_entities(spark, entities):
    cfg = ERConfig()
    got = score_pairs(
        _edges(spark, (1, 4)), entities, ["title", "venue"], cfg
    ).collect()
    assert len(got) == 1
    assert got[0]["sim"] == 0.0


def test_execute_comparisons_counts_and_threshold(spark, entities):
    cfg = ERConfig(sim_threshold=0.75)
    matches, n = execute_comparisons(
        _edges(spark, (1, 2), (1, 3), (2, 3)),
        entities,
        ["title", "venue"],
        cfg,
    )
    assert n == 3
    assert matches == [(1, 2)]


def test_execute_comparisons_empty_edges(spark, entities):
    cfg = ERConfig()
    matches, n = execute_comparisons(
        _edges(spark), entities, ["title", "venue"], cfg
    )
    assert matches == [] and n == 0


def test_execute_comparisons_threshold_inclusive(spark):
    df = spark.createDataFrame(
        [(1, "identical"), (2, "identical")], schema=f"{EID} long, a string"
    )
    matches, n = execute_comparisons(
        spark.createDataFrame([(1, 2, 1)], "e1 long, e2 long, weight long"),
        df,
        ["a"],
        ERConfig(sim_threshold=1.0),
    )
    assert matches == [(1, 2)] and n == 1


def test_thorough_config_used_in_spark_path(spark):
    # Token-reordered values score 1.0 only under the thorough matcher.
    df = spark.createDataFrame(
        [(1, "john albert smith"), (2, "smith john albert")],
        schema=f"{EID} long, name string",
    )
    edges = spark.createDataFrame(
        [(1, 2, 1)], "e1 long, e2 long, weight long"
    )
    fast = score_pairs(edges, df, ["name"], ERConfig()).collect()[0]["sim"]
    thor = score_pairs(
        edges, df, ["name"], ERConfig(thorough_matcher=True)
    ).collect()[0]["sim"]
    assert thor == pytest.approx(1.0)
    assert thor > fast
