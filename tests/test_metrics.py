"""QueryMetrics / Pair-Completeness tests."""
from __future__ import annotations

import time

import pytest

from repro.core.metrics import QueryMetrics, pair_completeness


def test_stage_timer_records_and_accumulates():
    m = QueryMetrics()
    with m.stage("a"):
        time.sleep(0.01)
    with m.stage("a"):
        time.sleep(0.01)
    with m.stage("b"):
        pass
    assert m.stage_seconds["a"] >= 0.02
    assert m.total_seconds == pytest.approx(
        sum(m.stage_seconds.values())
    )


def test_breakdown_fractions_sum_to_one():
    m = QueryMetrics()
    m.stage_seconds = {"a": 3.0, "b": 1.0}
    bd = m.breakdown()
    assert bd["a"] == pytest.approx(0.75)
    assert sum(bd.values()) == pytest.approx(1.0)


def test_breakdown_empty():
    assert QueryMetrics().breakdown() == {}


def test_merge_accumulates():
    a = QueryMetrics()
    a.stage_seconds = {"x": 1.0}
    a.comparisons = 5
    b = QueryMetrics()
    b.stage_seconds = {"x": 2.0, "y": 1.0}
    b.comparisons = 7
    b.matches = 2
    a.merge(b)
    assert a.stage_seconds == {"x": 3.0, "y": 1.0}
    assert a.comparisons == 12 and a.matches == 2


def test_pair_completeness_full_recall():
    gt = {(1, 2), (3, 4)}
    found = {(1, 2), (3, 4), (5, 6)}
    assert pair_completeness(found, gt, {1, 3}) == 1.0


def test_pair_completeness_partial():
    gt = {(1, 2), (1, 3), (7, 8)}
    found = {(1, 2)}
    # QE={1}: relevant GT pairs are (1,2),(1,3); (7,8) out of scope.
    assert pair_completeness(found, gt, {1}) == pytest.approx(0.5)


def test_pair_completeness_no_relevant_pairs_is_one():
    assert pair_completeness(set(), {(5, 6)}, {1, 2}) == 1.0
