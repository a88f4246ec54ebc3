"""TableIndex / LinkIndex (TBI, ITBI, LI of Sec. 3) tests."""
from __future__ import annotations

import pytest

from repro.core.indices import LinkIndex, TableIndex, register_table
from repro.core.tokenize import EID


@pytest.fixture(scope="module")
def ti(spark):
    df = spark.createDataFrame(
        [
            (1, "alpha beta", "x"),
            (2, "beta gamma", "y"),
            (3, "gamma delta", "x"),
        ],
        schema=f"{EID} long, words string, tag string",
    )
    return register_table(spark, "toy", df)


def test_table_index_counts(ti):
    assert ti.n_entities == 3
    assert ti.attrs == ["words", "tag"]
    # tokens: alpha beta gamma delta (len>=2); 'x','y' kept (len 1 < 2
    # and not digits -> dropped)
    assert ti.n_blocks == 4


def test_table_index_requires_eid(spark):
    df = spark.createDataFrame([("a",)], schema="words string")
    with pytest.raises(ValueError):
        TableIndex(spark, "bad", df)


def test_itbi_carries_sizes(ti):
    rows = {
        (r[EID], r["token"]): r["size"] for r in ti.itbi().collect()
    }
    assert rows[(1, "beta")] == 2
    assert rows[(1, "alpha")] == 1


def test_total_cardinality(ti):
    # beta:{1,2} gamma:{2,3} -> 1 comparison each; alpha, delta singletons.
    assert ti.total_cardinality() == 2.0


def test_stats_summary(ti):
    s = ti.stats_summary()
    assert s == {
        "table": "toy",
        "n_entities": 3,
        "n_attributes": 2,
        "tbi_size": 4,
    }


# ------------------------------------------------------------ LinkIndex
def test_link_index_empty(spark):
    li = LinkIndex(spark)
    assert len(li) == 0
    assert li.links_df().count() == 0
    assert li.resolved_df().count() == 0
    assert li.partners_of({1}) == set()


def test_link_index_amend_canonicalises(spark):
    li = LinkIndex(spark)
    li.amend([1, 2], [(2, 1), (1, 2), (3, 3)])
    assert li.links == {(1, 2)}  # dedup + canonical order + no self-links
    assert li.resolved_ids == {1, 2}


def test_link_index_partners(spark):
    li = LinkIndex(spark)
    li.amend([1], [(1, 5), (5, 9), (2, 7)])
    assert li.partners_of({1}) == {5}
    assert li.partners_of({5}) == {1, 9}
    assert li.partners_of({1, 7}) == {5, 2}


def test_link_index_links_df_sorted(spark):
    li = LinkIndex(spark)
    li.amend([], [(9, 4), (2, 8)])
    rows = [(r["e1"], r["e2"]) for r in li.links_df().collect()]
    assert rows == [(2, 8), (4, 9)]


def test_link_index_clear(spark):
    li = LinkIndex(spark)
    li.amend([1], [(1, 2)])
    li.clear()
    assert len(li) == 0 and li.resolved_ids == set()


def test_link_index_accumulates_across_amends(spark):
    li = LinkIndex(spark)
    li.amend([1], [(1, 2)])
    li.amend([3], [(3, 4)])
    assert li.links == {(1, 2), (3, 4)}
    assert li.resolved_ids == {1, 3}
