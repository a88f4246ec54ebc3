"""Group-Entities operator (Sec. 6.3) tests."""
from __future__ import annotations

import pytest

from repro.core.grouping import group_entities, grouped_key_rows
from repro.core.tokenize import EID


@pytest.fixture(scope="module")
def entities(spark):
    return spark.createDataFrame(
        [
            (1, "EDBT", "1"),
            (2, "International Conference on Extending Database Technology", None),
            (3, "SIGMOD", "1"),
        ],
        schema=f"{EID} long, title string, rank string",
    )


def test_groups_concatenate_distinct_values(spark, entities):
    links = spark.createDataFrame([(1, 2)], "e1 long, e2 long")
    rows = {
        r["_cluster"]: r
        for r in group_entities(entities, links, ["title", "rank"]).collect()
    }
    merged = rows[1]
    assert merged["title"] == (
        "EDBT | International Conference on Extending Database Technology"
    )
    assert merged["rank"] == "1"  # null contributes nothing
    assert list(merged["_members"]) == [1, 2]
    assert rows[3]["title"] == "SIGMOD"


def test_group_duplicate_values_collapse(spark):
    df = spark.createDataFrame(
        [(1, "same"), (2, "same")], schema=f"{EID} long, v string"
    )
    links = spark.createDataFrame([(1, 2)], "e1 long, e2 long")
    row = group_entities(df, links, ["v"]).collect()[0]
    assert row["v"] == "same"


def test_group_all_null_attribute_becomes_empty(spark):
    df = spark.createDataFrame(
        [(1, None), (2, None)], schema=f"{EID} long, v string"
    )
    links = spark.createDataFrame([(1, 2)], "e1 long, e2 long")
    row = group_entities(df, links, ["v"]).collect()[0]
    assert row["v"] == ""  # "nulls are mapped to an empty value"


def test_group_no_links_all_singletons(spark, entities):
    out = group_entities(entities, None, ["title", "rank"])
    assert out.count() == 3


def test_group_deterministic_value_order(spark):
    df = spark.createDataFrame(
        [(1, "zebra"), (2, "apple")], schema=f"{EID} long, v string"
    )
    links = spark.createDataFrame([(1, 2)], "e1 long, e2 long")
    row = group_entities(df, links, ["v"]).collect()[0]
    assert row["v"] == "apple | zebra"  # sorted, not insertion order


def test_grouped_key_rows_canonical(spark, entities):
    links = spark.createDataFrame([(1, 2)], "e1 long, e2 long")
    keys = grouped_key_rows(group_entities(entities, links, ["title"]))
    assert keys == [(1, 2), (3,)]
