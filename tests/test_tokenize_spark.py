"""Spark-side Token Blocking must agree with the driver-side tokenizer
(QBI and TBI are built "via the same blocking function", Sec. 6.1)."""
from __future__ import annotations

import pytest

from repro.core.similarity import tokenize_value
from repro.core.tokenize import (
    EID,
    attribute_columns,
    block_stats,
    tokenize_entities,
)


@pytest.fixture(scope="module")
def toy(spark):
    return spark.createDataFrame(
        [
            (1, "Collective Entity Resolution", None, "2008"),
            (2, "Collective E.R.", "Allan Blake", "2008"),
            (3, "entity RESOLUTION", "Blake", None),
        ],
        schema=f"{EID} long, title string, author string, year string",
    )


def test_attribute_columns_excludes_internal(toy):
    assert attribute_columns(toy) == ["title", "author", "year"]


def test_attribute_columns_requires_attrs(spark):
    df = spark.createDataFrame([(1,)], schema=f"{EID} long")
    with pytest.raises(ValueError):
        tokenize_entities(df)


def test_tokens_match_driver_tokenizer(toy):
    rows = toy.collect()
    expected = set()
    for r in rows:
        toks = set()
        for c in ("title", "author", "year"):
            toks.update(tokenize_value(r[c]))
        expected.update((t, r[EID]) for t in toks)
    got = {
        (r["token"], r[EID]) for r in tokenize_entities(toy).collect()
    }
    assert got == expected


def test_tokens_distinct_per_entity(toy):
    # "entity" occurs once per entity even if repeated across attributes.
    df = tokenize_entities(toy)
    counts = df.groupBy("token", EID).count().where("count > 1").count()
    assert counts == 0


def test_tokens_lowercased_and_split(toy):
    tokens = {r["token"] for r in tokenize_entities(toy).collect()}
    assert "resolution" in tokens and "RESOLUTION" not in tokens
    assert "2008" in tokens
    assert "e" not in tokens  # single letters dropped


def test_min_token_len_respected(toy):
    tokens = {
        r["token"]
        for r in tokenize_entities(toy, min_token_len=6).collect()
    }
    assert tokens == {"collective", "entity", "resolution", "2008"}


def test_block_stats(toy):
    stats = {
        r["token"]: (r["size"], r["card"])
        for r in block_stats(tokenize_entities(toy)).collect()
    }
    # "collective" in e1,e2; "entity" in e1,e3; "resolution" in e1,e3;
    # "blake" in e2,e3; "2008" in e1,e2; "allan" in e2.
    assert stats["collective"] == (2, 1.0)
    assert stats["entity"] == (2, 1.0)
    assert stats["allan"] == (1, 0.0)
    assert stats["2008"] == (2, 1.0)


def test_block_stats_cardinality_formula(spark):
    df = spark.createDataFrame(
        [(i, "same word") for i in range(5)],
        schema=f"{EID} long, a string",
    )
    stats = {r["token"]: r["card"] for r in block_stats(tokenize_entities(df)).collect()}
    assert stats["same"] == 10.0  # C(5,2)
    assert stats["word"] == 10.0
