"""Query Blocking + Block-Join (Deduplicate operator stages i-ii)."""
from __future__ import annotations

import pytest

from repro.core.blocking import (
    block_join,
    blocks_of,
    collection_cardinality,
    query_block_index,
)
from repro.core.indices import register_table
from repro.core.tokenize import EID


@pytest.fixture(scope="module")
def ti(spark):
    df = spark.createDataFrame(
        [
            (1, "alpha beta"),
            (2, "beta gamma"),
            (3, "gamma delta"),
            (4, "delta epsilon"),
            (5, "zeta"),
        ],
        schema=f"{EID} long, words string",
    )
    return register_table(spark, "chain", df)


def _ids(spark, *ids):
    return spark.createDataFrame([(i,) for i in ids], schema=f"{EID} long")


def test_qbi_restricts_to_qe(spark, ti):
    qbi = query_block_index(ti, _ids(spark, 1))
    assert {(r["token"], r[EID]) for r in qbi.collect()} == {
        ("alpha", 1),
        ("beta", 1),
    }


def test_qbi_excludes_resolved(spark, ti):
    ti.li.clear()
    ti.li.amend([1], [])
    try:
        qbi = query_block_index(ti, _ids(spark, 1, 2))
        assert {r[EID] for r in qbi.collect()} == {2}
    finally:
        ti.li.clear()


def test_block_join_enriches_full_membership(spark, ti):
    qbi = query_block_index(ti, _ids(spark, 1))
    eqbi = block_join(ti, qbi)
    got = {(r["token"], r[EID]) for r in eqbi.collect()}
    # blocks 'alpha' {1} and 'beta' {1,2}: entity 2 pulled in via beta.
    assert got == {("alpha", 1), ("beta", 1), ("beta", 2)}


def test_block_join_is_superset_of_qbi(spark, ti):
    qbi = query_block_index(ti, _ids(spark, 2, 3))
    eqbi = block_join(ti, qbi)
    q = {(r["token"], r[EID]) for r in qbi.collect()}
    e = {(r["token"], r[EID]) for r in eqbi.collect()}
    assert q <= e


def test_block_join_reaches_neighbours_not_neighbours_of_neighbours(
    spark, ti
):
    # QE={2}: blocks beta{1,2}, gamma{2,3} -> entities {1,2,3}; entity 4
    # shares no block with 2 and must not appear.
    eqbi = block_join(ti, query_block_index(ti, _ids(spark, 2)))
    assert {r[EID] for r in eqbi.collect()} == {1, 2, 3}


def test_blocks_of(spark, ti):
    sub = blocks_of(ti.tbi, _ids(spark, 5))
    assert {(r["token"], r[EID]) for r in sub.collect()} == {("zeta", 5)}


def test_collection_cardinality(spark, ti):
    # 4 two-entity blocks (beta, gamma, delta at sizes 2) -> beta 1 +
    # gamma 1 + delta 1 = 3; singletons contribute 0.
    assert collection_cardinality(ti.tbi) == 3.0


def test_collection_cardinality_empty(spark, ti):
    empty = ti.tbi.where("token = 'nosuchtoken'")
    assert collection_cardinality(empty) == 0.0
