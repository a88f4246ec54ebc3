"""Parser substrate tests, including DuckDB-oracle checks that compiled
predicates match real SQL WHERE semantics."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.sqlparse import (
    BoolExpr,
    ColRef,
    Comparison,
    DedupeQuery,
    ModExpr,
    QuerySyntaxError,
    compile_predicate,
    parse_query,
    split_where,
    string_literals,
)
from repro.oracle import assert_equivalent


# ------------------------------------------------------------- parsing
def test_parse_minimal_select():
    q = parse_query("SELECT * FROM T")
    assert not q.dedup
    assert q.select == ("*",)
    assert q.tables[0].name == "T"
    assert q.join is None and q.where is None


def test_parse_dedup_flag():
    assert parse_query("SELECT DEDUP * FROM T").dedup
    assert not parse_query("SELECT * FROM T").dedup


def test_parse_column_list():
    q = parse_query("SELECT a, b, T.c FROM T")
    assert q.select == (
        ColRef(None, "a"), ColRef(None, "b"), ColRef("T", "c"),
    )


def test_parse_table_alias():
    q = parse_query("SELECT * FROM People p WHERE p.name = 'x'")
    assert q.tables[0].name == "People"
    assert q.tables[0].alias == "p"
    assert q.alias_of("p").name == "People"
    assert q.alias_of("People").name == "People"


def test_parse_join():
    q = parse_query(
        "SELECT DEDUP P.Title FROM P INNER JOIN V ON P.Venue = V.Title"
    )
    assert len(q.tables) == 2
    assert q.join.left == ColRef("P", "Venue")
    assert q.join.right == ColRef("V", "Title")


def test_parse_join_without_inner_keyword():
    q = parse_query("SELECT * FROM A JOIN B ON A.x = B.y")
    assert q.join is not None


@pytest.mark.parametrize("op", ["=", "!=", "<>", "<", ">", "<=", ">="])
def test_parse_comparison_ops(op):
    q = parse_query(f"SELECT * FROM T WHERE a {op} 5")
    cmp = q.where
    assert isinstance(cmp, Comparison)
    assert cmp.op == ("!=" if op == "<>" else op)
    assert cmp.values == (5,)


def test_parse_string_literal_with_escape():
    q = parse_query("SELECT * FROM T WHERE a = 'O''Brien'")
    assert q.where.values == ("O'Brien",)


def test_parse_float_literal():
    q = parse_query("SELECT * FROM T WHERE a > 1.5")
    assert q.where.values == (1.5,)


def test_parse_in_list():
    q = parse_query("SELECT * FROM T WHERE a IN ('x', 'y', 3)")
    assert q.where.op == "IN"
    assert q.where.values == ("x", "y", 3)


def test_parse_like():
    q = parse_query("SELECT * FROM T WHERE a LIKE 'ab%'")
    assert q.where.op == "LIKE"


def test_parse_mod_expression():
    q = parse_query("SELECT DEDUP * FROM T WHERE MOD(id, 10) < 1")
    assert isinstance(q.where.operand, ModExpr)
    assert q.where.operand.modulus == 10
    assert q.where.operand.col == ColRef(None, "id")


def test_parse_and_or_precedence():
    q = parse_query("SELECT * FROM T WHERE a = 1 OR b = 2 AND c = 3")
    assert isinstance(q.where, BoolExpr) and q.where.op == "OR"
    right = q.where.children[1]
    assert isinstance(right, BoolExpr) and right.op == "AND"


def test_parse_parentheses():
    q = parse_query("SELECT * FROM T WHERE (a = 1 OR b = 2) AND c = 3")
    assert q.where.op == "AND"
    assert q.where.children[0].op == "OR"


def test_parse_keywords_case_insensitive():
    q = parse_query("select dedup a from T where a = 1 and b = 2")
    assert q.dedup and q.where.op == "AND"


@pytest.mark.parametrize(
    "bad",
    [
        "SELECT FROM T",
        "SELECT * T",
        "SELECT * FROM T WHERE",
        "SELECT * FROM T WHERE a",
        "SELECT * FROM T WHERE a = ",
        "SELECT * FROM A JOIN B ON A.x < B.y",  # non-equi join
        "SELECT * FROM T WHERE a IN ()",
        "SELECT * FROM T WHERE MOD(a) = 1",
        "SELECT * FROM T t EXTRA",  # trailing token after alias
        "",
    ],
)
def test_parse_errors(bad):
    with pytest.raises(QuerySyntaxError):
        parse_query(bad)


def test_lex_error_character():
    with pytest.raises(QuerySyntaxError):
        parse_query("SELECT * FROM T WHERE a = #")


# ------------------------------------------------------ sql round trip
@pytest.mark.parametrize(
    "where",
    [
        "a = 5",
        "a = 'x'",
        "a != 'x'",
        "a < 3 AND b > 4",
        "a = 1 OR b = 2 AND c = 3",
        "a IN ('x', 'y')",
        "MOD(id, 10) < 1",
    ],
)
def test_where_sql_roundtrip(where):
    q1 = parse_query(f"SELECT * FROM T WHERE {where}")
    q2 = parse_query(f"SELECT * FROM T WHERE {q1.where.sql()}")
    assert q1.where == q2.where


# ------------------------------------------------------- split_where
def test_split_where_single_table():
    q = parse_query("SELECT DEDUP * FROM T WHERE a = 1 AND b = 2")
    parts = split_where(q)
    assert set(parts) == {"T"}
    assert parts["T"].op == "AND"


def test_split_where_routes_conjuncts():
    q = parse_query(
        "SELECT DEDUP * FROM A JOIN B ON A.k = B.k "
        "WHERE A.x = 1 AND B.y = 2 AND A.z = 3"
    )
    parts = split_where(q)
    assert parts["A"].op == "AND" and len(parts["A"].children) == 2
    assert isinstance(parts["B"], Comparison)


def test_split_where_none_for_unfiltered_side():
    q = parse_query("SELECT DEDUP * FROM A JOIN B ON A.k = B.k WHERE A.x = 1")
    parts = split_where(q)
    assert parts["B"] is None


def test_split_where_rejects_unqualified_in_join():
    q = parse_query("SELECT DEDUP * FROM A JOIN B ON A.k = B.k WHERE x = 1")
    with pytest.raises(QuerySyntaxError):
        split_where(q)


def test_split_where_rejects_cross_table_disjunction():
    q = parse_query(
        "SELECT DEDUP * FROM A JOIN B ON A.k = B.k WHERE A.x = 1 OR B.y = 2"
    )
    with pytest.raises(QuerySyntaxError):
        split_where(q)


def test_string_literals_collects_strings_only():
    q = parse_query(
        "SELECT * FROM T WHERE a = 'EDBT' AND b = 5 OR c IN ('x', 1, 'y')"
    )
    assert sorted(string_literals(q.where)) == ["EDBT", "x", "y"]
    assert string_literals(None) == []


# ----------------------------------------- predicate compile vs DuckDB
_PRED_CASES = [
    ("state = 'NSW'", "state = 'NSW'"),
    ("age > '50'", "age > '50'"),
    ("state != 'NSW'", "state != 'NSW'"),
    ("state IN ('NSW', 'VIC')", "state IN ('NSW', 'VIC')"),
    ("surname LIKE 'B%'", "surname LIKE 'B%'"),
    ("state = 'NSW' AND surname LIKE 'B%'", "state = 'NSW' AND surname LIKE 'B%'"),
    ("state = 'NSW' OR state = 'VIC'", "state = 'NSW' OR state = 'VIC'"),
    ("MOD(_eid, 10) < 1", "MOD(_eid, 10) < 1"),
]


@pytest.mark.parametrize("spark_where,duck_where", _PRED_CASES)
def test_compiled_predicate_matches_duckdb(
    spark, people_data, spark_where, duck_where
):
    """The compiled Spark predicate selects exactly the rows DuckDB's
    WHERE does — the relational scaffolding under QE_E is sound."""
    df, _ = people_data
    q = parse_query(f"SELECT * FROM PPL WHERE {spark_where}")
    got = df.where(compile_predicate(df, q.where)).select(
        "_eid", "given_name", "state"
    )
    assert_equivalent(
        got,
        f"SELECT _eid, given_name, state FROM ppl WHERE {duck_where}",
        ppl=df.select("_eid", "given_name", "state", "surname", "age"),
    )


def test_unknown_alias_raises():
    q = parse_query("SELECT * FROM A JOIN B ON A.k = B.k")
    with pytest.raises(QuerySyntaxError):
        q.alias_of("C")
