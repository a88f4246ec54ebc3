"""Parser for Dedupe Queries: flat SQL with the DEDUP keyword (Sec. 3).

QueryER extends the SELECT clause with DEDUP ("SELECT DEDUP ... FROM
... WHERE ...") to request duplicate-resolved results; without it the
usual SQL semantics apply. The paper's query class is flat SPJ:
conjunctive/disjunctive WHERE conditions of the form ``E.x op
constant`` (op in =, !=, <, >, <=, >=, IN, LIKE) or equi-joins
``E1.x = E2.y``; the scalability query Q9 additionally needs
``MOD(col, n) op constant``.

A small hand-rolled tokenizer + recursive-descent parser — no SQL
library ships in the offline environment, so this is one of the
substrates built from scratch (see DESIGN.md). The AST compiles both
to Spark ``Column`` predicates (for execution and filter pushdown)
and back to a SQL string (for the DuckDB oracle in tests).
"""
from __future__ import annotations

import re
from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import Column, DataFrame

_TOKEN_SPEC = [
    ("WS", r"\s+"),
    ("NUMBER", r"\d+(?:\.\d+)?"),
    ("STRING", r"'(?:[^']|'')*'"),
    ("OP", r"<=|>=|<>|!=|=|<|>"),
    ("LPAREN", r"\("),
    ("RPAREN", r"\)"),
    ("COMMA", r","),
    ("DOT", r"\."),
    ("STAR", r"\*"),
    ("NAME", r"[A-Za-z_][A-Za-z0-9_]*"),
]
_TOKEN_RE = re.compile("|".join(f"(?P<{n}>{p})" for n, p in _TOKEN_SPEC))
_KEYWORDS = {
    "SELECT", "DEDUP", "FROM", "WHERE", "JOIN", "INNER", "ON",
    "AND", "OR", "IN", "LIKE", "MOD", "NOT",
}


@dataclass(frozen=True)
class Token:
    kind: str
    value: str


def _lex(text: str) -> list[Token]:
    out, pos = [], 0
    while pos < len(text):
        m = _TOKEN_RE.match(text, pos)
        if not m:
            raise QuerySyntaxError(f"unexpected character {text[pos]!r} at {pos}")
        pos = m.end()
        kind = m.lastgroup
        if kind == "WS":
            continue
        value = m.group()
        if kind == "NAME" and value.upper() in _KEYWORDS:
            kind, value = value.upper(), value.upper()
        out.append(Token(kind, value))
    out.append(Token("EOF", ""))
    return out


class QuerySyntaxError(ValueError):
    """Raised when a Dedupe query does not parse."""


# ------------------------------------------------------------------ AST
@dataclass(frozen=True)
class ColRef:
    """``[table.]column``; ``table`` is an alias or table name or None."""

    table: str | None
    column: str

    def sql(self) -> str:
        return f"{self.table}.{self.column}" if self.table else self.column


@dataclass(frozen=True)
class ModExpr:
    """``MOD(col, n)`` — needed by the scalability query Q9."""

    col: ColRef
    modulus: int

    def sql(self) -> str:
        return f"MOD({self.col.sql()}, {self.modulus})"


@dataclass(frozen=True)
class Comparison:
    operand: ColRef | ModExpr
    op: str  # '=', '!=', '<', '>', '<=', '>=', 'IN', 'LIKE'
    values: tuple  # one literal, or several for IN

    def col_ref(self) -> ColRef:
        return self.operand.col if isinstance(self.operand, ModExpr) else self.operand

    def sql(self) -> str:
        def lit(v):
            return f"'{str(v).replace(chr(39), chr(39) * 2)}'" if isinstance(v, str) else str(v)

        if self.op == "IN":
            return f"{self.operand.sql()} IN ({', '.join(lit(v) for v in self.values)})"
        return f"{self.operand.sql()} {self.op} {lit(self.values[0])}"


@dataclass(frozen=True)
class BoolExpr:
    """n-ary AND/OR over comparisons and nested BoolExprs."""

    op: str  # 'AND' | 'OR'
    children: tuple

    def sql(self) -> str:
        sep = f" {self.op} "
        parts = []
        for c in self.children:
            s = c.sql()
            parts.append(f"({s})" if isinstance(c, BoolExpr) else s)
        return sep.join(parts)


@dataclass(frozen=True)
class TableRef:
    name: str
    alias: str

    def sql(self) -> str:
        return f"{self.name} {self.alias}" if self.alias != self.name else self.name


@dataclass(frozen=True)
class JoinSpec:
    left: ColRef
    right: ColRef


@dataclass(frozen=True)
class DedupeQuery:
    """Parsed flat SPJ query. ``dedup`` is True iff DEDUP was present."""

    dedup: bool
    select: tuple  # of ColRef, or ('*',)
    tables: tuple[TableRef, ...]  # 1 (SP) or 2 (SPJ)
    join: JoinSpec | None
    where: object | None  # Comparison | BoolExpr | None

    def alias_of(self, name_or_alias: str) -> TableRef:
        for t in self.tables:
            if name_or_alias in (t.alias, t.name):
                return t
        raise QuerySyntaxError(f"unknown table reference {name_or_alias!r}")


# --------------------------------------------------------------- parser
class _Parser:
    def __init__(self, tokens: list[Token]):
        self.toks = tokens
        self.i = 0

    def peek(self) -> Token:
        return self.toks[self.i]

    def next(self) -> Token:
        t = self.toks[self.i]
        self.i += 1
        return t

    def expect(self, kind: str) -> Token:
        t = self.next()
        if t.kind != kind:
            raise QuerySyntaxError(f"expected {kind}, got {t.kind} {t.value!r}")
        return t

    def accept(self, kind: str) -> bool:
        if self.peek().kind == kind:
            self.next()
            return True
        return False

    # query := SELECT [DEDUP] select FROM table [JOIN table ON a=b] [WHERE ...]
    def parse(self) -> DedupeQuery:
        self.expect("SELECT")
        dedup = self.accept("DEDUP")
        select = self._select_list()
        self.expect("FROM")
        tables = [self._table_ref()]
        join = None
        if self.peek().kind in ("INNER", "JOIN"):
            self.accept("INNER")
            self.expect("JOIN")
            tables.append(self._table_ref())
            self.expect("ON")
            left = self._col_ref()
            self.expect("OP")  # '='; validated below
            if self.toks[self.i - 1].value != "=":
                raise QuerySyntaxError("only equi-joins are supported")
            right = self._col_ref()
            join = JoinSpec(left, right)
        where = None
        if self.accept("WHERE"):
            where = self._or_expr()
        self.expect("EOF")
        return DedupeQuery(
            dedup=dedup,
            select=tuple(select),
            tables=tuple(tables),
            join=join,
            where=where,
        )

    def _select_list(self):
        if self.accept("STAR"):
            return ["*"]
        cols = [self._col_ref()]
        while self.accept("COMMA"):
            cols.append(self._col_ref())
        return cols

    def _table_ref(self) -> TableRef:
        name = self.expect("NAME").value
        alias = name
        if self.peek().kind == "NAME":
            alias = self.next().value
        return TableRef(name, alias)

    def _col_ref(self) -> ColRef:
        first = self.expect("NAME").value
        if self.accept("DOT"):
            return ColRef(first, self.expect("NAME").value)
        return ColRef(None, first)

    def _or_expr(self):
        parts = [self._and_expr()]
        while self.accept("OR"):
            parts.append(self._and_expr())
        return parts[0] if len(parts) == 1 else BoolExpr("OR", tuple(parts))

    def _and_expr(self):
        parts = [self._atom()]
        while self.accept("AND"):
            parts.append(self._atom())
        return parts[0] if len(parts) == 1 else BoolExpr("AND", tuple(parts))

    def _atom(self):
        if self.accept("LPAREN"):
            e = self._or_expr()
            self.expect("RPAREN")
            return e
        if self.peek().kind == "MOD":
            self.next()
            self.expect("LPAREN")
            col = self._col_ref()
            self.expect("COMMA")
            n = int(float(self.expect("NUMBER").value))
            self.expect("RPAREN")
            operand: ColRef | ModExpr = ModExpr(col, n)
        else:
            operand = self._col_ref()
        t = self.next()
        if t.kind == "OP":
            op = "!=" if t.value == "<>" else t.value
            return Comparison(operand, op, (self._literal(),))
        if t.kind == "IN":
            self.expect("LPAREN")
            vals = [self._literal()]
            while self.accept("COMMA"):
                vals.append(self._literal())
            self.expect("RPAREN")
            return Comparison(operand, "IN", tuple(vals))
        if t.kind == "LIKE":
            return Comparison(operand, "LIKE", (self._literal(),))
        raise QuerySyntaxError(f"expected comparison operator, got {t.value!r}")

    def _literal(self):
        t = self.next()
        if t.kind == "STRING":
            return t.value[1:-1].replace("''", "'")
        if t.kind == "NUMBER":
            return float(t.value) if "." in t.value else int(t.value)
        raise QuerySyntaxError(f"expected literal, got {t.value!r}")


def parse_query(text: str) -> DedupeQuery:
    """Parse a (Dedupe) SQL string into a :class:`DedupeQuery`."""
    return _Parser(_lex(text)).parse()


# ----------------------------------------------------- predicate compile
def _cmp_column(df: DataFrame, cmp: Comparison) -> Column:
    col = df[cmp.col_ref().column]
    if isinstance(cmp.operand, ModExpr):
        col = col.cast("long") % cmp.operand.modulus
    vals = cmp.values
    if cmp.op == "=":
        return col == F.lit(vals[0])
    if cmp.op == "!=":
        return col != F.lit(vals[0])
    if cmp.op == "<":
        return col < F.lit(vals[0])
    if cmp.op == ">":
        return col > F.lit(vals[0])
    if cmp.op == "<=":
        return col <= F.lit(vals[0])
    if cmp.op == ">=":
        return col >= F.lit(vals[0])
    if cmp.op == "IN":
        return col.isin(list(vals))
    if cmp.op == "LIKE":
        return col.like(str(vals[0]))
    raise QuerySyntaxError(f"unsupported operator {cmp.op!r}")


def compile_predicate(df: DataFrame, expr) -> Column:
    """Compile a WHERE AST (for a single table) to a Spark Column."""
    if isinstance(expr, Comparison):
        return _cmp_column(df, expr)
    if isinstance(expr, BoolExpr):
        cols = [compile_predicate(df, c) for c in expr.children]
        out = cols[0]
        for c in cols[1:]:
            out = (out & c) if expr.op == "AND" else (out | c)
        return out
    raise QuerySyntaxError(f"cannot compile {expr!r}")


# ----------------------------------------------- per-table decomposition
def _tables_in(expr, query: DedupeQuery) -> set[str]:
    if isinstance(expr, Comparison):
        ref = expr.col_ref()
        if ref.table is None:
            if len(query.tables) == 1:
                return {query.tables[0].alias}
            raise QuerySyntaxError(
                f"column {ref.column!r} must be qualified in a join query"
            )
        return {query.alias_of(ref.table).alias}
    return set().union(*(_tables_in(c, query) for c in expr.children))


def split_where(query: DedupeQuery) -> dict[str, object]:
    """Partition the WHERE clause into one predicate per table alias.

    Top-level conjuncts are routed to the table they reference
    (standard filter pushdown); a single conjunct referencing both
    tables (other than the ON clause) is outside the paper's query
    class and rejected. Tables without conditions map to None
    (selectivity 100%, as in Q6-Q8's fixed-side joins).
    """
    out: dict[str, object] = {t.alias: None for t in query.tables}
    if query.where is None:
        return out
    conjuncts = (
        list(query.where.children)
        if isinstance(query.where, BoolExpr) and query.where.op == "AND"
        else [query.where]
    )
    per_table: dict[str, list] = {t.alias: [] for t in query.tables}
    for c in conjuncts:
        refs = _tables_in(c, query)
        if len(refs) != 1:
            raise QuerySyntaxError(
                "WHERE conjuncts must each reference exactly one table"
            )
        per_table[refs.pop()].append(c)
    for alias, cs in per_table.items():
        if len(cs) == 1:
            out[alias] = cs[0]
        elif cs:
            out[alias] = BoolExpr("AND", tuple(cs))
    return out


def string_literals(expr) -> list[str]:
    """All string literals in a predicate — the planner's WB blocking
    keys (Sec. 7.2.1 statistics step)."""
    if expr is None:
        return []
    if isinstance(expr, Comparison):
        return [v for v in expr.values if isinstance(v, str)]
    out: list[str] = []
    for c in expr.children:
        out.extend(string_literals(c))
    return out
