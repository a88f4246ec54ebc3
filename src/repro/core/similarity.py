"""String and entity similarity functions (the paper's resolution step).

The paper fixes Jaro-Winkler as the resolution function (Sec. 9.1) and
compares "the values of all corresponding attributes between entity
pairs" schema-agnostically (Sec. 6.1), leaving the aggregation open and
noting "any schema-based alternative can be used". Two aggregations are
provided:

* ``fast`` (default, used for all bulk experiments): per-attribute
  similarity (exact match for all-digit values, else Jaro-Winkler on
  the normalised strings) averaged over attributes non-null on both
  sides, blended 50/50 with the Jaccard similarity of the entities'
  full token sets. The token-set term rescues duplicates whose values
  were token-swapped or migrated between attributes; the digit rule
  stops short numeric strings (years, ranks) from contributing noisy
  Jaro-Winkler scores.
* ``thorough`` (the schema-based alternative; used for the paper's
  8-row motivating example, where near-duplicate non-matches share
  exact venue/author values): symmetric cross-attribute maximum — each
  non-null value of one entity is scored against *all* values of the
  other with max(Jaro-Winkler, Monge-Elkan) — with optional
  per-attribute weights. Quadratic in attributes and token counts, so
  not the bulk default.

Everything here is pure Python / driver-side; the Spark plumbing that
applies it to candidate pairs lives in ``repro.core.comparison``.
"""
from __future__ import annotations

import re

_TOKEN_RE = re.compile(r"[a-z0-9]+")


def tokenize_value(value: str | None, *, min_len: int = 2) -> list[str]:
    """Lower-cased alphanumeric tokens of a single attribute value.

    Tokens shorter than ``min_len`` are dropped except pure digits
    (years, ranks and phone fragments are discriminative in dirty data).
    Must agree with the Spark-side tokenizer in ``repro.core.tokenize``.
    """
    if value is None:
        return []
    out = []
    for tok in _TOKEN_RE.findall(str(value).lower()):
        if len(tok) >= min_len or tok.isdigit():
            out.append(tok)
    return out


def jaro(s1: str, s2: str) -> float:
    """Jaro similarity in [0, 1]; 1.0 iff the strings are equal."""
    if s1 == s2:
        return 1.0
    len1, len2 = len(s1), len(s2)
    if len1 == 0 or len2 == 0:
        return 0.0
    match_dist = max(len1, len2) // 2 - 1
    s1_matched = [False] * len1
    s2_matched = [False] * len2
    matches = 0
    for i, c1 in enumerate(s1):
        lo = max(0, i - match_dist)
        hi = min(len2, i + match_dist + 1)
        for j in range(lo, hi):
            if not s2_matched[j] and s2[j] == c1:
                s1_matched[i] = True
                s2_matched[j] = True
                matches += 1
                break
    if matches == 0:
        return 0.0
    transpositions = 0
    j = 0
    for i in range(len1):
        if s1_matched[i]:
            while not s2_matched[j]:
                j += 1
            if s1[i] != s2[j]:
                transpositions += 1
            j += 1
    transpositions //= 2
    m = float(matches)
    return (m / len1 + m / len2 + (m - transpositions) / m) / 3.0


def jaro_winkler(
    s1: str, s2: str, *, prefix_scale: float = 0.1, max_prefix: int = 4
) -> float:
    """Jaro-Winkler similarity: Jaro boosted by the common prefix."""
    j = jaro(s1, s2)
    if j <= 0.7:
        return j
    prefix = 0
    for c1, c2 in zip(s1[:max_prefix], s2[:max_prefix]):
        if c1 != c2:
            break
        prefix += 1
    return j + prefix * prefix_scale * (1.0 - j)


_WORD_SPLIT = re.compile(r"[^a-z0-9]+")


def monge_elkan(s1: str, s2: str) -> float:
    """Symmetric Monge-Elkan over words with Jaro-Winkler as the inner
    measure — robust to token reordering and abbreviation."""
    w1 = [w for w in _WORD_SPLIT.split(s1) if w]
    w2 = [w for w in _WORD_SPLIT.split(s2) if w]
    if not w1 or not w2:
        return 0.0

    def directed(a: list[str], b: list[str]) -> float:
        return sum(max(jaro_winkler(t, u) for u in b) for t in a) / len(a)

    return (directed(w1, w2) + directed(w2, w1)) / 2.0


def _norm(value: str | None) -> str | None:
    if value is None:
        return None
    v = " ".join(str(value).lower().split())
    return v or None


def value_similarity(
    left: str | None, right: str | None, *, thorough: bool = False
) -> float | None:
    """Similarity of two attribute values; None if either is missing.

    All-digit values (years, ranks, postcodes) must match exactly —
    Jaro-Winkler on 4-digit strings is pure noise ("2008" vs "2015"
    scores 0.7). ``thorough`` adds the Monge-Elkan word-level rescue.
    """
    ln, rn = _norm(left), _norm(right)
    if ln is None or rn is None:
        return None
    if ln.isdigit() and rn.isdigit():
        return 1.0 if ln == rn else 0.0
    jw = jaro_winkler(ln, rn)
    if thorough:
        return max(jw, monge_elkan(ln, rn))
    return jw


def token_jaccard(
    left: dict[str, str | None], right: dict[str, str | None]
) -> float:
    """Jaccard similarity of the entities' full token sets."""
    lt = {t for v in left.values() for t in tokenize_value(v)}
    rt = {t for v in right.values() for t in tokenize_value(v)}
    union = lt | rt
    return (len(lt & rt) / len(union)) if union else 0.0


def entity_similarity(
    left: dict[str, str | None],
    right: dict[str, str | None],
    *,
    jw_weight: float = 0.5,
    weights: dict[str, float] | None = None,
    thorough: bool = False,
) -> float:
    """Schema-agnostic similarity of two entities in [0, 1].

    ``left`` / ``right`` map attribute name -> value (None for missing).
    ``weights`` optionally weight attributes (the paper's schema-based
    alternative); unlisted attributes weigh 1.0. See module docstring
    for the fast/thorough aggregation semantics.
    """
    w = weights or {}
    if not thorough:
        s, wsum = 0.0, 0.0
        for attr, lv in left.items():
            sim = value_similarity(lv, right.get(attr))
            if sim is None:
                continue
            aw = w.get(attr, 1.0)
            s += aw * sim
            wsum += aw
        jw_mean = s / wsum if wsum else 0.0
        return jw_weight * jw_mean + (1.0 - jw_weight) * token_jaccard(
            left, right
        )

    def directed(a: dict, b: dict) -> float:
        s, wsum = 0.0, 0.0
        b_vals = [v for v in b.values() if _norm(v) is not None]
        for attr, lv in a.items():
            if _norm(lv) is None:
                continue
            best = 0.0
            for rv in b_vals:
                sim = value_similarity(lv, rv, thorough=True)
                if sim is not None and sim > best:
                    best = sim
            aw = w.get(attr, 1.0)
            s += aw * best
            wsum += aw
        return s / wsum if wsum else 0.0

    return (directed(left, right) + directed(right, left)) / 2.0
