"""Paper-dataset analogues at configurable scale (Table 7 shapes).

Each generator returns ``(pandas DataFrame, ground-truth pair set)``;
``to_spark`` lifts the frame into a Spark DataFrame. Rows carry
``_eid`` (unique id) and ``_src`` (clean-record provenance); columns
without a leading underscore are the entity's attributes, all strings
— matching the paper's raw-csv entity collections with no PK/FK.

Families (paper dataset -> generator):

* DSD  (DBLP-Scholar bibliography)        -> :func:`dsd`
* OAGP (Open Academic Graph papers)       -> :func:`oagp`
* OAGV (Open Academic Graph venues)       -> :func:`oagv`
* OAO  (OpenAIRE organisations, 10% dups) -> :func:`oao`
* OAP  (OpenAIRE projects, 10% dups)      -> :func:`oap`
* PPL  (febrl People, 40% dups)           -> :func:`people`

Join relationships mirror the paper's workload: OAGP.venue holds one
*variant* of an OAGV venue's title (so the equi-join misses variants
unless the venue side is deduplicated — the crux of Q6-Q8), PPL.organisation
references OAO names, OAP.organisation likewise.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .corrupt import CorruptionSpec, inject_duplicates

_SYL = [
    "ba", "ce", "di", "fo", "gu", "han", "kir", "lo", "mu", "nel",
    "pa", "qui", "ro", "sa", "tu", "ve", "wi", "xa", "yo", "zu",
    "mar", "ten", "sol", "bri", "cla", "dor", "fen", "gal", "hol", "jun",
]


def _words(n: int, seed: int, *, min_syl: int = 2, max_syl: int = 4) -> list[str]:
    """A deterministic pseudo-word vocabulary (frequency-table stand-in)."""
    g = np.random.default_rng(seed)
    out = []
    seen = set()
    while len(out) < n:
        w = "".join(
            _SYL[int(i)]
            for i in g.integers(0, len(_SYL), int(g.integers(min_syl, max_syl + 1)))
        )
        if w not in seen:
            seen.add(w)
            out.append(w)
    return out


_GIVEN = [w.capitalize() for w in _words(120, 101)]
_SURNAME = [w.capitalize() for w in _words(200, 102)]
_STREET = [w.capitalize() + " Street" for w in _words(150, 103)]
_SUBURB = [w.capitalize() for w in _words(80, 104)]
_STATE = ["NSW", "VIC", "QLD", "WA", "SA", "TAS", "ACT", "NT"]
_TITLE_VOCAB = _words(400, 105)
_VENUE_VOCAB = [w.capitalize() for w in _words(120, 106)]
_ORG_VOCAB = [w.capitalize() for w in _words(150, 107)]
_COUNTRY = [w.capitalize() for w in _words(30, 108)]
_FUNDER = ["EC", "NSF", "ERC", "DFG", "ANR", "EPSRC", "ELIDEK", "GSRT"]


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a generated frame to Spark with all-string attributes."""
    out = pdf.copy()
    for c in out.columns:
        if c == "_eid" or c == "_src":
            out[c] = out[c].astype("int64")
        else:
            out[c] = out[c].astype(object).where(pd.notna(out[c]), None)
            out[c] = out[c].map(lambda v: None if v is None else str(v))
    return spark.createDataFrame(out)


def _phrase(g: np.random.Generator, vocab: list[str], lo: int, hi: int) -> str:
    k = int(g.integers(lo, hi + 1))
    return " ".join(vocab[int(i)] for i in g.integers(0, len(vocab), k))


# ------------------------------------------------------------------ PPL
def people(
    n_clean: int, *, seed: int = 11, spec: CorruptionSpec | None = None
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """febrl People analogue: 12 attributes, 40% duplicates by default,
    an ``organisation`` attribute referencing OAO names (the paper added
    exactly such an attribute to join PPL with OAO)."""
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    orgs = [_ORG_VOCAB[int(i)] + " Institute" for i in g.integers(0, len(_ORG_VOCAB), n_clean)]
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "rec_id": [f"rec-{i}" for i in ids],
            "given_name": g.choice(_GIVEN, n_clean),
            "surname": g.choice(_SURNAME, n_clean),
            "street_number": g.integers(1, 400, n_clean).astype(str),
            "address_1": g.choice(_STREET, n_clean),
            "suburb": g.choice(_SUBURB, n_clean),
            "postcode": g.integers(1000, 9999, n_clean).astype(str),
            "state": g.choice(_STATE, n_clean),
            "date_of_birth": [
                f"{int(y)}{int(mo):02d}{int(d):02d}"
                for y, mo, d in zip(
                    g.integers(1930, 2005, n_clean),
                    g.integers(1, 13, n_clean),
                    g.integers(1, 29, n_clean),
                )
            ],
            "age": g.integers(18, 95, n_clean).astype(str),
            "phone_number": [
                f"0{int(a)} {int(b):04d} {int(c):04d}"
                for a, b, c in zip(
                    g.integers(2, 9, n_clean),
                    g.integers(0, 10000, n_clean),
                    g.integers(0, 10000, n_clean),
                )
            ],
            "organisation": orgs,
        }
    )
    attrs = [c for c in pdf.columns if not c.startswith("_") and c != "rec_id"]
    return inject_duplicates(
        pdf, attrs, spec or CorruptionSpec(dup_fraction=0.4), seed + 1
    )


# ------------------------------------------------------------------ OAO
def oao(
    n_clean: int, *, seed: int = 21
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """OpenAIRE Organisations analogue: 3 attributes, 10% duplicates."""
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "name": [
                _ORG_VOCAB[int(i)] + " Institute"
                for i in g.integers(0, len(_ORG_VOCAB), n_clean)
            ],
            "country": g.choice(_COUNTRY, n_clean),
            "city": g.choice(_SUBURB, n_clean),
        }
    )
    spec = CorruptionSpec(dup_fraction=0.1, max_dups_per_record=2)
    return inject_duplicates(pdf, ["name", "country", "city"], spec, seed + 1)


# ------------------------------------------------------------------ OAP
def oap(
    n_clean: int,
    *,
    seed: int = 31,
    org_names: list[str] | None = None,
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """OpenAIRE Projects analogue: 8 attributes, 10% duplicates; the
    ``organisation`` attribute references OAO names when provided."""
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    orgs = (
        [org_names[int(i)] for i in g.integers(0, len(org_names), n_clean)]
        if org_names
        else [
            _ORG_VOCAB[int(i)] + " Institute"
            for i in g.integers(0, len(_ORG_VOCAB), n_clean)
        ]
    )
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "title": [_phrase(g, _TITLE_VOCAB, 3, 7) for _ in range(n_clean)],
            "acronym": [
                "".join(t[0].upper() for t in _phrase(g, _TITLE_VOCAB, 2, 4).split())
                for _ in range(n_clean)
            ],
            "organisation": orgs,
            "funder": g.choice(_FUNDER, n_clean),
            "start_year": g.integers(2000, 2024, n_clean).astype(str),
            "duration_months": g.integers(12, 60, n_clean).astype(str),
            "budget": (g.integers(50, 5000, n_clean) * 1000).astype(str),
            "call_id": [
                f"{f}-{int(y)}-{int(k):03d}"
                for f, y, k in zip(
                    g.choice(_FUNDER, n_clean),
                    g.integers(2000, 2024, n_clean),
                    g.integers(1, 999, n_clean),
                )
            ],
        }
    )
    attrs = [c for c in pdf.columns if not c.startswith("_")]
    spec = CorruptionSpec(dup_fraction=0.1, max_dups_per_record=2)
    return inject_duplicates(pdf, attrs, spec, seed + 1)


# ----------------------------------------------------------- OAGV / OAGP
def oagv(
    n_clean: int, *, seed: int = 41
) -> tuple[pd.DataFrame, set[tuple[int, int]], list[list[str]]]:
    """OAG Venues analogue: 5 attributes. Every clean venue gets a long
    title and an acronym; the duplicate variant swaps them (the
    EDBT / "International Conference on Extending Database Technology"
    pattern of Table 2). Returns the per-group title-variant lists so
    OAGP can reference a *random variant* as its venue string.
    """
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    long_titles = [
        "International Conference on " + _phrase(g, _VENUE_VOCAB, 2, 3)
        for _ in range(n_clean)
    ]
    acronyms = [
        "".join(t[0].upper() for t in lt.split()[3:]) + "C" for lt in long_titles
    ]
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "title": long_titles,
            "description": acronyms,
            "rank": g.integers(1, 4, n_clean).astype(str),
            "frequency": g.choice(["annual", "yearly", "biennial", "biyearly"], n_clean),
            "established": g.integers(1970, 2020, n_clean).astype(str),
        }
    )
    base = pdf.copy()
    base["_src"] = base["_eid"]
    # Acronym-variant duplicate rows for ~half the venues.
    dup_rows = []
    gt: set[tuple[int, int]] = set()
    variants: list[list[str]] = [[t] for t in long_titles]
    next_id = n_clean + 1
    for i in range(n_clean):
        if g.random() < 0.5:
            dup_rows.append(
                {
                    "_eid": next_id,
                    "title": acronyms[i],
                    "description": long_titles[i],
                    "rank": pdf["rank"].iat[i] if g.random() > 0.3 else None,
                    "frequency": "yearly"
                    if pdf["frequency"].iat[i] == "annual"
                    else pdf["frequency"].iat[i],
                    "established": pdf["established"].iat[i]
                    if g.random() > 0.3
                    else None,
                    "_src": int(ids[i]),
                }
            )
            gt.add((int(ids[i]), next_id))
            variants[i].append(acronyms[i])
            next_id += 1
    dirty = pd.concat([base, pd.DataFrame(dup_rows)], ignore_index=True)
    order = g.permutation(len(dirty))
    return dirty.iloc[order].reset_index(drop=True), gt, variants


def oagp(
    n_clean: int,
    *,
    seed: int = 51,
    venue_variants: list[list[str]] | None = None,
    spec: CorruptionSpec | None = None,
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """OAG Papers analogue: 10 attributes (the real dump's 18 include
    ids/urls with no ER signal — DESIGN.md records the narrowing).
    ``venue`` holds one variant of an OAGV venue title when provided."""
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    if venue_variants:
        venue = [
            vs[int(g.integers(0, len(vs)))]
            for vs in (
                venue_variants[int(i)]
                for i in g.integers(0, len(venue_variants), n_clean)
            )
        ]
    else:
        venue = [_phrase(g, _VENUE_VOCAB, 1, 3) for _ in range(n_clean)]
    n_authors = g.integers(1, 4, n_clean)
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "title": [_phrase(g, _TITLE_VOCAB, 4, 9) for _ in range(n_clean)],
            "authors": [
                ", ".join(
                    f"{_GIVEN[int(g.integers(0, len(_GIVEN)))]} "
                    f"{_SURNAME[int(g.integers(0, len(_SURNAME)))]}"
                    for _ in range(int(k))
                )
                for k in n_authors
            ],
            "venue": venue,
            "year": g.integers(1990, 2024, n_clean).astype(str),
            "keywords": [_phrase(g, _TITLE_VOCAB, 2, 4) for _ in range(n_clean)],
            "doc_type": g.choice(["conference", "journal", "preprint"], n_clean),
            "volume": g.integers(1, 40, n_clean).astype(str),
            "issue": g.integers(1, 12, n_clean).astype(str),
            "n_citation": g.integers(0, 500, n_clean).astype(str),
            "publisher": g.choice(["ACM", "IEEE", "Springer", "VLDB", "OpenProc"], n_clean),
        }
    )
    attrs = ["title", "authors", "venue", "year", "keywords"]
    return inject_duplicates(
        pdf,
        attrs,
        spec or CorruptionSpec(dup_fraction=0.15, max_dups_per_record=2),
        seed + 1,
    )


# ------------------------------------------------------------------ DSD
def dsd(
    n_clean: int, *, seed: int = 61
) -> tuple[pd.DataFrame, set[tuple[int, int]]]:
    """DBLP-Scholar analogue: bibliographic records listed by two
    "sources" with different formatting conventions (Scholar-side rows
    abbreviate author given names and venue strings — the real DSD's
    dominant heterogeneity). 4 attributes as in Table 7."""
    g = np.random.default_rng(seed)
    ids = np.arange(1, n_clean + 1)
    titles = [_phrase(g, _TITLE_VOCAB, 4, 8) for _ in range(n_clean)]
    authors = [
        ", ".join(
            f"{_GIVEN[int(g.integers(0, len(_GIVEN)))]} "
            f"{_SURNAME[int(g.integers(0, len(_SURNAME)))]}"
            for _ in range(int(g.integers(1, 4)))
        )
        for _ in range(n_clean)
    ]
    venues = [
        "International Conference on " + _phrase(g, _VENUE_VOCAB, 1, 2)
        for _ in range(n_clean)
    ]
    pdf = pd.DataFrame(
        {
            "_eid": ids,
            "title": titles,
            "authors": authors,
            "venue": venues,
            "year": g.integers(1995, 2012, n_clean).astype(str),
        }
    )
    spec = CorruptionSpec(
        dup_fraction=0.08, max_dups_per_record=1, max_mods_per_record=3
    )
    return inject_duplicates(pdf, ["title", "authors", "venue", "year"], spec, seed + 1)
