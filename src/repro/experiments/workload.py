"""The evaluation workload (Sec. 9.1): datasets at reproduction scale
and the 13-query workload (Q1-Q13) mapped onto them.

Scale substitution: the paper runs 200K-2M rows on a 64 GB Java
testbed; pairwise Jaro-Winkler in Python makes that intractable here,
so every collection is scaled down ~100x (names keep the paper's, e.g.
"PPL2M" denotes the paper's 2M-row people file rendered at ~20K rows).
The *shape* results (who wins, roughly by how much, where crossovers
sit) are scale-free because every method sees the same data.

Selectivity ladder: Q1..Q5 sweep ~5% -> ~80% (approximate step 15%,
Sec. 9.1(a)); Q9 is MOD(id, 10) < 1 (fixed |QE|); Q10-Q13 are
overlapping range queries growing ~30% per step (LI experiment).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from ..core.config import ERConfig
from ..core.planner import Catalog
from ..datagen import datasets
from ..datagen.datasets import to_spark


@dataclass(frozen=True)
class Scale:
    """Clean-row counts per family at a given reproduction scale."""

    ppl: int = 2000
    oao: int = 600
    oap: int = 1500
    oagp: int = 2000
    oagv: int = 250
    dsd: int = 1500


BENCH_SCALE = Scale()
SMOKE_SCALE = Scale(ppl=300, oao=150, oap=300, oagp=300, oagv=60, dsd=250)


def build_catalog(
    spark: SparkSession,
    scale: Scale = BENCH_SCALE,
    *,
    config: ERConfig | None = None,
) -> tuple[Catalog, dict[str, set[tuple[int, int]]]]:
    """Generate every dataset family, register the tables, return the
    catalog plus ground truth per table (for PC and Table 7)."""
    cat = Catalog(spark, config=config or ERConfig())
    gt: dict[str, set[tuple[int, int]]] = {}

    ppl_pdf, ppl_gt = datasets.people(scale.ppl, seed=11)
    cat.register("PPL", to_spark(spark, ppl_pdf))
    gt["PPL"] = ppl_gt

    oao_pdf, oao_gt = datasets.oao(scale.oao, seed=21)
    cat.register("OAO", to_spark(spark, oao_pdf))
    gt["OAO"] = oao_gt
    org_names = sorted(set(oao_pdf["name"].dropna()))

    oap_pdf, oap_gt = datasets.oap(scale.oap, seed=31, org_names=org_names)
    cat.register("OAP", to_spark(spark, oap_pdf))
    gt["OAP"] = oap_gt

    oagv_pdf, oagv_gt, variants = datasets.oagv(scale.oagv, seed=41)
    cat.register("OAGV", to_spark(spark, oagv_pdf))
    gt["OAGV"] = oagv_gt

    oagp_pdf, oagp_gt = datasets.oagp(
        scale.oagp, seed=51, venue_variants=variants
    )
    cat.register("OAGP", to_spark(spark, oagp_pdf))
    gt["OAGP"] = oagp_gt

    dsd_pdf, dsd_gt = datasets.dsd(scale.dsd, seed=61)
    cat.register("DSD", to_spark(spark, dsd_pdf))
    gt["DSD"] = dsd_gt

    return cat, gt


# ------------------------------------------------------------- queries
def selectivity_queries(table: str, sel_column: str) -> dict[str, str]:
    """Q1..Q5: the ranging-selectivity SP ladder via MOD buckets.

    MOD(_eid, 20) < k selects ~5% per bucket step, giving the paper's
    ~5% -> ~80% sweep with a uniform, dataset-independent knob (the
    paper's per-dataset WHERE literals are not reproducible — the knob
    is selectivity, which MOD delivers exactly; Sec. 9.1(b) itself uses
    MOD for this reason).
    """
    steps = {"Q1": 1, "Q2": 4, "Q3": 7, "Q4": 10, "Q5": 16}
    return {
        name: (
            f"SELECT DEDUP * FROM {table} WHERE MOD({sel_column}, 20) < {k}"
        )
        for name, k in steps.items()
    }


Q9 = "SELECT DEDUP * FROM {table} WHERE MOD(_eid, 10) < 1"

# Q10-Q13: overlapping range queries, each ~30% wider (Sec. 9.1(c)).
LI_QUERIES = {
    "Q10": "SELECT DEDUP * FROM OAGP WHERE MOD(_eid, 100) < 38",
    "Q11": "SELECT DEDUP * FROM OAGP WHERE MOD(_eid, 100) < 49",
    "Q12": "SELECT DEDUP * FROM OAGP WHERE MOD(_eid, 100) < 64",
    "Q13": "SELECT DEDUP * FROM OAGP WHERE MOD(_eid, 100) < 83",
}

# SPJ workload (Sec. 9.1(f)): one side's selectivity fixed at 100%.
SPJ_QUERIES = {
    "Q6a": (
        "SELECT DEDUP p.surname, o.country FROM PPL p INNER JOIN OAO o "
        "ON p.organisation = o.name WHERE MOD(p._eid, 20) < 16"
    ),
    "Q6b": (
        "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
        "ON p.venue = v.title WHERE MOD(p._eid, 20) < 16"
    ),
    "Q7a": (
        "SELECT DEDUP p.title, o.country FROM OAP p INNER JOIN OAO o "
        "ON p.organisation = o.name WHERE MOD(p._eid, 20) < 15"
    ),
    "Q7b": (
        "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
        "ON p.venue = v.title"
    ),
    "Q8a": (
        "SELECT DEDUP p.surname, o.country FROM PPL p INNER JOIN OAO o "
        "ON p.organisation = o.name WHERE MOD(p._eid, 20) < 3"
    ),
    "Q8b": (
        "SELECT DEDUP p.title, v.rank FROM OAGP p INNER JOIN OAGV v "
        "ON p.venue = v.title WHERE MOD(p._eid, 20) < 3"
    ),
}


def print_table(title: str, header: list[str], rows: list[list]) -> None:
    """Fixed-width table printer for bench/job output."""
    widths = [
        max(len(str(h)), *(len(str(r[i])) for r in rows)) if rows else len(str(h))
        for i, h in enumerate(header)
    ]
    line = "  ".join(str(h).ljust(w) for h, w in zip(header, widths))
    print(f"\n== {title} ==")
    print(line)
    print("-" * len(line))
    for r in rows:
        print("  ".join(str(c).ljust(w) for c, w in zip(r, widths)))
