"""The three per-table indices of QueryER (Sec. 3):

* ``TBI_E``  — Table Block Index: block (token) -> entity ids. Held as a
  cached ``(token, _eid)`` DataFrame plus cached per-block stats.
* ``ITBI_E`` — Inverse Table Block Index: entity -> its blocks, sorted
  ascending by block size. Derived from the same pair DataFrame; the
  ascending ordering is what Block Filtering and the planner's
  estimation rely on.
* ``LI_E``   — Link Index: entity -> resolved link-set. Mutable,
  initially empty, amended by every Dedupe query; the reason QueryER
  "gets significantly faster with every query issued" (Sec. 6.1).

All are built once-off at table registration and kept in memory
(``.cache()`` for the Spark-resident parts, driver dict/sets for LI —
the paper's LI is an in-memory hash index and |L_E| stays small,
Table 7).
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from .config import ERConfig, DEFAULT_CONFIG
from .tokenize import EID, attribute_columns, block_stats, tokenize_entities

_LINK_SCHEMA = T.StructType(
    [
        T.StructField("e1", T.LongType(), False),
        T.StructField("e2", T.LongType(), False),
    ]
)


class LinkIndex:
    """In-memory link index LI_E.

    Tracks (a) the set of entity ids whose link-sets have been fully
    resolved by some earlier query and (b) the resolved matching pairs.
    Pairs are stored canonically as (min, max).
    """

    def __init__(self, spark: SparkSession) -> None:
        self._spark = spark
        self.resolved_ids: set[int] = set()
        self.links: set[tuple[int, int]] = set()

    def __len__(self) -> int:
        return len(self.links)

    def amend(self, resolved_ids: list[int], pairs: list[tuple[int, int]]) -> None:
        """Record that ``resolved_ids`` are now fully resolved, with the
        matching ``pairs`` discovered for them."""
        self.resolved_ids.update(int(i) for i in resolved_ids)
        for a, b in pairs:
            a, b = int(a), int(b)
            if a != b:
                self.links.add((a, b) if a < b else (b, a))

    def links_df(self) -> DataFrame:
        """The accumulated linkset as a Spark DataFrame (e1 < e2)."""
        return self._spark.createDataFrame(
            sorted(self.links), schema=_LINK_SCHEMA
        )

    def resolved_df(self) -> DataFrame:
        return self._spark.createDataFrame(
            [(i,) for i in sorted(self.resolved_ids)],
            schema=T.StructType([T.StructField(EID, T.LongType(), False)]),
        )

    def partners_of(self, ids: set[int]) -> set[int]:
        """All entities linked (directly) to any id in ``ids``."""
        out: set[int] = set()
        for a, b in self.links:
            if a in ids:
                out.add(b)
            if b in ids:
                out.add(a)
        return out

    def clear(self) -> None:
        self.resolved_ids.clear()
        self.links.clear()


class TableIndex:
    """A registered entity collection plus its once-off indices.

    ``entities`` must carry a unique ``_eid`` long column; every other
    column is treated as a string attribute (schema-agnostic — the
    paper considers no PKs/FKs).
    """

    def __init__(
        self,
        spark: SparkSession,
        name: str,
        entities: DataFrame,
        *,
        config: ERConfig = DEFAULT_CONFIG,
    ) -> None:
        if EID not in entities.columns:
            raise ValueError(f"table {name!r} lacks the required {EID} column")
        self.spark = spark
        self.name = name
        self.config = config
        self.entities = entities.cache()
        self.attrs = attribute_columns(entities)
        # TBI as (token, _eid) pairs — built once, kept in memory.
        self.tbi = tokenize_entities(
            entities, min_token_len=config.min_token_len
        ).cache()
        self.tbi_stats = block_stats(self.tbi).cache()
        self.n_entities = self.entities.count()
        self.n_blocks = self.tbi_stats.count()  # |TBI|
        self.li = LinkIndex(spark)
        self._ep_thresholds: dict[tuple, float] = {}
        self._meta_collections: dict[tuple, DataFrame] = {}

    # -- ITBI ---------------------------------------------------------
    def itbi(self) -> DataFrame:
        """Inverse index rows ``(_eid, token, size)``; consumers order by
        ``size`` ascending per entity (the paper pre-sorts block lists)."""
        return self.tbi.join(self.tbi_stats, "token")

    def meta_collection(self, cfg: ERConfig) -> DataFrame:
        """The full TBI after this config's Block Purging / Filtering,
        cached per stage-config — the once-off table-level form of the
        coarse Meta-Blocking decisions.

        Query-time Meta-Blocking intersects its EQBI with this kept
        set instead of re-deciding BP/BF on the query's collection.
        Besides being one semi-join instead of stats + windows per
        query, it makes both stages *pure restrictions* of a global
        decision: the comparisons of a sub-selection are always a
        subset of a super-selection's (AES ≤ NES) and of the batch
        run's — the monotonicity the DQ-Correctness argument needs.
        (Deciding BF against the collection-local block list instead
        would let a restricted view keep a globally-dropped block.)
        """
        from .metablocking import block_filtering, block_purging

        key = (
            "mc",
            cfg.block_purging,
            cfg.purge_smoothing,
            cfg.block_filtering,
            cfg.filter_ratio,
        )
        if key not in self._meta_collections:
            out = self.tbi
            if cfg.block_purging:
                out, _ = block_purging(out, cfg)
            if cfg.block_filtering:
                out = block_filtering(out, self.tbi_stats, cfg)
            self._meta_collections[key] = out.cache()
            self._meta_collections[key].count()
        return self._meta_collections[key]

    def ep_threshold(self, cfg: ERConfig) -> float:
        """Edge Pruning's weight threshold as a table-level statistic:
        the mean edge weight of the *full table's* blocking graph after
        this config's BP/BF stages.

        Computed once per (stage-config) at first use and cached — an
        ER-specific statistic in the spirit of Sec. 7.2.1. Sharing it
        between the query-time and batch pipelines makes EP's per-edge
        decision query-independent, which the DQ-Correctness argument
        (Sec. 6.1 "Meta-Blocking is deterministic") requires.
        """
        from .metablocking import candidate_pairs

        key = (
            cfg.block_purging,
            cfg.purge_smoothing,
            cfg.block_filtering,
            cfg.filter_ratio,
            cfg.min_token_len,
        )
        if key not in self._ep_thresholds:
            row = (
                candidate_pairs(self.meta_collection(cfg))
                .agg(F.avg("weight").alias("m"))
                .collect()[0]
            )
            self._ep_thresholds[key] = (
                float(row["m"]) if row["m"] is not None else 0.0
            )
        return self._ep_thresholds[key]

    def total_cardinality(self) -> float:
        """||B|| of the full table's block collection."""
        row = self.tbi_stats.agg(F.sum("card").alias("c")).collect()[0]
        return float(row["c"] or 0.0)

    def stats_summary(self) -> dict:
        """The Table 7 row for this collection (|L_E| needs ground truth,
        reported by the caller that owns it)."""
        return {
            "table": self.name,
            "n_entities": self.n_entities,
            "n_attributes": len(self.attrs),
            "tbi_size": self.n_blocks,
        }


def register_table(
    spark: SparkSession,
    name: str,
    entities: DataFrame,
    *,
    config: ERConfig = DEFAULT_CONFIG,
) -> TableIndex:
    """Build the once-off indices for ``entities`` (Sec. 3 init step)."""
    return TableIndex(spark, name, entities, config=config)
