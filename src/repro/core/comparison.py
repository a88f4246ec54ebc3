"""Comparison-Execution: the expensive stage of the Deduplicate operator.

Takes the surviving blocking-graph edges, joins both sides' full
attribute vectors, and scores each pair with the schema-agnostic
entity similarity (Jaro-Winkler blend, ``repro.core.similarity``)
inside ``mapInPandas`` so the quadratic work runs data-parallel across
Spark tasks instead of on the driver. Pairs scoring at or above
``cfg.sim_threshold`` become links.

The paper's guarantees implemented here: each comparison is executed
once (edges are canonical e1 < e2 and distinct), an entity is never
compared with itself (strict inequality upstream), and pairs whose
link-sets are already in LI_E never reach this stage (they are
excluded from QBI).
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .config import ERConfig
from .similarity import entity_similarity
from .tokenize import EID


def score_pairs(
    edges: DataFrame, entities: DataFrame, attrs: list[str], cfg: ERConfig
) -> DataFrame:
    """``(e1, e2, sim)`` for every edge; executed via mapInPandas."""
    left = entities.select(
        F.col(EID).alias("e1"), *[F.col(a).cast("string").alias(f"_l_{a}") for a in attrs]
    )
    right = entities.select(
        F.col(EID).alias("e2"), *[F.col(a).cast("string").alias(f"_r_{a}") for a in attrs]
    )
    joined = edges.select("e1", "e2").join(left, "e1").join(right, "e2")

    jw_weight = cfg.jw_weight
    weights = cfg.weights_dict
    thorough = cfg.thorough_matcher
    attr_list = list(attrs)

    def _score(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if pdf.empty:
                yield pd.DataFrame({"e1": [], "e2": [], "sim": []})
                continue
            sims = []
            lcols = {a: pdf[f"_l_{a}"] for a in attr_list}
            rcols = {a: pdf[f"_r_{a}"] for a in attr_list}
            for i in range(len(pdf)):
                lrec = {a: lcols[a].iat[i] for a in attr_list}
                rrec = {a: rcols[a].iat[i] for a in attr_list}
                sims.append(
                    entity_similarity(
                        lrec,
                        rrec,
                        jw_weight=jw_weight,
                        weights=weights,
                        thorough=thorough,
                    )
                )
            yield pd.DataFrame(
                {"e1": pdf["e1"], "e2": pdf["e2"], "sim": sims}
            )

    return joined.mapInPandas(
        _score, schema="e1 long, e2 long, sim double"
    )


def execute_comparisons(
    edges: DataFrame, entities: DataFrame, attrs: list[str], cfg: ERConfig
) -> tuple[list[tuple[int, int]], int]:
    """Run the comparisons; return (matching pairs, #comparisons executed).

    The comparison count is the paper's supplementary efficiency metric
    (Comp.) reported next to total time in every experiment.
    """
    scored = score_pairs(edges, entities, attrs, cfg).cache()
    try:
        n = scored.count()
        matches = [
            (int(r["e1"]), int(r["e2"]))
            for r in scored.where(
                F.col("sim") >= F.lit(cfg.sim_threshold)
            ).collect()
        ]
    finally:
        scored.unpersist()
    return matches, n
