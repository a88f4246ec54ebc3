"""Connected components over link-sets.

The Group-Entities operator and the Batch Approach both need to turn a
linkset L_E (pairs of matching entity ids) into clusters of duplicates.
The paper stores link-sets in the in-memory Link Index; consistently
with that, we collect the (small — |L_E| << |E|, see Table 7) pair set
to the driver and run union-find, then ship the labelling back as a
DataFrame. An iterative DataFrame min-label propagation would also
work but costs one shuffle per diameter step for no benefit at |L_E|
of this scale; DESIGN.md records the trade-off.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from .tokenize import EID


class UnionFind:
    """Classic union-find with path compression; labels are entity ids."""

    def __init__(self) -> None:
        self._parent: dict[int, int] = {}

    def find(self, x: int) -> int:
        parent = self._parent
        root = x
        while parent.get(root, root) != root:
            root = parent[root]
        while parent.get(x, x) != root:
            parent[x], x = root, parent[x]
        return root

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            # Deterministic: smaller id wins, so cluster labels are stable
            # across runs and across DQ/BA paths.
            lo, hi = (ra, rb) if ra < rb else (rb, ra)
            self._parent[hi] = lo
            self._parent.setdefault(lo, lo)

    def labels(self) -> dict[int, int]:
        return {x: self.find(x) for x in self._parent}


def connected_components(
    spark: SparkSession, links: DataFrame | None
) -> dict[int, int]:
    """Driver-side map eid -> cluster label (min eid of the component).

    Only entities that appear in at least one link are present; callers
    treat absent ids as singleton clusters labelled by their own id.
    """
    uf = UnionFind()
    if links is not None:
        for row in links.select("e1", "e2").collect():
            uf.union(int(row["e1"]), int(row["e2"]))
    return uf.labels()


def cluster_assignments(
    spark: SparkSession, entities: DataFrame, links: DataFrame | None
) -> DataFrame:
    """``(_eid, _cluster)`` for every entity; singletons label themselves."""
    labels = connected_components(spark, links)
    schema = T.StructType(
        [
            T.StructField(EID, T.LongType(), False),
            T.StructField("_cluster", T.LongType(), False),
        ]
    )
    label_df = spark.createDataFrame(
        [(k, v) for k, v in labels.items()], schema=schema
    )
    out = (
        entities.select(EID)
        .join(label_df, EID, "left")
        .selectExpr(EID, f"coalesce(_cluster, {EID}) as _cluster")
    )
    return out
