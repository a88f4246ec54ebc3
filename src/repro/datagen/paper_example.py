"""The paper's motivating example verbatim (Tables 1-3, Sec. 2).

Publications P (8 rows, duplicate groups [P1,P2], [P3,P4,P5],
[P6,P7,P8]) and Venues V (6 rows, groups [V1,V4], [V2,V3], [V5,V6]),
plus the expected result of the sample query

    SELECT DEDUP P.Title, P.Year, V.Rank
    FROM P INNER JOIN V ON P.venue = V.title
    WHERE P.venue = 'EDBT'

as shown in Table 3. Used by the end-to-end correctness tests and the
Table 5 cleaning-order experiment. The matcher configuration for this
8-row heterogeneous table is the thorough (schema-based) variant —
see ``EXAMPLE_CONFIG``.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.config import ERConfig

PUBLICATIONS = pd.DataFrame(
    [
        (1, "Collective Entity Resolution", None, "EDBT", "2008"),
        (2, "Collective E.R.", "Allan Blake",
         "International Conference on Extending Database Technology", "2008"),
        (3, "Entity Resolution on Big Data", "Jane Davids, John Doe",
         "ACM Sigmod", "2017"),
        (4, "E.R on Big Data", "J. Davids, J. Doe", "Sigmod", None),
        (5, "Entity Resolution on Big Data", "J. Davids, John Doe.",
         "Proc of ACM SIGMOD", "2017"),
        (6, "E.R for consumer data", "Allan Blake, Lisa Davidson", "EDBT",
         "2015"),
        (7, "Entity-Resolution for consumer data", "A. Blake, L. Davidson",
         "International Conference on Extending Database Technology", None),
        (8, "Entity-Resolution for consumer data", "Allan Blake , Davidson Lisa",
         "EDBT", "2015"),
    ],
    columns=["_eid", "Title", "Author", "Venue", "Year"],
)

VENUES = pd.DataFrame(
    [
        (1, "International Conference on Extending Database Technology",
         "Extending Database Technology", "1", "annual", "1984"),
        (2, "SIGMOD", "ACM SIGMOD Conference", "1", None, "1975"),
        (3, "ACM SIGMOD", None, "1", "annual", "1975"),
        (4, "EDBT", "International Conference on Extending Database Technology",
         None, "yearly", None),
        (5, "CIDR", "Conference on Innovative Data Systems Research", None,
         "biennial", "2002"),
        (6, "Conference on Innovative Data Systems Research", None, "2",
         "biyearly", "2002"),
    ],
    columns=["_eid", "Title", "Description", "Rank", "Frequency", "Est"],
)

# Ground truth duplicate groups as stated in Sec. 2.
P_GROUPS = [[1, 2], [3, 4, 5], [6, 7, 8]]
V_GROUPS = [[1, 4], [2, 3], [5, 6]]
P_GT = {
    (a, b) for grp in P_GROUPS for a in grp for b in grp if a < b
}
V_GT = {
    (a, b) for grp in V_GROUPS for a in grp for b in grp if a < b
}

# Table 3: expected Dedupe-query result — one row per surviving group
# pair; group [P3,P4,P5] does not appear (its venue does not resolve to
# EDBT), venue group [V1,V4] supplies Rank 1.
TABLE3 = [
    {"Title": {"Collective Entity Resolution", "Collective E.R."},
     "Year": {"2008"}, "Rank": {"1"}},
    {"Title": {"E.R for consumer data", "Entity-Resolution for consumer data"},
     "Year": {"2015"}, "Rank": {"1"}},
]

SAMPLE_QUERY = (
    "SELECT DEDUP P.Title, P.Year, V.Rank "
    "FROM P INNER JOIN V ON P.Venue = V.Title "
    "WHERE P.Venue = 'EDBT'"
)

# Thorough matcher + title/description emphasis: the schema-based
# alternative the paper allows, needed because this 8-row example
# contains near-duplicate NON-matches (P2/P7 share an exact venue
# string and an author surname) that no unweighted schema-agnostic
# score separates. Threshold calibrated in tests/test_similarity.py.
EXAMPLE_CONFIG = ERConfig(
    thorough_matcher=True,
    attribute_weights=(("Title", 3.0), ("Description", 3.0)),
    sim_threshold=0.725,  # inside the (0.712, 0.734) separation window
    block_purging=False,  # 8-row table: every block is tiny already
    edge_pruning=False,  # WEP's mean-weight cut is meaningless at 8 rows
)


def publications_df(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(PUBLICATIONS)


def venues_df(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(VENUES)
