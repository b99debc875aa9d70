"""Candidate entity match generation (paper §IV-B) and initial matches
(§IV-C), as Spark DataFrame computations.

Labels are normalized (lowercase, split on non-alphanumerics, distinct
tokens) and candidates are entity pairs whose token Jaccard is at least a
threshold (paper default 0.3). The label similarity doubles as the prior
match probability ``Pr[m_p]``. Initial matches ``M_in`` are pairs with
exactly equal non-empty normalized labels — used as (noisy) supervision
for attribute/relationship matching, never emitted as results directly.

The token-explode → inverted-index join → group/filter plan is the
standard distributed set-similarity join; it is oracle-checked against an
equivalent DuckDB SQL join in the tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

DEFAULT_THRESHOLD = 0.3


def token_table(entities: DataFrame, eid_col: str = "eid") -> DataFrame:
    """(eid, token) rows — distinct normalized tokens of each labeled entity."""
    toks = F.array_distinct(
        F.filter(
            F.split(F.lower(F.col("label")), "[^a-z0-9]+"),
            lambda x: x != F.lit(""),
        )
    )
    return (
        entities.where(F.col("label").isNotNull())
        .select(F.col("eid").alias(eid_col), F.explode(toks).alias("token"))
        .distinct()
    )


def candidate_matches(
    entities1: DataFrame,
    entities2: DataFrame,
    threshold: float = DEFAULT_THRESHOLD,
) -> DataFrame:
    """Candidate matches ``M_c``: (e1, e2, sim) with token Jaccard ≥ threshold.

    ``sim`` is the prior match probability of the pair (paper §IV-B).
    """
    t1 = token_table(entities1, "e1")
    t2 = token_table(entities2, "e2")
    n1 = t1.groupBy("e1").agg(F.count("*").alias("n1"))
    n2 = t2.groupBy("e2").agg(F.count("*").alias("n2"))
    common = (
        t1.join(t2, "token")
        .groupBy("e1", "e2")
        .agg(F.count("*").alias("common"))
    )
    return (
        common.join(n1, "e1")
        .join(n2, "e2")
        .withColumn("sim", F.col("common") / (F.col("n1") + F.col("n2") - F.col("common")))
        .where(F.col("sim") >= threshold)
        .select("e1", "e2", "sim")
    )


def initial_matches(entities1: DataFrame, entities2: DataFrame) -> DataFrame:
    """``M_in``: pairs whose normalized labels are exactly equal (non-empty)."""
    norm = F.array_join(
        F.filter(
            F.split(F.lower(F.col("label")), "[^a-z0-9]+"),
            lambda x: x != F.lit(""),
        ),
        " ",
    )

    def normed(df: DataFrame, out: str) -> DataFrame:
        return (
            df.where(F.col("label").isNotNull())
            .select(F.col("eid").alias(out), norm.alias("nlabel"))
            .where(F.col("nlabel") != "")
        )

    return normed(entities1, "e1").join(normed(entities2, "e2"), "nlabel").select("e1", "e2")
