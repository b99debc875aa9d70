"""Attribute matching (paper §IV-C).

``sim_A(a1, a2)`` (Eq. 1) is the average extended-Jaccard similarity
``sim_L`` of the two attributes' value sets over the initial entity
matches ``M_in``, with the denominator counting the M_in pairs where at
least one side carries the attribute. The global 1:1 constraint is solved
with the Hungarian algorithm over the sim_A matrix (DESIGN.md §5.3), with
a minimum-similarity acceptance threshold; the unconstrained variant
(every pair above the threshold) backs the "W/o 1:1 matching" column of
Table IV.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.util.hungarian import max_similarity_matching
from repro.util.strings import sim_L

DEFAULT_ATTR_SIM_THRESHOLD = 0.25

_sim_l_udf = F.udf(
    lambda v1, v2: float(sim_L(v1 or [], v2 or [])), T.DoubleType()
)


def value_sets(attr_triples: DataFrame, eid_out: str, attr_out: str) -> DataFrame:
    """(eid, attr, vals) — the value set N_u^a of each entity/attribute."""
    return attr_triples.groupBy(
        F.col("eid").alias(eid_out), F.col("attr").alias(attr_out)
    ).agg(F.collect_set("value").alias(f"vals_{attr_out}"))


def attribute_similarities(
    m_in: DataFrame, attr_triples1: DataFrame, attr_triples2: DataFrame
) -> pd.DataFrame:
    """sim_A for every co-occurring attribute pair, as a pandas frame
    (a1, a2, sim) — small enough to collect (|A1|·|A2| rows max)."""
    av1 = value_sets(attr_triples1, "e1", "a1")
    av2 = value_sets(attr_triples2, "e2", "a2")
    pairs1 = m_in.join(av1, "e1")  # (e1,e2,a1,vals_a1)
    pairs2 = m_in.join(av2, "e2")
    both = (
        pairs1.join(pairs2, ["e1", "e2"])
        .withColumn("s", _sim_l_udf("vals_a1", "vals_a2"))
        .groupBy("a1", "a2")
        .agg(F.sum("s").alias("sum_sim"), F.count("*").alias("cnt_both"))
    )
    cnt1 = pairs1.groupBy("a1").agg(F.count("*").alias("cnt1"))
    cnt2 = pairs2.groupBy("a2").agg(F.count("*").alias("cnt2"))
    sims = (
        both.join(cnt1, "a1")
        .join(cnt2, "a2")
        .withColumn(
            "sim",
            F.col("sum_sim") / (F.col("cnt1") + F.col("cnt2") - F.col("cnt_both")),
        )
        .select("a1", "a2", "sim")
    )
    return sims.toPandas()


def one_to_one_matching(
    sims: pd.DataFrame, threshold: float = DEFAULT_ATTR_SIM_THRESHOLD
) -> pd.DataFrame:
    """Global 1:1 attribute matching (Hungarian) over the sim_A table."""
    if sims.empty:
        return pd.DataFrame({"a1": [], "a2": [], "sim": []})
    attrs1 = sorted(sims["a1"].unique())
    attrs2 = sorted(sims["a2"].unique())
    i1 = {a: i for i, a in enumerate(attrs1)}
    i2 = {a: i for i, a in enumerate(attrs2)}
    mat = np.zeros((len(attrs1), len(attrs2)))
    for a1, a2, s in zip(sims["a1"], sims["a2"], sims["sim"]):
        mat[i1[a1], i2[a2]] = s
    picked = max_similarity_matching(mat, min_sim=threshold)
    return pd.DataFrame(
        {
            "a1": [attrs1[r] for r, _ in picked],
            "a2": [attrs2[c] for _, c in picked],
            "sim": [mat[r, c] for r, c in picked],
        }
    ).sort_values("sim", ascending=False).reset_index(drop=True)


def threshold_matching(
    sims: pd.DataFrame, threshold: float = DEFAULT_ATTR_SIM_THRESHOLD
) -> pd.DataFrame:
    """The "W/o 1:1" variant: every attribute pair with sim_A ≥ threshold."""
    if sims.empty:
        return pd.DataFrame({"a1": [], "a2": [], "sim": []})
    return (
        sims[sims["sim"] >= threshold]
        .sort_values("sim", ascending=False)
        .reset_index(drop=True)
    )


def match_attributes(
    m_in: DataFrame,
    attr_triples1: DataFrame,
    attr_triples2: DataFrame,
    threshold: float = DEFAULT_ATTR_SIM_THRESHOLD,
    one_to_one: bool = True,
) -> pd.DataFrame:
    """End-to-end attribute matching: sim_A + (1:1 | threshold) selection."""
    sims = attribute_similarities(m_in, attr_triples1, attr_triples2)
    if one_to_one:
        return one_to_one_matching(sims, threshold)
    return threshold_matching(sims, threshold)
