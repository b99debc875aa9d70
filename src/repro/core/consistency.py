"""Consistency between relationships (paper §V-A).

For each relationship pair ``(r1, r2)`` appearing as an ER-graph edge
label, the consistency parameters ``(ε1, ε2)`` of Eq. 3 are estimated from
the initial matches ``M_in``. Following DESIGN.md §5.1 we replace the
paper's O(L⁴)-piecewise joint MLE with one EM-style iteration grounded in
the data: the E-step estimates the latent matched-count ``L_{u1,u2}`` as
the number of neighbor values on each side that participate in some
*candidate* pair inside ``N1 × N2`` (injectivity-respecting:
``min(#distinct v1, #distinct v2)``, further capped by ``min(|N1|,|N2|)``)
— the same quantity the paper's latent variable models — and the M-step
is the exact closed-form maximizer of Eq. 4 given L: ``ε_i = ΣL / Σ|N_i|``
(with a half-count smoothing so empty evidence stays uninformative
instead of degenerate).

A relationship pair with consistent value sets (e.g. two functional
birth-place relations) estimates ε≈1; a spurious pair whose value sets
rarely contain candidate matches estimates ε≈0, which blocks propagation
along it.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

EPS_MIN, EPS_MAX = 0.01, 0.99


def consistency_mle(n1: np.ndarray, n2: np.ndarray, L: np.ndarray) -> tuple[float, float]:
    """Closed-form M-step of Eq. 4/5 given latent counts L (smoothed, clamped)."""
    n1 = np.asarray(n1, dtype=float)
    n2 = np.asarray(n2, dtype=float)
    L = np.minimum(np.asarray(L, dtype=float), np.minimum(n1, n2))
    tot = L.sum()
    eps1 = (tot + 0.5) / (n1.sum() + 1.0)
    eps2 = (tot + 0.5) / (n2.sum() + 1.0)
    return float(np.clip(eps1, EPS_MIN, EPS_MAX)), float(np.clip(eps2, EPS_MIN, EPS_MAX))


def degree_table(rel_triples: DataFrame, e_out: str, r_out: str, n_out: str) -> DataFrame:
    """|N_u^r| for every (entity, relationship) with at least one value."""
    return rel_triples.groupBy(
        F.col("src").alias(e_out), F.col("rel").alias(r_out)
    ).agg(F.countDistinct("dst").alias(n_out))


def estimate_consistencies(
    m_in: DataFrame,
    rel_triples1: DataFrame,
    rel_triples2: DataFrame,
    candidates: DataFrame,
    rel_pairs: pd.DataFrame,
) -> pd.DataFrame:
    """(r1, r2, eps1, eps2) for every relationship pair in ``rel_pairs``.

    ``candidates`` supplies the prior-weighted soft match counts
    (columns e1, e2, sim). ``rel_pairs`` has columns (r1, r2).
    """
    spark = m_in.sparkSession
    if rel_pairs.empty:
        return pd.DataFrame({"r1": [], "r2": [], "eps1": [], "eps2": []})
    rp = spark.createDataFrame(rel_pairs[["r1", "r2"]].drop_duplicates())
    d1 = degree_table(rel_triples1, "e1", "r1", "n1")
    d2 = degree_table(rel_triples2, "e2", "r2", "n2")
    # grid: every (M_in pair) × (relationship pair), with value-set sizes
    grid = (
        m_in.crossJoin(rp)
        .join(d1, ["e1", "r1"], "left")
        .join(d2, ["e2", "r2"], "left")
        .fillna(0, subset=["n1", "n2"])
        .where((F.col("n1") > 0) | (F.col("n2") > 0))
    )
    # soft latent counts: Σ priors of candidate pairs inside N1 × N2
    t1 = rel_triples1.select(
        F.col("src").alias("e1"), F.col("rel").alias("r1"), F.col("dst").alias("v1")
    )
    t2 = rel_triples2.select(
        F.col("src").alias("e2"), F.col("rel").alias("r2"), F.col("dst").alias("v2")
    )
    cand = candidates.select(F.col("e1").alias("v1"), F.col("e2").alias("v2"))
    soft = (
        m_in.join(t1, "e1")
        .join(t2, "e2")
        .join(rp, ["r1", "r2"])
        .join(cand, ["v1", "v2"])
        .groupBy("e1", "e2", "r1", "r2")
        .agg(
            F.least(
                F.countDistinct("v1"), F.countDistinct("v2")
            ).alias("L")
        )
    )
    rows = (
        grid.join(soft, ["e1", "e2", "r1", "r2"], "left")
        .fillna(0.0, subset=["L"])
        .select("r1", "r2", "n1", "n2", "L")
        .toPandas()
    )
    out = []
    for (r1, r2), g in rows.groupby(["r1", "r2"]):
        e1, e2 = consistency_mle(g["n1"].to_numpy(), g["n2"].to_numpy(), g["L"].to_numpy())
        out.append((r1, r2, e1, e2))
    res = pd.DataFrame(out, columns=["r1", "r2", "eps1", "eps2"])
    # rel pairs with no M_in evidence at all: uninformative default
    missing = rel_pairs.merge(res[["r1", "r2"]], on=["r1", "r2"], how="left", indicator=True)
    missing = missing[missing["_merge"] == "left_only"][["r1", "r2"]]
    if len(missing):
        missing = missing.assign(eps1=0.5, eps2=0.5)
        res = pd.concat([res, missing], ignore_index=True)
    return res
