"""Partial-order based pruning (paper §IV-D, Algorithm 1).

``min_rank(u1,u2) = max(min_rank_1, min_rank_2)`` where ``min_rank_i``
counts, inside the block of candidate pairs sharing the entity on side
``i``, the pairs whose similarity vector *strictly* dominates this pair's.
Pairs with ``min_rank ≥ k`` cannot be in anyone's top-k and are pruned.
Algorithm 1 runs two one-way passes (blocks of U1, then blocks of U2 on
the reduced set); we reproduce that pass structure. (Alg. 1's Line-12
"also drop pairs dominated by a pruned pair" is an optimization that is
subsumed here: any pair dominated by a pruned pair has min_rank strictly
larger inside the same block, so the rank filter already removes it.)

The dominance-count kernel is pure numpy (chunked O(J²·d) per block) and
runs inside ``applyInPandas`` per entity block.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

DEFAULT_K = 4


def strict_dominance_counts(V: np.ndarray, chunk: int = 256) -> np.ndarray:
    """For each row i of V: number of rows j with V[j] ≻ V[i]
    (componentwise ≥ with at least one strict >)."""
    J = V.shape[0]
    if J <= 1 or V.shape[1] == 0:
        return np.zeros(J, dtype=np.int64)
    out = np.empty(J, dtype=np.int64)
    for lo in range(0, J, chunk):
        hi = min(lo + chunk, J)
        block = V[lo:hi]  # (B, d)
        ge = np.all(V[:, None, :] >= block[None, :, :], axis=2)  # (J, B)
        gt = ge & np.any(V[:, None, :] > block[None, :, :], axis=2)
        out[lo:hi] = gt.sum(axis=0)
    return out


def _rank_pass(with_vec: DataFrame, side: str, out_col: str) -> DataFrame:
    """Dominance ranks within blocks of one side (min_rank_i of Eq. 2)."""

    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        V = np.array(pdf["svec"].tolist(), dtype=float)
        pdf = pdf.copy()
        pdf[out_col] = strict_dominance_counts(V)
        return pdf

    # note: StructType.add mutates in place — build a fresh copy instead
    schema = T.StructType(
        list(with_vec.schema.fields) + [T.StructField(out_col, T.LongType())]
    )
    return with_vec.groupBy(side).applyInPandas(kernel, schema=schema)


def prune_one_way(with_vec: DataFrame, side: str, k: int) -> DataFrame:
    """One PruningInOneWay pass: drop pairs with min_rank ≥ k, where
    min_rank = max of the dominance ranks in the pair's two blocks."""
    r1 = _rank_pass(with_vec, "e1", "rank1")
    r2 = _rank_pass(r1, "e2", "rank2")
    pruned = r2.where(
        F.greatest(F.col("rank1"), F.col("rank2")) < F.lit(k)
    ).drop("rank1", "rank2")
    # `side` names the pass (paper iterates U1 then U2); the filter itself
    # is symmetric, so the pass only differs in running on the reduced set.
    _ = side
    return pruned


def partial_order_prune(with_vec: DataFrame, k: int = DEFAULT_K) -> DataFrame:
    """Algorithm 1: two one-way pruning passes; returns the retained set M_rd."""
    pass1 = prune_one_way(with_vec, "e1", k)
    return prune_one_way(pass1, "e2", k)
