"""Relational match propagation (paper §V-B, §V-C).

Two layers:

1. **Neighbor propagation** (Eq. 6–9): for a (hypothetically matched)
   vertex ``(u1,u2)`` and each edge label ``(r1,r2)``, the posterior
   ``Pr[u1'≃u2' | u1≃u2]`` of every neighbor pair in ``(N1×N2)∩V`` is
   obtained by enumerating *partial injective* match sets M with weight
   ``f(M)·g(M|N1)·g(M|N2)`` and marginalizing (exact up to ``enum_cap``
   candidate pairs per group, top-prior truncation beyond — DESIGN.md
   §5.2). Runs as ``applyInPandas`` over (source vertex, rel-pair) groups;
   the result is the probabilistic ER graph: directed edges with
   ``prob = Pr[m_dst | m_src]`` (max over parallel rel-pair edges).

2. **Distant propagation** (Eq. 10, Algorithm 2): max-product shortest
   paths. Every edge on a qualifying path (product ≥ τ) itself has
   prob ≥ τ, so the τ-filter before the search is lossless. A driver-side
   Dijkstra serves the question-selection inner loop; a Spark
   iterative-join fixpoint provides the scalable path (tested equal).
"""
from __future__ import annotations

import heapq
from collections import defaultdict

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.consistency import degree_table

DEFAULT_ENUM_CAP = 12
PRIOR_CLIP = 1e-6

Pair = tuple[int, int]


def neighbor_posteriors(
    v1: np.ndarray,
    v2: np.ndarray,
    priors: np.ndarray,
    n1: int,
    n2: int,
    eps1: float,
    eps2: float,
    cap: int = DEFAULT_ENUM_CAP,
) -> np.ndarray:
    """Posterior match probability for each candidate neighbor pair
    (v1[i], v2[i]) given the source vertex is a match (Eq. 9).

    ``n1``/``n2`` are the full value-set sizes |N1|, |N2| (which may
    exceed the number of candidate pairs — values with no candidate
    counterpart only contribute the (1-ε) miss factors, which cancel in
    the normalization). Enumeration is over partial injective match sets;
    with the weight reparametrization w_p = prior/(1-prior)·ζ the
    posterior is Σ_{M∋p} Πw / Σ_M Πw.
    """
    m = len(priors)
    if m == 0:
        return np.array([])
    priors = np.clip(np.asarray(priors, dtype=float), PRIOR_CLIP, 1 - PRIOR_CLIP)
    eps1 = float(np.clip(eps1, PRIOR_CLIP, 1 - PRIOR_CLIP))
    eps2 = float(np.clip(eps2, PRIOR_CLIP, 1 - PRIOR_CLIP))
    zeta = (eps1 * eps2) / ((1 - eps1) * (1 - eps2))
    order = np.argsort(-priors)
    kept = order[:cap]
    dropped = order[cap:]
    w = priors[kept] / (1 - priors[kept]) * zeta
    kv1 = v1[kept]
    kv2 = v2[kept]
    kn = len(kept)
    total = 0.0
    mass = np.zeros(kn)

    # DFS over pairs in index order; at each pair choose include (if its
    # endpoints are free — injectivity) or exclude.
    def dfs(i: int, used1: set, used2: set, weight: float, chosen: list[int]) -> None:
        nonlocal total
        if i == kn:
            total += weight
            for c in chosen:
                mass[c] += weight
            return
        dfs(i + 1, used1, used2, weight, chosen)
        if kv1[i] not in used1 and kv2[i] not in used2:
            used1.add(kv1[i])
            used2.add(kv2[i])
            chosen.append(i)
            dfs(i + 1, used1, used2, weight * w[i], chosen)
            chosen.pop()
            used1.discard(kv1[i])
            used2.discard(kv2[i])

    dfs(0, set(), set(), 1.0, [])
    out = np.empty(m)
    out[kept] = mass / total
    # truncated tail: fall back to the prior (no relational evidence used)
    out[dropped] = priors[dropped]
    return out


_POST_SCHEMA = T.StructType(
    [
        T.StructField("src_e1", T.LongType()),
        T.StructField("src_e2", T.LongType()),
        T.StructField("dst_e1", T.LongType()),
        T.StructField("dst_e2", T.LongType()),
        T.StructField("prob", T.DoubleType()),
    ]
)


def probabilistic_edges(
    edges: DataFrame,
    candidates: DataFrame,
    rel_triples1: DataFrame,
    rel_triples2: DataFrame,
    consistencies: pd.DataFrame,
    enum_cap: int = DEFAULT_ENUM_CAP,
) -> DataFrame:
    """The probabilistic ER graph: (src_e1, src_e2, dst_e1, dst_e2, prob).

    ``edges`` from :func:`repro.core.er_graph.er_edges`; ``candidates``
    supplies priors (e1, e2, sim); ``consistencies`` is the (r1, r2, eps1,
    eps2) frame. Parallel edges via different rel pairs keep the max prob.
    """
    spark = edges.sparkSession
    if consistencies.empty:
        return spark.createDataFrame([], schema=_POST_SCHEMA)
    cons = spark.createDataFrame(consistencies)
    d1 = degree_table(rel_triples1, "src_e1", "r1", "n1")
    d2 = degree_table(rel_triples2, "src_e2", "r2", "n2")
    prior = candidates.select(
        F.col("e1").alias("dst_e1"), F.col("e2").alias("dst_e2"), F.col("sim").alias("prior")
    )
    full = (
        edges.join(cons, ["r1", "r2"])
        .join(d1, ["src_e1", "r1"])
        .join(d2, ["src_e2", "r2"])
        .join(prior, ["dst_e1", "dst_e2"])
    )

    def kernel(pdf: pd.DataFrame) -> pd.DataFrame:
        post = neighbor_posteriors(
            pdf["dst_e1"].to_numpy(),
            pdf["dst_e2"].to_numpy(),
            pdf["prior"].to_numpy(),
            int(pdf["n1"].iloc[0]),
            int(pdf["n2"].iloc[0]),
            float(pdf["eps1"].iloc[0]),
            float(pdf["eps2"].iloc[0]),
            cap=enum_cap,
        )
        return pd.DataFrame(
            {
                "src_e1": pdf["src_e1"],
                "src_e2": pdf["src_e2"],
                "dst_e1": pdf["dst_e1"],
                "dst_e2": pdf["dst_e2"],
                "prob": post,
            }
        )

    posts = full.groupBy("src_e1", "src_e2", "r1", "r2").applyInPandas(
        kernel, schema=_POST_SCHEMA
    )
    return posts.groupBy("src_e1", "src_e2", "dst_e1", "dst_e2").agg(
        F.max("prob").alias("prob")
    )


# ---------------------------------------------------------------------------
# Distant propagation (Algorithm 2)
# ---------------------------------------------------------------------------


def _adjacency(prob_edges: pd.DataFrame, tau: float) -> dict[Pair, list[tuple[Pair, float]]]:
    adj: dict[Pair, list[tuple[Pair, float]]] = defaultdict(list)
    strong = prob_edges[prob_edges["prob"] >= tau]
    for s1, s2, d1, d2, p in zip(
        strong["src_e1"], strong["src_e2"], strong["dst_e1"], strong["dst_e2"], strong["prob"]
    ):
        adj[(int(s1), int(s2))].append(((int(d1), int(d2)), float(p)))
    return adj


def best_path_probs(
    adj: dict[Pair, list[tuple[Pair, float]]], sources: set[Pair], tau: float
) -> dict[Pair, float]:
    """Max-product path probability ≥ τ from any source (multi-source
    Dijkstra in -log space; sources themselves have prob 1)."""
    best: dict[Pair, float] = {s: 1.0 for s in sources}
    heap = [(-1.0, s) for s in sources]
    heapq.heapify(heap)
    while heap:
        negp, v = heapq.heappop(heap)
        p = -negp
        if p < best.get(v, 0.0):
            continue
        for u, ep in adj.get(v, ()):
            np_ = p * ep
            if np_ >= tau and np_ > best.get(u, 0.0):
                best[u] = np_
                heapq.heappush(heap, (-np_, u))
    return best


def inferred_sets(
    prob_edges: pd.DataFrame, tau: float, sources: list[Pair] | None = None
) -> dict[Pair, dict[Pair, float]]:
    """Algorithm 2: for each question q, the pairs inferable from it with
    path probability ≥ τ (q itself included with prob 1)."""
    adj = _adjacency(prob_edges, tau)
    if sources is None:
        verts = set(adj)
        for outs in adj.values():
            verts.update(u for u, _ in outs)
        sources = sorted(verts)
    return {q: best_path_probs(adj, {q}, tau) for q in sources}


def propagate_driver(
    prob_edges: pd.DataFrame, seeds: set[Pair], tau: float
) -> dict[Pair, float]:
    """Pairs inferable as matches from the seed matches (driver-side)."""
    return best_path_probs(_adjacency(prob_edges, tau), set(seeds), tau)


def propagate_spark(
    prob_edges: DataFrame, seeds: DataFrame, tau: float, max_iter: int = 50
) -> DataFrame:
    """Spark fixpoint version of :func:`propagate_driver`.

    ``seeds`` has columns (e1, e2). Returns (e1, e2, prob) for every pair
    reachable with max-product path probability ≥ τ (seeds at prob 1.0).
    Iterates dist ⋈ edges → max until no pair improves.
    """
    strong = prob_edges.where(F.col("prob") >= tau).select(
        "src_e1", "src_e2", "dst_e1", "dst_e2", "prob"
    )
    dist = seeds.select("e1", "e2").distinct().withColumn("p", F.lit(1.0))
    dist = dist.localCheckpoint()
    for _ in range(max_iter):
        stepped = (
            dist.join(
                strong,
                (dist["e1"] == strong["src_e1"]) & (dist["e2"] == strong["src_e2"]),
            )
            .select(
                F.col("dst_e1").alias("e1"),
                F.col("dst_e2").alias("e2"),
                (F.col("p") * F.col("prob")).alias("p"),
            )
            .where(F.col("p") >= tau)
        )
        new_dist = (
            dist.unionByName(stepped).groupBy("e1", "e2").agg(F.max("p").alias("p"))
        ).localCheckpoint()
        # fixpoint when no pair's best prob improved (tiny tolerance for
        # float-order-of-operations differences across partitions)
        improved = (
            new_dist.alias("n")
            .join(dist.alias("o"), ["e1", "e2"], "left")
            .where(
                F.col("o.p").isNull() | (F.col("n.p") > F.col("o.p") + F.lit(1e-12))
            )
            .limit(1)
            .count()
        )
        dist = new_dist
        if improved == 0:
            break
    return dist.select("e1", "e2", F.col("p").alias("prob"))
