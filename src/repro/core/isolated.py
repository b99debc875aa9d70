"""Inference for isolated entity pairs (paper §VII-B).

Isolated pairs occur in no relationship triple, so match propagation
cannot reach them and polling them one-by-one would waste the budget.
Instead, for each isolated pair p, the set ``N_p`` of retained pairs with
a similar attribute signature (Jaccard of attribute-match sets ≥ ψ)
provides training data: labeled matches are positives, labeled
non-matches are negatives, and — because propagation only ever labels
matches — *unresolved* pairs in N_p are treated as negatives to balance
the classes (subsampled to the positive count: using all of them would
drown the positives on isolation-heavy datasets).

Two deviations from a literal reading of §VII-B, both documented in
DESIGN.md §5:

- ψ defaults to 0.5 — with our profiles' small per-type schemas (2–5
  matched attributes) the paper's ψ=0.9 degenerates into exact-signature
  groups that often contain no labeled positives; a group still left
  without signal falls back to a forest trained on all labeled pairs;
- targets are predicted with 2-fold cross-prediction: a pair never sits
  in the training set of the forest that scores it, otherwise the forest
  memorizes true-match targets as "non-matches" and recall collapses.

Engines: ``numpy`` (default, in-process forest from ``repro.util.rf``) or
``sparkml`` (pyspark.ml RandomForestClassifier) — tested for parity.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.util.rf import RandomForest
from repro.util.strings import jaccard

Pair = tuple[int, int]

PSI = 0.5


def _signature(pvec) -> frozenset[int]:
    return frozenset(int(i) for i in (pvec if pvec is not None else []))


def classify_isolated(
    retained: pd.DataFrame,
    labels: dict[Pair, bool],
    targets: list[Pair],
    psi: float = PSI,
    engine: str = "numpy",
    spark=None,
    seed: int = 0,
) -> set[Pair]:
    """Predict which ``targets`` (unresolved pairs) are matches.

    ``retained`` is the pandas M_rd frame with columns (e1, e2, svec,
    pvec); ``labels`` maps resolved pairs to match/non-match.
    """
    if engine not in ("numpy", "sparkml"):
        raise ValueError(f"unknown engine {engine!r}")
    if engine == "sparkml" and spark is None:
        raise ValueError("engine='sparkml' needs a SparkSession")
    if not targets:
        return set()
    retained = retained.reset_index(drop=True)
    pairs = [(int(a), int(b)) for a, b in zip(retained["e1"], retained["e2"])]
    pair_idx = {p: i for i, p in enumerate(pairs)}
    sigs = [_signature(p) for p in retained["pvec"]]
    X_all = np.array(retained["svec"].tolist(), dtype=float)
    if X_all.ndim != 2 or X_all.shape[1] == 0:
        return set()
    target_set = {t for t in targets if t in pair_idx}
    rng = np.random.default_rng(seed)

    by_sig: dict[frozenset, list[Pair]] = {}
    for t in sorted(target_set):
        by_sig.setdefault(sigs[pair_idx[t]], []).append(t)

    # global labeled pool for the fallback path
    global_lab = [(i, labels[p]) for i, p in enumerate(pairs) if p in labels]

    predicted: set[Pair] = set()
    for sig, group_targets in by_sig.items():
        in_np = [i for i, s in enumerate(sigs) if jaccard(sig, s) >= psi]
        lab_idx = [(i, labels[pairs[i]]) for i in in_np if pairs[i] in labels]
        unres_nontarget = [
            i for i in in_np if pairs[i] not in labels and pairs[i] not in target_set
        ]
        # 2-fold cross-prediction: fold A is scored by a forest whose
        # unresolved-negative pool comes from fold B (and vice versa)
        order = rng.permutation(len(group_targets))
        folds = [
            [group_targets[j] for j in order[0::2]],
            [group_targets[j] for j in order[1::2]],
        ]
        for f, fold in enumerate(folds):
            if not fold:
                continue
            other = [pair_idx[t] for t in folds[1 - f]]
            lab = lab_idx if any(v for _, v in lab_idx) else global_lab
            pos = [i for i, v in lab if v]
            neg = [i for i, v in lab if not v]
            if not pos:
                continue  # no positive signal anywhere
            quota = max(len(pos), 50)
            unres_pool = unres_nontarget + other
            if len(unres_pool) > quota:
                unres_pool = list(rng.choice(unres_pool, size=quota, replace=False))
            train_idx = pos + neg + unres_pool
            y = np.array(
                [1.0] * len(pos) + [0.0] * (len(neg) + len(unres_pool))
            )
            if y.sum() == 0 or y.sum() == len(y):
                continue
            Xt = np.array([X_all[pair_idx[t]] for t in fold])
            proba = _fit_predict(
                X_all[train_idx], y, Xt, engine, spark, seed + f
            )
            predicted.update(t for t, pr in zip(fold, proba) if pr >= 0.5)
    return predicted


def _fit_predict(
    X: np.ndarray, y: np.ndarray, Xt: np.ndarray, engine: str, spark, seed: int
) -> np.ndarray:
    if engine == "numpy":
        return RandomForest(n_trees=50, max_depth=8, seed=seed).fit(X, y).predict_proba(Xt)
    from pyspark.ml.classification import RandomForestClassifier
    from pyspark.ml.functions import array_to_vector
    from pyspark.sql import functions as F

    train = spark.createDataFrame(
        pd.DataFrame({"features_arr": list(map(list, X)), "label": y})
    ).withColumn("features", array_to_vector(F.col("features_arr")))
    model = RandomForestClassifier(
        numTrees=50, maxDepth=8, seed=seed, labelCol="label"
    ).fit(train)
    test = spark.createDataFrame(
        pd.DataFrame({"id": range(len(Xt)), "features_arr": list(map(list, Xt))})
    ).withColumn("features", array_to_vector(F.col("features_arr")))
    probs = (
        model.transform(test).select("id", "probability").toPandas().sort_values("id")
    )
    return np.array([float(v[1]) for v in probs["probability"]])
