"""Corleone baseline (Gokhale et al., SIGMOD'14 — [9] in the paper).

Hands-off crowdsourced entity matching: an active-learning loop trains a
random-forest matcher on crowdsourced labels over the similarity vectors,
repeatedly asking the crowd about the most *uncertain* pairs (committee
disagreement) in batches until uncertainty dries up, then labels the rest
with the learned forest. Question-hungry by design (the paper reports
161–1166 questions), with accuracy that degrades when literal features
are weak — the behaviours Table III relies on.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines.power import majority
from repro.crowd.workers import WorkerPool
from repro.util.rf import RandomForest

Pair = tuple[int, int]


def run_corleone(
    retained: pd.DataFrame,
    crowd: WorkerPool,
    batch: int = 20,
    max_rounds: int = 30,
    uncertainty: float = 0.35,
    seed: int = 0,
) -> tuple[set[Pair], int]:
    """Returns (predicted matches, #questions asked)."""
    pairs = [(int(a), int(b)) for a, b in zip(retained["e1"], retained["e2"])]
    X = np.array(retained["svec"].tolist(), dtype=float)
    sims = retained["sim"].to_numpy()
    n = len(pairs)
    labels: dict[int, bool] = {}

    # bootstrap: the most/least similar pairs seed the two classes
    order = np.argsort(sims)
    for i in list(order[-2:]) + list(order[:2]):
        labels[int(i)] = majority(crowd.ask(pairs[int(i)]))

    for _ in range(max_rounds):
        y = np.array([1.0 if labels[i] else 0.0 for i in labels])
        if y.sum() == 0 or y.sum() == len(y):
            # single-class so far: ask around the decision boundary (median sim)
            mid = order[len(order) // 2]
            cand = [i for i in order if i not in labels]
            if not cand:
                break
            pick = min(cand, key=lambda i: abs(sims[i] - sims[mid]))
            labels[int(pick)] = majority(crowd.ask(pairs[int(pick)]))
            continue
        rf = RandomForest(n_trees=30, max_depth=8, seed=seed).fit(
            X[list(labels)], y
        )
        proba = rf.predict_proba(X)
        unl = np.array([i for i in range(n) if i not in labels])
        if len(unl) == 0:
            break
        unc = np.abs(proba[unl] - 0.5)
        uncertain = unl[unc < uncertainty]
        if len(uncertain) == 0:
            break
        pick = uncertain[np.argsort(unc[unc < uncertainty])][:batch]
        for i in pick:
            labels[int(i)] = majority(crowd.ask(pairs[int(i)]))

    y = np.array([1.0 if labels[i] else 0.0 for i in labels])
    matches: set[Pair] = {pairs[i] for i, lab in labels.items() if lab}
    if 0 < y.sum() < len(y):
        rf = RandomForest(n_trees=30, max_depth=8, seed=seed).fit(X[list(labels)], y)
        proba = rf.predict_proba(X)
        for i in range(n):
            if i not in labels and proba[i] >= 0.5:
                matches.add(pairs[i])
    return matches, len(labels)
