"""POWER baseline (Chai et al., VLDBJ'18 — [16] in the paper).

Partial-order-based crowdsourced ER: similarity vectors are grouped
(quantized onto a grid, POWER's vector-grouping optimization), and each
labeled group propagates through the partial order — a *match* label
resolves every vector dominating it as a match, a *non-match* label
resolves every dominated vector as a non-match. Questions are chosen to
maximize expected resolutions (the group that splits the unresolved order
best). Errors appear exactly where the data violates monotonicity, which
is the behaviour the paper exploits on I-Y/D-Y.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.crowd.workers import WorkerPool

Pair = tuple[int, int]


def majority(votes: list[tuple[float, bool]]) -> bool:
    return sum(1 for _, v in votes if v) > len(votes) / 2


def _group_vectors(retained: pd.DataFrame, grid: float) -> tuple[np.ndarray, dict]:
    V = np.array(retained["svec"].tolist(), dtype=float)
    Q = np.round(V / grid).astype(int)
    groups: dict[tuple, list[int]] = {}
    for i, key in enumerate(map(tuple, Q)):
        groups.setdefault(key, []).append(i)
    return Q, groups


def run_power(
    retained: pd.DataFrame,
    crowd: WorkerPool,
    grid: float = 0.1,
    max_questions: int = 5000,
) -> tuple[set[Pair], int]:
    """Returns (predicted matches, #questions asked)."""
    pairs = [(int(a), int(b)) for a, b in zip(retained["e1"], retained["e2"])]
    sims = retained["sim"].to_numpy()
    _, groups = _group_vectors(retained, grid)
    keys = list(groups)
    karr = np.array(keys)  # (G, d)
    status = {}  # group index -> True (match) / False
    n_q = 0
    while n_q < max_questions:
        unresolved = [g for g in range(len(keys)) if g not in status]
        if not unresolved:
            break
        # expected resolutions: (#dominating + #dominated unresolved)/2
        best_g, best_gain = None, -1
        for g in unresolved:
            ge = np.all(karr[unresolved] >= karr[g], axis=1).sum()
            le = np.all(karr[unresolved] <= karr[g], axis=1).sum()
            gain = (ge + le) / 2
            if gain > best_gain:
                best_g, best_gain = g, gain
        # representative question: highest-prior pair of the group
        idxs = groups[keys[best_g]]
        rep = max(idxs, key=lambda i: sims[i])
        label = majority(crowd.ask(pairs[rep]))
        n_q += 1
        # monotone propagation over groups
        for g in unresolved:
            if label and np.all(karr[g] >= karr[best_g]):
                status[g] = True
            elif not label and np.all(karr[g] <= karr[best_g]):
                status[g] = False
        status[best_g] = label
    matches: set[Pair] = set()
    for g, lab in status.items():
        if lab:
            matches.update(pairs[i] for i in groups[keys[g]])
    return matches, n_q
