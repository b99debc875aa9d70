"""Evaluation metrics used by the experiment tables.

- precision / recall / F1 over entity-match sets (Tables III, VI, VII, VIII);
- reduction ratio (RR) and pair completeness (PC) for the pruning module
  (Table V);
- error rate of the *optimal monotone classifier* (Tao, PODS'18 — cited as
  [15] in the paper) for Table V: the minimum fraction of labels that must
  be flipped so that no non-match's similarity vector dominates a match's.
  For binary labels on a poset this equals the maximum matching of the
  bipartite "violation" graph (König's theorem), which we compute with an
  augmenting-path matcher restricted to comparable pairs.
"""
from __future__ import annotations

from collections.abc import Iterable

import numpy as np


def prf(predicted: set, gold: set) -> tuple[float, float, float]:
    """Precision, recall, F1 of a predicted match set against the gold."""
    if not predicted:
        return 0.0, 0.0, 0.0
    tp = len(predicted & gold)
    p = tp / len(predicted)
    r = tp / len(gold) if gold else 0.0
    f1 = 2 * p * r / (p + r) if p + r > 0 else 0.0
    return p, r, f1


def reduction_ratio(n_before: int, n_after: int) -> float:
    """Proportion of candidates pruned."""
    if n_before == 0:
        return 0.0
    return 1.0 - n_after / n_before


def pair_completeness(pairs: Iterable[tuple[int, int]], gold: set) -> float:
    """Proportion of true matches preserved in a candidate/retained set."""
    if not gold:
        return 0.0
    kept = sum(1 for p in pairs if p in gold)
    return kept / len(gold)


def _dominates(a: np.ndarray, b: np.ndarray) -> bool:
    """a ⪰ b (componentwise)."""
    return bool(np.all(a >= b))


def monotone_error_rate(
    vectors: np.ndarray, labels: np.ndarray, blocks: list[np.ndarray] | None = None
) -> float:
    """Minimum error rate of any monotone classifier on (vectors, labels).

    A violation is a (match m, non-match n) pair with ``s(n) ⪰ s(m)`` —
    no monotone classifier gets both right. The minimum number of errors
    equals the maximum matching of the bipartite violation graph.
    ``blocks`` optionally restricts comparability to index groups (the
    paper restricts the partial order to pairs sharing an entity).
    """
    vectors = np.asarray(vectors, dtype=float)
    labels = np.asarray(labels, dtype=bool)
    n = len(labels)
    if n == 0:
        return 0.0
    if blocks is None:
        blocks = [np.arange(n)]
    # adjacency: for each match index, the non-match indices it conflicts with
    adj: dict[int, set[int]] = {}
    for idx in blocks:
        idx = np.asarray(idx)
        ms = idx[labels[idx]]
        ns = idx[~labels[idx]]
        for m in ms:
            for nn in ns:
                if _dominates(vectors[nn], vectors[m]):
                    adj.setdefault(int(m), set()).add(int(nn))
    # Hungarian-style augmenting-path maximum bipartite matching.
    match_of: dict[int, int] = {}  # non-match index -> match index

    def try_augment(m: int, seen: set[int]) -> bool:
        for nn in adj.get(m, ()):
            if nn in seen:
                continue
            seen.add(nn)
            if nn not in match_of or try_augment(match_of[nn], seen):
                match_of[nn] = m
                return True
        return False

    flips = sum(1 for m in adj if try_augment(m, set()))
    return flips / n
