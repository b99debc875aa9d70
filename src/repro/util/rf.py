"""Minimal random-forest classifier (numpy CART, gini impurity).

scikit-learn is not installed in this container (DESIGN.md §5.4). The
isolated-pair classifier fits once per attribute-signature group and the
Corleone baseline refits inside an active-learning loop, so a lightweight
in-process forest beats Spark-ML round-trips there; a pyspark.ml variant
is also wired in ``core/isolated.py`` and tested for parity.

Deterministic in ``seed``; predict_proba returns the fraction of trees
voting positive (sklearn-style default-ish parameters).
"""
from __future__ import annotations

import numpy as np


class _Node:
    __slots__ = ("feature", "threshold", "left", "right", "proba")

    def __init__(self, proba: float):
        self.feature: int = -1
        self.threshold: float = 0.0
        self.left: "_Node | None" = None
        self.right: "_Node | None" = None
        self.proba = proba


def _gini(pos: float, n: float) -> float:
    if n == 0:
        return 0.0
    p = pos / n
    return 2 * p * (1 - p)


def _build(
    X: np.ndarray,
    y: np.ndarray,
    rng: np.random.Generator,
    depth: int,
    max_depth: int,
    min_leaf: int,
    n_feat: int,
) -> _Node:
    n = len(y)
    pos = float(y.sum())
    node = _Node(proba=pos / n if n else 0.5)
    if depth >= max_depth or n < 2 * min_leaf or pos == 0 or pos == n:
        return node
    feats = rng.choice(X.shape[1], size=n_feat, replace=False)
    best_gain, best_f, best_t = 1e-12, -1, 0.0
    parent = _gini(pos, n)
    for f in feats:
        col = X[:, f]
        order = np.argsort(col, kind="stable")
        cs, ys = col[order], y[order]
        cum_pos = np.cumsum(ys)
        # candidate splits between distinct adjacent values
        distinct = np.nonzero(cs[1:] > cs[:-1])[0]
        for i in distinct:
            nl = i + 1
            nr = n - nl
            if nl < min_leaf or nr < min_leaf:
                continue
            pl = float(cum_pos[i])
            gain = parent - (nl * _gini(pl, nl) + nr * _gini(pos - pl, nr)) / n
            if gain > best_gain:
                best_gain, best_f, best_t = gain, int(f), float((cs[i] + cs[i + 1]) / 2)
    if best_f < 0:
        return node
    mask = X[:, best_f] <= best_t
    node.feature, node.threshold = best_f, best_t
    node.left = _build(X[mask], y[mask], rng, depth + 1, max_depth, min_leaf, n_feat)
    node.right = _build(X[~mask], y[~mask], rng, depth + 1, max_depth, min_leaf, n_feat)
    return node


def _predict_one(node: _Node, x: np.ndarray) -> float:
    while node.feature >= 0:
        node = node.left if x[node.feature] <= node.threshold else node.right
    return node.proba


class RandomForest:
    """Bagged CART forest for binary classification."""

    def __init__(
        self,
        n_trees: int = 50,
        max_depth: int = 8,
        min_samples_leaf: int = 1,
        seed: int = 0,
    ):
        self.n_trees = n_trees
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.seed = seed
        self._trees: list[_Node] = []

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float)
        if X.ndim != 2 or len(X) != len(y):
            raise ValueError("X must be 2-D and aligned with y")
        rng = np.random.default_rng(self.seed)
        n, d = X.shape
        n_feat = max(1, int(np.sqrt(d)))
        self._trees = []
        for _ in range(self.n_trees):
            idx = rng.integers(0, n, size=n)
            self._trees.append(
                _build(
                    X[idx], y[idx], rng, 0, self.max_depth, self.min_samples_leaf, n_feat
                )
            )
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if not self._trees:
            raise RuntimeError("fit() first")
        X = np.asarray(X, dtype=float)
        out = np.zeros(len(X))
        for t in self._trees:
            out += [_predict_one(t, x) for x in X]
        return out / self.n_trees

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X) >= 0.5).astype(int)
