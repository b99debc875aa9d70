"""Tests for the numpy random forest."""
import numpy as np
import pytest

from repro.util.rf import RandomForest


def separable_data(n=200, seed=0):
    rng = np.random.default_rng(seed)
    X0 = rng.random((n // 2, 3)) * 0.4
    X1 = rng.random((n // 2, 3)) * 0.4 + 0.6
    X = np.vstack([X0, X1])
    y = np.array([0.0] * (n // 2) + [1.0] * (n // 2))
    return X, y


class TestRandomForest:
    def test_learns_separable(self):
        X, y = separable_data()
        rf = RandomForest(n_trees=20, seed=0).fit(X, y)
        assert (rf.predict(X) == y).mean() > 0.97

    def test_generalizes(self):
        X, y = separable_data(seed=0)
        Xt, yt = separable_data(seed=1)
        rf = RandomForest(n_trees=20, seed=0).fit(X, y)
        assert (rf.predict(Xt) == yt).mean() > 0.95

    def test_proba_bounds(self):
        X, y = separable_data()
        proba = RandomForest(n_trees=10, seed=0).fit(X, y).predict_proba(X)
        assert np.all(proba >= 0) and np.all(proba <= 1)

    def test_deterministic_in_seed(self):
        X, y = separable_data()
        p1 = RandomForest(n_trees=10, seed=7).fit(X, y).predict_proba(X)
        p2 = RandomForest(n_trees=10, seed=7).fit(X, y).predict_proba(X)
        assert np.array_equal(p1, p2)

    def test_seed_changes_forest(self):
        # overlapping classes so bootstrap resampling shows through
        rng = np.random.default_rng(0)
        X = rng.random((100, 3))
        y = (X[:, 0] + rng.normal(0, 0.3, 100) > 0.5).astype(float)
        p1 = RandomForest(n_trees=5, seed=1).fit(X, y).predict_proba(X)
        p2 = RandomForest(n_trees=5, seed=2).fit(X, y).predict_proba(X)
        assert not np.array_equal(p1, p2)

    def test_single_class_predicts_constant(self):
        X = np.random.default_rng(0).random((20, 2))
        y = np.ones(20)
        proba = RandomForest(n_trees=5, seed=0).fit(X, y).predict_proba(X)
        assert np.all(proba == 1.0)

    def test_predict_before_fit_raises(self):
        with pytest.raises(RuntimeError):
            RandomForest().predict_proba(np.zeros((1, 2)))

    def test_shape_validation(self):
        with pytest.raises(ValueError):
            RandomForest().fit(np.zeros(3), np.zeros(3))

    def test_xor_learnable_with_depth(self):
        rng = np.random.default_rng(0)
        X = rng.integers(0, 2, size=(300, 2)).astype(float)
        X += rng.normal(0, 0.05, X.shape)
        y = (np.round(X[:, 0]) != np.round(X[:, 1])).astype(float)
        rf = RandomForest(n_trees=30, max_depth=6, seed=0).fit(X, y)
        assert (rf.predict(X) == y).mean() > 0.9

    def test_irrelevant_feature_ignored(self):
        X, y = separable_data()
        X = np.hstack([X, np.random.default_rng(3).random((len(X), 1))])
        rf = RandomForest(n_trees=20, seed=0).fit(X, y)
        assert (rf.predict(X) == y).mean() > 0.95
