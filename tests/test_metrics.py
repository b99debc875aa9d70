"""Tests for evaluation metrics (P/R/F1, RR, PC, monotone error rate)."""
import numpy as np
import pytest

from repro.eval.metrics import (
    monotone_error_rate,
    pair_completeness,
    prf,
    reduction_ratio,
)


class TestPRF:
    def test_perfect(self):
        assert prf({(1, 2)}, {(1, 2)}) == (1.0, 1.0, 1.0)

    def test_empty_prediction(self):
        assert prf(set(), {(1, 2)}) == (0.0, 0.0, 0.0)

    def test_half_precision(self):
        p, r, f1 = prf({(1, 2), (3, 4)}, {(1, 2)})
        assert p == 0.5 and r == 1.0 and f1 == pytest.approx(2 / 3)

    def test_half_recall(self):
        p, r, f1 = prf({(1, 2)}, {(1, 2), (3, 4)})
        assert p == 1.0 and r == 0.5 and f1 == pytest.approx(2 / 3)

    def test_disjoint(self):
        assert prf({(9, 9)}, {(1, 2)}) == (0.0, 0.0, 0.0)

    @pytest.mark.parametrize("n_extra", [0, 1, 5])
    def test_precision_formula(self, n_extra):
        gold = {(i, i) for i in range(10)}
        pred = set(gold) | {(100 + i, i) for i in range(n_extra)}
        p, r, _ = prf(pred, gold)
        assert p == pytest.approx(10 / (10 + n_extra))
        assert r == 1.0


class TestReductionRatio:
    @pytest.mark.parametrize(
        "before,after,expected", [(100, 50, 0.5), (100, 100, 0.0), (10, 0, 1.0), (0, 0, 0.0)]
    )
    def test_cases(self, before, after, expected):
        assert reduction_ratio(before, after) == pytest.approx(expected)


class TestPairCompleteness:
    def test_full(self):
        gold = {(1, 2), (3, 4)}
        assert pair_completeness([(1, 2), (3, 4), (5, 6)], gold) == 1.0

    def test_half(self):
        assert pair_completeness([(1, 2)], {(1, 2), (3, 4)}) == 0.5

    def test_empty_gold(self):
        assert pair_completeness([(1, 2)], set()) == 0.0


class TestMonotoneErrorRate:
    def test_perfectly_monotone(self):
        V = np.array([[0.1], [0.5], [0.9]])
        labels = np.array([False, False, True])
        assert monotone_error_rate(V, labels) == 0.0

    def test_one_violation(self):
        # non-match above a match: one flip needed
        V = np.array([[0.9], [0.1]])
        labels = np.array([False, True])
        assert monotone_error_rate(V, labels) == pytest.approx(0.5)

    def test_incomparable_vectors_no_violation(self):
        V = np.array([[1.0, 0.0], [0.0, 1.0]])
        labels = np.array([True, False])
        assert monotone_error_rate(V, labels) == 0.0

    def test_blocks_restrict_comparability(self):
        V = np.array([[0.9], [0.1]])
        labels = np.array([False, True])
        # different blocks → the violating pair is never compared
        assert monotone_error_rate(V, labels, [np.array([0]), np.array([1])]) == 0.0

    def test_matching_not_double_counted(self):
        # one non-match dominating two matches: a single flip (the non-match)
        # suffices... but König matching counts max matching = 1
        V = np.array([[0.9], [0.1], [0.2]])
        labels = np.array([False, True, True])
        assert monotone_error_rate(V, labels) == pytest.approx(1 / 3)

    def test_empty(self):
        assert monotone_error_rate(np.zeros((0, 1)), np.array([], dtype=bool)) == 0.0

    def test_equal_vectors_conflict(self):
        V = np.array([[0.5], [0.5]])
        labels = np.array([True, False])
        assert monotone_error_rate(V, labels) == pytest.approx(0.5)
