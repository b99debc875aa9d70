"""Tests for the rectangular assignment solver (vs brute force)."""
import itertools

import numpy as np
import pytest

from repro.util.hungarian import linear_sum_assignment, max_similarity_matching


def brute_force_min(cost: np.ndarray) -> float:
    n, m = cost.shape
    if n > m:
        return brute_force_min(cost.T)
    best = np.inf
    for perm in itertools.permutations(range(m), n):
        best = min(best, sum(cost[i, j] for i, j in enumerate(perm)))
    return best


class TestLinearSumAssignment:
    @pytest.mark.parametrize("seed", range(12))
    @pytest.mark.parametrize("shape", [(3, 3), (4, 4), (3, 5), (5, 3), (2, 6), (5, 5)])
    def test_matches_brute_force(self, seed, shape):
        rng = np.random.default_rng(seed)
        cost = rng.random(shape)
        r, c = linear_sum_assignment(cost)
        assert cost[r, c].sum() == pytest.approx(brute_force_min(cost))

    def test_assignment_is_injective(self):
        rng = np.random.default_rng(0)
        cost = rng.random((6, 9))
        r, c = linear_sum_assignment(cost)
        assert len(set(r)) == 6 and len(set(c)) == 6

    def test_identity_optimal(self):
        cost = 1.0 - np.eye(4)
        r, c = linear_sum_assignment(cost)
        assert list(r) == list(c) == [0, 1, 2, 3]

    def test_single_cell(self):
        r, c = linear_sum_assignment(np.array([[5.0]]))
        assert list(r) == [0] and list(c) == [0]

    def test_rejects_bad_shape(self):
        with pytest.raises(ValueError):
            linear_sum_assignment(np.zeros(3))

    @pytest.mark.parametrize("seed", range(6))
    def test_integer_costs(self, seed):
        rng = np.random.default_rng(seed)
        cost = rng.integers(0, 10, size=(4, 4)).astype(float)
        r, c = linear_sum_assignment(cost)
        assert cost[r, c].sum() == pytest.approx(brute_force_min(cost))


class TestMaxSimilarityMatching:
    def test_picks_diagonal(self):
        sim = np.eye(3) * 0.9 + 0.05
        picked = max_similarity_matching(sim, min_sim=0.5)
        assert sorted(picked) == [(0, 0), (1, 1), (2, 2)]

    def test_threshold_filters(self):
        sim = np.array([[0.9, 0.0], [0.0, 0.2]])
        assert max_similarity_matching(sim, min_sim=0.5) == [(0, 0)]

    def test_one_to_one_enforced(self):
        # row 0 and row 1 both prefer column 0; only one can have it
        sim = np.array([[0.9, 0.8], [0.85, 0.1]])
        picked = dict(max_similarity_matching(sim, min_sim=0.0))
        assert len(set(picked.values())) == len(picked)

    def test_empty(self):
        assert max_similarity_matching(np.zeros((0, 0))) == []

    def test_rectangular(self):
        sim = np.array([[0.1, 0.9, 0.2]])
        assert max_similarity_matching(sim, min_sim=0.5) == [(0, 1)]

    @pytest.mark.parametrize("seed", range(8))
    def test_total_similarity_maximal(self, seed):
        rng = np.random.default_rng(seed)
        sim = rng.random((3, 3))
        picked = max_similarity_matching(sim)
        got = sum(sim[r, c] for r, c in picked)
        best = max(
            sum(sim[i, p[i]] for i in range(3))
            for p in itertools.permutations(range(3))
        )
        assert got == pytest.approx(best)
