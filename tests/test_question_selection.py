"""Tests for multiple-questions selection (Algorithm 3) and baselines."""
import itertools

import pytest

from repro.core.question_selection import (
    marginal_gain,
    select_max_inf,
    select_max_pr,
    select_questions,
)


def benefit(Q, inferred, priors):
    """Direct Eq. 15–16 evaluation."""
    pairs = set()
    for q in Q:
        pairs |= set(inferred[q])
    total = 0.0
    for p in pairs:
        keep = 1.0
        for q in Q:
            if p in inferred[q]:
                keep *= 1 - priors[q]
        total += 1 - keep
    return total


class TestSelectQuestions:
    def setup_method(self):
        self.inferred = {
            ("a", 1): {("a", 1): 1.0, ("b", 2): 0.95, ("c", 3): 0.92},
            ("b", 2): {("b", 2): 1.0},
            ("d", 4): {("d", 4): 1.0, ("e", 5): 0.91},
            ("f", 6): {("f", 6): 1.0},
        }
        self.priors = {("a", 1): 0.8, ("b", 2): 0.7, ("d", 4): 0.9, ("f", 6): 0.6}

    def test_picks_highest_benefit_first(self):
        assert select_questions(self.inferred, self.priors, 1) == [("a", 1)]

    def test_respects_mu(self):
        assert len(select_questions(self.inferred, self.priors, 2)) == 2

    def test_covers_scattered_components(self):
        # second pick should be the other component, not the subsumed (b,2)
        sel = select_questions(self.inferred, self.priors, 2)
        assert sel == [("a", 1), ("d", 4)]

    def test_greedy_matches_optimal_small(self):
        for mu in (1, 2, 3):
            sel = select_questions(self.inferred, self.priors, mu)
            best = max(
                (benefit(Q, self.inferred, self.priors), Q)
                for Q in itertools.combinations(self.inferred, mu)
            )
            # greedy is (1-1/e)-approx; on this instance it is exact
            assert benefit(sel, self.inferred, self.priors) == pytest.approx(best[0])

    def test_zero_prior_never_selected(self):
        inferred = {("a", 1): {("a", 1): 1.0}}
        assert select_questions(inferred, {("a", 1): 0.0}, 5) == []

    def test_empty(self):
        assert select_questions({}, {}, 3) == []

    def test_lazy_consistency_with_naive(self):
        # lazy-evaluation output must equal the naive greedy's benefit
        import numpy as np

        rng = np.random.default_rng(0)
        C = [("q", i) for i in range(12)]
        inferred = {}
        priors = {}
        for q in C:
            reach = {("q", int(j)): 0.95 for j in rng.choice(12, rng.integers(1, 5), replace=False)}
            reach[q] = 1.0
            inferred[q] = reach
            priors[q] = float(rng.uniform(0.3, 0.95))
        sel = select_questions(inferred, priors, 4)
        # naive greedy
        naive, covered = [], {}
        for _ in range(4):
            best_q, best_g = None, 0.0
            for q in inferred:
                if q in naive:
                    continue
                g = marginal_gain(q, inferred[q], priors, covered)
                if g > best_g + 1e-12:
                    best_q, best_g = q, g
            if best_q is None:
                break
            naive.append(best_q)
            pq = priors[best_q]
            for p in inferred[best_q]:
                covered[p] = covered.get(p, 0.0) + (1 - covered.get(p, 0.0)) * pq
        assert benefit(sel, inferred, priors) == pytest.approx(
            benefit(naive, inferred, priors)
        )


class TestMarginalGain:
    def test_fresh_gain(self):
        g = marginal_gain(("a", 1), {("a", 1): 1.0, ("b", 2): 0.9}, {("a", 1): 0.5}, {})
        assert g == pytest.approx(1.0)  # 2 pairs × 0.5 prior

    def test_covered_reduces_gain(self):
        g = marginal_gain(
            ("a", 1), {("a", 1): 1.0}, {("a", 1): 0.5}, {("a", 1): 0.8}
        )
        assert g == pytest.approx(0.1)


class TestBaselineSelectors:
    def test_max_inf_prefers_big_sets(self):
        inferred = {
            ("a", 1): {("a", 1): 1.0, ("b", 2): 0.9, ("c", 3): 0.9},
            ("b", 2): {("b", 2): 1.0},
        }
        un = {("a", 1), ("b", 2), ("c", 3)}
        assert select_max_inf(inferred, un, 1) == [("a", 1)]

    def test_max_inf_skips_exhausted(self):
        inferred = {("a", 1): {("b", 2): 0.9}}
        assert select_max_inf(inferred, {("z", 9)}, 1) == []

    def test_max_pr_prefers_high_prior(self):
        priors = {("a", 1): 0.9, ("b", 2): 0.5}
        assert select_max_pr(priors, {("a", 1), ("b", 2)}, 1) == [("a", 1)]

    def test_max_pr_only_unresolved(self):
        priors = {("a", 1): 0.9, ("b", 2): 0.5}
        assert select_max_pr(priors, {("b", 2)}, 2) == [("b", 2)]
