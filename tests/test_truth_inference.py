"""Tests for error-tolerant truth inference (Eq. 17)."""
import pytest

from repro.core.truth_inference import (
    infer_truths,
    posterior_match_prob,
)


class TestPosterior:
    def test_no_votes_returns_prior(self):
        assert posterior_match_prob(0.7, []) == pytest.approx(0.7)

    def test_single_perfectish_match_vote(self):
        post = posterior_match_prob(0.5, [(0.99, True)])
        assert post == pytest.approx(0.99, abs=1e-6)

    def test_single_nonmatch_vote(self):
        post = posterior_match_prob(0.5, [(0.99, False)])
        assert post == pytest.approx(0.01, abs=1e-6)

    def test_votes_cancel(self):
        post = posterior_match_prob(0.5, [(0.9, True), (0.9, False)])
        assert post == pytest.approx(0.5)

    def test_majority_wins(self):
        post = posterior_match_prob(0.5, [(0.9, True), (0.9, True), (0.9, False)])
        assert post > 0.8

    def test_worker_quality_matters(self):
        strong = posterior_match_prob(0.5, [(0.99, True)])
        weak = posterior_match_prob(0.5, [(0.6, True)])
        assert strong > weak > 0.5

    def test_low_quality_worker_vote_is_weak_evidence(self):
        post = posterior_match_prob(0.5, [(0.51, True)])
        assert 0.5 < post < 0.55

    def test_prior_influences(self):
        hi = posterior_match_prob(0.9, [(0.8, False)])
        lo = posterior_match_prob(0.1, [(0.8, False)])
        assert hi > lo

    @pytest.mark.parametrize("prior", [0.0, 1.0])
    def test_extreme_priors_clamped(self, prior):
        post = posterior_match_prob(prior, [(0.9, True)])
        assert 0.0 < post < 1.0

    def test_eq17_closed_form(self):
        # two matches, one non-match at λ=0.8, prior 0.6
        lam, prior = 0.8, 0.6
        ratio = (1 - prior) / prior * ((1 - lam) / lam) ** 2 * (lam / (1 - lam))
        expected = 1 / (1 + ratio)
        got = posterior_match_prob(prior, [(lam, True), (lam, True), (lam, False)])
        assert got == pytest.approx(expected)


class TestInferTruths:
    def test_split(self):
        votes = {
            (1, 2): [(0.95, True)] * 5,
            (3, 4): [(0.95, False)] * 5,
            (5, 6): [(0.7, True), (0.7, False)],
        }
        priors = {(1, 2): 0.5, (3, 4): 0.5, (5, 6): 0.5}
        res = infer_truths(votes, priors)
        assert res.matches == {(1, 2)}
        assert res.non_matches == {(3, 4)}
        assert (5, 6) in res.hard

    def test_hard_updates_prior_to_posterior(self):
        votes = {(5, 6): [(0.7, True), (0.7, False)]}
        res = infer_truths(votes, {(5, 6): 0.5})
        assert res.hard[(5, 6)] == pytest.approx(0.5)

    def test_thresholds(self):
        votes = {(1, 2): [(0.85, True)]}
        res_strict = infer_truths(votes, {(1, 2): 0.5}, hi=0.9)
        assert (1, 2) in res_strict.hard
        res_loose = infer_truths(votes, {(1, 2): 0.5}, hi=0.8)
        assert (1, 2) in res_loose.matches

    def test_empty(self):
        res = infer_truths({}, {})
        assert not res.matches and not res.non_matches and not res.hard

    def test_missing_prior_defaults_half(self):
        votes = {(9, 9): [(0.95, True)] * 3}
        assert (9, 9) in infer_truths(votes, {}).matches
