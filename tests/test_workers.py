"""Tests for the simulated crowdsourcing platform."""
import pytest

from repro.crowd.workers import PerfectOracle, WorkerPool


class TestWorkerPool:
    def test_vote_count(self):
        pool = WorkerPool({(1, 2)}, seed=0, n_per_question=5)
        assert len(pool.ask((1, 2))) == 5

    def test_cache_returns_same_votes(self):
        pool = WorkerPool({(1, 2)}, seed=0)
        assert pool.ask((1, 2)) is pool.ask((1, 2))
        assert pool.questions_asked == 1

    def test_deterministic_in_seed(self):
        v1 = WorkerPool({(1, 2)}, seed=5).ask((1, 2))
        v2 = WorkerPool({(1, 2)}, seed=5).ask((1, 2))
        assert v1 == v2

    def test_error_rate_zero_gives_truth(self):
        pool = WorkerPool({(1, 2)}, seed=0, error_rate=0.0)
        assert all(v for _, v in pool.ask((1, 2)))
        assert not any(v for _, v in pool.ask((3, 4)))

    def test_error_rate_sets_quality(self):
        pool = WorkerPool(set(), seed=0, error_rate=0.25)
        assert all(q == pytest.approx(0.75) for q in pool.qualities)

    @pytest.mark.parametrize("err", [0.05, 0.15, 0.25])
    def test_empirical_error_near_nominal(self, err):
        gold = {(i, i) for i in range(200)}
        pool = WorkerPool(gold, seed=1, error_rate=err, n_per_question=1)
        wrong = sum(1 for i in range(200) if not pool.ask((i, i))[0][1])
        assert wrong / 200 == pytest.approx(err, abs=0.07)

    def test_beta_qualities_high_mean(self):
        pool = WorkerPool(set(), n_workers=500, seed=0)
        mean = sum(pool.qualities) / len(pool.qualities)
        assert 0.9 < mean < 0.97

    def test_question_counter(self):
        pool = WorkerPool({(1, 2)}, seed=0)
        pool.ask((1, 2)); pool.ask((3, 4)); pool.ask((1, 2))
        assert pool.questions_asked == 2


class TestPerfectOracle:
    def test_truthful(self):
        o = PerfectOracle({(1, 2)})
        assert o.ask((1, 2)) == [(1.0, True)]
        assert o.ask((9, 9)) == [(1.0, False)]

    def test_counts_questions(self):
        o = PerfectOracle({(1, 2)})
        o.ask((1, 2)); o.ask((1, 2)); o.ask((2, 3))
        assert o.questions_asked == 2
