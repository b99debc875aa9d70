"""Tests for the baseline implementations (POWER/HIKE/Corleone/PARIS/SiGMa)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.corleone import run_corleone
from repro.baselines.hike import run_hike
from repro.baselines.paris import functionalities, run_paris
from repro.baselines.power import majority, run_power
from repro.baselines.sigma import run_sigma
from repro.crowd.workers import PerfectOracle
from repro.eval.metrics import prf


@pytest.fixture()
def separable_retained():
    """Matches at svec≈[0.9,0.9], non-matches at ≈[0.2,0.2] → monotone."""
    rng = np.random.default_rng(0)
    rows, gold = [], set()
    for i in range(40):
        match = i % 2 == 0
        base = 0.9 if match else 0.2
        v = [float(np.clip(base + rng.normal(0, 0.03), 0, 1)) for _ in range(2)]
        p = (i, i + 1000)
        rows.append({"e1": p[0], "e2": p[1], "sim": v[0], "svec": v, "pvec": [0, 1]})
        if match:
            gold.add(p)
    return pd.DataFrame(rows), gold


class TestMajority:
    def test_majority(self):
        assert majority([(0.9, True), (0.9, True), (0.9, False)])
        assert not majority([(0.9, False), (0.9, True)])  # tie → non-match


class TestPower:
    def test_monotone_data_resolved_perfectly(self, separable_retained):
        retained, gold = separable_retained
        matches, n_q = run_power(retained, PerfectOracle(gold))
        p, r, f1 = prf(matches, gold)
        assert f1 > 0.95
        assert n_q < len(retained)  # fewer questions than pairs

    def test_question_budget_respected(self, separable_retained):
        retained, gold = separable_retained
        _, n_q = run_power(retained, PerfectOracle(gold), max_questions=3)
        assert n_q <= 3

    def test_nonmonotone_data_errs(self):
        """Labels violating monotonicity → propagation makes mistakes."""
        rows, gold = [], set()
        rng = np.random.default_rng(1)
        for i in range(40):
            match = i % 2 == 0
            # inverted: matches have LOW vectors
            base = 0.2 if match else 0.9
            v = [float(np.clip(base + rng.normal(0, 0.03), 0, 1))]
            p = (i, i + 1000)
            rows.append({"e1": p[0], "e2": p[1], "sim": v[0], "svec": v, "pvec": [0]})
            if match:
                gold.add(p)
        matches, _ = run_power(pd.DataFrame(rows), PerfectOracle(gold))
        # markedly worse than the >0.95 it achieves on monotone data
        assert prf(matches, gold)[2] < 0.8


class TestHike:
    def test_partitions_resolved(self, separable_retained):
        retained, gold = separable_retained
        matches, n_q = run_hike(retained, PerfectOracle(gold))
        assert prf(matches, gold)[2] > 0.95

    def test_multiple_partitions_cost_more_questions(self, separable_retained):
        retained, gold = separable_retained
        part2 = retained.copy()
        part2["pvec"] = [[0, 2]] * len(part2)
        part2["e1"] += 10_000
        part2["e2"] += 10_000
        gold2 = gold | {(a + 10_000, b + 10_000) for a, b in gold}
        both = pd.concat([retained, part2], ignore_index=True)
        _, q_single = run_hike(retained, PerfectOracle(gold))
        _, q_double = run_hike(both, PerfectOracle(gold2))
        assert q_double > q_single


class TestCorleone:
    def test_learns_separable(self, separable_retained):
        retained, gold = separable_retained
        matches, n_q = run_corleone(retained, PerfectOracle(gold), seed=0)
        assert prf(matches, gold)[2] > 0.9
        assert n_q >= 4  # at least the bootstrap labels


def star_edges():
    """Two seeded pairs, each pointing at its own value pair via a truly
    functional relationship (fun(f) = 1)."""
    edges = pd.DataFrame(
        {
            "src_e1": [0, 5], "src_e2": [1000, 1005],
            "r1": ["f", "f"], "r2": ["f", "f"],
            "dst_e1": [1, 2], "dst_e2": [1001, 1002],
        }
    )
    retained = pd.DataFrame(
        {
            "e1": [0, 5, 1, 2, 3],
            "e2": [1000, 1005, 1001, 1002, 1003],
            "sim": [0.9, 0.9, 0.45, 0.45, 0.2],
            "svec": [[0.9], [0.9], [0.45], [0.45], [0.2]],
            "pvec": [[0]] * 5,
        }
    )
    rt = pd.DataFrame({"src": [0, 5], "rel": ["f", "f"], "dst": [1, 2]})
    fun = functionalities(rt)
    return edges, retained, fun


class TestParis:
    def test_propagates_from_seed(self):
        edges, retained, fun = star_edges()
        got = run_paris(edges, retained, fun, fun, seeds={(0, 1000), (5, 1005)})
        assert {(1, 1001), (2, 1002)} <= got
        assert (3, 1003) not in got

    def test_no_seeds_only_strong_priors(self):
        edges, retained, fun = star_edges()
        got = run_paris(edges, retained, fun, fun, seeds=set(), threshold=0.5)
        assert (3, 1003) not in got

    def test_functionalities(self):
        rt = pd.DataFrame(
            {"src": [1, 1, 2], "rel": ["r", "r", "r"], "dst": [5, 6, 7]}
        )
        assert functionalities(rt)["r"] == pytest.approx(2 / 3)


class TestSigma:
    def test_greedy_expansion_from_seed(self):
        edges, retained, fun = star_edges()
        got = run_sigma(edges, retained, fun, fun, seeds={(0, 1000), (5, 1005)})
        assert {(1, 1001), (2, 1002)} <= got

    def test_one_to_one_enforced(self):
        edges, retained, fun = star_edges()
        conflict = pd.concat(
            [
                retained,
                pd.DataFrame(
                    {"e1": [1], "e2": [1002], "sim": [0.44],
                     "svec": [[0.44]], "pvec": [[0]]}
                ),
            ],
            ignore_index=True,
        )
        got = run_sigma(edges, conflict, fun, fun, seeds={(0, 1000), (5, 1005)})
        used1 = [p[0] for p in got]
        used2 = [p[1] for p in got]
        assert len(used1) == len(set(used1)) and len(used2) == len(set(used2))

    def test_threshold_stops_weak(self):
        edges, retained, fun = star_edges()
        got = run_sigma(edges, retained, fun, fun, seeds=set(), threshold=0.99)
        assert got == set()
