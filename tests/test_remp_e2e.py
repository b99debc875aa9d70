"""End-to-end tests: full pipeline + crowd loop on small-scale profiles,
plus the table harnesses."""
import pytest

from repro.core.remp import (
    RempConfig,
    propagate_from_seeds,
    run_crowd_loop,
)
from repro.crowd.workers import PerfectOracle, WorkerPool
from repro.eval import experiments
from repro.eval.metrics import prf


class TestPipelineArtifacts:
    def test_retained_subset_of_candidates(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        cand = set(zip(art.candidates["e1"], art.candidates["e2"]))
        ret = set(zip(art.retained["e1"], art.retained["e2"]))
        assert ret <= cand

    def test_retained_preserves_most_gold(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        ret = set(zip(art.retained["e1"].astype(int), art.retained["e2"].astype(int)))
        gold = pair.gold_set()
        assert len(ret & gold) / len(gold) > 0.9

    def test_prob_edges_within_graph(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        assert ((art.prob_edges["prob"] >= 0) & (art.prob_edges["prob"] <= 1)).all()

    def test_attr_matches_are_one_to_one(self, small_artifacts):
        _, art = small_artifacts("iimb_lite")
        assert art.attr_matches["a1"].is_unique
        assert art.attr_matches["a2"].is_unique

    def test_priors_match_label_sims(self, small_artifacts):
        _, art = small_artifacts("iimb_lite")
        priors = art.priors()
        assert all(0.0 <= v <= 1.0 for v in priors.values())

    def test_graph_pairs_subset_of_retained(self, small_artifacts):
        _, art = small_artifacts("iimb_lite")
        ret = set(zip(art.retained["e1"].astype(int), art.retained["e2"].astype(int)))
        assert art.graph_pairs() <= ret


class TestCrowdLoop:
    def test_perfect_oracle_high_f1(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        res = run_crowd_loop(art, PerfectOracle(pair.gold_set()), RempConfig())
        p, r, f1 = prf(res.matches, pair.gold_set())
        assert f1 > 0.85
        assert len(res.questions) < len(pair.gold_matches) / 2

    def test_labeled_and_inferred_disjoint(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        res = run_crowd_loop(art, PerfectOracle(pair.gold_set()), RempConfig())
        assert not (res.labeled_matches & res.inferred_matches)

    def test_budget_caps_questions(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        cfg = RempConfig(budget=5)
        res = run_crowd_loop(art, PerfectOracle(pair.gold_set()), cfg)
        assert len(res.questions) <= 5

    def test_mu_one_asks_single_question_per_loop(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        cfg = RempConfig(mu=1, max_loops=7)
        res = run_crowd_loop(art, PerfectOracle(pair.gold_set()), cfg)
        assert len(res.questions) == res.loops

    def test_noisy_workers_still_accurate(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        pool = WorkerPool(pair.gold_set(), seed=0, error_rate=0.15)
        res = run_crowd_loop(art, pool, RempConfig())
        assert prf(res.matches, pair.gold_set())[2] > 0.75

    @pytest.mark.parametrize("selector", ["benefit", "maxinf", "maxpr"])
    def test_selectors_run(self, small_artifacts, selector):
        pair, art = small_artifacts("iimb_lite")
        cfg = RempConfig(selector=selector, budget=10)
        res = run_crowd_loop(art, PerfectOracle(pair.gold_set()), cfg)
        assert len(res.questions) <= 10

    def test_benefit_selector_beats_maxpr(self, small_artifacts):
        """The paper's claim (Fig. 5): benefit-based selection infers more
        matches than MaxPr at the same budget."""
        pair, art = small_artifacts("iimb_lite")
        gold = pair.gold_set()
        f1s = {}
        for sel in ("benefit", "maxpr"):
            cfg = RempConfig(selector=sel, budget=8, use_isolated_classifier=False)
            res = run_crowd_loop(art, PerfectOracle(gold), cfg)
            f1s[sel] = len(res.matches & gold)
        assert f1s["benefit"] >= f1s["maxpr"]

    def test_unknown_selector_raises(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        with pytest.raises(ValueError):
            run_crowd_loop(art, PerfectOracle(set()), RempConfig(selector="zzz"))


class TestSeedPropagation:
    def test_more_seeds_more_matches(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        gold = sorted(pair.gold_set())
        small = propagate_from_seeds(art, set(gold[: len(gold) // 5]))
        large = propagate_from_seeds(art, set(gold[: 4 * len(gold) // 5]))
        # more seeds can only help (and must at least contain the seeds)
        assert small <= large or len(large & pair.gold_set()) >= len(small & pair.gold_set())
        assert len(large) >= len(small)

    def test_seeds_included(self, small_artifacts):
        pair, art = small_artifacts("iimb_lite")
        seeds = set(sorted(pair.gold_set())[:10])
        assert seeds <= propagate_from_seeds(art, seeds)


class TestHarnesses:
    @pytest.fixture(scope="class")
    def artifacts(self, small_artifacts):
        return {
            name: small_artifacts(name) for name in ("iimb_lite", "da_lite")
        }

    def test_table2(self, artifacts):
        df = experiments.table2_datasets(artifacts)
        assert set(df["dataset"]) == {"iimb_lite", "da_lite"}

    def test_table5(self, artifacts):
        df = experiments.table5_pruning(artifacts)
        assert ((df["cand_pc"] >= df["ret_pc"]) | (df["ret_pc"] > 0.9)).all()
        assert (df["rr"] >= 0).all()

    def test_table6(self, artifacts):
        df = experiments.table6_seed_propagation(
            artifacts, portions=(0.4,), repeats=1
        )
        assert (df["remp_f1"] > 0.3).all()

    def test_table7(self, artifacts):
        df = experiments.table7_multi_questions(artifacts, mus=(5,))
        assert (df["f1"] > 0.7).all()
        assert (df["questions"] >= df["loops"]).all()
