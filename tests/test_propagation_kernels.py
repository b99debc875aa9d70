"""Tests for the probabilistic-propagation kernels (no Spark)."""
import itertools

import numpy as np
import pandas as pd
import pytest

from repro.core.propagation import (
    _adjacency,
    best_path_probs,
    inferred_sets,
    neighbor_posteriors,
    propagate_driver,
)


def brute_posteriors(v1, v2, priors, n1, n2, eps1, eps2):
    """Direct enumeration of Eq. 6–9 over injective match sets."""
    m = len(priors)
    idx = list(range(m))
    total = 0.0
    mass = np.zeros(m)
    for r in range(m + 1):
        for sub in itertools.combinations(idx, r):
            if len({v1[i] for i in sub}) < r or len({v2[i] for i in sub}) < r:
                continue  # not injective
            f = 1.0
            for i in idx:
                f *= priors[i] if i in sub else 1 - priors[i]
            g = (eps1**r) * ((1 - eps1) ** (n1 - r)) * (eps2**r) * ((1 - eps2) ** (n2 - r))
            w = f * g
            total += w
            for i in sub:
                mass[i] += w
    return mass / total


class TestNeighborPosteriors:
    @pytest.mark.parametrize("seed", range(8))
    def test_matches_brute_force(self, seed):
        rng = np.random.default_rng(seed)
        m = int(rng.integers(1, 6))
        v1 = rng.integers(0, 3, m)
        v2 = rng.integers(0, 3, m)
        priors = rng.uniform(0.1, 0.9, m)
        n1, n2 = int(rng.integers(m, m + 3)), int(rng.integers(m, m + 3))
        eps1, eps2 = rng.uniform(0.2, 0.95, 2)
        got = neighbor_posteriors(v1, v2, priors, n1, n2, eps1, eps2)
        want = brute_posteriors(v1, v2, priors, n1, n2, eps1, eps2)
        assert got == pytest.approx(want, abs=1e-9)

    def test_paper_example_shape(self):
        # Fig. 1 / §V-B example: two disjoint movie pairs, consistent rel:
        # both pairs end up near-certain matches
        post = neighbor_posteriors(
            np.array([0, 1]), np.array([0, 1]), np.array([0.5, 0.5]),
            2, 2, 0.95, 0.95,
        )
        assert np.all(post > 0.95)

    def test_competing_candidates_split_mass(self):
        # one left value matched by two right candidates: posteriors split
        post = neighbor_posteriors(
            np.array([0, 0]), np.array([0, 1]), np.array([0.5, 0.5]),
            1, 2, 0.9, 0.9,
        )
        assert post[0] == pytest.approx(post[1])
        assert np.all(post < 0.9)

    def test_higher_prior_wins_competition(self):
        post = neighbor_posteriors(
            np.array([0, 0]), np.array([0, 1]), np.array([0.8, 0.3]),
            1, 2, 0.9, 0.9,
        )
        assert post[0] > post[1]

    def test_low_consistency_blocks_inference(self):
        post = neighbor_posteriors(
            np.array([0]), np.array([0]), np.array([0.5]), 1, 1, 0.1, 0.1
        )
        assert post[0] < 0.5

    def test_cap_falls_back_to_prior(self):
        m = 20
        post = neighbor_posteriors(
            np.arange(m), np.arange(m), np.full(m, 0.5), m, m, 0.9, 0.9, cap=4
        )
        # dropped tail keeps its prior
        assert int(np.isclose(post, 0.5).sum()) >= m - 4

    def test_empty(self):
        assert len(neighbor_posteriors(np.array([]), np.array([]), np.array([]), 0, 0, 0.9, 0.9)) == 0


def edges_df(rows):
    return pd.DataFrame(
        rows, columns=["src_e1", "src_e2", "dst_e1", "dst_e2", "prob"]
    )


class TestPathPropagation:
    def test_single_hop(self):
        pe = edges_df([(1, 11, 2, 12, 0.95)])
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert res[(2, 12)] == pytest.approx(0.95)

    def test_two_hops_multiply(self):
        pe = edges_df([(1, 11, 2, 12, 0.95), (2, 12, 3, 13, 0.96)])
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert res[(3, 13)] == pytest.approx(0.95 * 0.96)

    def test_tau_cuts_path(self):
        pe = edges_df([(1, 11, 2, 12, 0.95), (2, 12, 3, 13, 0.5)])
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert (3, 13) not in res

    def test_product_below_tau_cut(self):
        pe = edges_df([(1, 11, 2, 12, 0.91), (2, 12, 3, 13, 0.91)])
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert (3, 13) not in res  # 0.91² ≈ 0.828 < 0.9

    def test_best_of_parallel_paths(self):
        pe = edges_df(
            [(1, 11, 3, 13, 0.91), (1, 11, 2, 12, 0.99), (2, 12, 3, 13, 0.99)]
        )
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert res[(3, 13)] == pytest.approx(0.99 * 0.99)

    def test_multi_source(self):
        pe = edges_df([(1, 11, 2, 12, 0.95), (5, 15, 2, 12, 0.99)])
        res = propagate_driver(pe, {(1, 11), (5, 15)}, tau=0.9)
        assert res[(2, 12)] == pytest.approx(0.99)

    def test_seeds_have_prob_one(self):
        res = propagate_driver(edges_df([]), {(1, 11)}, tau=0.9)
        assert res[(1, 11)] == 1.0

    def test_cycle_terminates(self):
        pe = edges_df([(1, 11, 2, 12, 0.95), (2, 12, 1, 11, 0.95)])
        res = propagate_driver(pe, {(1, 11)}, tau=0.9)
        assert res[(2, 12)] == pytest.approx(0.95)


class TestInferredSets:
    def test_each_vertex_infers_itself(self):
        pe = edges_df([(1, 11, 2, 12, 0.95)])
        inf = inferred_sets(pe, tau=0.9)
        assert inf[(1, 11)][(1, 11)] == 1.0
        assert inf[(2, 12)][(2, 12)] == 1.0

    def test_directionality(self):
        pe = edges_df([(1, 11, 2, 12, 0.95)])
        inf = inferred_sets(pe, tau=0.9)
        assert (2, 12) in inf[(1, 11)]
        assert (1, 11) not in inf[(2, 12)]

    def test_sources_argument(self):
        pe = edges_df([(1, 11, 2, 12, 0.95)])
        inf = inferred_sets(pe, tau=0.9, sources=[(1, 11)])
        assert set(inf) == {(1, 11)}

    def test_adjacency_filters_weak_edges(self):
        pe = edges_df([(1, 11, 2, 12, 0.5)])
        assert _adjacency(pe, 0.9) == {}
