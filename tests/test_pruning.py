"""Tests for partial-order pruning (Algorithm 1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.pruning import (
    partial_order_prune,
    strict_dominance_counts,
)


class TestStrictDominanceCounts:
    def test_chain(self):
        V = np.array([[0.1], [0.5], [0.9]])
        assert strict_dominance_counts(V).tolist() == [2, 1, 0]

    def test_incomparable(self):
        V = np.array([[1.0, 0.0], [0.0, 1.0]])
        assert strict_dominance_counts(V).tolist() == [0, 0]

    def test_equal_vectors_do_not_dominate(self):
        V = np.array([[0.5, 0.5], [0.5, 0.5]])
        assert strict_dominance_counts(V).tolist() == [0, 0]

    def test_mixed(self):
        V = np.array([[0.9, 0.9], [0.9, 0.5], [0.1, 0.1]])
        assert strict_dominance_counts(V).tolist() == [0, 1, 2]

    def test_single_row(self):
        assert strict_dominance_counts(np.array([[0.5]])).tolist() == [0]

    def test_empty_dims(self):
        assert strict_dominance_counts(np.zeros((3, 0))).tolist() == [0, 0, 0]

    @pytest.mark.parametrize("seed", range(5))
    def test_matches_naive(self, seed):
        rng = np.random.default_rng(seed)
        V = rng.random((40, 3))
        got = strict_dominance_counts(V, chunk=7)
        naive = np.array(
            [
                sum(
                    1
                    for j in range(len(V))
                    if np.all(V[j] >= V[i]) and np.any(V[j] > V[i])
                )
                for i in range(len(V))
            ]
        )
        assert np.array_equal(got, naive)


def make_block(spark, vectors, e1s, e2s):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "e1": e1s,
                "e2": e2s,
                "sim": [v[0] for v in vectors],
                "svec": [list(map(float, v)) for v in vectors],
                "pvec": [[0]] * len(vectors),
            }
        )
    )


class TestPartialOrderPrune:
    def test_keeps_topk_in_block(self, spark):
        # one entity with 6 counterparts in a dominance chain: keep top k
        vecs = [[x] for x in (0.9, 0.8, 0.7, 0.6, 0.5, 0.4)]
        df = make_block(spark, vecs, [1] * 6, list(range(6)))
        out = partial_order_prune(df, k=2).toPandas()
        assert sorted(out["e2"]) == [0, 1]

    def test_small_blocks_untouched(self, spark):
        vecs = [[0.9], [0.1]]
        df = make_block(spark, vecs, [1, 2], [10, 11])
        out = partial_order_prune(df, k=4).toPandas()
        assert len(out) == 2

    def test_incomparable_all_kept(self, spark):
        # mutually incomparable vectors: min_rank 0 for everyone
        vecs = [[1.0, 0.0], [0.0, 1.0], [0.5, 0.5]]
        df = make_block(spark, vecs, [1] * 3, [10, 11, 12])
        out = partial_order_prune(df, k=1).toPandas()
        assert len(out) == 3

    def test_rank_uses_both_sides(self, spark):
        # e2=10 is shared: rank within its block counts too
        vecs = [[0.9], [0.5], [0.4]]
        df = make_block(spark, vecs, [1, 2, 3], [10, 10, 10])
        out = partial_order_prune(df, k=2).toPandas()
        assert set(zip(out["e1"], out["e2"])) == {(1, 10), (2, 10)}

    def test_k_monotone(self, spark):
        rng = np.random.default_rng(0)
        vecs = [[float(x)] for x in rng.random(12)]
        df = make_block(spark, vecs, [1] * 12, list(range(12)))
        n2 = partial_order_prune(df, k=2).count()
        n6 = partial_order_prune(df, k=6).count()
        assert n2 <= n6

    def test_columns_preserved(self, spark):
        df = make_block(spark, [[0.5]], [1], [10])
        out = partial_order_prune(df, k=4)
        assert set(out.columns) == {"e1", "e2", "sim", "svec", "pvec"}
