"""Spark tests: probabilistic edges + the iterative-join propagation
fixpoint vs the driver-side Dijkstra."""
import numpy as np
import pandas as pd
import pytest

from repro.core.propagation import (
    probabilistic_edges,
    propagate_driver,
    propagate_spark,
)


@pytest.fixture(scope="module")
def star_graph(spark):
    """A match (1,11) whose rel 'r' points at two value pairs."""
    edges = spark.createDataFrame(
        pd.DataFrame(
            {
                "src_e1": [1, 1],
                "src_e2": [11, 11],
                "r1": ["r", "r"],
                "r2": ["r", "r"],
                "dst_e1": [2, 3],
                "dst_e2": [12, 13],
            }
        )
    )
    cand = spark.createDataFrame(
        pd.DataFrame({"e1": [1, 2, 3], "e2": [11, 12, 13], "sim": [0.9, 0.5, 0.5]})
    )
    rt1 = spark.createDataFrame(
        pd.DataFrame({"src": [1, 1], "rel": ["r", "r"], "dst": [2, 3]})
    )
    rt2 = spark.createDataFrame(
        pd.DataFrame({"src": [11, 11], "rel": ["r", "r"], "dst": [12, 13]})
    )
    cons = pd.DataFrame({"r1": ["r"], "r2": ["r"], "eps1": [0.95], "eps2": [0.95]})
    return edges, cand, rt1, rt2, cons


class TestProbabilisticEdges:
    def test_disjoint_neighbors_high_prob(self, star_graph):
        edges, cand, rt1, rt2, cons = star_graph
        pe = probabilistic_edges(edges, cand, rt1, rt2, cons).toPandas()
        assert len(pe) == 2
        assert (pe["prob"] > 0.9).all()

    def test_matches_kernel(self, star_graph):
        from repro.core.propagation import neighbor_posteriors

        edges, cand, rt1, rt2, cons = star_graph
        pe = probabilistic_edges(edges, cand, rt1, rt2, cons).toPandas()
        want = neighbor_posteriors(
            np.array([2, 3]), np.array([12, 13]), np.array([0.5, 0.5]),
            2, 2, 0.95, 0.95,
        )
        got = pe.sort_values("dst_e1")["prob"].to_numpy()
        assert got == pytest.approx(want)

    def test_empty_consistencies(self, spark, star_graph):
        edges, cand, rt1, rt2, _ = star_graph
        pe = probabilistic_edges(edges, cand, rt1, rt2, pd.DataFrame())
        assert pe.count() == 0

    def test_low_consistency_low_prob(self, star_graph):
        edges, cand, rt1, rt2, _ = star_graph
        cons = pd.DataFrame({"r1": ["r"], "r2": ["r"], "eps1": [0.1], "eps2": [0.1]})
        pe = probabilistic_edges(edges, cand, rt1, rt2, cons).toPandas()
        assert (pe["prob"] < 0.5).all()

    def test_parallel_rel_pairs_keep_max(self, spark, star_graph):
        edges_pd = pd.DataFrame(
            {
                "src_e1": [1, 1], "src_e2": [11, 11],
                "r1": ["r", "s"], "r2": ["r", "s"],
                "dst_e1": [2, 2], "dst_e2": [12, 12],
            }
        )
        edges = spark.createDataFrame(edges_pd)
        cand = spark.createDataFrame(
            pd.DataFrame({"e1": [1, 2], "e2": [11, 12], "sim": [0.9, 0.5]})
        )
        rt1 = spark.createDataFrame(
            pd.DataFrame({"src": [1, 1], "rel": ["r", "s"], "dst": [2, 2]})
        )
        rt2 = spark.createDataFrame(
            pd.DataFrame({"src": [11, 11], "rel": ["r", "s"], "dst": [12, 12]})
        )
        cons = pd.DataFrame(
            {"r1": ["r", "s"], "r2": ["r", "s"], "eps1": [0.95, 0.5], "eps2": [0.95, 0.5]}
        )
        pe = probabilistic_edges(edges, cand, rt1, rt2, cons).toPandas()
        assert len(pe) == 1  # max over the two parallel edges
        strong = probabilistic_edges(
            edges, cand, rt1, rt2, cons[cons["r1"] == "r"]
        ).toPandas()
        assert pe["prob"].iloc[0] == pytest.approx(strong["prob"].iloc[0])


class TestPropagateSparkVsDriver:
    @pytest.mark.parametrize("seed", [0, 1])
    def test_fixpoint_equals_dijkstra(self, spark, seed):
        rng = np.random.default_rng(seed)
        n = 30
        rows = []
        for _ in range(60):
            a, b = rng.integers(0, n, 2)
            if a != b:
                rows.append((int(a), int(a) + 100, int(b), int(b) + 100, float(rng.uniform(0.85, 1.0))))
        pe = pd.DataFrame(
            rows, columns=["src_e1", "src_e2", "dst_e1", "dst_e2", "prob"]
        ).drop_duplicates(subset=["src_e1", "dst_e1"])
        seeds = {(0, 100), (5, 105)}
        want = propagate_driver(pe, seeds, tau=0.9)
        seeds_df = spark.createDataFrame(
            pd.DataFrame({"e1": [s[0] for s in seeds], "e2": [s[1] for s in seeds]})
        )
        got_df = propagate_spark(spark.createDataFrame(pe), seeds_df, tau=0.9).toPandas()
        got = {
            (int(a), int(b)): p
            for a, b, p in zip(got_df["e1"], got_df["e2"], got_df["prob"])
        }
        assert set(got) == set(want)
        for k in want:
            assert got[k] == pytest.approx(want[k])

    def test_no_edges(self, spark):
        pe = spark.createDataFrame(
            pd.DataFrame(
                {"src_e1": [1], "src_e2": [2], "dst_e1": [3], "dst_e2": [4], "prob": [0.5]}
            )
        )
        seeds = spark.createDataFrame(pd.DataFrame({"e1": [1], "e2": [2]}))
        out = propagate_spark(pe, seeds, tau=0.9).toPandas()
        assert len(out) == 1  # only the seed survives (edge < tau)
