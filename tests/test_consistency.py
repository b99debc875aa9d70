"""Tests for relationship-consistency estimation (Eq. 3–5)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.consistency import (
    consistency_mle,
    degree_table,
    estimate_consistencies,
)


class TestConsistencyMLE:
    def test_perfect_consistency(self):
        n = np.full(50, 2.0)
        e1, e2 = consistency_mle(n, n, n)
        assert e1 > 0.95 and e2 > 0.95

    def test_zero_consistency(self):
        n = np.full(50, 2.0)
        e1, e2 = consistency_mle(n, n, np.zeros(50))
        assert e1 < 0.02 and e2 < 0.02

    def test_half_consistency(self):
        n = np.full(100, 2.0)
        L = np.full(100, 1.0)
        e1, _ = consistency_mle(n, n, L)
        assert e1 == pytest.approx(0.5, abs=0.01)

    def test_asymmetric_sets(self):
        n1 = np.full(50, 4.0)
        n2 = np.full(50, 1.0)
        L = np.full(50, 1.0)
        e1, e2 = consistency_mle(n1, n2, L)
        assert e1 == pytest.approx(0.25, abs=0.01)
        assert e2 == pytest.approx(0.99, abs=0.01)  # clamped high

    def test_L_capped_by_set_sizes(self):
        n1 = np.full(10, 1.0)
        n2 = np.full(10, 1.0)
        e1, _ = consistency_mle(n1, n2, np.full(10, 5.0))
        assert e1 <= 0.99

    def test_empty_evidence_uninformative(self):
        e1, e2 = consistency_mle(np.array([]), np.array([]), np.array([]))
        assert e1 == pytest.approx(0.5) and e2 == pytest.approx(0.5)

    def test_clamped_into_open_interval(self):
        n = np.full(5000, 1.0)
        e1, _ = consistency_mle(n, n, n)
        assert e1 <= 0.99


class TestDegreeTable:
    def test_counts_distinct(self, spark):
        rt = spark.createDataFrame(
            pd.DataFrame(
                {"src": [1, 1, 1, 2], "rel": ["r", "r", "r", "r"], "dst": [5, 5, 6, 7]}
            )
        )
        d = degree_table(rt, "e", "r", "n").toPandas().set_index("e")["n"]
        assert d[1] == 2 and d[2] == 1


class TestEstimateConsistencies:
    def test_functional_rel_high_eps(self, spark):
        """A relationship whose matched entities point at matched values
        estimates high consistency; an inconsistent one estimates low."""
        n = 40
        m_in = spark.createDataFrame(
            pd.DataFrame({"e1": range(n), "e2": range(1000, 1000 + n)})
        )
        # good rel: i → i+100 on both sides (values are matched pairs)
        rt1 = pd.DataFrame({"src": range(n), "rel": ["good"] * n, "dst": range(100, 100 + n)})
        rt2 = pd.DataFrame(
            {"src": range(1000, 1000 + n), "rel": ["good"] * n, "dst": range(1100, 1100 + n)}
        )
        # bad rel: kb2 points somewhere unrelated (shifted by 7)
        bad2 = pd.DataFrame(
            {
                "src": range(1000, 1000 + n),
                "rel": ["bad"] * n,
                "dst": [1100 + (i + 7) % n for i in range(n)],
            }
        )
        bad1 = rt1.assign(rel="bad")
        cand = spark.createDataFrame(
            pd.DataFrame(
                {"e1": range(100, 100 + n), "e2": range(1100, 1100 + n), "sim": [0.8] * n}
            )
        )
        rel_pairs = pd.DataFrame({"r1": ["good", "bad"], "r2": ["good", "bad"]})
        cons = estimate_consistencies(
            m_in,
            spark.createDataFrame(pd.concat([rt1, bad1])),
            spark.createDataFrame(pd.concat([rt2, bad2])),
            cand,
            rel_pairs,
        ).set_index(["r1", "r2"])
        assert cons.loc[("good", "good"), "eps1"] > 0.9
        assert cons.loc[("bad", "bad"), "eps1"] < 0.15

    def test_unseen_rel_pair_defaults(self, spark):
        from repro.kb.model import REL_SCHEMA

        m_in = spark.createDataFrame(pd.DataFrame({"e1": [1], "e2": [2]}))
        empty = spark.createDataFrame([], schema=REL_SCHEMA)
        cand = spark.createDataFrame(pd.DataFrame({"e1": [1], "e2": [2], "sim": [0.5]}))
        cons = estimate_consistencies(
            m_in, empty, empty, cand, pd.DataFrame({"r1": ["x"], "r2": ["y"]})
        )
        assert cons["eps1"].iloc[0] == pytest.approx(0.5)

    def test_empty_rel_pairs(self, spark):
        m_in = spark.createDataFrame(pd.DataFrame({"e1": [1], "e2": [2]}))
        empty = spark.createDataFrame(
            pd.DataFrame({"src": [1], "rel": ["r"], "dst": [2]})
        )
        cand = spark.createDataFrame(pd.DataFrame({"e1": [1], "e2": [2], "sim": [0.5]}))
        cons = estimate_consistencies(
            m_in, empty, empty, cand, pd.DataFrame({"r1": [], "r2": []})
        )
        assert cons.empty
