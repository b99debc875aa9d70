"""Spark tests for attribute matching (Eq. 1) and similarity vectors."""
import pandas as pd
import pytest

from repro.core.attribute_match import (
    attribute_similarities,
    one_to_one_matching,
    threshold_matching,
    value_sets,
)
from repro.core.candidates import candidate_matches, initial_matches
from repro.core.simvectors import similarity_vectors
from repro.oracle import assert_equivalent
from repro.util.strings import sim_L


@pytest.fixture(scope="module")
def crafted(spark, movie_pair):
    kb1 = movie_pair.kb1.to_spark(spark)
    kb2 = movie_pair.kb2.to_spark(spark)
    m_in = initial_matches(kb1.entities, kb2.entities)
    return kb1, kb2, m_in


class TestValueSets:
    def test_grouping(self, spark, crafted):
        kb1, _, _ = crafted
        vs = value_sets(kb1.attr_triples, "e1", "a1").toPandas()
        assert set(vs.columns) == {"e1", "a1", "vals_a1"}
        row = vs[(vs["e1"] == 0) & (vs["a1"] == "byear")]
        assert row["vals_a1"].iloc[0] == ["1917-10-22"]

    def test_oracle_value_counts(self, spark, crafted):
        kb1, _, _ = crafted
        got = (
            value_sets(kb1.attr_triples, "e1", "a1")
            .selectExpr("e1", "a1", "size(vals_a1) AS n")
        )
        at = kb1.attr_triples.toPandas()
        sql = "SELECT eid AS e1, attr AS a1, COUNT(DISTINCT value) AS n FROM at GROUP BY 1, 2"
        assert_equivalent(got, sql, at=at)


class TestAttributeSimilarities:
    def test_same_named_attrs_match_perfectly(self, crafted):
        kb1, kb2, m_in = crafted
        sims = attribute_similarities(m_in, kb1.attr_triples, kb2.attr_triples)
        diag = sims[(sims["a1"] == sims["a2"])]
        # crafted values are identical across KBs
        assert (diag["sim"] > 0.99).all()

    def test_cross_attrs_low(self, crafted):
        kb1, kb2, m_in = crafted
        sims = attribute_similarities(m_in, kb1.attr_triples, kb2.attr_triples)
        off = sims[(sims["a1"] == "byear") & (sims["a2"] == "pop")]
        assert off.empty or (off["sim"] < 0.3).all()

    def test_eq1_denominator(self, spark):
        """A pair where only one side has the attribute counts in the
        denominator with similarity 0."""
        e = pd.DataFrame({"eid": [1, 2], "label": ["a b c", "d e f"], "etype": ["t", "t"]})
        e2 = e.assign(eid=[11, 12])
        at1 = pd.DataFrame({"eid": [1, 2], "attr": ["x", "x"], "value": ["vv", "ww"]})
        at2 = pd.DataFrame({"eid": [11], "attr": ["x"], "value": ["vv"]})
        m_in = spark.createDataFrame(pd.DataFrame({"e1": [1, 2], "e2": [11, 12]}))
        sims = attribute_similarities(
            m_in, spark.createDataFrame(at1), spark.createDataFrame(at2)
        )
        # pair (1,11): sim_L = 1; pair (2,12): only KB1 side has x → counts 0
        assert sims["sim"].iloc[0] == pytest.approx(0.5)


class TestOneToOne:
    def test_one_to_one_unique(self):
        sims = pd.DataFrame(
            {"a1": ["x", "x", "y"], "a2": ["u", "v", "u"], "sim": [0.9, 0.8, 0.85]}
        )
        m = one_to_one_matching(sims, threshold=0.1)
        assert len(m) == len(set(m["a1"])) == len(set(m["a2"]))

    def test_threshold_variant_allows_duplicates(self):
        sims = pd.DataFrame(
            {"a1": ["x", "x"], "a2": ["u", "v"], "sim": [0.9, 0.8]}
        )
        m = threshold_matching(sims, threshold=0.5)
        assert len(m) == 2

    def test_empty(self):
        empty = pd.DataFrame({"a1": [], "a2": [], "sim": []})
        assert one_to_one_matching(empty).empty
        assert threshold_matching(empty).empty


class TestSimilarityVectors:
    def test_component_zero_is_label_sim(self, spark, crafted):
        kb1, kb2, _ = crafted
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3)
        am = pd.DataFrame({"a1": ["byear"], "a2": ["byear"], "sim": [1.0]})
        vec = similarity_vectors(cand, am, kb1.attr_triples, kb2.attr_triples).toPandas()
        for s, v in zip(vec["sim"], vec["svec"]):
            assert v[0] == pytest.approx(s)

    def test_attr_component_values(self, spark, crafted, movie_pair):
        kb1, kb2, _ = crafted
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3)
        am = pd.DataFrame({"a1": ["byear"], "a2": ["byear"], "sim": [1.0]})
        vec = similarity_vectors(cand, am, kb1.attr_triples, kb2.attr_triples).toPandas()
        av1 = movie_pair.kb1.attr_triples
        av2 = movie_pair.kb2.attr_triples
        for e1, e2, v in zip(vec["e1"], vec["e2"], vec["svec"]):
            vals1 = list(av1[(av1["eid"] == e1) & (av1["attr"] == "byear")]["value"])
            vals2 = list(av2[(av2["eid"] == e2) & (av2["attr"] == "byear")]["value"])
            assert v[1] == pytest.approx(sim_L(vals1, vals2))

    def test_vector_dim(self, spark, crafted):
        kb1, kb2, _ = crafted
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3)
        am = pd.DataFrame({"a1": ["byear", "year"], "a2": ["byear", "year"], "sim": [1.0, 1.0]})
        vec = similarity_vectors(cand, am, kb1.attr_triples, kb2.attr_triples).toPandas()
        assert all(len(v) == 3 for v in vec["svec"])

    def test_no_attr_matches_gives_label_only(self, spark, crafted):
        kb1, kb2, _ = crafted
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3)
        am = pd.DataFrame({"a1": [], "a2": [], "sim": []})
        vec = similarity_vectors(cand, am, kb1.attr_triples, kb2.attr_triples).toPandas()
        assert all(len(v) == 1 for v in vec["svec"])

    def test_pvec_marks_presence(self, spark, crafted):
        kb1, kb2, _ = crafted
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3)
        am = pd.DataFrame({"a1": ["byear"], "a2": ["byear"], "sim": [1.0]})
        vec = similarity_vectors(cand, am, kb1.attr_triples, kb2.attr_triples).toPandas()
        for pv in vec["pvec"]:
            assert pv[0] == 0  # label always present
