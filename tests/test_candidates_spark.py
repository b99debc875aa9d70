"""Spark tests for candidate generation — oracle-checked against DuckDB."""
import pandas as pd
import pytest

from repro import synth_data
from repro.core.candidates import candidate_matches, initial_matches, token_table
from repro.oracle import assert_equivalent
from repro.util.strings import label_jaccard


@pytest.fixture(scope="module")
def spark_entities(spark, movie_pair):
    kb1 = movie_pair.kb1.to_spark(spark)
    kb2 = movie_pair.kb2.to_spark(spark)
    return kb1, kb2


class TestTokenTable:
    def test_tokens_distinct_and_normalized(self, spark, spark_entities):
        kb1, _ = spark_entities
        toks = token_table(kb1.entities).toPandas()
        assert (toks["token"].str.lower() == toks["token"]).all()
        assert not toks.duplicated().any()

    def test_null_labels_skipped(self, spark):
        ents = spark.createDataFrame(
            pd.DataFrame({"eid": [1, 2], "label": ["ok", None], "etype": ["t", "t"]})
        )
        assert token_table(ents).toPandas()["eid"].tolist() == [1]

    def test_oracle_token_jaccard_join(self, spark, spark_entities):
        """The token join + Jaccard is equivalent to the DuckDB SQL plan."""
        kb1, kb2 = spark_entities
        got = candidate_matches(kb1.entities, kb2.entities, 0.3)
        t1 = token_table(kb1.entities, "e1").toPandas()
        t2 = token_table(kb2.entities, "e2").toPandas()
        sql = """
            WITH n1 AS (SELECT e1, COUNT(*) c1 FROM t1 GROUP BY e1),
                 n2 AS (SELECT e2, COUNT(*) c2 FROM t2 GROUP BY e2),
                 co AS (SELECT e1, e2, COUNT(*) c FROM t1 JOIN t2 USING (token) GROUP BY e1, e2)
            SELECT e1, e2, CAST(c AS DOUBLE)/(c1+c2-c) AS sim
            FROM co JOIN n1 USING (e1) JOIN n2 USING (e2)
            WHERE CAST(c AS DOUBLE)/(c1+c2-c) >= 0.3
        """
        assert_equivalent(got, sql, t1=t1, t2=t2)


class TestCandidateMatches:
    def test_gold_pairs_found(self, spark_entities, movie_pair):
        kb1, kb2 = spark_entities
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3).toPandas()
        pairs = set(zip(cand["e1"], cand["e2"]))
        assert movie_pair.gold_set() <= pairs

    def test_sim_equals_label_jaccard(self, spark_entities, movie_pair):
        kb1, kb2 = spark_entities
        cand = candidate_matches(kb1.entities, kb2.entities, 0.3).toPandas()
        lbl1 = dict(zip(movie_pair.kb1.entities["eid"], movie_pair.kb1.entities["label"]))
        lbl2 = dict(zip(movie_pair.kb2.entities["eid"], movie_pair.kb2.entities["label"]))
        for e1, e2, s in zip(cand["e1"], cand["e2"], cand["sim"]):
            assert s == pytest.approx(label_jaccard(lbl1[e1], lbl2[e2]))

    def test_threshold_respected(self, spark_entities):
        kb1, kb2 = spark_entities
        cand = candidate_matches(kb1.entities, kb2.entities, 0.5).toPandas()
        assert (cand["sim"] >= 0.5).all()

    def test_higher_threshold_fewer_pairs(self, spark_entities):
        kb1, kb2 = spark_entities
        lo = candidate_matches(kb1.entities, kb2.entities, 0.3).count()
        hi = candidate_matches(kb1.entities, kb2.entities, 0.9).count()
        assert hi <= lo

    def test_scales_to_synth_keys(self, spark):
        """Runs over the shipped synthetic generator tables too."""
        df = synth_data.uniform_keys(spark, n=500, n_keys=100)
        ents = df.selectExpr("k AS eid", "CAST(k AS STRING) AS label", "'t' AS etype")
        cand = candidate_matches(ents, ents, 1.0).toPandas()
        assert (cand["e1"] == cand["e2"]).all()


class TestInitialMatches:
    def test_exact_label_pairs(self, spark_entities, movie_pair):
        kb1, kb2 = spark_entities
        m_in = initial_matches(kb1.entities, kb2.entities).toPandas()
        pairs = set(zip(m_in["e1"], m_in["e2"]))
        # crafted pair: all labels except "the player"+suffix are identical
        assert (0, 1000) in pairs and (5, 1005) in pairs

    def test_oracle_equality_join(self, spark, spark_entities):
        kb1, kb2 = spark_entities
        got = initial_matches(kb1.entities, kb2.entities)
        e1 = kb1.entities.toPandas()
        e2 = kb2.entities.toPandas()
        sql = """
            SELECT a.eid AS e1, b.eid AS e2
            FROM e1 a JOIN e2 b
            ON lower(a.label) = lower(b.label)
            WHERE a.label IS NOT NULL AND b.label IS NOT NULL
        """
        # crafted labels have no punctuation, so lowercase equality matches
        assert_equivalent(got, sql, e1=e1, e2=e2)
