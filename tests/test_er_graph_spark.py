"""Spark tests for ER-graph construction — oracle-checked edge join."""
import pandas as pd
import pytest

from repro.core.er_graph import INVERSE_PREFIX, er_edges, isolated_vertices, with_inverses
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def graph_inputs(spark, movie_pair):
    kb1 = movie_pair.kb1.to_spark(spark)
    kb2 = movie_pair.kb2.to_spark(spark)
    verts = spark.createDataFrame(
        pd.DataFrame(
            {"e1": [0, 1, 2, 3, 4, 5], "e2": [1000, 1001, 1002, 1003, 1004, 1005]}
        )
    )
    return kb1, kb2, verts


class TestErEdges:
    def test_expected_edges(self, graph_inputs):
        kb1, kb2, verts = graph_inputs
        edges = er_edges(verts, kb1.rel_triples, kb2.rel_triples).toPandas()
        got = set(
            zip(edges["src_e1"], edges["src_e2"], edges["r1"], edges["dst_e1"])
        )
        # tim(1) directed cradle(3) and player(4) in both KBs
        assert (1, 1001, "directed", 3) in got
        assert (1, 1001, "directed", 4) in got
        # joan(0) and john(2) born in nyc(5)
        assert (0, 1000, "born_in", 5) in got
        assert (2, 1002, "born_in", 5) in got

    def test_cross_pair_edges_need_both_triples(self, spark, graph_inputs):
        kb1, kb2, verts = graph_inputs
        # remove one KB2 triple: the corresponding edge must disappear
        t2 = kb2.rel_triples.where("NOT (src = 1001 AND dst = 1003)")
        edges = er_edges(verts, kb1.rel_triples, t2).toPandas()
        got = set(zip(edges["src_e1"], edges["dst_e1"]))
        assert (1, 3) not in got

    def test_oracle_edge_join(self, spark, graph_inputs, movie_pair):
        kb1, kb2, verts = graph_inputs
        got = er_edges(verts, kb1.rel_triples, kb2.rel_triples)
        sql = """
            SELECT DISTINCT v.e1 AS src_e1, v.e2 AS src_e2,
                   t1.rel AS r1, t2.rel AS r2,
                   w.e1 AS dst_e1, w.e2 AS dst_e2
            FROM v JOIN t1 ON t1.src = v.e1
                 JOIN t2 ON t2.src = v.e2
                 JOIN v w ON w.e1 = t1.dst AND w.e2 = t2.dst
        """
        assert_equivalent(
            got,
            sql,
            v=verts.toPandas(),
            t1=movie_pair.kb1.rel_triples,
            t2=movie_pair.kb2.rel_triples,
        )

    def test_edges_only_between_vertices(self, graph_inputs):
        kb1, kb2, verts = graph_inputs
        vs = set(map(tuple, verts.toPandas().itertuples(index=False)))
        edges = er_edges(verts, kb1.rel_triples, kb2.rel_triples).toPandas()
        for _, r in edges.iterrows():
            assert (r["src_e1"], r["src_e2"]) in vs
            assert (r["dst_e1"], r["dst_e2"]) in vs


class TestWithInverses:
    def test_doubles_triples(self, graph_inputs):
        kb1, _, _ = graph_inputs
        n = kb1.rel_triples.count()
        assert with_inverses(kb1.rel_triples).count() == 2 * n

    def test_inverse_swaps_endpoints(self, graph_inputs):
        kb1, _, _ = graph_inputs
        aug = with_inverses(kb1.rel_triples).toPandas()
        fwd = aug[~aug["rel"].str.startswith(INVERSE_PREFIX)]
        inv = aug[aug["rel"].str.startswith(INVERSE_PREFIX)]
        assert set(zip(inv["src"], inv["dst"])) == set(zip(fwd["dst"], fwd["src"]))

    def test_inverse_edges_connect_movies_to_directors(self, graph_inputs):
        kb1, kb2, verts = graph_inputs
        edges = er_edges(
            verts, with_inverses(kb1.rel_triples), with_inverses(kb2.rel_triples)
        ).toPandas()
        got = set(zip(edges["src_e1"], edges["r1"], edges["dst_e1"]))
        assert (3, "~directed", 1) in got  # movie pair → its director pair


class TestIsolatedVertices:
    def test_untouched_vertices_reported(self, spark, graph_inputs):
        kb1, kb2, verts = graph_inputs
        extra = spark.createDataFrame(pd.DataFrame({"e1": [99], "e2": [1099]}))
        all_v = verts.unionByName(extra)
        edges = er_edges(all_v, kb1.rel_triples, kb2.rel_triples)
        iso = isolated_vertices(all_v, edges).toPandas()
        assert (99, 1099) in set(zip(iso["e1"], iso["e2"]))

    def test_connected_not_isolated(self, graph_inputs):
        kb1, kb2, verts = graph_inputs
        edges = er_edges(verts, kb1.rel_triples, kb2.rel_triples)
        iso = isolated_vertices(verts, edges).toPandas()
        assert (1, 1001) not in set(zip(iso["e1"], iso["e2"]))
