"""ER graph construction (paper Definition 2).

Vertices are the retained candidate pairs ``M_rd``; there is an edge
``(u1,u2) → (u1',u2')`` labeled ``(r1,r2)`` iff ``(u1,r1,u1') ∈ T1`` and
``(u2,r2,u2') ∈ T2``. Built with plain DataFrame joins
(``M_rd ⋈ T1 ⋈ T2 ⋈ M_rd``) and oracle-checked against the equivalent
DuckDB SQL join in the tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

INVERSE_PREFIX = "~"


def with_inverses(rel_triples: DataFrame) -> DataFrame:
    """Relationship triples plus their inverses (``r`` → ``~r``, endpoints
    swapped).

    Propagation along an edge label (r1, r2) flows from subject pairs to
    object pairs only (Def. 2 is directed); real KBs carry both a relation
    and its inverse (directed/directedBy), which is what lets a labeled
    movie pair infer its actor pairs. Our generator emits one direction,
    so the pipeline augments both KBs with explicit inverses — a labeled
    match then propagates to subject *and* object neighbors, each
    direction with its own consistency estimate (DESIGN.md §5).
    """
    inv = rel_triples.select(
        F.col("dst").alias("src"),
        F.concat(F.lit(INVERSE_PREFIX), F.col("rel")).alias("rel"),
        F.col("src").alias("dst"),
    )
    return rel_triples.unionByName(inv)


def er_edges(vertices: DataFrame, rel_triples1: DataFrame, rel_triples2: DataFrame) -> DataFrame:
    """Edge list (src_e1, src_e2, r1, r2, dst_e1, dst_e2) of the ER graph.

    ``vertices`` needs columns (e1, e2); extra columns are ignored.
    """
    v_src = vertices.select(F.col("e1").alias("src_e1"), F.col("e2").alias("src_e2"))
    v_dst = vertices.select(F.col("e1").alias("dst_e1"), F.col("e2").alias("dst_e2"))
    t1 = rel_triples1.select(
        F.col("src").alias("src_e1"), F.col("rel").alias("r1"), F.col("dst").alias("dst_e1")
    )
    t2 = rel_triples2.select(
        F.col("src").alias("src_e2"), F.col("rel").alias("r2"), F.col("dst").alias("dst_e2")
    )
    return (
        v_src.join(t1, "src_e1")
        .join(t2, "src_e2")
        .join(v_dst, ["dst_e1", "dst_e2"])
        .select("src_e1", "src_e2", "r1", "r2", "dst_e1", "dst_e2")
        .distinct()
    )


def isolated_vertices(vertices: DataFrame, edges: DataFrame) -> DataFrame:
    """Vertices that occur in no edge (handled by the §VII-B classifier)."""
    srcs = edges.select(F.col("src_e1").alias("e1"), F.col("src_e2").alias("e2"))
    dsts = edges.select(F.col("dst_e1").alias("e1"), F.col("dst_e2").alias("e2"))
    touched = srcs.union(dsts).distinct()
    return vertices.join(touched, ["e1", "e2"], "left_anti")
