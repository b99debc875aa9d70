"""Similarity vectors over matched attributes (paper §IV-D).

For each candidate pair ``(u1, u2)`` and each attribute match
``(a1, a2) = M_at[i]``, component ``s_{i+1} = sim_L(N_{u1}^{a1}, N_{u2}^{a2})``
(0 when either side lacks the attribute). Component 0 is the label
similarity: in the paper's KBs ``rdfs:label`` is itself an attribute that
always participates in the attribute matching, while our data model holds
labels out-of-band — so the label contributes the leading vector component
explicitly. Built sparsely with DataFrame joins — only (pair, i) cells
where both sides carry the attribute are computed — then densified into
an ``svec`` array column (``pvec`` records which components are backed by
values present on both sides; 0 is always present).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.attribute_match import value_sets
from repro.util.strings import sim_L

_sim_l_udf = F.udf(lambda v1, v2: float(sim_L(v1 or [], v2 or [])), T.DoubleType())


def similarity_vectors(
    candidates: DataFrame,
    attr_matches: pd.DataFrame,
    attr_triples1: DataFrame,
    attr_triples2: DataFrame,
) -> DataFrame:
    """(e1, e2, sim, svec) — candidates with dense similarity vectors.

    ``attr_matches`` is the (a1, a2) frame from attribute matching; its row
    order defines the vector dimension index.
    """
    spark = candidates.sparkSession
    dim = len(attr_matches) + 1  # component 0 = label similarity
    if dim == 1:
        return candidates.withColumn(
            "svec", F.array(F.col("sim").cast(T.DoubleType()))
        ).withColumn("pvec", F.array(F.lit(0).cast(T.LongType())))
    am = spark.createDataFrame(
        pd.DataFrame(
            {
                "a1": attr_matches["a1"].to_numpy(),
                "a2": attr_matches["a2"].to_numpy(),
                "idx": range(1, dim),
            }
        )
    )
    av1 = value_sets(attr_triples1, "e1", "a1").join(am, "a1").select("e1", "idx", "vals_a1")
    av2 = value_sets(attr_triples2, "e2", "a2").join(am, "a2").select("e2", "idx", "vals_a2")
    cells = (
        candidates.select("e1", "e2")
        .join(av1, "e1")
        .join(av2, ["e2", "idx"])
        .withColumn("s", _sim_l_udf("vals_a1", "vals_a2"))
        .groupBy("e1", "e2")
        .agg(
            F.map_from_arrays(F.collect_list("idx"), F.collect_list("s")).alias("cells"),
            F.sort_array(F.collect_list("idx")).alias("present"),
        )
    )

    def densify(label_sim, cells_map) -> list[float]:
        v = [0.0] * dim
        v[0] = float(label_sim)
        if cells_map:
            for i, s in cells_map.items():
                v[int(i)] = float(s)
        return v

    densify_udf = F.udf(densify, T.ArrayType(T.DoubleType()))
    return (
        candidates.join(cells, ["e1", "e2"], "left")
        .withColumn("svec", densify_udf("sim", "cells"))
        .withColumn(
            "pvec",
            F.concat(
                F.array(F.lit(0).cast(T.LongType())),
                F.coalesce(F.col("present"), F.array().cast(T.ArrayType(T.LongType()))),
            ),
        )
        .drop("cells", "present")
    )
