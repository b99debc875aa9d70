"""Knowledge-base data model.

A KB is the paper's 5-tuple K = (U, L, A, R, T) materialized as three
tables (entities with labels/types, attribute triples, relationship
triples). Canonical storage is pandas — the synthetic profiles are
laptop-scale — with ``to_spark`` handing Spark DataFrames to the
distributed pipeline stages. A ``KBPair`` bundles two KBs with the gold
standards the evaluation tables need (entity matches for Tables III/V–VIII,
attribute matches for Table IV).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

ENTITY_SCHEMA = T.StructType(
    [
        T.StructField("eid", T.LongType(), False),
        T.StructField("label", T.StringType(), True),
        T.StructField("etype", T.StringType(), False),
    ]
)
ATTR_SCHEMA = T.StructType(
    [
        T.StructField("eid", T.LongType(), False),
        T.StructField("attr", T.StringType(), False),
        T.StructField("value", T.StringType(), False),
    ]
)
REL_SCHEMA = T.StructType(
    [
        T.StructField("src", T.LongType(), False),
        T.StructField("rel", T.StringType(), False),
        T.StructField("dst", T.LongType(), False),
    ]
)


@dataclass
class KB:
    """One knowledge base: entities (with optional labels), attribute
    triples and relationship triples."""

    name: str
    entities: pd.DataFrame  # eid, label (nullable), etype
    attr_triples: pd.DataFrame  # eid, attr, value
    rel_triples: pd.DataFrame  # src, rel, dst

    @property
    def attrs(self) -> list[str]:
        """Distinct attribute names (the paper's A)."""
        return sorted(self.attr_triples["attr"].unique())

    @property
    def rels(self) -> list[str]:
        """Distinct relationship names (the paper's R)."""
        return sorted(self.rel_triples["rel"].unique())

    def to_spark(self, spark: SparkSession) -> "SparkKB":
        return SparkKB(
            name=self.name,
            entities=spark.createDataFrame(self.entities, schema=ENTITY_SCHEMA),
            attr_triples=spark.createDataFrame(self.attr_triples, schema=ATTR_SCHEMA),
            rel_triples=spark.createDataFrame(self.rel_triples, schema=REL_SCHEMA),
        )


@dataclass
class SparkKB:
    """Spark-side mirror of :class:`KB` used by the pipeline stages."""

    name: str
    entities: DataFrame
    attr_triples: DataFrame
    rel_triples: DataFrame


@dataclass
class KBPair:
    """Two KBs plus gold standards for evaluation.

    ``gold_matches``: columns (e1, e2) — the reference entity matches.
    ``gold_attr_matches``: columns (a1, a2) — reference attribute matches
    (only meaningful for heterogeneous profiles, cf. Table IV).
    """

    kb1: KB
    kb2: KB
    gold_matches: pd.DataFrame
    gold_attr_matches: pd.DataFrame = field(
        default_factory=lambda: pd.DataFrame({"a1": [], "a2": []})
    )

    def gold_set(self) -> set[tuple[int, int]]:
        return set(
            zip(self.gold_matches["e1"].astype(int), self.gold_matches["e2"].astype(int))
        )

    def stats(self) -> dict:
        """Table II row: #entities, #attributes, #relationships, #matches."""
        return {
            "entities": (len(self.kb1.entities), len(self.kb2.entities)),
            "attributes": (len(self.kb1.attrs), len(self.kb2.attrs)),
            "relationships": (len(self.kb1.rels), len(self.kb2.rels)),
            "matches": len(self.gold_matches),
        }
