"""Shared test fixtures: crafted micro-KBs and cached small-scale artifacts."""
import numpy as np
import pandas as pd
import pytest

from repro.core.remp import RempConfig, build_pipeline
from repro.kb.model import KB, KBPair
from repro.kb.profiles import PROFILES


@pytest.fixture(scope="session")
def movie_pair() -> KBPair:
    """Hand-crafted KB pair mirroring the paper's Fig. 1 neighborhood:
    persons who directed movies and were born in cities; labels mostly
    identical so candidates/initial matches are predictable."""
    def kb(name, offset, label_suffix=""):
        ents = pd.DataFrame(
            {
                "eid": np.arange(6) + offset,
                "label": [
                    "joan fontaine", "tim burton", "john smith",
                    "cradle song", "the player" + label_suffix, "new york",
                ],
                "etype": ["person", "person", "person", "movie", "movie", "city"],
            }
        )
        attrs = pd.DataFrame(
            {
                "eid": np.array([0, 1, 2, 3, 4, 5]) + offset,
                "attr": ["byear", "byear", "byear", "year", "year", "pop"],
                "value": [
                    "1917-10-22", "1958-08-25", "1960-01-01",
                    "1933-01-01", "1992-01-01", "8000000",
                ],
            }
        )
        rels = pd.DataFrame(
            {
                "src": np.array([1, 1, 0, 2]) + offset,
                "rel": ["directed", "directed", "born_in", "born_in"],
                "dst": np.array([3, 4, 5, 5]) + offset,
            }
        )
        return KB(name=name, entities=ents, attr_triples=attrs, rel_triples=rels)

    kb1 = kb("y", 0)
    kb2 = kb("d", 1000)
    gold = pd.DataFrame({"e1": np.arange(6), "e2": np.arange(6) + 1000})
    attr_gold = pd.DataFrame(
        {"a1": ["byear", "year", "pop"], "a2": ["byear", "year", "pop"]}
    )
    return KBPair(kb1=kb1, kb2=kb2, gold_matches=gold, gold_attr_matches=attr_gold)


@pytest.fixture(scope="session")
def small_artifacts(spark):
    """Pipeline artifacts for small-scale profiles (cached per session)."""
    cache = {}

    def get(name: str, scale: float = 0.25, seed: int = 0):
        key = (name, scale, seed)
        if key not in cache:
            pair = PROFILES[name](seed=seed, scale=scale)
            cache[key] = (pair, build_pipeline(spark, pair, RempConfig()))
        return cache[key]

    return get
