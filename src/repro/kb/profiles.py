"""The four dataset profiles (Table II substitutes, DESIGN.md §4).

Each profile function returns a :class:`KBPair` deterministic in ``seed``.
``scale`` shrinks object counts for unit tests (tests use scale≈0.2–0.3,
benchmarks scale=1.0). The profiles preserve the structural properties the
paper's experiments depend on rather than absolute sizes:

- ``iimb_lite``  — identical schemas, dense relationships, low noise;
- ``da_lite``    — bibliographic two-type KBs with exactly ONE relationship;
- ``iy_lite``    — asymmetric schemas, high label noise, ~28% isolated;
- ``dy_lite``    — heterogeneous many-vs-few attributes, unlabeled
                   entities, ~60% isolated matches, 19 gold attr matches.
"""
from __future__ import annotations

import numpy as np

from repro.kb.model import KBPair
from repro.kb.synth_kb import (
    AttrSpec,
    RelSpec,
    TypeSpec,
    ViewSpec,
    WorldSpec,
    generate_world,
    make_pair,
)


def _n(base: int, scale: float) -> int:
    return max(8, int(base * scale))


def iimb_lite(seed: int = 0, scale: float = 1.0) -> KBPair:
    """IIMB substitute: 365/365 entities, identical 12-attr/15-rel schema."""
    rng = np.random.default_rng(seed)
    types = [
        TypeSpec("person", _n(120, scale), [
            AttrSpec("birth_year", "date", num_range=(1920, 2000)),
            AttrSpec("gender", "str", vocab=2),
            AttrSpec("nationality", "str", vocab=20),
        ]),
        TypeSpec("movie", _n(100, scale), [
            AttrSpec("year", "date", num_range=(1950, 2020)),
            AttrSpec("genre", "str", vocab=12, max_card=2),
            AttrSpec("budget", "num", num_range=(1, 300)),
            AttrSpec("language", "str", vocab=10),
        ]),
        TypeSpec("location", _n(80, scale), [
            AttrSpec("population", "num", num_range=(1000, 9_000_000)),
            AttrSpec("country", "str", vocab=25),
        ]),
        TypeSpec("organization", _n(65, scale), [
            AttrSpec("founded", "date", num_range=(1800, 2015)),
            AttrSpec("industry", "str", vocab=15),
            AttrSpec("sector", "str", vocab=8),
        ]),
    ]
    rels = [
        RelSpec("acted_in", "person", "movie", avg_deg=2.5, coverage=0.9),
        RelSpec("directed", "person", "movie", avg_deg=1.3, coverage=0.35),
        RelSpec("produced", "person", "movie", avg_deg=1.5, coverage=0.25),
        RelSpec("born_in", "person", "location", functional=True, coverage=0.95),
        RelSpec("lives_in", "person", "location", functional=True, coverage=0.8),
        RelSpec("works_for", "person", "organization", avg_deg=1.2, coverage=0.6),
        RelSpec("spouse", "person", "person", functional=True, coverage=0.4),
        RelSpec("child_of", "person", "person", avg_deg=1.5, coverage=0.5),
        RelSpec("located_in", "organization", "location", functional=True, coverage=0.9),
        RelSpec("filmed_in", "movie", "location", avg_deg=1.8, coverage=0.8),
        RelSpec("produced_by", "movie", "organization", avg_deg=1.3, coverage=0.85),
        RelSpec("hq_in", "organization", "location", functional=True, coverage=0.7),
        RelSpec("owns", "organization", "organization", avg_deg=1.2, coverage=0.3),
        RelSpec("part_of", "location", "location", functional=True, coverage=0.75),
        RelSpec("sequel_of", "movie", "movie", functional=True, coverage=0.2),
    ]
    world = generate_world(WorldSpec(types, rels), rng)
    v1 = ViewSpec("iimb1", entity_coverage=1.0, value_typo=0.03, rel_dropout=0.05)
    v2 = ViewSpec(
        "iimb2", entity_coverage=1.0, label_token_drop=0.04, label_token_typo=0.06,
        value_typo=0.05, rel_dropout=0.08,
    )
    return make_pair(world, v1, v2, rng)


def da_lite(seed: int = 0, scale: float = 1.0) -> KBPair:
    """DBLP-ACM substitute: publications + authors, ONE relationship type.

    Clean strings (monotone baselines do well here); asymmetric entity
    coverage (DBLP side smaller, like 2.61K vs 64.3K in the paper).
    """
    rng = np.random.default_rng(seed)
    types = [
        TypeSpec("pub", _n(520, scale), [
            AttrSpec("year", "date", num_range=(1995, 2010)),
            AttrSpec("venue", "str", vocab=18),
        ], label_tokens=(4, 7)),
        TypeSpec("author", _n(360, scale), [
            AttrSpec("affiliation", "str", vocab=40),
        ], label_tokens=(2, 3)),
    ]
    rels = [RelSpec("authored_by", "pub", "author", avg_deg=2.6, coverage=0.995)]
    world = generate_world(WorldSpec(types, rels), rng)
    v1 = ViewSpec(
        "dblp", entity_coverage=0.5, seed_types={"pub"},
        label_token_typo=0.03, value_typo=0.02,
    )
    v2 = ViewSpec(
        "acm", entity_coverage=0.97, seed_types={"pub"},
        label_token_typo=0.04, label_token_drop=0.02,
        value_typo=0.03, rel_dropout=0.03,
    )
    return make_pair(world, v1, v2, rng)


# iy_lite: world attrs covered by each side. KB1 (imdb-like) has the narrow
# schema; KB2 (yago-like) the wide one + junk attrs.
_IY_SHARED_ATTRS = {"m_year", "p_birth_year", "p_gender", "l_population"}


def iy_lite(seed: int = 0, scale: float = 1.0) -> KBPair:
    """IMDB-YAGO substitute: noisy labels, asymmetric schemas, ~28% isolated.

    Gold attribute matches: exactly 4 (paper Table IV, I-Y row).
    """
    rng = np.random.default_rng(seed)
    types = [
        TypeSpec("movie", _n(620, scale), confusable=0.25, attrs=[
            AttrSpec("m_year", "date", num_range=(1950, 2020)),
            AttrSpec("m_duration", "num", num_range=(60, 240), coverage=0.8),
            AttrSpec("m_genre", "str", vocab=15, max_card=2, coverage=0.9),
        ]),
        TypeSpec("person", _n(560, scale), confusable=0.25, attrs=[
            AttrSpec("p_birth_year", "date", num_range=(1900, 2000)),
            AttrSpec("p_gender", "str", vocab=2),
            AttrSpec("p_height", "num", num_range=(150, 200), coverage=0.5),
        ]),
        TypeSpec("location", _n(170, scale), [
            AttrSpec("l_population", "num", num_range=(1000, 9_000_000)),
            AttrSpec("l_area", "num", num_range=(10, 10000), coverage=0.6),
        ]),
        TypeSpec("company", _n(110, scale), [
            AttrSpec("c_founded", "date", num_range=(1900, 2015)),
        ]),
    ]
    rels = [
        RelSpec("acted_in", "person", "movie", avg_deg=2.2, coverage=0.74),
        RelSpec("directed", "person", "movie", avg_deg=1.3, coverage=0.25),
        RelSpec("born_in", "person", "location", functional=True, coverage=0.55),
        RelSpec("died_in", "person", "location", functional=True, coverage=0.15),
        RelSpec("produced_by", "movie", "company", avg_deg=1.3, coverage=0.65),
        RelSpec("located_in", "company", "location", functional=True, coverage=0.5),
        RelSpec("spouse", "person", "person", functional=True, coverage=0.25),
        RelSpec("sequel_of", "movie", "movie", functional=True, coverage=0.12),
    ]
    world = generate_world(WorldSpec(types, rels), rng)
    v1 = ViewSpec(
        "imdb", entity_coverage=0.92, attr_rename="i_", rel_rename="i_",
        covered_attrs=set(_IY_SHARED_ATTRS), n_noise_attrs=1, noise_attr_density=0.3,
        covered_rels={"acted_in", "directed", "produced_by", "sequel_of", "spouse"},
        label_token_drop=0.07, label_token_typo=0.10, value_typo=0.12,
        rel_dropout=0.05, attr_dropout=0.05,
    )
    v2 = ViewSpec(
        "yago", entity_coverage=0.72, attr_rename="y_", rel_rename="y_",
        covered_attrs=None,  # full world schema (wide side)
        covered_rels=None,
        n_noise_attrs=3, noise_attr_density=0.25,
        label_token_drop=0.06, label_token_typo=0.08, value_typo=0.10,
        rel_dropout=0.05, attr_dropout=0.05,
    )
    return make_pair(world, v1, v2, rng)


def dy_lite(seed: int = 0, scale: float = 1.0) -> KBPair:
    """DBpedia-YAGO substitute: heterogeneous many-vs-few attributes, ~8%
    unlabeled entities, ~60% isolated matches, 19 gold attribute matches
    of which several are rare or format-shifted (low attr-match recall,
    paper Table IV D-Y row)."""
    rng = np.random.default_rng(seed)
    # 19 shared world attributes spread over 6 types; some rare (coverage
    # 0.06) and some format-shifted in KB1 → unrecoverable by value overlap.
    types = [
        TypeSpec("person", _n(680, scale), confusable=0.3, attrs=[
            AttrSpec("birth_year", "date", num_range=(1850, 2000)),
            AttrSpec("gender", "str", vocab=2),
            AttrSpec("height", "num", num_range=(150, 200), coverage=0.3),
            AttrSpec("weight", "num", num_range=(45, 120), coverage=0.035),
        ]),
        TypeSpec("movie", _n(520, scale), confusable=0.3, attrs=[
            AttrSpec("year", "date", num_range=(1950, 2020)),
            AttrSpec("runtime", "num", num_range=(60, 240), coverage=0.7),
            AttrSpec("genre", "str", vocab=15, max_card=2),
        ]),
        TypeSpec("location", _n(500, scale), confusable=0.3, attrs=[
            AttrSpec("population", "num", num_range=(1000, 9_000_000)),
            AttrSpec("area", "num", num_range=(10, 10000), coverage=0.6),
            AttrSpec("elevation", "num", num_range=(0, 4000), coverage=0.06),
        ]),
        TypeSpec("organization", _n(420, scale), confusable=0.3, attrs=[
            AttrSpec("founded", "date", num_range=(1800, 2015)),
            AttrSpec("employees", "num", num_range=(10, 100000), coverage=0.5),
            AttrSpec("revenue", "num", num_range=(1, 5000), coverage=0.06),
        ]),
        TypeSpec("disease", _n(380, scale), confusable=0.3, attrs=[
            AttrSpec("icd10", "str", vocab=400),
            AttrSpec("prevalence", "num", num_range=(1, 1000), coverage=0.5),
            AttrSpec("mortality", "num", num_range=(1, 100), coverage=0.06),
        ]),
        TypeSpec("album", _n(340, scale), confusable=0.3, attrs=[
            AttrSpec("release_year", "date", num_range=(1960, 2020)),
            AttrSpec("tracks", "num", num_range=(5, 30), coverage=0.7),
            AttrSpec("length", "num", num_range=(20, 90), coverage=0.06),
        ]),
    ]
    # Sparse relationship coverage across ALL types: isolation (~60% of
    # matches) is incidental per-entity, like the paper's D-Y, so every
    # attribute-signature group retains some labeled positives for the
    # §VII-B classifier.
    rels = [
        RelSpec("acted_in", "person", "movie", avg_deg=2.0, coverage=0.30),
        RelSpec("directed", "person", "movie", avg_deg=1.2, coverage=0.10),
        RelSpec("born_in", "person", "location", functional=True, coverage=0.30),
        RelSpec("located_in", "location", "location", functional=True, coverage=0.30),
        RelSpec("hq_in", "organization", "location", functional=True, coverage=0.35),
        RelSpec("spouse", "person", "person", functional=True, coverage=0.12),
        RelSpec("subtype_of", "disease", "disease", functional=True, coverage=0.35),
        RelSpec("by_artist", "album", "person", avg_deg=1.1, coverage=0.35),
    ]
    world = generate_world(WorldSpec(types, rels), rng)
    v1 = ViewSpec(
        "dbpedia", entity_coverage=0.85, attr_rename="d_", rel_rename="d_",
        covered_attrs=None,
        n_noise_attrs=24, noise_attr_density=0.15,
        label_token_drop=0.05, label_token_typo=0.08, label_missing=0.05,
        value_typo=0.10, rel_dropout=0.10, attr_dropout=0.04,
        format_shift_attrs={"elevation", "revenue", "mortality", "length"},
        # DBpedia-style synonym attributes (d:birthDate vs d:dateOfBirth):
        # the W/o-1:1 matcher accepts both names → Table IV precision drop
        split_attrs={"birth_year": 1, "year": 1, "population": 1,
                     "founded": 1, "icd10": 1, "release_year": 1},
    )
    v2 = ViewSpec(
        "yago", entity_coverage=0.82, attr_rename="y_", rel_rename="y_",
        covered_attrs=None,
        n_noise_attrs=2, noise_attr_density=0.2,
        label_token_drop=0.05, label_token_typo=0.07, label_missing=0.04,
        value_typo=0.08, rel_dropout=0.10, attr_dropout=0.04,
    )
    return make_pair(world, v1, v2, rng)


PROFILES = {
    "iimb_lite": iimb_lite,
    "da_lite": da_lite,
    "iy_lite": iy_lite,
    "dy_lite": dy_lite,
}
