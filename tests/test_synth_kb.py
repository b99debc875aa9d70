"""Tests for the synthetic KB-pair generator."""
import numpy as np
import pandas as pd
import pytest

from repro.kb.synth_kb import (
    ID_OFFSET,
    AttrSpec,
    RelSpec,
    TypeSpec,
    ViewSpec,
    WorldSpec,
    generate_world,
    make_pair,
    make_view,
)


def tiny_world(seed=0):
    spec = WorldSpec(
        types=[
            TypeSpec("person", 40, [
                AttrSpec("byear", "date", num_range=(1950, 2000)),
                AttrSpec("tag", "str", vocab=10),
            ]),
            TypeSpec("city", 15, [AttrSpec("pop", "num", num_range=(1000, 100000))]),
        ],
        rels=[
            RelSpec("born_in", "person", "city", functional=True, coverage=0.9),
            RelSpec("knows", "person", "person", avg_deg=2.0, coverage=0.5),
        ],
    )
    return generate_world(spec, np.random.default_rng(seed))


class TestGenerateWorld:
    def test_object_counts(self):
        w = tiny_world()
        assert len(w.objects) == 55
        assert set(w.objects["otype"]) == {"person", "city"}

    def test_deterministic(self):
        w1, w2 = tiny_world(3), tiny_world(3)
        pd.testing.assert_frame_equal(w1.objects, w2.objects)
        pd.testing.assert_frame_equal(w1.rel_triples, w2.rel_triples)

    def test_seed_changes_world(self):
        assert not tiny_world(1).objects.equals(tiny_world(2).objects)

    def test_functional_rel_outdegree_one(self):
        w = tiny_world()
        bi = w.rel_triples[w.rel_triples["rel"] == "born_in"]
        assert bi.groupby("src").size().max() == 1

    def test_rel_types_respected(self):
        w = tiny_world()
        persons = set(w.objects[w.objects["otype"] == "person"]["oid"])
        cities = set(w.objects[w.objects["otype"] == "city"]["oid"])
        bi = w.rel_triples[w.rel_triples["rel"] == "born_in"]
        assert set(bi["src"]) <= persons and set(bi["dst"]) <= cities

    def test_date_values_format(self):
        w = tiny_world()
        vals = w.attr_values[w.attr_values["attr"] == "byear"]["value"]
        assert all(len(v.split("-")) == 3 for v in vals)

    def test_no_self_loops(self):
        w = tiny_world()
        assert (w.rel_triples["src"] != w.rel_triples["dst"]).all()

    def test_labels_nonempty(self):
        w = tiny_world()
        assert w.objects["label"].str.len().min() > 0


class TestMakeView:
    def test_full_coverage_keeps_all(self):
        w = tiny_world()
        kb, inc = make_view(w, ViewSpec("v"), np.random.default_rng(0))
        assert len(kb.entities) == len(w.objects)
        assert len(inc) == len(w.objects)

    def test_partial_coverage(self):
        w = tiny_world()
        kb, _ = make_view(w, ViewSpec("v", entity_coverage=0.5), np.random.default_rng(0))
        assert 10 < len(kb.entities) < 45

    def test_id_offset_applied(self):
        w = tiny_world()
        kb, _ = make_view(w, ViewSpec("v"), np.random.default_rng(0), id_offset=ID_OFFSET)
        assert kb.entities["eid"].min() >= ID_OFFSET

    def test_attr_rename(self):
        w = tiny_world()
        kb, _ = make_view(w, ViewSpec("v", attr_rename="x_"), np.random.default_rng(0))
        assert all(a.startswith("x_") for a in kb.attrs)

    def test_covered_attrs_filter(self):
        w = tiny_world()
        kb, _ = make_view(
            w, ViewSpec("v", covered_attrs={"pop"}), np.random.default_rng(0)
        )
        assert kb.attrs == ["pop"]

    def test_noise_attrs_added(self):
        w = tiny_world()
        kb, _ = make_view(
            w, ViewSpec("v", n_noise_attrs=2, noise_attr_density=0.5),
            np.random.default_rng(0),
        )
        assert sum(1 for a in kb.attrs if "noise" in a) == 2

    def test_label_missing(self):
        w = tiny_world()
        kb, _ = make_view(
            w, ViewSpec("v", label_missing=0.5), np.random.default_rng(0)
        )
        frac = kb.entities["label"].isna().mean()
        assert 0.3 < frac < 0.7

    def test_rel_dropout(self):
        w = tiny_world()
        kb_full, _ = make_view(w, ViewSpec("v"), np.random.default_rng(0))
        kb_drop, _ = make_view(
            w, ViewSpec("v", rel_dropout=0.5), np.random.default_rng(0)
        )
        assert len(kb_drop.rel_triples) < len(kb_full.rel_triples)

    def test_rel_endpoints_included(self):
        w = tiny_world()
        kb, inc = make_view(
            w, ViewSpec("v", entity_coverage=0.6), np.random.default_rng(0)
        )
        eids = set(kb.entities["eid"])
        assert set(kb.rel_triples["src"]) <= eids
        assert set(kb.rel_triples["dst"]) <= eids

    def test_seed_types_closure(self):
        w = tiny_world()
        kb, _ = make_view(
            w,
            ViewSpec("v", entity_coverage=0.5, seed_types={"person"}),
            np.random.default_rng(0),
        )
        # every included city must touch an included person via born_in
        cities = set(kb.entities[kb.entities["etype"] == "city"]["eid"])
        linked = set(kb.rel_triples[kb.rel_triples["rel"] == "born_in"]["dst"])
        w_bi = w.rel_triples[w.rel_triples["rel"] == "born_in"]
        persons = set(kb.entities[kb.entities["etype"] == "person"]["eid"])
        reachable = set(w_bi[w_bi["src"].isin(persons)]["dst"])
        assert cities <= reachable

    def test_format_shift_changes_values(self):
        w = tiny_world()
        plain, _ = make_view(w, ViewSpec("v"), np.random.default_rng(0))
        shifted, _ = make_view(
            w, ViewSpec("v", format_shift_attrs={"pop"}), np.random.default_rng(0)
        )
        v0 = set(plain.attr_triples[plain.attr_triples["attr"] == "pop"]["value"])
        v1 = set(shifted.attr_triples[shifted.attr_triples["attr"] == "pop"]["value"])
        assert v0.isdisjoint(v1)


class TestMakePair:
    def test_gold_matches_are_shared_objects(self):
        w = tiny_world()
        pair = make_pair(
            w, ViewSpec("a", entity_coverage=0.8), ViewSpec("b", entity_coverage=0.8),
            np.random.default_rng(0),
        )
        e1 = set(pair.kb1.entities["eid"])
        e2 = set(pair.kb2.entities["eid"])
        for a, b in pair.gold_set():
            assert a in e1 and b in e2
            assert b - a == ID_OFFSET  # same world object

    def test_gold_attr_matches_shared_schema(self):
        w = tiny_world()
        pair = make_pair(
            w,
            ViewSpec("a", attr_rename="a_", covered_attrs={"byear", "tag"}),
            ViewSpec("b", attr_rename="b_", covered_attrs={"byear"}),
            np.random.default_rng(0),
        )
        assert set(zip(pair.gold_attr_matches["a1"], pair.gold_attr_matches["a2"])) == {
            ("a_byear", "b_byear")
        }

    def test_stats_shape(self):
        w = tiny_world()
        pair = make_pair(w, ViewSpec("a"), ViewSpec("b"), np.random.default_rng(0))
        s = pair.stats()
        assert s["matches"] == len(pair.gold_matches)
        assert s["entities"][0] == len(pair.kb1.entities)
