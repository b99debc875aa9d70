"""Shape tests for the four dataset profiles (Table II substitutes)."""
import pytest

from repro.kb.profiles import PROFILES, da_lite, dy_lite, iimb_lite, iy_lite


@pytest.mark.parametrize("name", list(PROFILES))
def test_deterministic(name):
    p1 = PROFILES[name](seed=0, scale=0.2)
    p2 = PROFILES[name](seed=0, scale=0.2)
    assert p1.kb1.entities.equals(p2.kb1.entities)
    assert p1.gold_matches.equals(p2.gold_matches)


@pytest.mark.parametrize("name", list(PROFILES))
def test_gold_valid(name):
    p = PROFILES[name](seed=0, scale=0.2)
    e1 = set(p.kb1.entities["eid"])
    e2 = set(p.kb2.entities["eid"])
    assert all(a in e1 and b in e2 for a, b in p.gold_set())


@pytest.mark.parametrize("name", list(PROFILES))
def test_scale_shrinks(name):
    small = PROFILES[name](seed=0, scale=0.2)
    big = PROFILES[name](seed=0, scale=1.0)
    assert len(small.kb1.entities) < len(big.kb1.entities)


def test_iimb_shape():
    p = iimb_lite(seed=0)
    s = p.stats()
    assert s["entities"] == (365, 365)
    assert s["attributes"] == (12, 12)
    assert s["relationships"] == (15, 15)
    assert s["matches"] == 365


def test_da_single_relationship():
    p = da_lite(seed=0)
    assert len(p.kb1.rels) == 1 and len(p.kb2.rels) == 1
    # DBLP side is the smaller one
    assert len(p.kb1.entities) < len(p.kb2.entities)


def test_iy_asymmetric_schema():
    p = iy_lite(seed=0)
    assert len(p.kb1.attrs) < len(p.kb2.attrs)
    assert len(p.kb1.rels) < len(p.kb2.rels)
    assert len(p.gold_attr_matches) == 4  # paper Table IV I-Y row


def test_dy_many_vs_few_attrs():
    p = dy_lite(seed=0)
    assert len(p.kb1.attrs) > 2 * len(p.kb2.attrs)
    assert len(p.gold_attr_matches) == 19  # paper Table IV D-Y row


def test_dy_unlabeled_entities():
    p = dy_lite(seed=0)
    assert p.kb1.entities["label"].isna().mean() > 0.02


@pytest.mark.parametrize(
    "fn,lo,hi",
    [(iimb_lite, 0.0, 0.05), (da_lite, 0.0, 0.05), (iy_lite, 0.15, 0.45), (dy_lite, 0.45, 0.75)],
)
def test_isolation_shares(fn, lo, hi):
    """Isolated-match proportions follow the paper's ordering
    (IIMB 0.3% < D-A 0.4% < I-Y 28.1% < D-Y 60.4%)."""
    p = fn(seed=0, scale=1.0)
    gold = p.gold_set()
    r1 = set(p.kb1.rel_triples["src"]) | set(p.kb1.rel_triples["dst"])
    r2 = set(p.kb2.rel_triples["src"]) | set(p.kb2.rel_triples["dst"])
    iso = sum(1 for (a, b) in gold if a not in r1 or b not in r2) / len(gold)
    assert lo <= iso <= hi
