"""Synthetic KB-pair generator.

The paper evaluates on public KB dumps (IIMB, DBLP-ACM, IMDB-YAGO,
DBpedia-YAGO) that are unavailable offline, so we generate *pairs of views
of a shared world* (DESIGN.md §4): a typed world of objects with labels,
attribute values and relationship triples is sampled once, then each KB is
an independent view with its own entity coverage, schema coverage +
renaming, label/value noise, triple dropout and unlabeled-entity
injection. Objects present in both views form the gold entity matches;
world attributes covered by both schemas form the gold attribute matches.

Everything is deterministic in the seed (one numpy Generator threaded
through all sampling).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kb.model import KB, KBPair

# eids of KB2 are offset so accidental cross-KB id equality cannot mask a
# join bug in the pipeline.
ID_OFFSET = 1_000_000


@dataclass
class AttrSpec:
    """A world attribute: string-valued (vocab tokens), numeric, or date.

    Dates render as "YYYY-MM-DD" strings, which the pipeline's literal
    similarity tokenizes — pct-difference on bare years is a useless
    discriminator (1950 vs 1980 → 0.985), matching how real KBs store
    dates as structured literals.
    """

    name: str
    kind: str = "str"  # "str" | "num" | "date"
    vocab: int = 200  # distinct base values (str kind)
    max_card: int = 1  # values per object (1 = single-valued)
    coverage: float = 1.0  # probability an object carries this attribute
    num_range: tuple[int, int] = (1900, 2020)
    value_tokens: int = 1  # tokens per string value


@dataclass
class TypeSpec:
    """An entity type: how many objects, their label shape, their attrs."""

    name: str
    n_objects: int
    attrs: list[AttrSpec] = field(default_factory=list)
    label_tokens: tuple[int, int] = (2, 3)
    label_vocab: int = 0  # 0 → 3 * n_objects (mostly-unique labels)
    # Fraction of objects whose label is derived from another same-type
    # object's label plus one distinguishing token (sequels, namesakes,
    # "John Smith Jr."). Confusable clusters create non-match candidate
    # pairs with HIGH label similarity — the regime where literal-only
    # monotone methods err and relational propagation pays off (the
    # paper's Joan/John example in Fig. 1).
    confusable: float = 0.0


@dataclass
class RelSpec:
    """A world relationship with typed domain/range.

    ``functional=True`` gives out-degree exactly 1 (strong propagation
    evidence, like wasBornIn); otherwise out-degree ~ 1+Poisson(avg_deg-1)
    (multi-valued, like actedIn). ``coverage`` is the fraction of source
    objects that participate at all — the lever for isolated entities.
    """

    name: str
    src_type: str
    dst_type: str
    functional: bool = False
    avg_deg: float = 2.0
    coverage: float = 1.0


@dataclass
class WorldSpec:
    types: list[TypeSpec]
    rels: list[RelSpec]


@dataclass
class ViewSpec:
    """How one KB views the world (noise + schema heterogeneity knobs)."""

    name: str
    entity_coverage: float = 1.0
    # When set, coverage sampling applies only to these types; objects of
    # other types are included iff they share a world relationship triple
    # with an included seed object (bibliographic-style correlated views:
    # an author exists in DBLP only because one of its papers does).
    seed_types: set[str] | None = None
    attr_rename: str = ""  # prefix for attribute names ("" = world names)
    rel_rename: str = ""  # prefix for relationship names
    covered_attrs: set[str] | None = None  # None = all world attrs
    covered_rels: set[str] | None = None  # None = all world rels
    n_noise_attrs: int = 0  # per-KB junk attributes (unmatchable)
    noise_attr_density: float = 0.2
    label_token_drop: float = 0.0
    label_token_typo: float = 0.0
    label_missing: float = 0.0
    value_typo: float = 0.0
    attr_dropout: float = 0.0
    rel_dropout: float = 0.0
    format_shift_attrs: set[str] = field(default_factory=set)  # numeric rescale
    # world attr → #synonym names: this KB splits the attribute's triples
    # across synonymous names (DBpedia's d:birthDate vs d:dateOfBirth);
    # ~70% stay on the canonical name. Synonyms confuse the un-constrained
    # attribute matcher — the paper's "W/o 1:1" precision collapse.
    split_attrs: dict[str, int] = field(default_factory=dict)


@dataclass
class World:
    spec: WorldSpec
    objects: pd.DataFrame  # oid, otype, label (token-joined)
    attr_values: pd.DataFrame  # oid, attr, value
    rel_triples: pd.DataFrame  # src, rel, dst


def generate_world(spec: WorldSpec, rng: np.random.Generator) -> World:
    """Sample the shared world: objects, labels, attribute values, triples."""
    obj_rows: list[tuple[int, str, str]] = []
    attr_rows: list[tuple[int, str, str]] = []
    attrs_by_oid: dict[int, list[tuple[str, str]]] = {}
    oid = 0
    oids_by_type: dict[str, list[int]] = {}
    for ts in spec.types:
        vocab = ts.label_vocab or 3 * ts.n_objects
        toks_per = rng.integers(ts.label_tokens[0], ts.label_tokens[1] + 1, ts.n_objects)
        n_common = max(4, vocab // 40)
        for i in range(ts.n_objects):
            # Mixture token draw: ~20% "common" tokens shared across objects
            # (ambiguity → candidate non-matches, bounded hub size) and ~80%
            # near-unique tokens (resolvability).
            k = int(toks_per[i])
            common = rng.random(k) < 0.2
            tok_ids = np.where(
                common,
                rng.integers(0, n_common, size=k),
                rng.integers(n_common, max(n_common + 1, vocab), size=k),
            )
            label = " ".join(f"{ts.name}t{t}" for t in tok_ids)
            prior_in_type = len(oids_by_type.get(ts.name, []))
            base_oid = -1
            if ts.confusable > 0 and prior_in_type > 0 and rng.random() < ts.confusable:
                # derive from an earlier same-type object's label + one
                # distinguishing token (obj_rows is indexed by oid); a
                # sequel/namesake also shares most attribute values with
                # its base, so literal evidence alone cannot separate them
                base_oid = oids_by_type[ts.name][int(rng.integers(0, prior_in_type))]
                label = f"{obj_rows[base_oid][2]} {ts.name}x{i}"
            obj_rows.append((oid, ts.name, label))
            oids_by_type.setdefault(ts.name, []).append(oid)
            if base_oid >= 0:
                mine: list[tuple[str, str]] = []
                for a, v in attrs_by_oid.get(base_oid, []):
                    if rng.random() < 0.35:  # copy base's value
                        attr_rows.append((oid, a, v))
                        mine.append((a, v))
                attrs_by_oid[oid] = mine
                oid += 1
                continue
            attrs_by_oid[oid] = []
            for a in ts.attrs:
                if rng.random() > a.coverage:
                    continue
                card = int(rng.integers(1, a.max_card + 1))
                for _ in range(card):
                    if a.kind == "num":
                        v = str(int(rng.integers(a.num_range[0], a.num_range[1] + 1)))
                    elif a.kind == "date":
                        y = int(rng.integers(a.num_range[0], a.num_range[1] + 1))
                        v = f"{y}-{int(rng.integers(1, 13)):02d}-{int(rng.integers(1, 29)):02d}"
                    else:
                        vt = rng.integers(0, a.vocab, size=a.value_tokens)
                        v = " ".join(f"{a.name}v{x}" for x in vt)
                    attr_rows.append((oid, a.name, v))
                    attrs_by_oid[oid].append((a.name, v))
            oid += 1
    rel_rows: list[tuple[int, str, int]] = []
    for rs in spec.rels:
        srcs = oids_by_type.get(rs.src_type, [])
        dsts = np.array(oids_by_type.get(rs.dst_type, []))
        if len(dsts) == 0:
            continue
        for s in srcs:
            if rng.random() > rs.coverage:
                continue
            deg = 1 if rs.functional else 1 + rng.poisson(max(0.0, rs.avg_deg - 1))
            targets = rng.choice(dsts, size=min(deg, len(dsts)), replace=False)
            for d in targets:
                if d != s:
                    rel_rows.append((s, rs.name, int(d)))
    return World(
        spec=spec,
        objects=pd.DataFrame(obj_rows, columns=["oid", "otype", "label"]),
        attr_values=pd.DataFrame(attr_rows, columns=["oid", "attr", "value"]).drop_duplicates(),
        rel_triples=pd.DataFrame(rel_rows, columns=["src", "rel", "dst"]).drop_duplicates(),
    )


def _perturb_label(label: str, vs: ViewSpec, rng: np.random.Generator) -> str | None:
    if rng.random() < vs.label_missing:
        return None
    toks = label.split()
    out = []
    for t in toks:
        r = rng.random()
        if r < vs.label_token_drop and len(toks) > 1:
            continue
        if r < vs.label_token_drop + vs.label_token_typo:
            out.append(t + "x")
        else:
            out.append(t)
    return " ".join(out) if out else label  # never fully empty unless missing


def _perturb_value(value: str, attr_kind_num: bool, vs: ViewSpec, rng: np.random.Generator) -> str:
    if rng.random() >= vs.value_typo:
        return value
    if attr_kind_num:
        try:
            x = float(value)
            return str(int(x * (1 + rng.uniform(-0.03, 0.03))))
        except ValueError:
            pass
    toks = value.split()
    i = int(rng.integers(0, len(toks)))
    toks[i] = toks[i] + "q"
    return " ".join(toks)


def make_view(
    world: World, vs: ViewSpec, rng: np.random.Generator, id_offset: int = 0
) -> tuple[KB, np.ndarray]:
    """Materialize one KB view; returns (KB, included world oids)."""
    num_attrs = {a.name for ts in world.spec.types for a in ts.attrs if a.kind == "num"}
    n = len(world.objects)
    if vs.seed_types is None:
        included_mask = rng.random(n) < vs.entity_coverage
        included = world.objects.loc[included_mask, "oid"].to_numpy()
        inc_set = set(int(o) for o in included)
    else:
        is_seed = world.objects["otype"].isin(vs.seed_types).to_numpy()
        included_mask = is_seed & (rng.random(n) < vs.entity_coverage)
        inc_set = set(int(o) for o in world.objects.loc[included_mask, "oid"])
        rt_all = world.rel_triples
        nbrs = set(rt_all.loc[rt_all["src"].isin(inc_set), "dst"]) | set(
            rt_all.loc[rt_all["dst"].isin(inc_set), "src"]
        )
        non_seed = set(world.objects.loc[~is_seed, "oid"])
        inc_set |= {int(o) for o in nbrs & non_seed}
        included = np.array(sorted(inc_set))

    ents = world.objects[world.objects["oid"].isin(inc_set)].copy()
    ents["label"] = [_perturb_label(l, vs, rng) for l in ents["label"]]
    ents["eid"] = ents["oid"] + id_offset
    entities = ents[["eid", "label", "otype"]].rename(columns={"otype": "etype"})

    cov_attrs = vs.covered_attrs
    av = world.attr_values
    av = av[av["oid"].isin(inc_set)]
    if cov_attrs is not None:
        av = av[av["attr"].isin(cov_attrs)]
    if vs.attr_dropout > 0:
        av = av[rng.random(len(av)) >= vs.attr_dropout]
    values = []
    names = []
    for attr, value in zip(av["attr"], av["value"]):
        if attr in vs.format_shift_attrs and attr in num_attrs:
            # deterministic per-KB unit shift → values "dramatically
            # different" across KBs (the paper's icd10 case)
            values.append(str(int(float(value)) * 37 + 11))
        else:
            values.append(_perturb_value(value, attr in num_attrs, vs, rng))
        n_syn = vs.split_attrs.get(attr, 0)
        if n_syn > 0 and rng.random() > 0.7:
            names.append(f"{vs.attr_rename}{attr}_syn{int(rng.integers(0, n_syn))}")
        else:
            names.append(vs.attr_rename + attr)
    attr_triples = pd.DataFrame(
        {
            "eid": av["oid"].to_numpy() + id_offset,
            "attr": names,
            "value": values,
        }
    )
    # Per-KB junk attributes that exist in no gold attribute match.
    noise_rows = []
    for j in range(vs.n_noise_attrs):
        name = f"{vs.name}_noise{j}"
        pick = included[rng.random(len(included)) < vs.noise_attr_density]
        for o in pick:
            noise_rows.append((int(o) + id_offset, name, f"{name}v{int(rng.integers(0, 50))}"))
    if noise_rows:
        attr_triples = pd.concat(
            [attr_triples, pd.DataFrame(noise_rows, columns=["eid", "attr", "value"])],
            ignore_index=True,
        )

    rt = world.rel_triples
    rt = rt[rt["src"].isin(inc_set) & rt["dst"].isin(inc_set)]
    if vs.covered_rels is not None:
        rt = rt[rt["rel"].isin(vs.covered_rels)]
    if vs.rel_dropout > 0:
        rt = rt[rng.random(len(rt)) >= vs.rel_dropout]
    rel_triples = pd.DataFrame(
        {
            "src": rt["src"].to_numpy() + id_offset,
            "rel": [vs.rel_rename + r for r in rt["rel"]],
            "dst": rt["dst"].to_numpy() + id_offset,
        }
    )
    kb = KB(
        name=vs.name,
        entities=entities.reset_index(drop=True),
        attr_triples=attr_triples.reset_index(drop=True),
        rel_triples=rel_triples.reset_index(drop=True),
    )
    return kb, included


def make_pair(
    world: World, vs1: ViewSpec, vs2: ViewSpec, rng: np.random.Generator
) -> KBPair:
    """Build the KB pair plus gold entity/attribute matches."""
    kb1, inc1 = make_view(world, vs1, rng, id_offset=0)
    kb2, inc2 = make_view(world, vs2, rng, id_offset=ID_OFFSET)
    common = np.intersect1d(inc1, inc2)
    gold_matches = pd.DataFrame({"e1": common, "e2": common + ID_OFFSET})

    world_attrs = {a.name for ts in world.spec.types for a in ts.attrs}
    a1_cov = world_attrs if vs1.covered_attrs is None else world_attrs & vs1.covered_attrs
    a2_cov = world_attrs if vs2.covered_attrs is None else world_attrs & vs2.covered_attrs
    shared = sorted(a1_cov & a2_cov)
    gold_attr_matches = pd.DataFrame(
        {"a1": [vs1.attr_rename + a for a in shared], "a2": [vs2.attr_rename + a for a in shared]}
    )
    return KBPair(kb1=kb1, kb2=kb2, gold_matches=gold_matches, gold_attr_matches=gold_attr_matches)
