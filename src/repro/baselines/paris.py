"""PARIS baseline (Suchanek et al., VLDB'11 — [28] in the paper).

Probabilistic alignment without crowdsourcing: match probabilities are
propagated iteratively through relationship triples, weighted by
relationship *functionality* — a functional relation pair transfers a
subject match to its objects almost deterministically, a multi-valued one
only weakly. Our ER-graph edge set already contains both directions
(explicit inverses, ``~r``), so a single forward sweep with
``w(r1,r2) = fun(r1)·fun(r2)`` covers PARIS's subject→object and
object→subject evidence (the functionality of ``~r`` is the inverse
functionality of ``r``). PARIS-lite simplifications are documented in
DESIGN.md §2.
"""
from __future__ import annotations

from collections import defaultdict

import pandas as pd

Pair = tuple[int, int]


def functionalities(rel_triples: pd.DataFrame) -> dict[str, float]:
    """fun(r) = #distinct subjects / #triples (1.0 ⇔ functional)."""
    out: dict[str, float] = {}
    for r, g in rel_triples.groupby("rel"):
        out[str(r)] = g["src"].nunique() / len(g)
    return out


def run_paris(
    edges: pd.DataFrame,
    retained: pd.DataFrame,
    fun1: dict[str, float],
    fun2: dict[str, float],
    seeds: set[Pair],
    iters: int = 15,
    base_weight: float = 0.3,
    threshold: float = 0.5,
) -> set[Pair]:
    """Predicted matches from seed matches via functionality propagation.

    ``edges`` is the ER-graph edge list (with inverse rels included);
    ``retained`` provides label-similarity priors as literal evidence.
    """
    prior = {
        (int(a), int(b)): base_weight * float(s)
        for a, b, s in zip(retained["e1"], retained["e2"], retained["sim"])
    }
    incoming: dict[Pair, list[tuple[Pair, float]]] = defaultdict(list)
    for s1, s2, r1, r2, d1, d2 in zip(
        edges["src_e1"], edges["src_e2"], edges["r1"], edges["r2"],
        edges["dst_e1"], edges["dst_e2"],
    ):
        w = fun1.get(str(r1), 0.5) * fun2.get(str(r2), 0.5)
        incoming[(int(d1), int(d2))].append(((int(s1), int(s2)), w))

    prob = {p: 0.0 for p in prior}
    for s in seeds:
        prob[s] = 1.0
    for _ in range(iters):
        new = {}
        for p in prob:
            if p in seeds:
                new[p] = 1.0
                continue
            keep = 1.0 - prior.get(p, 0.0)
            for q, w in incoming.get(p, ()):  # evidence from matched neighbors
                keep *= 1.0 - w * prob.get(q, 0.0)
            new[p] = 1.0 - keep
        prob = new

    # PARIS keeps, per subject entity, the best-scoring counterpart
    best1: dict[int, tuple[float, Pair]] = {}
    best2: dict[int, tuple[float, Pair]] = {}
    for p, pr in prob.items():
        if pr < threshold:
            continue
        if p[0] not in best1 or pr > best1[p[0]][0]:
            best1[p[0]] = (pr, p)
        if p[1] not in best2 or pr > best2[p[1]][0]:
            best2[p[1]] = (pr, p)
    return {p for _, p in best1.values()} & {p for _, p in best2.values()} | set(seeds)
