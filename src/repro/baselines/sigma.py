"""SiGMa baseline (Lacoste-Julien et al., KDD'13 — [29] in the paper).

Simple Greedy Matching: a priority queue seeded with known matches;
each popped pair is accepted if both entities are still free (hard 1:1),
and every accepted match boosts the scores of its graph neighbors —
``score = (1-β)·label_sim + β·relational_score`` where the relational
score accumulates functionality-weighted contributions from already
matched neighbor pairs. Greedy and error-accumulating by design (no
crowd), which is why Table VI shows it degrading on heterogeneous KBs.
"""
from __future__ import annotations

import heapq
from collections import defaultdict

import pandas as pd

Pair = tuple[int, int]


def run_sigma(
    edges: pd.DataFrame,
    retained: pd.DataFrame,
    fun1: dict[str, float],
    fun2: dict[str, float],
    seeds: set[Pair],
    beta: float = 0.6,
    threshold: float = 0.42,
) -> set[Pair]:
    """Predicted matches from seed matches via greedy 1:1 expansion.

    The default threshold sits above the static-only score ceiling
    ``(1-β)·1.0 = 0.4``: like the original SiGMa, a pair is accepted only
    with relational support, so datasets dominated by isolated pairs see
    SiGMa stall near its seeds (the paper's D-Y behaviour in Table VI).
    """
    static = {
        (int(a), int(b)): float(s)
        for a, b, s in zip(retained["e1"], retained["e2"], retained["sim"])
    }
    out_nbrs: dict[Pair, list[tuple[Pair, float]]] = defaultdict(list)
    for s1, s2, r1, r2, d1, d2 in zip(
        edges["src_e1"], edges["src_e2"], edges["r1"], edges["r2"],
        edges["dst_e1"], edges["dst_e2"],
    ):
        # geometric mean keeps multi-valued-but-consistent relations (the
        # D-A authorship case) contributing a usable score
        w = (fun1.get(str(r1), 0.5) * fun2.get(str(r2), 0.5)) ** 0.5
        out_nbrs[(int(s1), int(s2))].append(((int(d1), int(d2)), w))

    rel_score: dict[Pair, float] = defaultdict(float)
    matched1: dict[int, int] = {}
    matched2: dict[int, int] = {}
    matches: set[Pair] = set()

    def score(p: Pair) -> float:
        return (1 - beta) * static.get(p, 0.0) + beta * min(1.0, rel_score[p])

    def accept(p: Pair) -> None:
        matches.add(p)
        matched1[p[0]] = p[1]
        matched2[p[1]] = p[0]
        for q, w in out_nbrs.get(p, ()):
            if q[0] not in matched1 and q[1] not in matched2:
                rel_score[q] += w
                heapq.heappush(heap, (-score(q), q))

    heap: list[tuple[float, Pair]] = []
    for s in seeds:
        if s[0] not in matched1 and s[1] not in matched2:
            accept(s)
    for p, s in static.items():
        heapq.heappush(heap, (-score(p), p))
    while heap:
        neg, p = heapq.heappop(heap)
        if -neg < threshold:
            break
        if p[0] in matched1 or p[1] in matched2:
            continue
        if -neg < score(p) - 1e-12:
            continue  # stale entry, a fresher one is in the heap
        accept(p)
    return matches
