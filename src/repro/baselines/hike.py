"""HIKE baseline (Zhuang et al., CIKM'17 — [12] in the paper).

Hybrid human-machine entity alignment: entities are partitioned by
attribute/relationship signature (hierarchical agglomerative clustering in
the original; here the attribute-presence signature of each pair, which is
what the clustering recovers on KBs with typed schemas), then the
monotonicity/partial-order machinery runs inside each partition. Because
partitions are resolved independently, HIKE asks at least one question per
partition — more total questions than Remp, which propagates across
partitions through relationships.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.power import run_power
from repro.crowd.workers import WorkerPool

Pair = tuple[int, int]


def run_hike(
    retained: pd.DataFrame,
    crowd: WorkerPool,
    grid: float = 0.1,
    max_questions: int = 5000,
) -> tuple[set[Pair], int]:
    """Returns (predicted matches, #questions asked)."""
    # pvec arrives as list or numpy array depending on the Arrow path
    sig = [
        tuple(int(i) for i in (p if p is not None else []))
        for p in retained["pvec"]
    ]
    retained = retained.assign(_sig=sig)
    matches: set[Pair] = set()
    n_q = 0
    for _, part in retained.groupby("_sig", sort=True):
        if n_q >= max_questions:
            break
        m, q = run_power(
            part.drop(columns="_sig").reset_index(drop=True),
            crowd,
            grid=grid,
            max_questions=max_questions - n_q,
        )
        matches |= m
        n_q += q
    return matches, n_q
