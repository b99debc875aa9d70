"""Rectangular linear-assignment solver (Hungarian / Jonker-Volgenant style).

The paper solves the global 1:1 attribute-matching constraint with the
Hungarian algorithm (§IV-C). scipy is not available in this container, so
we implement the O(n³) shortest-augmenting-path variant over a dense cost
matrix in pure numpy, plus a similarity-maximizing wrapper with a minimum
score threshold. Verified against brute-force enumeration in the tests.
"""
from __future__ import annotations

import numpy as np


def linear_sum_assignment(cost: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Minimum-cost assignment of a (possibly rectangular) cost matrix.

    Returns ``(row_idx, col_idx)`` like ``scipy.optimize.linear_sum_assignment``:
    every row of the smaller dimension is assigned to a distinct column.
    """
    cost = np.asarray(cost, dtype=float)
    if cost.ndim != 2:
        raise ValueError("cost must be 2-D")
    transposed = cost.shape[0] > cost.shape[1]
    if transposed:
        cost = cost.T
    n, m = cost.shape  # n <= m
    # Shortest-augmenting-path with potentials (u for rows, v for cols).
    INF = np.inf
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    # way[j] = previous column on the alternating path; p[j] = row matched to col j
    p = np.full(m + 1, n, dtype=int)  # sentinel row n
    for i in range(n):
        p[m] = i
        j0 = m  # virtual start column
        minv = np.full(m + 1, INF)
        used = np.zeros(m + 1, dtype=bool)
        way = np.full(m + 1, m, dtype=int)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta = INF
            j1 = -1
            cur = cost[i0, :] - u[i0] - v[:m]
            better = (~used[:m]) & (cur < minv[:m])
            minv[:m][better] = cur[better]
            way[:m][better] = j0
            free = ~used[:m]
            if free.any():
                j1 = int(np.argmin(np.where(free, minv[:m], INF)))
                delta = minv[j1]
            if not np.isfinite(delta):
                raise RuntimeError("assignment infeasible (non-finite costs)")
            u[p[used]] += delta
            v[used] -= delta
            minv[:m][~used[:m]] -= delta
            j0 = j1
            if p[j0] == n:
                break
        # augment along the alternating path
        while j0 != m:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    rows = np.empty(n, dtype=int)
    cols = np.empty(n, dtype=int)
    k = 0
    for j in range(m):
        if p[j] != n:
            rows[k] = p[j]
            cols[k] = j
            k += 1
    order = np.argsort(rows)
    rows, cols = rows[order], cols[order]
    if transposed:
        return cols, rows
    return rows, cols


def max_similarity_matching(
    sim: np.ndarray, min_sim: float = 0.0
) -> list[tuple[int, int]]:
    """1:1 matching maximizing total similarity, keeping pairs ≥ ``min_sim``.

    This is the paper's global 1:1 attribute-matching selection: rows are
    attributes of KB1, columns attributes of KB2, entries are sim_A.
    """
    sim = np.asarray(sim, dtype=float)
    if sim.size == 0:
        return []
    rows, cols = linear_sum_assignment(-sim)
    return [
        (int(r), int(c)) for r, c in zip(rows, cols) if sim[r, c] >= min_sim
    ]
