"""Multiple questions selection (paper §VI, Algorithm 3).

``benefit(Q) = Σ_p Pr[p ∈ inferred(H) | Q]`` with
``Pr[p ∈ inferred(H)|Q] = 1 − Π_{q∈Q: p∈inferred(q)} (1 − Pr[m_q])``
(Eq. 15–16). The function is increasing and submodular (Theorem 2), so the
(1−1/e)-greedy applies; we implement the lazy-evaluation variant of
Algorithm 3 with a priority queue of stale marginal gains.

Also provides the two baseline selectors of §VIII-B: MaxInf (largest
inferred set) and MaxPr (largest prior match probability).
"""
from __future__ import annotations

import heapq

Pair = tuple[int, int]


def marginal_gain(
    q: Pair,
    inferred_q: dict[Pair, float],
    priors: dict[Pair, float],
    covered: dict[Pair, float],
) -> float:
    """Δbenefit of adding q given current coverage probabilities b_p."""
    pq = priors.get(q, 0.0)
    return sum((1.0 - covered.get(p, 0.0)) * pq for p in inferred_q)


def select_questions(
    inferred: dict[Pair, dict[Pair, float]],
    priors: dict[Pair, float],
    mu: int,
) -> list[Pair]:
    """Algorithm 3: lazy-greedy selection of up to μ questions.

    ``inferred[q]`` maps each pair inferable from q to its path
    probability (q itself included). Stops early when no remaining
    question has positive marginal gain.
    """
    covered: dict[Pair, float] = {}
    # heap of (-stale_gain, tiebreak, q); gains only ever shrink
    heap = [
        (-marginal_gain(q, inf, priors, covered), i, q)
        for i, (q, inf) in enumerate(inferred.items())
    ]
    heapq.heapify(heap)
    selected: list[Pair] = []
    while heap and len(selected) < mu:
        neg_gain, i, q = heapq.heappop(heap)
        fresh = marginal_gain(q, inferred[q], priors, covered)
        if fresh <= 0:
            continue
        if heap and fresh < -heap[0][0] - 1e-12:
            heapq.heappush(heap, (-fresh, i, q))
            continue
        selected.append(q)
        pq = priors.get(q, 0.0)
        for p in inferred[q]:
            covered[p] = covered.get(p, 0.0) + (1.0 - covered.get(p, 0.0)) * pq
    return selected


def select_max_inf(
    inferred: dict[Pair, dict[Pair, float]], unresolved: set[Pair], mu: int
) -> list[Pair]:
    """MaxInf baseline: μ questions with the largest unresolved inferred sets."""
    ranked = sorted(
        inferred.items(),
        key=lambda kv: (-len(set(kv[1]) & unresolved), kv[0]),
    )
    return [q for q, inf in ranked[:mu] if len(set(inf) & unresolved) > 0]


def select_max_pr(
    priors: dict[Pair, float], unresolved: set[Pair], mu: int
) -> list[Pair]:
    """MaxPr baseline: μ unresolved questions with the highest prior."""
    ranked = sorted(
        (q for q in unresolved if q in priors),
        key=lambda q: (-priors[q], q),
    )
    return ranked[:mu]
