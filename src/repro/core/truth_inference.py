"""Error-tolerant truth inference (paper §VII-A).

Each question is labeled by several workers; worker w's quality λ_w is the
probability that w labels correctly (worker probability model). The
posterior match probability of Eq. 17 combines the prior with the labels;
two thresholds split questions into matches (≥ hi), non-matches (≤ lo)
and *hard* questions, whose prior is replaced by the posterior so their
benefit shrinks and they are less likely to be re-asked.
"""
from __future__ import annotations

from dataclasses import dataclass, field

Pair = tuple[int, int]

HI_THRESHOLD = 0.8
LO_THRESHOLD = 0.2


def posterior_match_prob(prior: float, votes: list[tuple[float, bool]]) -> float:
    """Eq. 17: posterior Pr[m_q | W_T, W_F].

    ``votes`` is a list of (worker quality λ, vote) with vote=True meaning
    "labeled as a match". Computed in odds form for numerical stability.
    """
    prior = min(max(prior, 1e-9), 1 - 1e-9)
    # Pr[m]/(Pr[m] + Pr[¬m]·Π_{W_T} (1-λ)/λ · Π_{W_F} λ/(1-λ))
    ratio = (1 - prior) / prior
    for lam, vote in votes:
        lam = min(max(lam, 1e-9), 1 - 1e-9)
        ratio *= (1 - lam) / lam if vote else lam / (1 - lam)
    return 1.0 / (1.0 + ratio)


@dataclass
class TruthResult:
    matches: set[Pair] = field(default_factory=set)
    non_matches: set[Pair] = field(default_factory=set)
    hard: dict[Pair, float] = field(default_factory=dict)  # pair -> new prior


def infer_truths(
    votes_per_q: dict[Pair, list[tuple[float, bool]]],
    priors: dict[Pair, float],
    hi: float = HI_THRESHOLD,
    lo: float = LO_THRESHOLD,
) -> TruthResult:
    """Split labeled questions into matches / non-matches / hard ones."""
    out = TruthResult()
    for q, votes in votes_per_q.items():
        post = posterior_match_prob(priors.get(q, 0.5), votes)
        if post >= hi:
            out.matches.add(q)
        elif post <= lo:
            out.non_matches.add(q)
        else:
            out.hard[q] = post
    return out
