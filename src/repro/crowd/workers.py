"""Simulated crowdsourcing platform (DESIGN.md §2, §5.6).

The paper runs two worker regimes:

- *real workers* (Table III): MTurk workers with ≥95% approval; we draw
  per-worker quality λ from a Beta distribution with mean ≈0.93 and
  assign each question to ``n_per_question`` distinct workers;
- *simulated workers* (Fig. 3): every worker errs with a fixed error
  rate (0.05 / 0.15 / 0.25), i.e. λ = 1 − error_rate;
- *perfect oracle* (Tables VI/VII internal experiments: "use ground
  truths as labels").

Labels are cached per question so that, like in the paper ("we reuse the
label to each question for all approaches"), every approach asked about
the same pair observes the same worker votes — share one pool across the
approaches being compared.
"""
from __future__ import annotations

import numpy as np

Pair = tuple[int, int]
Votes = list[tuple[float, bool]]  # (worker quality λ, voted-match?)


class WorkerPool:
    """A pool of simulated workers with a shared per-question label cache."""

    def __init__(
        self,
        gold: set[Pair],
        n_workers: int = 200,
        seed: int = 0,
        error_rate: float | None = None,
        beta: tuple[float, float] = (28.0, 2.0),
        n_per_question: int = 5,
    ):
        self.gold = gold
        self.rng = np.random.default_rng(seed)
        if error_rate is not None:
            self.qualities = np.full(n_workers, 1.0 - error_rate)
        else:
            self.qualities = self.rng.beta(beta[0], beta[1], size=n_workers)
        self.n_per_question = n_per_question
        self._cache: dict[Pair, Votes] = {}
        self.questions_asked = 0  # distinct questions actually labeled

    def ask(self, q: Pair) -> Votes:
        """Votes of ``n_per_question`` workers on q (cached per question)."""
        if q in self._cache:
            return self._cache[q]
        truth = q in self.gold
        idx = self.rng.choice(len(self.qualities), size=self.n_per_question, replace=False)
        votes: Votes = []
        for i in idx:
            lam = float(self.qualities[i])
            correct = self.rng.random() < lam
            votes.append((lam, truth if correct else not truth))
        self._cache[q] = votes
        self.questions_asked += 1
        return votes


class PerfectOracle(WorkerPool):
    """Ground-truth labels (used by Tables VI/VII style experiments)."""

    def __init__(self, gold: set[Pair]):
        super().__init__(gold, n_workers=1, seed=0, error_rate=0.0, n_per_question=1)

    def ask(self, q: Pair) -> Votes:
        if q not in self._cache:
            self._cache[q] = [(1.0, q in self.gold)]
            self.questions_asked += 1
        return self._cache[q]
