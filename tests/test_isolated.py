"""Tests for the isolated-pair random-forest inference (§VII-B)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.isolated import classify_isolated


def make_retained(n_pos=30, n_neg=30, n_iso_pos=10, n_iso_neg=10, seed=0):
    """Labeled connected pairs + unlabeled isolated pairs, separable in svec."""
    rng = np.random.default_rng(seed)
    rows = []
    eid = 0

    def vec(match):
        base = 0.85 if match else 0.15
        return [float(np.clip(base + rng.normal(0, 0.05), 0, 1)) for _ in range(3)]

    labels = {}
    targets = []
    truth = {}
    for match, k, labeled in [
        (True, n_pos, True), (False, n_neg, True),
        (True, n_iso_pos, False), (False, n_iso_neg, False),
    ]:
        for _ in range(k):
            p = (eid, eid + 1000)
            rows.append({"e1": p[0], "e2": p[1], "sim": vec(match)[0], "svec": vec(match), "pvec": [0, 1, 2]})
            if labeled:
                labels[p] = match
            else:
                targets.append(p)
                truth[p] = match
            eid += 1
    return pd.DataFrame(rows), labels, targets, truth


class TestClassifyIsolated:
    def test_recovers_isolated_matches(self):
        retained, labels, targets, truth = make_retained()
        pred = classify_isolated(retained, labels, targets, seed=0)
        tp = sum(1 for t in targets if truth[t] and t in pred)
        fp = sum(1 for t in targets if not truth[t] and t in pred)
        assert tp >= 8 and fp <= 2

    def test_empty_targets(self):
        retained, labels, _, _ = make_retained()
        assert classify_isolated(retained, labels, [], seed=0) == set()

    def test_no_positives_no_fallback_signal(self):
        retained, labels, targets, _ = make_retained()
        only_neg = {p: False for p, v in labels.items() if not v}
        assert classify_isolated(retained, only_neg, targets, seed=0) == set()

    def test_engines_agree(self, spark):
        retained, labels, targets, truth = make_retained()
        p_np = classify_isolated(retained, labels, targets, engine="numpy", seed=0)
        p_ml = classify_isolated(
            retained, labels, targets, engine="sparkml", spark=spark, seed=0
        )
        # same model family on clearly separable data: near-identical output
        agree = len(p_np & p_ml) / max(1, len(p_np | p_ml))
        assert agree > 0.8

    def test_sparkml_requires_session(self):
        retained, labels, targets, _ = make_retained()
        with pytest.raises(ValueError):
            classify_isolated(retained, labels, targets, engine="sparkml")

    def test_unknown_engine(self):
        retained, labels, targets, _ = make_retained()
        with pytest.raises(ValueError):
            classify_isolated(retained, labels, targets, engine="nope")

    def test_signature_grouping_separates_schemas(self):
        """Pairs with disjoint attribute signatures train separately."""
        retained, labels, targets, truth = make_retained()
        other = retained.copy()
        other["e1"] += 50_000
        other["e2"] += 50_000
        other["pvec"] = [[0, 3, 4]] * len(other)
        both = pd.concat([retained, other], ignore_index=True)
        pred = classify_isolated(both, labels, targets, seed=0)
        tp = sum(1 for t in targets if truth[t] and t in pred)
        assert tp >= 8
