"""String / literal similarity kernels used throughout the pipeline.

Pure-Python + numpy only, so every Spark pandas-UDF that wraps these can be
unit-tested without a SparkSession. Mirrors §IV-B/§IV-C of the paper:

- label normalization: lowercase + split on non-alphanumeric (stemming is
  substituted away, see DESIGN.md §5.5);
- token Jaccard as the label similarity / prior match probability;
- internal literal similarity: token Jaccard for strings, maximum
  percentage difference for numbers;
- ``sim_L``: the *extended Jaccard* over two literal sets with an internal
  similarity threshold (default 0.9, per the paper).
"""
from __future__ import annotations

import re

_TOKEN_RE = re.compile(r"[a-z0-9]+")

# Internal literal-similarity threshold used by sim_L (paper: "set to 0.9
# to guarantee high precision").
LITERAL_SIM_THRESHOLD = 0.9


def normalize_label(label: str | None) -> str:
    """Lowercased, punctuation-collapsed form of an entity label."""
    if label is None:
        return ""
    return " ".join(_TOKEN_RE.findall(label.lower()))


def tokens(label: str | None) -> frozenset[str]:
    """Normalized token set of a label (empty for missing labels)."""
    if label is None:
        return frozenset()
    return frozenset(_TOKEN_RE.findall(label.lower()))


def jaccard(s1: frozenset | set, s2: frozenset | set) -> float:
    """Jaccard coefficient of two sets; 0.0 when both are empty."""
    if not s1 and not s2:
        return 0.0
    inter = len(s1 & s2)
    if inter == 0:
        return 0.0
    return inter / (len(s1) + len(s2) - inter)


def label_jaccard(l1: str | None, l2: str | None) -> float:
    """Token Jaccard of two raw labels — the paper's prior Pr[m_p]."""
    return jaccard(tokens(l1), tokens(l2))


def _as_number(v: str) -> float | None:
    try:
        return float(v)
    except (TypeError, ValueError):
        return None


def literal_sim(v1: str, v2: str) -> float:
    """Internal literal similarity (paper §IV-C).

    Numbers compare by maximum percentage difference
    (``1 - |x-y| / max(|x|,|y|)``); everything else by token Jaccard.
    A number never matches a non-number.
    """
    n1, n2 = _as_number(v1), _as_number(v2)
    if n1 is not None and n2 is not None:
        if n1 == n2:
            return 1.0
        denom = max(abs(n1), abs(n2))
        if denom == 0.0:
            return 1.0
        return max(0.0, 1.0 - abs(n1 - n2) / denom)
    if (n1 is None) != (n2 is None):
        return 0.0
    return jaccard(tokens(v1), tokens(v2))


def sim_L(
    vals1: list[str] | set[str],
    vals2: list[str] | set[str],
    threshold: float = LITERAL_SIM_THRESHOLD,
) -> float:
    """Extended Jaccard between two literal *sets* (paper §IV-C).

    Two literals are "the same" when their internal similarity is at least
    ``threshold``. Matched greedily 1:1 (each literal used once); the
    extended Jaccard is ``m / (|V1| + |V2| - m)``. Returns 0.0 when either
    side is empty.
    """
    v1, v2 = list(dict.fromkeys(vals1)), list(dict.fromkeys(vals2))
    if not v1 or not v2:
        return 0.0
    used = [False] * len(v2)
    m = 0
    for a in v1:
        best_j, best_s = -1, threshold
        for j, b in enumerate(v2):
            if used[j]:
                continue
            s = literal_sim(a, b)
            if s >= best_s:
                best_j, best_s = j, s
        if best_j >= 0:
            used[best_j] = True
            m += 1
    return m / (len(v1) + len(v2) - m)
