"""Pattern-based column-type detection (paper §3(3)).

Values are generalized into run-length syntactic shapes (digits -> ``\\d+``,
letters -> ``[a-z]+``, punctuation kept literal), the same language as the
paper's example patterns ("\\d+ [a-zA-Z]+", "[a-zA-Z]+\\d+"). Patterns used
as domain-evaluation functions are *induced from the training corpus*: the
majority pattern of each column, ranked by how many columns it dominates
(paper: "We generate common patterns observed in our corpus C, for a total
of 45 patterns").

f_pat^d(p, v) = 0 if generalize(v) == p else 1 (Equation 3).
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from repro.typedetect.base import normalize_value

# Patterns too generic to define a meaningful syntactic domain on their own.
TRIVIAL_PATTERNS = frozenset({"", "[a-z]+", "[a-z]+ [a-z]+", "[a-z]+ [a-z]+ [a-z]+"})


def generalize(value: str) -> str:
    """Run-length syntactic shape of a value (on the normalized form)."""
    v = normalize_value(value)
    out: list[str] = []
    i = 0
    while i < len(v):
        ch = v[i]
        if ch.isdigit():
            while i < len(v) and v[i].isdigit():
                i += 1
            out.append(r"\d+")
        elif ch.isalpha():
            while i < len(v) and v[i].isalpha():
                i += 1
            out.append("[a-z]+")
        else:
            out.append(ch)
            i += 1
    return "".join(out)


def pattern_distance(pattern: str, value: str) -> float:
    """f_pat^d in {0, 1}."""
    return 0.0 if generalize(value) == pattern else 1.0


def induce_patterns(
    values_pdf: pd.DataFrame,
    *,
    top_k: int = 45,
    majority: float = 0.8,
) -> list[str]:
    """Top-k corpus patterns: a column 'votes' for its majority pattern
    (>= ``majority`` of distinct values share the shape); patterns are ranked
    by number of voting columns. ``values_pdf`` has (col_id, value)."""
    votes: Counter[str] = Counter()
    shapes = values_pdf["value"].map(generalize)
    df = pd.DataFrame({"col_id": values_pdf["col_id"].to_numpy(), "shape": shapes.to_numpy()})
    for _, grp in df.groupby("col_id"):
        top_shape, cnt = Counter(grp["shape"]).most_common(1)[0]
        if cnt / len(grp) >= majority and top_shape not in TRIVIAL_PATTERNS:
            votes[top_shape] += 1
    return [p for p, _ in votes.most_common(top_k)]
