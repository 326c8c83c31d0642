"""Tests for pattern generalization and corpus pattern induction."""
import pandas as pd
import pytest

from repro.typedetect.pattern import (
    TRIVIAL_PATTERNS,
    generalize,
    induce_patterns,
    pattern_distance,
)


@pytest.mark.parametrize(
    "value,shape",
    [
        ("fy17", r"[a-z]+\d+"),
        ("FY17", r"[a-z]+\d+"),  # normalized to lowercase first
        ("12 oz", r"\d+ [a-z]+"),
        ("12/3/2020", r"\d+/\d+/\d+"),
        ("b50005237", r"[a-z]+\d+"),
        ("tt0054215", r"[a-z]+\d+"),
        ("107 patients", r"\d+ [a-z]+"),
        ("0.05%", r"\d+.\d+%"),
        ("65 & above", r"\d+ & [a-z]+"),
        ("", ""),
        ("abc", "[a-z]+"),
        ("123", r"\d+"),
        ("a-b_c", "[a-z]+-[a-z]+_[a-z]+"),
        ("  x ", "[a-z]+"),  # trimmed
    ],
)
def test_generalize(value, shape):
    assert generalize(value) == shape


def test_pattern_distance_binary():
    assert pattern_distance(r"[a-z]+\d+", "fy17") == 0.0
    assert pattern_distance(r"[a-z]+\d+", "fy definition") == 1.0


def test_induce_patterns_majority_vote():
    rows = []
    for c in range(10):
        rows += [(c, f"fy{i}") for i in range(10)]  # [a-z]+\d+ dominant
    for c in range(10, 13):
        rows += [(c, f"{i} oz") for i in range(10)]
    pdf = pd.DataFrame(rows, columns=["col_id", "value"])
    pats = induce_patterns(pdf, top_k=5)
    assert pats[0] == r"[a-z]+\d+"
    assert r"\d+ [a-z]+" in pats


def test_induce_excludes_trivial():
    rows = [(c, w) for c in range(5) for w in ["alpha", "beta", "gamma", "delta"]]
    pdf = pd.DataFrame(rows, columns=["col_id", "value"])
    assert induce_patterns(pdf, top_k=5) == []


def test_induce_requires_majority():
    # 50/50 mixed column: no shape reaches the 0.8 majority -> no vote
    rows = [(0, v) for v in ["a1", "b2", "c3", "1 kg", "2 kg", "3 kg"]]
    pdf = pd.DataFrame(rows, columns=["col_id", "value"])
    assert induce_patterns(pdf, top_k=5) == []


def test_trivial_patterns_cover_word_shapes():
    assert generalize("hello world") in TRIVIAL_PATTERNS
