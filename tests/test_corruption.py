"""Unit tests for error injection (typos / incompatible values / metadata)."""
import numpy as np
import pytest

from repro.domains.corruption import (
    METADATA_STRINGS,
    incompatible_value,
    make_error,
    metadata_string,
    typo,
)
from repro.domains.vocab import DOMAINS


@pytest.mark.parametrize("word", ["germany", "february", "fl", "seattle", "a"])
def test_typo_differs(word):
    rng = np.random.default_rng(1)
    for _ in range(10):
        assert typo(word, rng) != word


def test_typo_edit_distance_small():
    rng = np.random.default_rng(2)
    t = typo("february", rng)
    assert abs(len(t) - len("february")) <= 1


def test_typo_deterministic():
    assert typo("germany", np.random.default_rng(3)) == typo("germany", np.random.default_rng(3))


def test_incompatible_from_other_domain():
    rng = np.random.default_rng(4)
    for _ in range(20):
        v = incompatible_value("country", rng)
        assert isinstance(v, str) and v


def test_metadata_string_member():
    rng = np.random.default_rng(5)
    assert metadata_string(rng) in METADATA_STRINGS


@pytest.mark.parametrize("domain", ["country", "date", "age_group", "city"])
def test_make_error_not_in_clean(domain):
    rng = np.random.default_rng(6)
    clean = [DOMAINS[domain].sample_value(rng) for _ in range(10)]
    for _ in range(10):
        assert make_error(domain, clean, rng) not in clean


def test_make_error_mix_has_typos_and_metadata():
    rng = np.random.default_rng(7)
    clean = list(DOMAINS["country"].common[:20])
    errs = [make_error("country", clean, rng) for _ in range(200)]
    meta = [e for e in errs if e in set(METADATA_STRINGS)]
    assert len(meta) > 5  # metadata branch exercised
    assert len(set(errs)) > 50  # diverse errors
