"""Tests for the simulated CTA classifiers (score regimes of DESIGN.md §2)."""
import pytest

from repro.typedetect.cta import cta_distance, cta_score, doduo_types, sherlock_types


def test_type_inventories():
    assert len(sherlock_types()) == 16
    assert len(doduo_types()) >= len(sherlock_types())
    assert set(sherlock_types()) <= set(doduo_types())


@pytest.mark.parametrize("family", ["sherlock", "doduo"])
def test_common_value_scores_high(family):
    assert cta_score(family, "country", "germany") > 0.7
    assert cta_score(family, "month", "february") > 0.7


@pytest.mark.parametrize("family", ["sherlock", "doduo"])
def test_uncommon_value_scores_mid(family):
    s = cta_score(family, "country", "liechtenstein")
    assert 0.2 < s < 0.7


@pytest.mark.parametrize("family", ["sherlock", "doduo"])
def test_other_domain_value_scores_low(family):
    assert cta_score(family, "state_abbr", "germany") < 0.3


@pytest.mark.parametrize("family", ["sherlock", "doduo"])
def test_typo_scores_near_zero(family):
    assert cta_score(family, "country", "germny") < 0.2


def test_score_in_unit_interval():
    for v in ["germany", "zzz123", "liechtenstein", "fl", ""]:
        for fam in ("sherlock", "doduo"):
            assert 0.0 <= cta_score(fam, "country", v) <= 1.0


def test_distance_is_one_minus_score():
    s = cta_score("doduo", "city", "germany")
    assert cta_distance("doduo", "city", "germany") == pytest.approx(1.0 - s)


def test_deterministic():
    assert cta_score("sherlock", "country", "france") == cta_score("sherlock", "country", "france")


def test_case_insensitive():
    assert cta_score("doduo", "country", "Germany") == cta_score("doduo", "country", "germany")


def test_families_differ():
    vals = ["germany", "france", "italy"]
    assert any(
        cta_score("sherlock", "country", v) != cta_score("doduo", "country", v) for v in vals
    )
