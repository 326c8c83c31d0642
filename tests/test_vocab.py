"""Unit tests for the semantic-domain vocabularies and generators."""
import numpy as np
import pytest

from repro.domains.vocab import (
    DOMAINS,
    DomainSpec,
    code_domains,
    domain_vocab,
    mixed_domains,
    nl_domains,
)


def test_domain_kinds_partition():
    names = set(DOMAINS)
    assert set(nl_domains()) | set(code_domains()) | set(mixed_domains()) == names
    assert not set(nl_domains()) & set(code_domains())


def test_domain_counts():
    assert len(nl_domains()) >= 20
    assert len(code_domains()) >= 20
    assert len(mixed_domains()) >= 4


@pytest.mark.parametrize("name", sorted(DOMAINS))
def test_domain_spec_well_formed(name):
    d = DOMAINS[name]
    assert isinstance(d, DomainSpec)
    assert d.kind in ("nl", "code", "mixed")
    if d.kind == "nl":
        assert len(d.common) >= 2
        assert d.generator is None
    if d.kind == "code":
        assert d.generator is not None


@pytest.mark.parametrize("name", sorted(DOMAINS))
def test_sample_value_in_domain(name):
    d = DOMAINS[name]
    rng = np.random.default_rng(1)
    v = d.sample_value(rng)
    assert isinstance(v, str) and len(v) > 0


@pytest.mark.parametrize("name", sorted(n for n in DOMAINS if DOMAINS[n].generator))
def test_generators_deterministic(name):
    g = DOMAINS[name].generator
    a = g(np.random.default_rng(5), 20)
    b = g(np.random.default_rng(5), 20)
    assert a == b


def test_tiers_disjoint():
    for name in nl_domains():
        d = DOMAINS[name]
        assert not set(d.common) & set(d.uncommon), name


def test_state_abbr_is_50():
    assert len(DOMAINS["state_abbr"].common) == 50


def test_months_complete():
    assert len(DOMAINS["month"].common) == 12
    assert "february" in DOMAINS["month"].common


def test_domain_vocab_concat():
    assert domain_vocab("country") == DOMAINS["country"].common + DOMAINS["country"].uncommon


def test_credit_card_generator_luhn_valid():
    from repro.typedetect.function import validate_luhn

    vals = DOMAINS["credit_card"].generator(np.random.default_rng(2), 30)
    assert all(validate_luhn(v) for v in vals)


def test_date_generator_parses():
    from repro.typedetect.function import validate_date

    vals = DOMAINS["date"].generator(np.random.default_rng(3), 30)
    assert all(validate_date(v) for v in vals)


def test_code_mixed_columnar_two_shapes():
    from repro.typedetect.pattern import generalize

    vals = DOMAINS["code_mixed"].generator(np.random.default_rng(4), 200)
    shapes = {generalize(v) for v in vals}
    # one dominant + one minority template (they may rarely collide)
    assert 1 <= len(shapes) <= 3


def test_code_mixed_majority_dominates():
    from collections import Counter

    from repro.typedetect.pattern import generalize

    vals = DOMAINS["code_mixed"].generator(np.random.default_rng(6), 500)
    counts = Counter(generalize(v) for v in vals)
    top = counts.most_common(1)[0][1]
    assert top / len(vals) > 0.7


def test_date_mixed_minority_textual():
    vals = DOMAINS["date_mixed"].generator(np.random.default_rng(7), 300)
    textual = [v for v in vals if v[0].isalpha()]
    assert 0.05 < len(textual) / len(vals) < 0.3


def test_unit_mixed_has_percent_minority():
    vals = DOMAINS["unit_mixed"].generator(np.random.default_rng(8), 300)
    pct = [v for v in vals if v.endswith("%")]
    assert 0.03 < len(pct) / len(vals) < 0.35
