"""Property-based tests (hypothesis) over the substrate invariants."""
import numpy as np
from hypothesis import given, settings, strategies as st

from repro.core import stats
from repro.core.lp import solve_two_budget_linear
from repro.domains.corruption import typo
from repro.typedetect.base import normalize_value, stable_unit
from repro.typedetect.pattern import generalize

_text = st.text(
    alphabet=st.characters(whitelist_categories=("Ll", "Nd", "Po", "Zs")), max_size=25
)


@given(_text)
def test_generalize_idempotent_on_values(s):
    # generalizing a value twice through normalize keeps a stable shape
    assert generalize(s) == generalize(normalize_value(s))


@given(_text)
def test_generalize_matches_own_value(s):
    # a value always matches the pattern generalized from itself
    from repro.typedetect.pattern import pattern_distance

    assert pattern_distance(generalize(s), s) == 0.0


@given(st.text(alphabet="abcdefgh", min_size=1, max_size=15), st.integers(0, 100))
def test_typo_always_differs(word, seed):
    rng = np.random.default_rng(seed)
    assert typo(word, rng) != word


@given(st.text(max_size=20), st.text(max_size=20))
def test_stable_unit_in_range_and_deterministic(a, b):
    u = stable_unit(a, b)
    assert 0.0 <= u < 1.0
    assert u == stable_unit(a, b)


@given(
    st.lists(st.floats(0, 10), min_size=1, max_size=12),
    st.lists(st.floats(0, 1), min_size=1, max_size=12),
    st.integers(0, 12),
    st.floats(0, 5),
)
@settings(max_examples=60)
def test_two_budget_linear_always_feasible(c, f, b1, b2):
    n = min(len(c), len(f))
    c, f = np.array(c[:n]), np.array(f[:n])
    x = solve_two_budget_linear(c, f, b1, b2)
    assert (x >= -1e-9).all() and (x <= 1 + 1e-9).all()
    assert x.sum() <= b1 + 1e-6
    assert f @ x <= b2 + 1e-6


@given(st.floats(0, 1), st.floats(0, 1))
def test_cohens_h_bounded_by_pi(a, b):
    assert 0.0 <= stats.cohens_h(a, b) <= np.pi + 1e-9


@given(st.integers(0, 200), st.integers(0, 200))
def test_wilson_monotone_in_false_triggers(t, nt):
    # more false triggers can never increase the confidence bound
    c1 = stats.wilson_lower_confidence(np.array([float(t)]), np.array([float(nt)]))[0]
    c2 = stats.wilson_lower_confidence(np.array([float(t + 1)]), np.array([float(nt)]))[0]
    if t + nt > 0:
        assert c2 <= c1 + 1e-9


@given(st.lists(st.text(max_size=12), min_size=1, max_size=30))
@settings(max_examples=40)
def test_outlier_featurize_shape(values):
    from repro.baselines.outliers import featurize

    x = featurize(values)
    assert x.shape == (len(values), 8)
    assert np.isfinite(x).all()
