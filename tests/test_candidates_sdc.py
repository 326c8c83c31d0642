"""Tests for candidate-grid generation and the SDC model itself."""
import numpy as np
import pytest

from repro.core.candidates import generate_candidates
from repro.core.sdc import SDC
from repro.typedetect.base import KIND_GRIDS, M_GRID, EvalFunctionSpec
from repro.typedetect.registry import Registry


@pytest.fixture(scope="module")
def tiny_registry():
    return Registry(
        [
            EvalFunctionSpec(0, "cta", "sherlock", "country"),
            EvalFunctionSpec(1, "emb", "glove", "january"),
            EvalFunctionSpec(2, "pattern", "regex", r"[a-z]+\d+"),
            EvalFunctionSpec(3, "function", "validator", "validate_date"),
        ]
    )


def test_candidate_ids_dense(tiny_registry):
    cands = generate_candidates(tiny_registry)
    assert cands["cand_id"].tolist() == list(range(len(cands)))


def test_candidate_counts_per_kind(tiny_registry):
    cands = generate_candidates(tiny_registry)
    by_kind = cands.groupby("kind").size()
    g_cta, g_emb = KIND_GRIDS["cta"], KIND_GRIDS["emb"]
    assert by_kind["cta"] == g_cta.n_in * g_cta.n_out * len(M_GRID)
    assert by_kind["emb"] == g_emb.n_in * g_emb.n_out * len(M_GRID)
    assert by_kind["pattern"] == len(M_GRID)  # binary kind: one ball pair
    assert by_kind["function"] == len(M_GRID)


def test_d_out_geq_d_in(tiny_registry):
    cands = generate_candidates(tiny_registry)
    assert (cands["d_out"] >= cands["d_in"]).all()


def test_threshold_indices_valid(tiny_registry):
    cands = generate_candidates(tiny_registry)
    for r in cands.itertuples():
        thr = KIND_GRIDS[r.kind].thresholds
        assert thr[r.d_in_idx] == r.d_in
        assert thr[r.d_out_idx] == r.d_out


def _sdc(d_in=0.5, d_out=1.0, m=0.8):
    return SDC(0, 0, "emb", "glove", "january", d_in, d_out, m, conf=0.9)


def test_sdc_pre_condition():
    r = _sdc(m=0.6)
    assert r.pre_condition(np.array([0.1, 0.2, 0.3, 0.9, 1.5]))  # 3/5 = 0.6 >= m
    assert not r.pre_condition(np.array([0.1, 0.9, 0.9, 0.9, 1.5]))


def test_sdc_pre_condition_boundary_inclusive():
    r = _sdc(m=0.5)
    assert r.pre_condition(np.array([0.5, 0.6]))  # exactly 50% inside


def test_sdc_post_condition_mask():
    r = _sdc()
    mask = r.post_condition(np.array([0.1, 1.0, 1.01]))
    assert mask.tolist() == [False, False, True]


def test_sdc_triggers_requires_cover_and_flag():
    r = _sdc(m=0.6)
    assert r.triggers(np.array([0.1, 0.2, 0.3, 1.5]))
    assert not r.triggers(np.array([0.1, 0.2, 0.3, 0.9]))  # covered, nothing out
    assert not r.triggers(np.array([0.9, 0.9, 0.9, 1.5]))  # not covered


def test_sdc_empty_column():
    assert not _sdc().pre_condition(np.array([]))


def test_sdc_describe_mentions_family():
    assert "glove" in _sdc().describe()
