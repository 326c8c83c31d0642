"""Tests for the ST-/RT-Bench analogs and synthetic error injection."""
import numpy as np
import pytest

from repro.domains.benchmark import (
    BENCH_PROFILES,
    build_bench_pdf,
    inject_synthetic_errors,
    make_benchmark,
)


@pytest.mark.parametrize("profile", ["st", "rt"])
def test_bench_shapes(profile):
    vals, meta = build_bench_pdf(BENCH_PROFILES[profile], 400, seed=3)
    assert meta.col_id.nunique() == 400
    # dirty prevalence near the paper's rates (3.3-3.9%)
    assert 0.01 < meta.is_dirty.mean() < 0.09


def test_bench_ground_truth_consistency():
    vals, meta = build_bench_pdf(BENCH_PROFILES["st"], 400, seed=3)
    dirty_cols = set(meta.loc[meta.is_dirty, "col_id"])
    err_cols = set(vals.loc[vals.is_error, "col_id"])
    assert err_cols == dirty_cols


def test_bench_errors_only_in_dirty_columns():
    vals, meta = build_bench_pdf(BENCH_PROFILES["rt"], 300, seed=5)
    clean_cols = set(meta.loc[~meta.is_dirty, "col_id"])
    assert not (set(vals.loc[vals.is_error, "col_id"]) & clean_cols)


def test_bench_deterministic():
    a, _ = build_bench_pdf(BENCH_PROFILES["st"], 200, seed=7)
    b, _ = build_bench_pdf(BENCH_PROFILES["st"], 200, seed=7)
    assert a.equals(b)


def test_bench_contains_trap_domains():
    _, meta = build_bench_pdf(BENCH_PROFILES["st"], 600, seed=3)
    doms = set(meta.domain)
    assert {"gene", "age_group", "code_mixed"} & doms


@pytest.mark.parametrize("rate", [0.05, 0.10, 0.20])
def test_inject_synthetic_errors_rate(rate):
    vals, meta = build_bench_pdf(BENCH_PROFILES["st"], 400, seed=3)
    before = int(vals.is_error.sum())
    v2, m2 = inject_synthetic_errors(vals, meta, rate, seed=9)
    added = int(v2.is_error.sum()) - before
    assert abs(added - rate * 400) <= 0.4 * rate * 400 + 2


def test_injected_value_from_other_domain():
    vals, meta = build_bench_pdf(BENCH_PROFILES["st"], 300, seed=3)
    v2, m2 = inject_synthetic_errors(vals, meta, 0.1, seed=9)
    new = v2.iloc[len(vals):]
    dom = dict(zip(meta.col_id, meta.domain))
    by_col = vals.groupby("col_id")["value"].apply(set).to_dict()
    for r in new.itertuples():
        assert r.is_error
        assert r.value not in by_col[r.col_id]


def test_make_benchmark_spark(spark):
    b = make_benchmark(spark, "st", n_cols=100, seed=3)
    assert b.values.count() > 0
    assert b.meta.count() == 100
    assert "is_error" in b.values.columns


def test_make_benchmark_with_injection_name(spark):
    b = make_benchmark(spark, "rt", n_cols=80, seed=3, synth_error_rate=0.1)
    assert "10%" in b.name
