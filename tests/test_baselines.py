"""Tests for all baseline scorers and the distributed runner."""
import numpy as np
import pytest

from repro.baselines.base import SCORERS, make_scorer, run_scorer_on_bench
from repro.baselines.autodetect import train_cooccurrence
from repro.evalx.harness import BASELINE_ROWS

_ALL = [k for k, _, _ in BASELINE_ROWS]


def test_all_table4_baselines_registered():
    for k in _ALL:
        assert make_scorer(k) is not None
    assert set(_ALL) <= set(SCORERS)


@pytest.mark.parametrize("name", _ALL)
def test_scorer_shape_and_range(name):
    sc = make_scorer(name)
    vals = ["germany", "france", "italy", "spain", "grmny", "12/3/2020", "fy17", "n/a"]
    s = np.asarray(sc.score(vals))
    assert s.shape == (len(vals),)
    assert (s >= 0).all() and (s <= 1).all()


@pytest.mark.parametrize("name", _ALL)
def test_scorer_deterministic(name):
    sc1, sc2 = make_scorer(name), make_scorer(name)
    vals = ["al", "ak", "az", "ar", "ca", "germany"]
    assert np.allclose(sc1.score(vals), sc2.score(vals))


def test_regex_flags_shape_breaker():
    sc = make_scorer("regex")
    vals = [f"fy{i}" for i in range(10, 20)] + ["fy definition"]
    s = sc.score(vals)
    assert s[-1] == s.max() > 0


def test_sherlock_flags_typo_but_also_rare():
    # the paper's Fig-3 point: CTA z-scoring cannot distinguish rare valid
    # values from errors
    sc = make_scorer("sherlock")
    vals = ["germany", "france", "italy", "spain", "poland", "ireland",
            "liechtenstein", "grmnyx"]
    s = sc.score(vals)
    assert s[-1] > 0  # typo flagged
    assert s[6] > 0  # rare-but-valid country also (wrongly) scored


def test_katara_false_positives_on_rare_values():
    sc = make_scorer("katara")
    vals = ["germany", "france", "italy", "spain", "poland", "liechtenstein"]
    s = sc.score(vals)
    assert s[-1] == 1.0  # not in the KB (common tier) -> flagged


def test_vendor_a_only_on_dominant_pattern():
    sc = make_scorer("vendor_a")
    assert sc.score(["a1", "b2", "1 kg", "2 kg"]).sum() == 0  # 50/50: silent
    s = sc.score([f"x{i}" for i in range(20)] + ["hello world"])
    assert s[-1] == 1.0


def test_gpt_detects_typo_and_metadata():
    sc = make_scorer("gpt_few_cot")
    vals = ["germany", "france", "italy", "spain", "poland", "ireland",
            "greece", "turkey", "russia", "china", "grmny", "n/a"]
    s = sc.score(vals)
    assert s[10] > 0 and s[11] > 0


def test_outlier_scorers_rank_metadata_high_in_code_column():
    vals = [f"{i:05d}" for i in range(30)] + ["new facility"]
    for name in ("dbod", "rkde", "svdd"):
        s = make_scorer(name).score(vals)
        assert s[-1] == s.max() > 0, name


def test_ppca_runs_and_scores_nontrivially():
    # PPCA can absorb a single dominant outlier into its principal
    # components (small residual) — faithful behaviour; just require a
    # well-formed non-degenerate scoring.
    vals = [f"{i:05d}" for i in range(30)] + ["new facility"]
    s = make_scorer("ppca").score(vals)
    assert s.shape == (31,) and s.max() > 0


def test_autodetect_uses_model():
    values = [(0, f"fy{i}") for i in range(20)] + [(1, f"{i} oz") for i in range(20)]
    import pandas as pd

    model = train_cooccurrence(pd.DataFrame(values, columns=["col_id", "value"]), sample_frac=1.0)
    sc = make_scorer("autodetect", {"model": model})
    s = sc.score([f"fy{i}" for i in range(10)] + ["germany"])
    assert s[-1] == 1.0  # word shape never co-occurs with [a-z]+\d+


def test_run_scorer_on_bench_spark(spark, small_bench_pdf):
    vals, _ = small_bench_pdf
    sub = spark.createDataFrame(vals[vals.col_id < 40])
    out = run_scorer_on_bench(spark, sub, "regex").toPandas()
    assert set(out.columns) == {"col_id", "value", "score"}
    assert (out["score"] > 0).all()


def test_spark_runner_matches_local(spark, small_bench_pdf):
    vals, _ = small_bench_pdf
    sub = vals[vals.col_id < 30]
    out = run_scorer_on_bench(spark, spark.createDataFrame(sub), "katara").toPandas()
    sc = make_scorer("katara")
    local = []
    for cid, grp in sub.groupby("col_id"):
        v = grp["value"].tolist()
        s = sc.score(v)
        local += [(cid, vv, ss) for vv, ss in zip(v, s) if ss > 0]
    assert len(out) == len(local)
