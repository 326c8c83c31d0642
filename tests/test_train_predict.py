"""Integration tests: end-to-end training, rule-set artifacts, and the
equivalence of the Spark and driver-side prediction paths."""
import numpy as np
import pandas as pd
import pytest

from repro.core.predict import ColumnPredictor, predict_bench, predict_bench_pdf
from repro.core.train import RULE_COLUMNS, RuleSet, TrainConfig


def test_train_produces_rules(trained):
    assert len(trained.r_all) > 50
    assert len(trained.coarse.rules) > 0
    assert len(trained.fine.rules) > 0
    assert set(RULE_COLUMNS) <= set(trained.r_all.columns)


def test_rules_pass_statistical_gates(trained):
    cfg_h = TrainConfig().h_threshold
    assert (trained.r_all["h"] >= cfg_h).all()
    assert (trained.r_all["chi2"] >= 3.841).all()
    assert trained.r_all["rho_below_background"].all()


def test_confidence_in_unit_interval(trained):
    assert trained.r_all["conf"].between(0, 1).all()


def test_selection_within_budgets(trained):
    cfg = TrainConfig(n_centroids=20, n_syn=300, b_size=200, n_rounds=10)
    for rs in (trained.coarse, trained.fine):
        assert len(rs.rules) <= cfg.b_size
        assert rs.rules["fpr"].sum() <= cfg.b_fpr + 1e-9


def test_selected_subset_of_r_all(trained):
    all_ids = set(trained.r_all["cand_id"])
    assert set(trained.coarse.rules["cand_id"]) <= all_ids
    assert set(trained.fine.rules["cand_id"]) <= all_ids


def test_timings_recorded(trained):
    assert {"candidate_assessment", "distant_supervision", "coarse_select",
            "fine_select", "total"} <= set(trained.timings)


def test_ruleset_json_roundtrip(trained):
    rs = trained.fine
    back = RuleSet.from_json(rs.to_json())
    pd.testing.assert_frame_equal(back.rules, rs.rules[RULE_COLUMNS].reset_index(drop=True))
    assert back.registry.token() == rs.registry.token()


def test_ruleset_compact_preserves_predictions(trained, small_bench_pdf):
    vals, _ = small_bench_pdf
    sub = vals[vals.col_id < 50]
    full = predict_bench_pdf(trained.fine, sub)
    compacted = predict_bench_pdf(trained.fine.compact(), sub)
    a = full.sort_values(["col_id", "value"]).reset_index(drop=True)
    b = compacted.sort_values(["col_id", "value"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b)


def test_spark_predict_matches_pdf_path(spark, trained, small_bench_pdf):
    vals, _ = small_bench_pdf
    sub = vals[vals.col_id < 80]
    bench_df = spark.createDataFrame(sub)
    sp = predict_bench(spark, bench_df, trained.fine).toPandas()
    pp = predict_bench_pdf(trained.fine, sub)
    merged = sp.merge(pp, on=["col_id", "value"], how="outer", suffixes=("_s", "_p"))
    assert len(merged) == len(sp) == len(pp)
    assert np.allclose(merged["score_s"], merged["score_p"], atol=1e-9)


def test_column_predictor_scores_error(trained):
    from repro.domains.vocab import DOMAINS

    pred = ColumnPredictor(trained.all_constraints)
    # long date column: one metadata error (paper Fig. 2, C7) must be flagged
    col = [f"{m}/{d}/2020" for m in range(1, 13) for d in (3, 14, 21)]
    scores_clean = pred.predict_column(col)
    scores_dirty = pred.predict_column(col + ["new facility"])
    assert scores_dirty[-1] > 0  # the metadata string is flagged
    assert scores_dirty[-1] >= scores_clean.max()


def test_column_predictor_empty():
    rs = RuleSet("empty", pd.DataFrame(columns=RULE_COLUMNS), __import__("repro.typedetect.registry", fromlist=["Registry"]).Registry([]))
    assert ColumnPredictor(rs).predict_column([]).size == 0


def test_fit_cached_roundtrip(spark, tmp_path, monkeypatch, small_corpus):
    import repro.core.train as train_mod

    monkeypatch.setattr(train_mod, "ARTIFACT_DIR", tmp_path)
    cfg = TrainConfig(n_centroids=8, n_syn=60, b_size=50, n_rounds=5)
    first = train_mod.fit_cached(spark, "relational", n_cols=120, corpus_seed=3, config=cfg)
    second = train_mod.fit_cached(spark, "relational", n_cols=120, corpus_seed=3, config=cfg)
    for k in ("all", "coarse", "fine"):
        pd.testing.assert_frame_equal(first[k].rules, second[k].rules)
