"""Tests for the PR metrics (PR-AUC, F1@P=0.8)."""
import pandas as pd
import pytest

from repro.evalx.metrics import pr_metrics


def _truth(errors, clean):
    rows = [(c, v, True) for c, v in errors] + [(c, v, False) for c, v in clean]
    return pd.DataFrame(rows, columns=["col_id", "value", "is_error"])


def _pred(items):
    return pd.DataFrame(items, columns=["col_id", "value", "score"])


def test_perfect_predictions():
    truth = _truth([(0, "a"), (1, "b")], [(0, "x"), (1, "y")])
    pred = _pred([(0, "a", 0.9), (1, "b", 0.8)])
    m = pr_metrics(pred, truth)
    assert m.pr_auc == pytest.approx(1.0)
    assert m.f1_at_p80 == pytest.approx(1.0)


def test_no_predictions():
    truth = _truth([(0, "a")], [(0, "x")])
    m = pr_metrics(_pred([]), truth)
    assert m.pr_auc == 0.0 and m.f1_at_p80 == 0.0


def test_all_wrong_predictions():
    truth = _truth([(0, "a")], [(0, "x"), (0, "y")])
    pred = _pred([(0, "x", 0.9), (0, "y", 0.8)])
    m = pr_metrics(pred, truth)
    assert m.pr_auc == 0.0 and m.f1_at_p80 == 0.0


def test_half_precision_recall():
    truth = _truth([(0, "a"), (0, "b")], [(0, "x")])
    pred = _pred([(0, "a", 0.9), (0, "x", 0.9)])  # tie: 1 TP, 1 FP
    m = pr_metrics(pred, truth)
    # single operating point: P=0.5, R=0.5 -> AP = 0.5*0.5... stepwise:
    assert m.f1_at_p80 == 0.0
    assert 0.2 < m.pr_auc <= 0.5


def test_ranking_matters():
    truth = _truth([(0, "a")], [(0, "x")])
    good = _pred([(0, "a", 0.9), (0, "x", 0.1)])
    bad = _pred([(0, "a", 0.1), (0, "x", 0.9)])
    assert pr_metrics(good, truth).pr_auc > pr_metrics(bad, truth).pr_auc


def test_f1_at_precision_target():
    truth = _truth([(0, str(i)) for i in range(10)], [(0, f"c{i}") for i in range(10)])
    # top-8 all correct (P=1, R=0.8), then 2 wrong
    items = [(0, str(i), 1.0 - i * 0.01) for i in range(8)]
    items += [(0, "c0", 0.5), (0, "c1", 0.4)]
    m = pr_metrics(pr := _pred(items), truth)
    assert m.f1_at_p80 == pytest.approx(2 * 1.0 * 0.8 / 1.8, abs=1e-6)


def test_unlabeled_prediction_counts_as_fp():
    truth = _truth([(0, "a")], [(0, "x")])
    pred = _pred([(0, "a", 0.9), (5, "zz", 0.95)])  # (5,"zz") not in truth
    m = pr_metrics(pred, truth)
    assert m.pr_auc < 1.0


def test_n_true_and_n_pred():
    truth = _truth([(0, "a"), (1, "b"), (2, "c")], [(0, "x")])
    pred = _pred([(0, "a", 0.9)])
    m = pr_metrics(pred, truth)
    assert m.n_true == 3 and m.n_pred == 1


def test_curve_monotone_recall():
    truth = _truth([(0, "a"), (0, "b")], [(0, "x"), (0, "y")])
    pred = _pred([(0, "a", 0.9), (0, "x", 0.7), (0, "b", 0.5), (0, "y", 0.3)])
    m = pr_metrics(pred, truth)
    rec = m.curve["recall"].tolist()
    assert rec == sorted(rec)


def test_zero_true_errors():
    truth = _truth([], [(0, "x")])
    pred = _pred([(0, "x", 0.9)])
    m = pr_metrics(pred, truth)
    assert m.pr_auc == 0.0
