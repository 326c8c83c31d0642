"""Precision-recall metrics (paper §6.1).

Predictions are scored cells (col_id, value, score); ground truth is the
set of labelled error cells. Sweeping the score threshold yields the
PR-curve; we summarize with:

- PR-AUC: area under the precision-recall curve (average-precision form,
  i.e. sum of precision at each recall step — the standard step-wise
  integral);
- F1@P=0.8: the best F1 among operating points with precision >= 0.8
  (0 if the curve never reaches precision 0.8) — the paper's
  high-precision summary metric.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass
class PRResult:
    pr_auc: float
    f1_at_p80: float
    n_true: int
    n_pred: int
    curve: pd.DataFrame  # (threshold, precision, recall, f1)

    def row(self) -> str:
        return f"{self.f1_at_p80:.2f}, {self.pr_auc:.2f}"


def _join_truth(pred: pd.DataFrame, truth: pd.DataFrame) -> tuple[np.ndarray, np.ndarray, int]:
    """Align predictions with ground truth; returns (scores, is_true, n_true_total)."""
    t = truth[["col_id", "value", "is_error"]].drop_duplicates(["col_id", "value"])
    n_true = int(t["is_error"].sum())
    if pred.empty:
        return np.array([]), np.array([], dtype=bool), n_true
    merged = pred.merge(t, on=["col_id", "value"], how="left")
    is_true = merged["is_error"].astype("boolean").fillna(False).to_numpy(dtype=bool)
    return merged["score"].to_numpy(dtype=float), is_true, n_true


def pr_metrics(pred: pd.DataFrame, truth: pd.DataFrame, precision_target: float = 0.8) -> PRResult:
    """Compute the PR summary for scored predictions against labelled truth.

    ``pred``: (col_id, value, score > 0); ``truth``: (col_id, value,
    is_error). Cells absent from ``pred`` count as not-predicted (recall
    denominators use all labelled errors).
    """
    scores, is_true, n_true = _join_truth(pred, truth)
    if len(scores) == 0 or n_true == 0:
        return PRResult(0.0, 0.0, n_true, len(scores), pd.DataFrame(
            columns=["threshold", "precision", "recall", "f1"]))
    order = np.argsort(-scores, kind="stable")
    s, t = scores[order], is_true[order]
    tp = np.cumsum(t)
    k = np.arange(1, len(s) + 1)
    precision = tp / k
    recall = tp / n_true
    # operating points = positions where the threshold changes (last of ties)
    last_of_tie = np.r_[s[1:] != s[:-1], True]
    p_pts, r_pts, thr = precision[last_of_tie], recall[last_of_tie], s[last_of_tie]
    # step-wise AUC (average precision): sum precision * delta recall
    dr = np.diff(np.r_[0.0, recall])
    pr_auc = float(np.sum(precision * dr))
    with np.errstate(divide="ignore", invalid="ignore"):
        f1 = np.where(p_pts + r_pts > 0, 2 * p_pts * r_pts / (p_pts + r_pts), 0.0)
    ok = p_pts >= precision_target
    f1_at = float(f1[ok].max()) if ok.any() else 0.0
    curve = pd.DataFrame(
        {"threshold": thr, "precision": p_pts, "recall": r_pts, "f1": f1}
    )
    return PRResult(pr_auc, f1_at, n_true, len(scores), curve)
