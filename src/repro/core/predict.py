"""Online prediction (paper Figure 5, right; latency analysis §6.4).

Two equivalent implementations (tests assert they agree):

- ``predict_bench``: the Spark/Catalyst path — distances via mapInPandas,
  per-(column, func) CDFs, broadcast-join against the rule set; used by the
  quality harness over 1200-column benchmarks.
- ``predict_column``: the driver-side per-column path used for latency
  measurements (paper Figures 12-13), implementing the Appendix-B.2
  optimization: rules sharing a pre-condition (func, d_in, m) are evaluated
  with a single pre-condition check.

A flagged cell's score is the max confidence over all SDCs flagging it
(paper Example 3: "we assign the confidence of a prediction based on its
most confident SDC").
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.contingency import column_func_cdf, covered_expr, func_dim
from repro.core.train import RuleSet
from repro.typedetect.registry import (
    DistanceEvaluator,
    compute_distances,
    make_value_dim,
)

_RULE_PRED_COLS = ["cand_id", "func_id", "d_in_idx", "d_out_idx", "m", "d_out", "conf"]


def predict_bench(
    spark: SparkSession, values_df: DataFrame, ruleset: RuleSet
) -> DataFrame:
    """Flagged cells over a benchmark: (col_id, value, score).

    ``values_df`` needs (col_id, value); extra columns are ignored. Only the
    evaluation functions the rule set references are computed (the compact
    registry), which is where Fine-Select's latency advantage over
    All-Constraints comes from.
    """
    compact = ruleset.compact()
    cells = values_df.select("col_id", "value")
    value_dim = make_value_dim(spark, cells)
    dists = compute_distances(spark, value_dim, compact.registry).cache()
    funcs = func_dim(spark, compact.registry)
    cdf = column_func_cdf(cells, value_dim, dists, funcs)
    rules_df = spark.createDataFrame(compact.rules[_RULE_PRED_COLS])
    covered = (
        cdf.join(F.broadcast(rules_df), "func_id")
        # online prediction applies SDCs to columns of any size (the
        # min-size gate is a *training* statistic, see contingency.py)
        .where(covered_expr(min_n=1))
        .select("col_id", "func_id", "d_out", "conf")
    )
    flagged = (
        cells.join(value_dim, "value")
        .join(dists, "value_id")
        .join(covered, ["col_id", "func_id"])
        .where(F.col("dist") > F.col("d_out"))
        .groupBy("col_id", "value")
        .agg(F.max("conf").alias("score"))
    )
    return flagged


class ColumnPredictor:
    """Driver-side predictor over single columns (latency experiments).

    Construction pre-groups the rule set by shared pre-condition
    (Appendix B.2) and builds the compact evaluator once.
    """

    def __init__(self, ruleset: RuleSet):
        compact = ruleset.compact()
        self.rules = compact.rules
        self.evaluator = DistanceEvaluator(compact.registry.specs)
        self.n_funcs = len(compact.registry.specs)
        # pre-condition groups: (func_id, d_in, m) -> [(d_out, conf), ...]
        groups: dict[tuple[int, float, float], list[tuple[float, float]]] = {}
        for r in compact.rules.itertuples():
            groups.setdefault((int(r.func_id), float(r.d_in), float(r.m)), []).append(
                (float(r.d_out), float(r.conf))
            )
        self.groups = [
            (f, d_in, m, np.array([d for d, _ in rs]), np.array([c for _, c in rs]))
            for (f, d_in, m), rs in groups.items()
        ]

    def predict_column(self, values: list[str]) -> np.ndarray:
        """Error score per value (0 = not flagged)."""
        n = len(values)
        scores = np.zeros(n)
        if n == 0:
            return scores
        mat = self.evaluator.matrix(values)
        for f, d_in, m, d_outs, confs in self.groups:
            col = mat[:, f]
            if np.count_nonzero(col <= d_in) / n < m - 1e-12:
                continue
            for d_out, conf in zip(d_outs, confs):
                mask = col > d_out
                if mask.any():
                    scores[mask] = np.maximum(scores[mask], conf)
        return scores

    def applied_rules(self, values: list[str]) -> pd.DataFrame:
        """Rules (rows of the compact rule frame) whose pre-condition holds
        on the column — the 'column is covered' notion used in the paper's
        Table-9 coverage analysis."""
        n = len(values)
        if n == 0:
            return self.rules.iloc[0:0]
        mat = self.evaluator.matrix(values)
        mask = [
            np.count_nonzero(mat[:, int(r.func_id)] <= r.d_in) / n >= r.m - 1e-12
            for r in self.rules.itertuples()
        ]
        return self.rules[np.array(mask, dtype=bool)]


def predict_bench_pdf(ruleset: RuleSet, values_pdf: pd.DataFrame) -> pd.DataFrame:
    """Driver-side equivalent of ``predict_bench`` over a pandas benchmark
    (used in tests to cross-check the Spark path, and by the latency bench)."""
    pred = ColumnPredictor(ruleset)
    out = []
    for col_id, grp in values_pdf.groupby("col_id"):
        vals = grp["value"].tolist()
        scores = pred.predict_column(vals)
        for v, s in zip(vals, scores):
            if s > 0:
                out.append((col_id, v, s))
    return pd.DataFrame(out, columns=["col_id", "value", "score"])
