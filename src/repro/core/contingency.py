"""Corpus-scale contingency tables for every SDC candidate (paper §5.2).

Three DataFrame stages (see DESIGN.md §4):

1. distances: (value_id, func_id, dist) from ``typedetect.registry``;
2. per-(column, func) CDFs: n and cnt_le[k] for every kind-grid threshold;
3. per-candidate 2x2 contingency: join the candidate grid on func_id,
   evaluate pre-condition (covered) and column-level trigger from the CDF
   arrays, aggregate the paper's Table-2 counts, and attach the statistical
   test columns (Cohen's h, chi-squared, Wilson confidence, FPR estimate).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import stats
from repro.typedetect.base import KIND_GRIDS
from repro.typedetect.registry import Registry

# All kind grids padded to a common length so cnt_le is a fixed-size array.
MAX_T = max(len(g.thresholds) for g in KIND_GRIDS.values())


def func_dim(spark: SparkSession, registry: Registry) -> DataFrame:
    """(func_id, kind, thr[MAX_T]) — thresholds padded by repeating the last."""
    rows = []
    for s in registry.specs:
        thr = list(KIND_GRIDS[s.kind].thresholds)
        thr = thr + [thr[-1]] * (MAX_T - len(thr))
        rows.append((s.func_id, s.kind, thr))
    pdf = pd.DataFrame(rows, columns=["func_id", "kind", "thr"])
    return spark.createDataFrame(pdf)


def column_func_cdf(
    values_df: DataFrame,
    value_dim: DataFrame,
    dists: DataFrame,
    funcs: DataFrame,
) -> DataFrame:
    """Per-(column, func) distance CDF over the kind-grid thresholds.

    Output: (col_id, func_id, n, cnt_le[MAX_T]) where cnt_le[k] counts the
    column's values with dist <= thr[k]. This single aggregate serves every
    candidate built on the function — the paper's grid search collapses
    into array indexing downstream.
    """
    joined = (
        values_df.join(value_dim, "value")
        .join(dists, "value_id")
        .join(F.broadcast(funcs.select("func_id", "thr")), "func_id")
    )
    aggs = [F.count(F.lit(1)).alias("n")] + [
        F.sum((F.col("dist") <= F.element_at("thr", k + 1)).cast("long")).alias(f"c{k}")
        for k in range(MAX_T)
    ]
    out = joined.groupBy("col_id", "func_id").agg(*aggs)
    return out.select(
        "col_id",
        "func_id",
        "n",
        F.array(*[F.col(f"c{k}") for k in range(MAX_T)]).alias("cnt_le"),
    )


# Minimum column size for a column to evidence "coverage" during training.
# The paper evaluates pre-conditions over full value multisets (Table 3:
# median 36-484 values per column), where chance coverage is impossible; our
# columns are distinct-value sets, so very small columns could satisfy any
# pre-condition by luck (this is exactly how adversarial random-hash
# candidates would sneak through §6.5's test). Columns below this size still
# count on the "not covered" side of the contingency table.
MIN_COVER_COL_SIZE = 8


def covered_expr(d_in_idx="d_in_idx", m="m", min_n: int = MIN_COVER_COL_SIZE):
    """Pre-condition on CDF arrays: cnt_le[d_in_idx]/n >= m (with fp guard)."""
    return (
        F.element_at("cnt_le", (F.col(d_in_idx) + 1).cast("int")).cast("double")
        >= F.col(m) * F.col("n") - 1e-9
    ) & (F.col("n") >= min_n)


def triggered_expr(d_out_idx="d_out_idx"):
    """Column-level trigger: some value beyond the outer ball."""
    return F.element_at("cnt_le", (F.col(d_out_idx) + 1).cast("int")) < F.col("n")


def contingency_table(
    cdf: DataFrame,
    candidates: DataFrame,
    n_total_cols: int,
    *,
    use_wilson: bool = True,
) -> DataFrame:
    """Per-candidate Table-2 counts + §5.2 statistics.

    ``candidates`` is the (small) candidate grid as a Spark DF; it is
    broadcast against the (col, func) CDFs. ``use_wilson=False`` switches
    the confidence to the plain ratio (ablation Table 8).
    """
    cand_small = candidates.select("cand_id", "func_id", "d_in_idx", "d_out_idx", "m")
    joined = cdf.join(F.broadcast(cand_small), "func_id")
    cov = covered_expr()
    trig = triggered_expr()
    agg = joined.groupBy("cand_id").agg(
        F.sum((cov & trig).cast("long")).alias("cov_t"),
        F.sum((cov & ~trig).cast("long")).alias("cov_not_t"),
        F.sum(((~cov) & trig).cast("long")).alias("notcov_t"),
        F.sum(((~cov) & (~trig)).cast("long")).alias("notcov_not_t"),
    )
    n_cov = F.col("cov_t") + F.col("cov_not_t")
    n_notcov = F.col("notcov_t") + F.col("notcov_not_t")
    rho = F.when(n_cov > 0, F.col("cov_t") / n_cov).otherwise(F.lit(0.0))
    rho_bar = F.when(n_notcov > 0, F.col("notcov_t") / n_notcov).otherwise(F.lit(0.0))
    conf = (
        stats.wilson_lower_confidence_col(F.col("cov_t"), F.col("cov_not_t"))
        if use_wilson
        else stats.plain_confidence_col(F.col("cov_t"), F.col("cov_not_t"))
    )
    return agg.select(
        "cand_id",
        "cov_t",
        "cov_not_t",
        "notcov_t",
        "notcov_not_t",
        n_cov.alias("n_covered"),
        rho.alias("rho"),
        rho_bar.alias("rho_bar"),
        stats.cohens_h_col(rho, rho_bar).alias("h"),
        (rho < rho_bar).alias("rho_below_background"),
        stats.chi2_stat_col(
            F.col("cov_t").cast("double"),
            F.col("notcov_t").cast("double"),
            F.col("cov_not_t").cast("double"),
            F.col("notcov_not_t").cast("double"),
        ).alias("chi2"),
        conf.alias("conf"),
        (F.col("cov_t") / F.lit(float(n_total_cols))).alias("fpr"),
    )
