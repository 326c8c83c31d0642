"""Distant-supervision recall estimation (paper §5.3, Equation 10).

C_syn = { C(v^e) = C ∪ {v^e} }: take a corpus column C, inject one value
v^e sampled from a *different* column, and ask which candidates detect
exactly the injected value. D(r) = the set of synthetic columns whose
injected error r detects — the recall proxy used by CSS/FSS.

``r(C(v^e)) = v^e`` is interpreted as set equality: the candidate covers the
augmented column, flags v^e, and flags nothing else (a candidate that also
flags host values is producing false positives there, which the paper's
notation excludes).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def sample_syn_columns(
    values_pdf: pd.DataFrame,
    n_syn: int,
    seed: int,
) -> pd.DataFrame:
    """(syn_id, host_col_id, err_value): hosts and foreign values sampled
    uniformly from the corpus; the foreign value must not already appear in
    the host column (otherwise it is not an injected error)."""
    rng = np.random.default_rng(seed)
    col_ids = values_pdf["col_id"].unique()
    by_col = values_pdf.groupby("col_id")["value"].apply(set).to_dict()
    all_vals = values_pdf[["col_id", "value"]].to_numpy()
    rows = []
    for syn_id in range(n_syn):
        host = int(col_ids[rng.integers(0, len(col_ids))])
        host_vals = by_col[host]
        for _ in range(50):
            src_col, v = all_vals[rng.integers(0, len(all_vals))]
            if int(src_col) != host and v not in host_vals:
                rows.append((syn_id, host, v))
                break
    return pd.DataFrame(rows, columns=["syn_id", "host_col_id", "err_value"])


def detection_matrix(
    spark: SparkSession,
    syn_pdf: pd.DataFrame,
    cdf: DataFrame,
    dists: DataFrame,
    value_dim: DataFrame,
    candidates: DataFrame,
) -> DataFrame:
    """(cand_id, syn_id) pairs where candidate r detects the injected error.

    Reuses the already-materialized per-(column, func) CDFs: injecting one
    value shifts the host CDF by exactly one, so the augmented pre-condition
    is (cnt_le[d_in_idx] + [err_dist <= d_in]) >= m * (n + 1).
    """
    syn_df = spark.createDataFrame(syn_pdf)
    err_dists = (
        syn_df.join(value_dim, syn_df.err_value == value_dim.value)
        .join(dists, "value_id")
        .select("syn_id", "host_col_id", "func_id", F.col("dist").alias("err_dist"))
    )
    host_cdf = cdf.withColumnRenamed("col_id", "host_col_id")
    joined = err_dists.join(host_cdf, ["host_col_id", "func_id"]).join(
        F.broadcast(
            candidates.select("cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx")
        ),
        "func_id",
    )
    from repro.core.contingency import MIN_COVER_COL_SIZE

    err_in = (F.col("err_dist") <= F.col("d_in")).cast("long")
    covered_aug = (
        (F.element_at("cnt_le", (F.col("d_in_idx") + 1).cast("int")) + err_in).cast("double")
        >= F.col("m") * (F.col("n") + 1) - 1e-9
    ) & (F.col("n") + 1 >= MIN_COVER_COL_SIZE)
    host_clean = F.element_at("cnt_le", (F.col("d_out_idx") + 1).cast("int")) == F.col("n")
    detect = covered_aug & host_clean & (F.col("err_dist") > F.col("d_out"))
    return joined.where(detect).select("cand_id", "syn_id")
