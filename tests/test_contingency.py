"""Correctness of the distributed contingency pipeline: the Spark CDF stage
is oracle-checked against DuckDB, and the per-candidate contingency counts
are checked against a brute-force pure-python evaluation of the SDC
semantics (Definition 2) on the same data."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.candidates import generate_candidates
from repro.core.contingency import (
    MAX_T,
    column_func_cdf,
    contingency_table,
    func_dim,
)
from repro.core.sdc import SDC
from repro.domains.corpus import CORPUS_PROFILES, build_corpus_pdf
from repro.oracle import assert_equivalent
from repro.typedetect.base import KIND_GRIDS
from repro.typedetect.registry import (
    DistanceEvaluator,
    Registry,
    build_registry,
    compute_distances,
    make_value_dim,
)


@pytest.fixture(scope="module")
def setup(spark):
    values_pdf, _ = build_corpus_pdf(CORPUS_PROFILES["relational"], 60, seed=13)
    registry = build_registry(values_pdf, n_centroids=4, n_hash=2)
    values_df = spark.createDataFrame(values_pdf)
    value_dim = make_value_dim(spark, values_df)
    dists = compute_distances(spark, value_dim, registry).cache()
    funcs = func_dim(spark, registry)
    cdf = column_func_cdf(values_df, value_dim, dists, funcs).cache()
    return values_pdf, registry, values_df, value_dim, dists, funcs, cdf


def test_func_dim_padded(spark, setup):
    _, registry, *_ , funcs, _ = setup[:1] + setup[1:2] + setup[2:]
    fpdf = func_dim(spark, registry).toPandas()
    assert all(len(t) == MAX_T for t in fpdf["thr"])
    for r in fpdf.itertuples():
        thr = KIND_GRIDS[r.kind].thresholds
        assert list(r.thr[: len(thr)]) == list(thr)


def test_cdf_oracle_single_threshold(spark, setup):
    """The n / cnt_le aggregation cross-checked with DuckDB for one kind."""
    values_pdf, registry, values_df, value_dim, dists, funcs, cdf = setup
    emb_ids = [s.func_id for s in registry.by_kind("emb")]
    t0 = KIND_GRIDS["emb"].thresholds[0]
    got = (
        cdf.where(F.col("func_id").isin(emb_ids))
        .select("col_id", "func_id", "n", F.element_at("cnt_le", 1).alias("c0"))
    )
    assert_equivalent(
        got,
        f"""
        SELECT v.col_id AS col_id, d.func_id AS func_id,
               count(*) AS n,
               sum(CASE WHEN d.dist <= {t0} THEN 1 ELSE 0 END) AS c0
        FROM v JOIN vd ON v.value = vd.value JOIN d ON vd.value_id = d.value_id
        WHERE d.func_id IN ({",".join(map(str, emb_ids))})
        GROUP BY v.col_id, d.func_id
        """,
        v=values_df,
        vd=value_dim,
        d=dists,
    )


def test_cdf_monotone_and_bounded(spark, setup):
    *_, cdf = setup
    pdf = cdf.toPandas()
    for r in pdf.itertuples():
        arr = list(r.cnt_le)
        assert arr == sorted(arr)  # CDF monotone
        assert 0 <= arr[0] and arr[-1] <= r.n


def test_contingency_matches_bruteforce(spark, setup):
    values_pdf, registry, values_df, value_dim, dists, funcs, cdf = setup
    cands = generate_candidates(registry)
    # subsample candidates for brute-force tractability
    cands = cands[cands["cand_id"] % 11 == 0].reset_index(drop=True)
    cand_df = spark.createDataFrame(
        cands[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )
    n_cols = values_pdf["col_id"].nunique()
    got = contingency_table(cdf, cand_df, n_cols).toPandas().set_index("cand_id")

    ev = DistanceEvaluator(registry.specs)
    by_col = {
        cid: ev.matrix(grp["value"].tolist())
        for cid, grp in values_pdf.groupby("col_id")
    }
    for r in cands.itertuples():
        sdc = SDC(r.cand_id, r.func_id, r.kind, r.family, r.name, r.d_in, r.d_out, r.m)
        a = b = c = d = 0
        for cid, mat in by_col.items():
            dcol = mat[:, r.func_id]
            cov = sdc.pre_condition(dcol) and len(dcol) >= 8  # MIN_COVER_COL_SIZE
            trig = bool(np.any(sdc.post_condition(dcol)))
            if cov and trig:
                a += 1
            elif cov:
                c += 1
            elif trig:
                b += 1
            else:
                d += 1
        row = got.loc[r.cand_id]
        assert (row.cov_t, row.cov_not_t, row.notcov_t, row.notcov_not_t) == (
            a, c, b, d,
        ), r


def test_contingency_total_is_corpus_size(spark, setup):
    values_pdf, registry, values_df, value_dim, dists, funcs, cdf = setup
    cands = generate_candidates(registry).head(50)
    cand_df = spark.createDataFrame(
        cands[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )
    n_cols = values_pdf["col_id"].nunique()
    got = contingency_table(cdf, cand_df, n_cols).toPandas()
    totals = got[["cov_t", "cov_not_t", "notcov_t", "notcov_not_t"]].sum(axis=1)
    assert (totals == n_cols).all()
