"""Tests for C_syn construction and the distant-supervision detection matrix."""
import numpy as np
import pytest

from repro.core.candidates import generate_candidates
from repro.core.contingency import column_func_cdf, func_dim
from repro.core.sdc import SDC
from repro.core.synth_errors import detection_matrix, sample_syn_columns
from repro.domains.corpus import CORPUS_PROFILES, build_corpus_pdf
from repro.typedetect.registry import (
    DistanceEvaluator,
    build_registry,
    compute_distances,
    make_value_dim,
)


@pytest.fixture(scope="module")
def syn_setup(spark):
    values_pdf, _ = build_corpus_pdf(CORPUS_PROFILES["relational"], 50, seed=21)
    registry = build_registry(values_pdf, n_centroids=4)
    values_df = spark.createDataFrame(values_pdf)
    value_dim = make_value_dim(spark, values_df)
    dists = compute_distances(spark, value_dim, registry).cache()
    funcs = func_dim(spark, registry)
    cdf = column_func_cdf(values_df, value_dim, dists, funcs).cache()
    syn = sample_syn_columns(values_pdf, 40, seed=3)
    return values_pdf, registry, value_dim, dists, cdf, syn


def test_sample_syn_valid(syn_setup):
    values_pdf, _, _, _, _, syn = syn_setup
    by_col = values_pdf.groupby("col_id")["value"].apply(set).to_dict()
    for r in syn.itertuples():
        assert r.err_value not in by_col[r.host_col_id]


def test_sample_syn_deterministic(syn_setup):
    values_pdf, *_ = syn_setup
    a = sample_syn_columns(values_pdf, 20, seed=3)
    b = sample_syn_columns(values_pdf, 20, seed=3)
    assert a.equals(b)


def test_detection_matrix_matches_bruteforce(spark, syn_setup):
    values_pdf, registry, value_dim, dists, cdf, syn = syn_setup
    cands = generate_candidates(registry)
    cands = cands[cands["cand_id"] % 17 == 0].reset_index(drop=True)
    cand_df = spark.createDataFrame(
        cands[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )
    got = detection_matrix(spark, syn, cdf, dists, value_dim, cand_df).toPandas()
    got_pairs = set(map(tuple, got[["cand_id", "syn_id"]].to_numpy()))

    ev = DistanceEvaluator(registry.specs)
    by_col = {
        cid: (grp["value"].tolist(), ev.matrix(grp["value"].tolist()))
        for cid, grp in values_pdf.groupby("col_id")
    }
    expect = set()
    for s in syn.itertuples():
        host_vals, host_mat = by_col[s.host_col_id]
        err_mat = ev.matrix([s.err_value])
        for r in cands.itertuples():
            dcol = np.r_[host_mat[:, r.func_id], err_mat[0, r.func_id]]
            sdc = SDC(r.cand_id, r.func_id, r.kind, r.family, r.name, r.d_in, r.d_out, r.m)
            covered = sdc.pre_condition(dcol) and len(dcol) >= 8  # MIN_COVER_COL_SIZE
            host_clean = not np.any(host_mat[:, r.func_id] > r.d_out)
            err_out = err_mat[0, r.func_id] > r.d_out
            if covered and host_clean and err_out:
                expect.add((r.cand_id, s.syn_id))
    assert got_pairs == expect


def test_detection_pairs_unique(spark, syn_setup):
    values_pdf, registry, value_dim, dists, cdf, syn = syn_setup
    cands = generate_candidates(registry).head(200)
    cand_df = spark.createDataFrame(
        cands[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )
    got = detection_matrix(spark, syn, cdf, dists, value_dim, cand_df).toPandas()
    assert not got.duplicated().any()
