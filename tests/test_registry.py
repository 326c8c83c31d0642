"""Tests for the evaluator registry and the distributed distance stage."""
import numpy as np
import pandas as pd
import pytest

from repro.typedetect.cta import cta_distance
from repro.typedetect.embedding import emb_distance
from repro.typedetect.function import function_distance
from repro.typedetect.hashing import hash_distance
from repro.typedetect.pattern import pattern_distance
from repro.typedetect.registry import (
    DistanceEvaluator,
    Registry,
    build_registry,
    compute_distances,
    make_value_dim,
)


@pytest.fixture(scope="module")
def registry(small_corpus_pdf):
    values, _ = small_corpus_pdf
    return build_registry(values, n_centroids=10, n_hash=3)


def test_registry_dense_ids(registry):
    assert [s.func_id for s in registry.specs] == list(range(len(registry.specs)))


def test_registry_kind_composition(registry):
    kinds = {s.kind for s in registry.specs}
    assert kinds == {"cta", "emb", "pattern", "function", "hash"}
    assert len(registry.by_kind("function")) == 8
    assert len(registry.by_kind("emb")) == 20  # 10 per space
    assert len(registry.by_kind("hash")) == 3


def test_registry_token_stable(registry, small_corpus_pdf):
    values, _ = small_corpus_pdf
    again = build_registry(values, n_centroids=10, n_hash=3)
    assert registry.token() == again.token()


def test_registry_ablation_kinds(small_corpus_pdf):
    values, _ = small_corpus_pdf
    reg = build_registry(values, n_centroids=5, include_kinds=("cta", "function"))
    assert {s.kind for s in reg.specs} == {"cta", "function"}


def test_registry_requires_corpus_for_embeddings():
    with pytest.raises(ValueError):
        build_registry(None, include_kinds=("emb",))


def test_evaluator_matches_direct_functions(registry):
    ev = DistanceEvaluator(registry.specs)
    values = ["germany", "fy17", "12/3/2020", "xqzv99"]
    mat = ev.matrix(values)
    assert mat.shape == (4, len(registry.specs))
    for s in registry.specs[::7]:  # sample every 7th function
        for i, v in enumerate(values):
            if s.kind == "cta":
                want = cta_distance(s.family, s.name, v)
            elif s.kind == "emb":
                want = emb_distance(s.family, s.name, v)
            elif s.kind == "pattern":
                want = pattern_distance(s.name, v)
            elif s.kind == "function":
                want = function_distance(s.name, v)
            else:
                want = hash_distance(s.name, v)
            assert mat[i, s.func_id] == pytest.approx(want, abs=1e-9), (s, v)


def test_value_dim_deterministic(spark):
    pdf = pd.DataFrame({"col_id": [0, 0, 1], "value": ["b", "a", "b"]})
    df = spark.createDataFrame(pdf)
    vd = make_value_dim(spark, df).toPandas().sort_values("value_id")
    assert vd["value"].tolist() == ["a", "b"]  # sorted, distinct


def test_compute_distances_matches_local(spark, registry):
    pdf = pd.DataFrame(
        {"col_id": [0] * 4, "value": ["germany", "fy17", "12/3/2020", "xqzv99"]}
    )
    df = spark.createDataFrame(pdf)
    vd = make_value_dim(spark, df)
    dists = compute_distances(spark, vd, registry).toPandas()
    assert len(dists) == 4 * len(registry.specs)
    vd_pdf = vd.toPandas()
    ev = DistanceEvaluator(registry.specs)
    local = ev.matrix(vd_pdf.sort_values("value_id")["value"].tolist())
    got = dists.pivot(index="value_id", columns="func_id", values="dist").sort_index()
    assert np.allclose(got.to_numpy(), local, atol=1e-9)


def test_spec_pdf_roundtrip(registry):
    pdf = registry.spec_pdf()
    assert list(pdf.columns) == ["func_id", "kind", "family", "name"]
    assert len(pdf) == len(registry.specs)
