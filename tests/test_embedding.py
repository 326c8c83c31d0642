"""Tests for the simulated embedding spaces (distance regimes of DESIGN.md §2)."""
import numpy as np
import pytest

from repro.typedetect.embedding import DIM, emb_distance, emb_matrix, embed


def test_embeddings_unit_norm():
    for space in ("glove", "sbert"):
        for v in ["germany", "xqzt999", "new york", "12/3/2020"]:
            assert np.linalg.norm(embed(space, v)) == pytest.approx(1.0, abs=1e-9)


def test_same_domain_close_glove():
    assert emb_distance("glove", "january", "february") < 0.8


def test_unrelated_far_glove():
    d_in = emb_distance("glove", "january", "february")
    d_out = emb_distance("glove", "january", "yellow")
    assert d_out > d_in + 0.3


def test_typo_is_oov_far_glove():
    # GloVe-style: the typo is out-of-vocabulary -> far from the cluster
    assert emb_distance("glove", "january", "febuary") > 1.1


def test_rare_value_oov_glove_but_known_sbert():
    # the Fig.-3 phenomenon: rare-but-valid values are far for word-level
    # embeddings, near for the subword-aware space
    g = emb_distance("glove", "germany", "liechtenstein")
    s = emb_distance("sbert", "germany", "liechtenstein")
    assert g > 1.1
    assert s < 0.9


def test_sbert_typo_intermediate():
    d_in = emb_distance("sbert", "january", "february")
    d_typo = emb_distance("sbert", "january", "febuary")
    d_far = emb_distance("sbert", "january", "b50004853")
    assert d_in < d_typo <= d_far + 0.2


def test_distance_symmetric():
    a = emb_distance("sbert", "seattle", "germany")
    b = emb_distance("sbert", "germany", "seattle")
    assert a == pytest.approx(b, abs=1e-9)


def test_distance_self_zero():
    assert emb_distance("glove", "germany", "germany") == pytest.approx(0.0, abs=1e-9)


def test_matrix_shape_and_agreement():
    vals = ["germany", "france", "qqq111"]
    m = emb_matrix("glove", vals)
    assert m.shape == (3, DIM)
    d = np.linalg.norm(m[0] - embed("glove", "france"))
    assert d == pytest.approx(emb_distance("glove", "france", "germany"), abs=1e-9)


def test_multiword_value_in_domain():
    # full-name values average word vectors of the name domains
    from repro.domains.vocab import DOMAINS

    full = DOMAINS["full_name"].common[0]
    other = DOMAINS["full_name"].common[1]
    assert emb_distance("glove", full, other) < emb_distance("glove", full, "12/3/2020")


def test_deterministic_across_calls():
    embed.cache_clear()
    a = embed("sbert", "germany").copy()
    embed.cache_clear()
    b = embed("sbert", "germany").copy()
    assert np.allclose(a, b)


def test_distance_range():
    for space in ("glove", "sbert"):
        d = emb_distance(space, "january", "zz9q8x")
        assert 0.0 <= d <= 2.0
