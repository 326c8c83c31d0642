"""Paper §6.5 robustness: adversarial random-hash SDC candidates must all be
rejected by the statistical tests (no hash rule reaches R_all)."""
import numpy as np

from repro.typedetect.hashing import hash_distance


def test_hash_distance_uniformish():
    vals = [hash_distance("h0", f"v{i}") for i in range(2000)]
    arr = np.array(vals)
    assert 0.45 < arr.mean() < 0.55
    assert arr.min() >= 0.0 and arr.max() <= 1.0


def test_hash_distance_deterministic():
    assert hash_distance("h1", "x") == hash_distance("h1", "x")
    assert hash_distance("h1", "x") != hash_distance("h2", "x")


def test_adversarial_hash_candidates_rejected(spark, small_corpus):
    """Train with 40 injected random-hash functions: none survives into
    R_all, so they contribute no rules and no false positives (§6.5)."""
    from repro.core.train import TrainConfig, train

    cfg = TrainConfig(n_centroids=5, n_syn=100, b_size=100, n_rounds=5, n_hash=40)
    res = train(spark, small_corpus, cfg)
    assert (res.r_all["kind"] != "hash").all()
    assert len(res.r_all) > 0  # real candidates still pass
    for rs in (res.coarse, res.fine):
        assert (rs.rules["kind"] != "hash").all()
