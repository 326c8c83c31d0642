"""Shared fixtures for the test suite.

Heavy artifacts (small corpus, one trained model) are session-scoped so the
many tests that need them amortize one Spark training run.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.domains.benchmark import BENCH_PROFILES, build_bench_pdf
from repro.domains.corpus import CORPUS_PROFILES, build_corpus_pdf


@pytest.fixture(scope="session")
def rng():
    return np.random.default_rng(0)


@pytest.fixture(scope="session")
def small_corpus_pdf() -> tuple[pd.DataFrame, pd.DataFrame]:
    """400-column relational-profile corpus (pandas) for substrate tests."""
    return build_corpus_pdf(CORPUS_PROFILES["relational"], 400, seed=7)


@pytest.fixture(scope="session")
def small_bench_pdf() -> tuple[pd.DataFrame, pd.DataFrame]:
    """300-column ST-profile benchmark (pandas) with ground truth."""
    return build_bench_pdf(BENCH_PROFILES["st"], 300, seed=11)


@pytest.fixture(scope="session")
def small_corpus(spark):
    from repro.domains.corpus import make_corpus

    return make_corpus(spark, "relational", n_cols=400, seed=7)


@pytest.fixture(scope="session")
def trained(spark, small_corpus):
    """One end-to-end training run on the small corpus, shared by all
    integration tests (candidates, stats, selection, prediction)."""
    from repro.core.train import TrainConfig, train

    cfg = TrainConfig(n_centroids=20, n_syn=300, b_size=200, n_rounds=10)
    return train(spark, small_corpus, cfg)
