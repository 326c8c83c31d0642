"""Benchmark fixtures: one small trained model + benches shared across all
pytest-benchmark cases (kept small so the benchmark suite stays in minutes)."""
from __future__ import annotations

import pytest


@pytest.fixture(scope="session")
def bench_corpus(spark):
    from repro.domains.corpus import make_corpus

    return make_corpus(spark, "relational", n_cols=600, seed=7)


@pytest.fixture(scope="session")
def bench_trained(spark, bench_corpus):
    from repro.core.train import TrainConfig, train

    cfg = TrainConfig(n_centroids=20, n_syn=400, b_size=300, n_rounds=10)
    return train(spark, bench_corpus, cfg)


@pytest.fixture(scope="session")
def bench_st(spark):
    from repro.domains.benchmark import make_benchmark

    return make_benchmark(spark, "st", n_cols=300, seed=11)


@pytest.fixture(scope="session")
def bench_st_pdf(bench_st):
    return bench_st.values.toPandas()
