"""Benchmarks for Table 5 / Figures 12-13: per-column online prediction
latency — the compact Fine-Select rule set must beat All-Constraints."""
import pytest


@pytest.fixture(scope="module")
def sample_columns(bench_st_pdf):
    return [g["value"].tolist() for _, g in bench_st_pdf.groupby("col_id")][:100]


@pytest.mark.parametrize("variant", ["fine", "coarse", "all"])
def test_per_column_latency(benchmark, bench_trained, sample_columns, variant):
    from repro.core.predict import ColumnPredictor

    pred = ColumnPredictor(bench_trained.ruleset(variant))

    def run():
        for c in sample_columns:
            pred.predict_column(c)

    benchmark(run)


def test_large_column_latency(benchmark, bench_trained):
    import numpy as np

    from repro.core.predict import ColumnPredictor
    from repro.domains.vocab import DOMAINS

    rng = np.random.default_rng(0)
    col = list(dict.fromkeys(DOMAINS["date"].generator(rng, 3000)))[:1000]
    pred = ColumnPredictor(bench_trained.fine)

    def run():
        return pred.predict_column(col)

    s = benchmark(run)
    assert s.shape == (len(col),)
