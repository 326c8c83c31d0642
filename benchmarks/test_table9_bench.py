"""Benchmark for the Table-9 experiment: applying learned SDCs to the nine
data-cleaning datasets (driver-side per-column application path)."""


def test_cleaning_datasets_application(benchmark, bench_trained):
    from repro.core.predict import ColumnPredictor
    from repro.domains.cleaning_datasets import build_cleaning_datasets

    cols = build_cleaning_datasets()
    pred = ColumnPredictor(bench_trained.fine)

    def run():
        return sum(
            int((pred.predict_column(c.values) > 0).sum()) for c in cols
        )

    n_flagged = benchmark(run)
    assert n_flagged >= 0
