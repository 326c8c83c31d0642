"""Benchmark for the Table-3 corpus-statistics aggregation (Spark)."""


def test_corpus_stats_aggregation(benchmark, spark, bench_corpus):
    from repro.domains.corpus import corpus_stats

    def run():
        return corpus_stats(bench_corpus).collect()

    rows = benchmark(run)
    assert rows[0]["total_cols"] == 600
