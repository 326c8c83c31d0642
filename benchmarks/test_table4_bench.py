"""Benchmarks for the Table-4 quality pipeline: Spark prediction path of the
Auto-Test variants and one representative baseline runner."""
import pytest


@pytest.mark.parametrize("variant", ["fine", "all"])
def test_predict_bench_spark(benchmark, spark, bench_trained, bench_st, variant):
    from repro.core.predict import predict_bench

    rs = bench_trained.ruleset(variant)

    def run():
        return predict_bench(spark, bench_st.values, rs).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n >= 0


def test_baseline_runner_spark(benchmark, spark, bench_st):
    from repro.baselines.base import run_scorer_on_bench

    def run():
        return run_scorer_on_bench(spark, bench_st.values, "regex").count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n > 0


def test_metrics_computation(benchmark, bench_trained, bench_st_pdf):
    from repro.core.predict import predict_bench_pdf
    from repro.evalx.metrics import pr_metrics

    pred = predict_bench_pdf(bench_trained.fine, bench_st_pdf)

    def run():
        return pr_metrics(pred, bench_st_pdf)

    m = benchmark(run)
    assert 0 <= m.pr_auc <= 1
