"""Tests for the evaluation harness and table formatting."""
from repro.domains.benchmark import make_benchmark
from repro.evalx.harness import MethodResult, evaluate_methods, results_table
from repro.evalx.metrics import PRResult


def test_evaluate_methods_subset(spark):
    bench = make_benchmark(spark, "st", n_cols=60, seed=19)
    res = evaluate_methods(spark, bench, baseline_keys=["regex", "katara"])
    assert [r.method for r in res] == ["regex", "katara"]
    for r in res:
        assert 0.0 <= r.metrics.pr_auc <= 1.0


def test_evaluate_ruleset_variant(spark, trained):
    bench = make_benchmark(spark, "st", n_cols=60, seed=19)
    res = evaluate_methods(
        spark, bench, rulesets={"Fine-Select": trained.fine}, baseline_keys=[]
    )
    assert res[0].group == "Ours"


def test_results_table_layout():
    m = PRResult(0.5, 0.25, 10, 5, None)
    results = {
        "real": [MethodResult("regex", "Regex", "Column-type detection", m)],
        "+5%": [MethodResult("regex", "Regex", "Column-type detection", m)],
    }
    t = results_table(results)
    assert list(t.columns) == ["group", "method", "real", "+5%"]
    assert t.iloc[0]["real"] == "0.25, 0.50"


def test_results_table_missing_method_dash():
    m = PRResult(0.5, 0.25, 10, 5, None)
    results = {
        "a": [MethodResult("regex", "Regex", "g", m)],
        "b": [MethodResult("katara", "Katara", "g", m)],
    }
    t = results_table(results).set_index("method")
    assert t.loc["Regex", "b"] == "-"
    assert t.loc["Katara", "a"] == "-"
