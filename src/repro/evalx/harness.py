"""Benchmark harness: run Auto-Test variants and all baselines on a
benchmark, summarize as the paper's (F1@P=0.8, PR-AUC) pairs.

Used by every per-table job. Methods are named exactly as rows of paper
Table 4 so jobs can print paper-style tables.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.base import run_scorer_on_bench
from repro.core.predict import predict_bench
from repro.core.train import RuleSet
from repro.domains.benchmark import Benchmark
from repro.evalx.metrics import PRResult, pr_metrics

# (method key, paper row label, group) in Table-4 order
BASELINE_ROWS: list[tuple[str, str, str]] = [
    ("sherlock", "Sherlock", "Column-type detection"),
    ("doduo", "Doduo", "Column-type detection"),
    ("glove", "Glove", "Column-type detection"),
    ("sbert", "SentenceBERT", "Column-type detection"),
    ("regex", "Regex", "Column-type detection"),
    ("dataprep", "DataPrep", "Column-type detection"),
    ("validators", "Validators", "Column-type detection"),
    ("autodetect", "AutoDetect", "Data-cleaning"),
    ("katara", "Katara", "Data-cleaning"),
    ("svdd", "SVDD", "Outlier detection"),
    ("dbod", "DBOD", "Outlier detection"),
    ("lof", "LOF", "Outlier detection"),
    ("rkde", "RKDE", "Outlier detection"),
    ("ppca", "PPCA", "Outlier detection"),
    ("iforest", "IForest", "Outlier detection"),
    ("gpt_few_cot", "few-shot-with-COT", "GPT"),
    ("gpt_few_nocot", "few-shot-no-COT", "GPT"),
    ("gpt_zero_cot", "zero-shot-with-COT", "GPT"),
    ("gpt_zero_nocot", "zero-shot-no-COT", "GPT"),
    ("gpt_finetuned", "GPT-finetuned", "GPT"),
    ("vendor_a", "Vendor-A", "Commercial"),
    ("vendor_b", "Vendor-B", "Commercial"),
]


@dataclass
class MethodResult:
    method: str
    label: str
    group: str
    metrics: PRResult


def evaluate_ruleset(
    spark: SparkSession, bench: Benchmark, ruleset: RuleSet
) -> PRResult:
    """Quality of one Auto-Test rule set on a benchmark (Spark predict path)."""
    pred = predict_bench(spark, bench.values, ruleset).toPandas()
    truth = bench.values.toPandas()
    return pr_metrics(pred, truth)


def evaluate_baseline(
    spark: SparkSession, bench: Benchmark, name: str, params: dict | None = None
) -> PRResult:
    pred = run_scorer_on_bench(spark, bench.values, name, params).toPandas()
    truth = bench.values.toPandas()
    return pr_metrics(pred, truth)


def evaluate_methods(
    spark: SparkSession,
    bench: Benchmark,
    rulesets: dict[str, RuleSet] | None = None,
    baseline_keys: list[str] | None = None,
    baseline_params: dict[str, dict] | None = None,
) -> list[MethodResult]:
    """Run a set of methods on one benchmark.

    ``rulesets``: {"All-Constraints": rs, ...} Auto-Test variants;
    ``baseline_keys``: subset of BASELINE_ROWS keys (default: all);
    ``baseline_params``: per-method params (e.g. autodetect's trained model).
    """
    out: list[MethodResult] = []
    for label, rs in (rulesets or {}).items():
        out.append(MethodResult(label, label, "Ours", evaluate_ruleset(spark, bench, rs)))
    keys = baseline_keys if baseline_keys is not None else [k for k, _, _ in BASELINE_ROWS]
    rows = {k: (lbl, grp) for k, lbl, grp in BASELINE_ROWS}
    params = baseline_params or {}
    for k in keys:
        lbl, grp = rows[k]
        out.append(MethodResult(k, lbl, grp, evaluate_baseline(spark, bench, k, params.get(k))))
    return out


def results_table(results: dict[str, list[MethodResult]]) -> pd.DataFrame:
    """Wide table: one row per method, one '(F1@P=0.8, PR-AUC)' cell per
    benchmark setting — the layout of paper Table 4."""
    settings = list(results.keys())
    methods: list[tuple[str, str, str]] = []
    for rs in results.values():
        for r in rs:
            key = (r.method, r.label, r.group)
            if key not in methods:
                methods.append(key)
    rows = []
    for method, label, group in methods:
        row = {"group": group, "method": label}
        for s in settings:
            match = [r for r in results[s] if r.method == method]
            row[s] = match[0].metrics.row() if match else "-"
        rows.append(row)
    return pd.DataFrame(rows)
