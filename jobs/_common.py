"""Shared plumbing for the per-table jobs.

Each ``jobs/tableN_*.py`` is a spark-submit entrypoint that reproduces one
table of the paper's evaluation section, printing the same rows the paper
reports and writing them under ``artifacts/`` (EXPERIMENTS.md is compiled
from these outputs).

Standard scale (DESIGN.md §5 scale note): 2000-column training corpora
(paper: 250-300K), 1200-column benchmarks (same as paper), B_size = 500 and
B_FPR = 0.1 (paper defaults).
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

from pyspark.sql import SparkSession

REPO = Path(__file__).resolve().parents[1]
ARTIFACTS = REPO / "artifacts"

CORPUS_N_COLS = 2000
BENCH_N_COLS = 1200
BENCH_SEEDS = {"st": 11, "rt": 12}
ERROR_LEVELS = [0.0, 0.05, 0.10, 0.20]


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
        "--conf spark.ui.showConsoleProgress=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def standard_config(**overrides):
    from repro.core.train import TrainConfig

    return TrainConfig(**{"n_centroids": 40, "n_syn": 1200, **overrides})


def trained_rulesets(spark, profile: str, config=None, refresh: bool = False):
    from repro.core.train import fit_cached

    return fit_cached(
        spark, profile, n_cols=CORPUS_N_COLS, config=config or standard_config(),
        refresh=refresh,
    )


def bench_settings(spark, profile: str):
    """The paper's four Table-4 settings for one benchmark."""
    from repro.domains.benchmark import make_benchmark

    out = {}
    for rate in ERROR_LEVELS:
        label = "real" if rate == 0 else f"+{int(rate*100)}% syn err."
        out[label] = make_benchmark(
            spark, profile, n_cols=BENCH_N_COLS, seed=BENCH_SEEDS[profile],
            synth_error_rate=rate,
        )
    return out


def autodetect_model(spark, profile: str = "relational"):
    from repro.baselines.autodetect import train_cooccurrence
    from repro.domains.corpus import make_corpus

    corpus = make_corpus(spark, profile, n_cols=CORPUS_N_COLS, seed=7)
    return train_cooccurrence(corpus.values.toPandas())


def emit(name: str, text: str) -> None:
    """Print a table and persist it under artifacts/ for EXPERIMENTS.md."""
    print(text)
    ARTIFACTS.mkdir(exist_ok=True)
    (ARTIFACTS / f"{name}.txt").write_text(text)
    print(f"[saved artifacts/{name}.txt]", file=sys.stderr)
