"""Paper Figures 12-14 (efficiency), as a textual report.

- Fig 12: average per-column online prediction latency for Fine-Select vs
  All-Constraints vs a representative baseline;
- Fig 13: per-column latency vs number of distinct values in the column;
- Fig 14: offline training time vs training-corpus size, broken into
  candidate-gen/assessment, distant supervision, and the two selections.
"""
import sys
import time
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import BENCH_N_COLS, BENCH_SEEDS, emit, get_spark, standard_config, trained_rulesets  # noqa: E402

COL_SIZES = [10, 30, 100, 300, 1000]
CORPUS_SIZES = [500, 1000, 2000, 4000]


def run(spark) -> str:
    import numpy as np

    from repro.baselines.base import make_scorer
    from repro.core.predict import ColumnPredictor
    from repro.core.train import train
    from repro.domains.benchmark import make_benchmark
    from repro.domains.corpus import make_corpus
    from repro.domains.vocab import DOMAINS

    rulesets = trained_rulesets(spark, "relational")
    bench = make_benchmark(spark, "st", n_cols=BENCH_N_COLS, seed=BENCH_SEEDS["st"])
    truth = bench.values.toPandas()
    cols = [g["value"].tolist() for _, g in truth.groupby("col_id")][:300]

    lines = ["== Fig 12: average online latency per column (seconds) =="]
    predictors = {
        "Fine-Select": ColumnPredictor(rulesets["fine"]),
        "Coarse-Select": ColumnPredictor(rulesets["coarse"]),
        "All-Constraints": ColumnPredictor(rulesets["all"]),
    }
    # warm the (shared, process-wide) embedding caches first, otherwise the
    # first predictor measured pays everyone's cache misses
    for pred in predictors.values():
        for c in cols:
            pred.predict_column(c)
    for label, pred in predictors.items():
        t0 = time.perf_counter()
        for c in cols:
            pred.predict_column(c)
        lines.append(f"{label:<18} {(time.perf_counter() - t0) / len(cols):.4f}")
    sb = make_scorer("sbert")
    t0 = time.perf_counter()
    for c in cols:
        sb.score(c)
    lines.append(f"{'SentenceBERT':<18} {(time.perf_counter() - t0) / len(cols):.4f}")

    lines.append("\n== Fig 13: latency vs column size (seconds per column) ==")
    rng = np.random.default_rng(0)
    gen = DOMAINS["date"].generator
    lines.append(f"{'n_distinct':>10} {'Fine-Select':>12} {'All-Constraints':>16}")
    for n in COL_SIZES:
        col = list(dict.fromkeys(gen(rng, n * 2)))[:n]
        for p in predictors.values():  # warm embedding caches for this column
            p.predict_column(col)
        times = []
        for label in ("Fine-Select", "All-Constraints"):
            p = predictors[label]
            reps = max(1, 30 // max(1, n // 100))
            t0 = time.perf_counter()
            for _ in range(reps):
                p.predict_column(col)
            times.append((time.perf_counter() - t0) / reps)
        lines.append(f"{n:>10} {times[0]:>12.4f} {times[1]:>16.4f}")

    lines.append("\n== Fig 14: offline training time vs corpus size (seconds) ==")
    lines.append(f"{'n_cols':>7} {'assess':>8} {'distsup':>8} {'coarse':>8} {'fine':>8} {'total':>8}")
    # warm-up training run: Spark executors and the process-wide embedding
    # caches otherwise charge their cold-start to the smallest corpus
    train(spark, make_corpus(spark, "relational", n_cols=200, seed=3), standard_config())
    for n in CORPUS_SIZES:
        corpus = make_corpus(spark, "relational", n_cols=n, seed=7)
        res = train(spark, corpus, standard_config())
        t = res.timings
        lines.append(
            f"{n:>7} {t['candidate_assessment']:>8.1f} {t['distant_supervision']:>8.1f} "
            f"{t['coarse_select']:>8.1f} {t['fine_select']:>8.1f} {t['total']:>8.1f}"
        )
    return "\n".join(lines)


if __name__ == "__main__":
    spark = get_spark("efficiency")
    emit("efficiency", run(spark))
