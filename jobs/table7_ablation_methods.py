"""Paper Table 7: ablation of column-type-detection families.

Fine-Select retrained with one family removed at a time (no-CTA /
no-embedding / no-pattern / no-function), evaluated on ST-/RT-Bench (real
errors), reported as (F1@P=0.8, PR-AUC).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import BENCH_N_COLS, BENCH_SEEDS, emit, get_spark, standard_config, trained_rulesets  # noqa: E402

ABLATIONS = {
    "Fine-Select": ("cta", "emb", "pattern", "function"),
    "no-CTA": ("emb", "pattern", "function"),
    "no-embedding": ("cta", "pattern", "function"),
    "no-pattern": ("cta", "emb", "function"),
    "no-function": ("cta", "emb", "pattern"),
}


def run(spark) -> str:
    from repro.core.predict import predict_bench_pdf
    from repro.domains.benchmark import make_benchmark
    from repro.evalx.metrics import pr_metrics

    # real errors (the paper's setting) plus the +10% synthetic setting: the
    # real benches carry only 40-47 errors, so the extra column stabilizes
    # the ablation comparison (EXPERIMENTS.md note).
    truths = {}
    for p in ("st", "rt"):
        for rate, tag in ((0.0, "real"), (0.10, "+10%")):
            b = make_benchmark(
                spark, p, n_cols=BENCH_N_COLS, seed=BENCH_SEEDS[p], synth_error_rate=rate
            )
            truths[f"{p} {tag}"] = b.values.toPandas()
    cols = list(truths)
    lines = [f"{'variant':<14} " + " ".join(f"{c:>12}" for c in cols)]
    for label, kinds in ABLATIONS.items():
        print(f"[table7] training {label}", file=sys.stderr)
        rulesets = trained_rulesets(
            spark, "relational", config=standard_config(include_kinds=kinds)
        )
        cells = [
            pr_metrics(predict_bench_pdf(rulesets["fine"], truths[c]), truths[c]).row()
            for c in cols
        ]
        lines.append(f"{label:<14} " + " ".join(f"{c:>12}" for c in cells))
    return "\n".join(lines)


if __name__ == "__main__":
    spark = get_spark("table7")
    emit("table7", run(spark))
