"""Paper Table 8: ablation of the statistical tests.

All-Constraints with (a) the Wilson score interval replaced by the plain
ratio and (b) the Cohen's h effect-size filter removed, on ST-/RT-Bench
(real errors), reported as (F1@P=0.8, PR-AUC).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import BENCH_N_COLS, BENCH_SEEDS, emit, get_spark, standard_config, trained_rulesets  # noqa: E402

VARIANTS = {
    "All-Constraints": {},
    "no Wilson score interval": {"use_wilson": False},
    "no Cohen's h": {"use_cohens_h": False},
}


def run(spark) -> str:
    from repro.core.predict import predict_bench_pdf
    from repro.domains.benchmark import make_benchmark
    from repro.evalx.metrics import pr_metrics

    # real + the +10% synthetic setting (small real error counts make the
    # ablation noisy otherwise — EXPERIMENTS.md note)
    truths = {}
    for p in ("st", "rt"):
        for rate, tag in ((0.0, "real"), (0.10, "+10%")):
            b = make_benchmark(
                spark, p, n_cols=BENCH_N_COLS, seed=BENCH_SEEDS[p], synth_error_rate=rate
            )
            truths[f"{p} {tag}"] = b.values.toPandas()
    cols = list(truths)
    lines = [f"{'variant':<26} " + " ".join(f"{c:>12}" for c in cols)]
    for label, overrides in VARIANTS.items():
        print(f"[table8] training {label}", file=sys.stderr)
        rulesets = trained_rulesets(
            spark, "relational", config=standard_config(**overrides)
        )
        cells = [
            pr_metrics(predict_bench_pdf(rulesets["all"], truths[c]), truths[c]).row()
            for c in cols
        ]
        lines.append(f"{label:<26} " + " ".join(f"{c:>12}" for c in cells))
    return "\n".join(lines)


if __name__ == "__main__":
    spark = get_spark("table8")
    emit("table8", run(spark))
