"""Paper Table 4: main quality comparison.

(F1@P=0.8, PR-AUC) for the three Auto-Test variants and all 22 baselines,
on ST-Bench and RT-Bench, at real / +5% / +10% / +20% synthetic-error
levels. Auto-Test is trained on the Relational-Tables corpus (the paper's
default for this table).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import autodetect_model, bench_settings, emit, get_spark, trained_rulesets  # noqa: E402


def run(spark) -> str:
    from repro.evalx.harness import evaluate_methods, results_table

    rulesets = trained_rulesets(spark, "relational")
    named = {
        "All-Constraints": rulesets["all"],
        "Fine-Select": rulesets["fine"],
        "Coarse-Select": rulesets["coarse"],
    }
    ad = {"autodetect": {"model": autodetect_model(spark)}}
    blocks = []
    for profile, title in [("st", "Spreadsheet-Table-Bench (ST-Bench)"),
                           ("rt", "Relational-Table-Bench (RT-Bench)")]:
        results = {}
        for label, bench in bench_settings(spark, profile).items():
            print(f"[table4] evaluating {profile} / {label} ...", file=sys.stderr)
            results[label] = evaluate_methods(
                spark, bench, rulesets=named, baseline_params=ad
            )
        blocks.append(f"== {title} ==\n" + results_table(results).to_string(index=False))
    return "\n\n".join(blocks)


if __name__ == "__main__":
    spark = get_spark("table4")
    emit("table4", run(spark))
