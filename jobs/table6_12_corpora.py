"""Paper Table 6 + Table 12 (Appendix A): sensitivity to the training corpus.

All three Auto-Test variants trained on each corpus profile (relational /
spreadsheet / tablib), evaluated on both benches at all four error levels.
Table 6 is the Fine-Select slice; Table 12 is the full grid.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import bench_settings, emit, get_spark, trained_rulesets  # noqa: E402


def run(spark) -> str:
    from repro.evalx.harness import evaluate_methods, results_table

    all_rulesets = {p: trained_rulesets(spark, p) for p in ("relational", "spreadsheet", "tablib")}
    benches = {p: bench_settings(spark, p) for p in ("st", "rt")}

    blocks = []
    for corpus_profile, rulesets in all_rulesets.items():
        named = {
            "All-Constraints": rulesets["all"],
            "Fine-Select": rulesets["fine"],
            "Coarse-Select": rulesets["coarse"],
        }
        results = {}
        for bench_profile, settings in benches.items():
            for label, bench in settings.items():
                print(f"[table6/12] {corpus_profile} -> {bench_profile}/{label}", file=sys.stderr)
                results[f"{bench_profile}:{label}"] = evaluate_methods(
                    spark, bench, rulesets=named, baseline_keys=[]
                )
        blocks.append(
            f"== Trained on {corpus_profile} ==\n"
            + results_table(results).to_string(index=False)
        )
    return "\n\n".join(blocks)


if __name__ == "__main__":
    spark = get_spark("table6_12")
    emit("table6_12", run(spark))
