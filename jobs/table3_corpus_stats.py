"""Paper Table 3: training-corpus statistics.

Prints total column counts and per-column distinct-value statistics for the
three corpus profiles (Relational-Tables / Spreadsheet-Tables / TabLib
analogs). Our columns are distinct-value sets, so total-value and
distinct-value statistics coincide (noted in EXPERIMENTS.md).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import CORPUS_N_COLS, emit, get_spark  # noqa: E402


def run(spark) -> str:
    from repro.domains.corpus import CORPUS_PROFILES, corpus_stats, make_corpus

    lines = [
        f"{'Corpus':<14} {'total cols':>10} {'mean dist vals':>15} {'median dist vals':>17}"
    ]
    for profile in CORPUS_PROFILES:
        corpus = make_corpus(spark, profile, n_cols=CORPUS_N_COLS, seed=7)
        row = corpus_stats(corpus).collect()[0]
        lines.append(
            f"{profile:<14} {row['total_cols']:>10} "
            f"{row['mean_distinct']:>15.2f} {row['median_distinct']:>17.0f}"
        )
    return "\n".join(lines)


if __name__ == "__main__":
    spark = get_spark("table3")
    emit("table3", run(spark))
