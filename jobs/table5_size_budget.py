"""Paper Table 5: sensitivity to the constraint-count budget B_size.

Quality (F1@P=0.8, PR-AUC on real benches) and per-column prediction
latency for Fine-Select at B_size in {100, 200, 500, 1000}, with
All-Constraints as the reference point. Selection is re-run on the shared
R_all/detection matrices (only the LP budget changes), matching the paper's
protocol.
"""
import sys
import time
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import BENCH_N_COLS, BENCH_SEEDS, emit, get_spark, standard_config, CORPUS_N_COLS  # noqa: E402

# The paper sweeps {100, 200, 500, 1000} against a 26673-rule pool; our
# pruned pool is ~10^2 smaller, so the budget sweep is scaled accordingly
# (EXPERIMENTS.md) — what must reproduce is the shape: quality and latency
# both grow with the budget, and a modest budget matches All-Constraints.
B_SIZES = [10, 25, 50, 100]


def run(spark) -> str:
    from repro.core import selection
    from repro.core.predict import ColumnPredictor, predict_bench_pdf
    from repro.core.train import RULE_COLUMNS, RuleSet, train
    from repro.domains.benchmark import make_benchmark
    from repro.domains.corpus import make_corpus
    from repro.evalx.metrics import pr_metrics

    cfg = standard_config()
    corpus = make_corpus(spark, "relational", n_cols=CORPUS_N_COLS, seed=7)
    res = train(spark, corpus, cfg)

    variants: dict[str, RuleSet] = {}
    for b in B_SIZES:
        sel = selection.fine_select(
            res.r_all, res.detect_pairs, b_size=b, b_fpr=cfg.b_fpr,
            delta=cfg.delta, seed=cfg.seed + 9, n_rounds=cfg.n_rounds,
        )
        variants[str(b)] = RuleSet(f"fine-{b}", sel.selected[RULE_COLUMNS], res.registry)
    variants[f"All-Constraints ({len(res.r_all)})"] = res.all_constraints

    blocks = []
    for profile in ("rt", "st"):
        bench = make_benchmark(
            spark, profile, n_cols=BENCH_N_COLS, seed=BENCH_SEEDS[profile]
        )
        truth = bench.values.toPandas()
        cols = [g["value"].tolist() for _, g in truth.groupby("col_id")]
        lines = [f"== {profile.upper()}-Bench ==",
                 f"{'budget':<24} {'rules':>6} {'F1@P=0.8':>9} {'PR-AUC':>7} {'sec/col':>9}"]
        for label, rs in variants.items():
            m = pr_metrics(predict_bench_pdf(rs, truth), truth)
            pred = ColumnPredictor(rs)
            t0 = time.perf_counter()
            for c in cols[:300]:
                pred.predict_column(c)
            latency = (time.perf_counter() - t0) / 300
            lines.append(
                f"{label:<24} {len(rs.rules):>6} {m.f1_at_p80:>9.2f} "
                f"{m.pr_auc:>7.2f} {latency:>9.4f}"
            )
        blocks.append("\n".join(lines))
    return "\n\n".join(blocks)


if __name__ == "__main__":
    spark = get_spark("table5")
    emit("table5", run(spark))
