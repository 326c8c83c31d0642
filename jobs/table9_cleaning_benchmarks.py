"""Paper Table 9 (+10, 11): learned SDCs applied to the 9 data-cleaning
benchmark datasets.

Reports, per dataset and aggregate:
- column-level coverage: columns on which at least one learned SDC applies,
- column-level precision: fraction of applied SDCs judged correct (an SDC
  is counted wrong if it flags any clean value under the *adjusted* ground
  truth),
- cell-level true-positives and precision, strict (labelled GT only) and
  adjusted (labelled + the Table-11 unlabelled errors),
plus a Table-10-style listing of the SDCs applied per named column and the
Table-11 new-errors-not-in-ground-truth detections.
"""
import sys
from collections import defaultdict
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark, trained_rulesets  # noqa: E402


def run(spark) -> str:
    from repro.core.predict import ColumnPredictor
    from repro.core.sdc import SDC
    from repro.domains.cleaning_datasets import DATASET_SHAPE, build_cleaning_datasets

    rulesets = trained_rulesets(spark, "relational")
    pred = ColumnPredictor(rulesets["fine"])
    cols = build_cleaning_datasets()

    per_ds = defaultdict(lambda: {"covered": 0, "cols_ok": 0, "tp": 0, "fp": 0, "fp_adj": 0})
    listings, table11 = [], []
    for c in cols:
        scores = pred.predict_column(c.values)
        applied = pred.applied_rules(c.values)
        d = per_ds[c.dataset]
        flagged = {v for v, s in zip(c.values, scores) if s > 0}
        if len(applied):
            d["covered"] += 1
            clean_adj = set(c.values) - c.all_errors
            if not (flagged & clean_adj):
                d["cols_ok"] += 1
            top = applied.sort_values("conf", ascending=False).iloc[0]
            sdc = SDC(int(top.cand_id), int(top.func_id), top.kind, top.family,
                      top["name"], top.d_in, top.d_out, top.m, top.conf)
            listings.append(f"  {c.dataset}.{c.column}: {sdc.describe()}"
                            + (f" -> flags {sorted(flagged)[:6]}" if flagged else ""))
        d["tp"] += len(flagged & c.labeled_errors)
        d["fp"] += len(flagged - c.labeled_errors)
        d["fp_adj"] += len(flagged - c.all_errors)
        missed = flagged & c.unlabeled_errors
        if missed:
            table11.append(f"  {c.dataset}.{c.column}: detects unlabelled errors {sorted(missed)}")

    order = list(DATASET_SHAPE)
    lines = [
        f"{'metric':<34} {'overall':>8} " + " ".join(f"{ds:>9}" for ds in order)
    ]

    def row(label, fn, pct=False):
        vals = [fn(per_ds[ds]) for ds in order]
        tot = fn({k: sum(per_ds[ds][k] for ds in order) for k in
                  ("covered", "cols_ok", "tp", "fp", "fp_adj")})
        fmt = (lambda v: "-" if v is None else (f"{v:.0%}" if pct else f"{v}"))
        return f"{label:<34} {fmt(tot):>8} " + " ".join(f"{fmt(v):>9}" for v in vals)

    lines.append(row("# cols covered by new SDCs", lambda d: d["covered"]))
    lines.append(row("col precision (% SDCs correct)",
                     lambda d: None if d["covered"] == 0 else d["cols_ok"] / d["covered"], pct=True))
    lines.append(row("cell true-positives", lambda d: d["tp"]))
    lines.append(row("cell precision (strict)",
                     lambda d: None if d["tp"] + d["fp"] == 0 else d["tp"] / (d["tp"] + d["fp"]), pct=True))
    lines.append(row("cell precision (adjusted)",
                     lambda d: None if d["tp"] + d["fp"] == 0
                     else (d["tp"] + d["fp"] - d["fp_adj"]) / (d["tp"] + d["fp"]), pct=True))
    out = "\n".join(lines)
    out += "\n\n== Table-10-style: SDCs applied per column ==\n" + "\n".join(listings)
    out += "\n\n== Table-11-style: errors not in existing ground truth ==\n" + "\n".join(table11)
    return out


if __name__ == "__main__":
    spark = get_spark("table9")
    emit("table9", run(spark))
