"""Evaluation benchmarks: ST-Bench / RT-Bench analogs with cell ground truth.

Paper §6.1: each bench is 1200 real columns with human-labelled errors
(ST-Bench 47 dirty columns / 3.9%, RT-Bench 40 / 3.3%). We synthesize both at
the same size/prevalence, with the paper's error taxonomy and with Fig.-3
style "trap" columns (rare names, gene codes, mixed-format ranges) that
induce false positives in naive detectors.

Also implements the +5%/+10%/+20% synthetic-error settings of Table 4:
errors injected as values randomly sampled from *other* columns of the bench
(the paper's protocol).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.domains import vocab
from repro.domains.columns import generate_column, max_distinct
from repro.domains.corruption import make_error


@dataclass(frozen=True)
class BenchProfile:
    name: str
    median_distinct: float
    sigma: float
    dirty_frac: float  # fraction of columns with real errors
    uncommon_frac: float
    trap_frac: float  # fraction of clean columns forced to be FP traps


BENCH_PROFILES: dict[str, BenchProfile] = {
    # Spreadsheet-Table-Bench: shorter columns, 3.9% dirty
    "st": BenchProfile("st", 10.0, 0.65, 47 / 1200, 0.22, 0.12),
    # Relational-Table-Bench: longer columns, 3.3% dirty
    "rt": BenchProfile("rt", 22.0, 0.55, 40 / 1200, 0.16, 0.12),
}

# Domains whose clean columns trip naive detectors (paper Fig. 3).
_TRAP_DOMAINS = ("gene", "age_group", "pay_range", "web_domain", "unit_mixed",
                 "date_mixed", "code_mixed", "first_name", "full_name", "city")


@dataclass
class Benchmark:
    name: str
    values: DataFrame  # (col_id, value, is_error)
    meta: DataFrame  # (col_id, domain, n_distinct, is_dirty)
    n_cols: int


def build_bench_pdf(
    profile: BenchProfile, n_cols: int, seed: int
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Driver-side benchmark builder; deterministic in ``seed``."""
    rng = np.random.default_rng(seed)
    nl, code, mixed = vocab.nl_domains(), vocab.code_domains(), vocab.mixed_domains()
    rows: list[tuple[int, str, bool]] = []
    meta: list[tuple[int, str, int, bool]] = []
    n_dirty = int(round(profile.dirty_frac * n_cols))
    dirty_ids = set(rng.choice(n_cols, size=n_dirty, replace=False).tolist())
    for col_id in range(n_cols):
        if col_id not in dirty_ids and rng.random() < profile.trap_frac:
            domain = _TRAP_DOMAINS[rng.integers(0, len(_TRAP_DOMAINS))]
        else:
            u = rng.random()
            pool = nl if u < 0.5 else code if u < 0.85 else mixed
            domain = pool[rng.integers(0, len(pool))]
        n = int(np.clip(rng.lognormal(np.log(profile.median_distinct), profile.sigma), 4, 120))
        n = min(n, max_distinct(domain))
        vals = generate_column(domain, n, rng, uncommon_frac=profile.uncommon_frac)
        rows.extend((col_id, v, False) for v in vals)
        if col_id in dirty_ids:
            n_err = 1 if rng.random() < 0.7 else 2
            clean = list(vals)
            for _ in range(n_err):
                err = make_error(domain, clean, rng)
                rows.append((col_id, err, True))
                clean.append(err)
        meta.append((col_id, domain, n, col_id in dirty_ids))
    values_pdf = pd.DataFrame(rows, columns=["col_id", "value", "is_error"])
    meta_pdf = pd.DataFrame(meta, columns=["col_id", "domain", "n_distinct", "is_dirty"])
    return values_pdf, meta_pdf


def inject_synthetic_errors(
    values_pdf: pd.DataFrame,
    meta_pdf: pd.DataFrame,
    rate: float,
    seed: int,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Paper Table-4 protocol: for ``rate`` of the clean columns, insert one
    value sampled from a column of a *different domain* (so the insertion is
    an error by construction), labelled as ground-truth error."""
    rng = np.random.default_rng(seed)
    clean_ids = meta_pdf.loc[~meta_pdf.is_dirty, "col_id"].to_numpy()
    n_inject = int(round(rate * len(meta_pdf)))
    target_ids = rng.choice(clean_ids, size=min(n_inject, len(clean_ids)), replace=False)
    dom_of = dict(zip(meta_pdf.col_id, meta_pdf.domain))
    by_col = values_pdf[~values_pdf.is_error].groupby("col_id")["value"].apply(list).to_dict()
    all_ids = meta_pdf.col_id.to_numpy()
    new_rows = []
    for cid in target_ids:
        host_vals = set(by_col[cid])
        for _ in range(50):
            src = int(all_ids[rng.integers(0, len(all_ids))])
            if dom_of[src] == dom_of[cid]:
                continue
            cand = by_col[src]
            v = cand[rng.integers(0, len(cand))]
            if v not in host_vals:
                new_rows.append((cid, v, True))
                break
    out_vals = pd.concat(
        [values_pdf, pd.DataFrame(new_rows, columns=["col_id", "value", "is_error"])],
        ignore_index=True,
    )
    out_meta = meta_pdf.copy()
    out_meta.loc[out_meta.col_id.isin(set(int(c) for c, _, _ in new_rows)), "is_dirty"] = True
    return out_vals, out_meta


def make_benchmark(
    spark: SparkSession,
    profile_name: str,
    *,
    n_cols: int = 1200,
    seed: int = 11,
    synth_error_rate: float = 0.0,
) -> Benchmark:
    profile = BENCH_PROFILES[profile_name]
    values_pdf, meta_pdf = build_bench_pdf(profile, n_cols, seed)
    if synth_error_rate > 0:
        values_pdf, meta_pdf = inject_synthetic_errors(
            values_pdf, meta_pdf, synth_error_rate, seed + 1000
        )
    name = f"{profile_name}-bench" + (f"+{int(synth_error_rate*100)}%syn" if synth_error_rate else "")
    return Benchmark(
        name,
        spark.createDataFrame(values_pdf).cache(),
        spark.createDataFrame(meta_pdf).cache(),
        n_cols,
    )
