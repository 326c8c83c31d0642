"""Training table corpora (paper §6.2: Relational-Tables / Spreadsheet-Tables / TabLib).

The real corpora are 247-298K columns crawled from the web; we synthesize
corpora with the same *profile shape* at laptop scale (DESIGN.md §2):

- ``relational``  — longer columns, very clean (machine-generated sources);
- ``spreadsheet`` — shorter columns, noisier (human-authored, higher
  intrinsic error rate; paper Appendix A attributes its weaker training
  signal to exactly these two properties);
- ``tablib``      — in-between.

A corpus is a pair of Spark DataFrames: ``values(col_id, value)`` (distinct
values per column, exploded) and ``meta(col_id, domain, n_distinct,
is_dirty)``.
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
class CorpusProfile:
    """Shape parameters for one training-corpus family."""

    name: str
    median_distinct: float  # median distinct values per column (lognormal)
    sigma: float  # lognormal spread
    dirty_col_rate: float  # fraction of columns carrying one real error
    uncommon_frac: float  # rare-tier rate inside NL columns


CORPUS_PROFILES: dict[str, CorpusProfile] = {
    "relational": CorpusProfile("relational", 22.0, 0.55, 0.015, 0.15),
    "spreadsheet": CorpusProfile("spreadsheet", 10.0, 0.65, 0.06, 0.20),
    "tablib": CorpusProfile("tablib", 15.0, 0.60, 0.025, 0.17),
}


@dataclass
class Corpus:
    name: str
    values: DataFrame  # (col_id: long, value: string)
    meta: DataFrame  # (col_id, domain, n_distinct, is_dirty)
    n_cols: int


def _domain_mixture(rng: np.random.Generator, n: int) -> list[str]:
    """Sample column domains: 50% NL, 35% code, 15% mixed (uniform within kind)."""
    nl, code, mixed = vocab.nl_domains(), vocab.code_domains(), vocab.mixed_domains()
    out = []
    for _ in range(n):
        u = rng.random()
        pool = nl if u < 0.5 else code if u < 0.85 else mixed
        out.append(pool[rng.integers(0, len(pool))])
    return out


def build_corpus_pdf(
    profile: CorpusProfile, n_cols: int, seed: int
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Driver-side corpus builder (pandas) — deterministic in ``seed``."""
    rng = np.random.default_rng(seed)
    domains = _domain_mixture(rng, n_cols)
    rows: list[tuple[int, str]] = []
    meta: list[tuple[int, str, int, bool]] = []
    for col_id, domain in enumerate(domains):
        n = int(np.clip(rng.lognormal(np.log(profile.median_distinct), profile.sigma), 3, 120))
        n = min(n, max_distinct(domain))
        vals = generate_column(domain, n, rng, uncommon_frac=profile.uncommon_frac)
        dirty = rng.random() < profile.dirty_col_rate
        if dirty:
            vals.append(make_error(domain, vals, rng))
        meta.append((col_id, domain, len(vals), dirty))
        rows.extend((col_id, v) for v in vals)
    values_pdf = pd.DataFrame(rows, columns=["col_id", "value"])
    meta_pdf = pd.DataFrame(meta, columns=["col_id", "domain", "n_distinct", "is_dirty"])
    return values_pdf, meta_pdf


def make_corpus(
    spark: SparkSession, profile_name: str, *, n_cols: int = 2000, seed: int = 7
) -> Corpus:
    """Materialize a corpus as Spark DataFrames (cached: read many times)."""
    profile = CORPUS_PROFILES[profile_name]
    values_pdf, meta_pdf = build_corpus_pdf(profile, n_cols, seed)
    values = spark.createDataFrame(values_pdf).cache()
    meta = spark.createDataFrame(meta_pdf).cache()
    return Corpus(profile_name, values, meta, n_cols)


def corpus_stats(corpus: Corpus) -> DataFrame:
    """Paper Table-3 statistics: column count, mean/median distinct per column.

    (Our columns are distinct-value sets, so total-value and distinct-value
    statistics coincide; Table 3's total-value columns are reported from the
    same aggregate in EXPERIMENTS.md with that note.)
    """
    from pyspark.sql import functions as F

    per_col = corpus.values.groupBy("col_id").agg(F.countDistinct("value").alias("n_distinct"))
    return per_col.agg(
        F.count("col_id").alias("total_cols"),
        F.avg("n_distinct").alias("mean_distinct"),
        F.expr("percentile_approx(n_distinct, 0.5, 10000)").alias("median_distinct"),
    )
