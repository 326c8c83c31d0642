"""Tests for column generation and the training corpora (paper Table 3
profiles), including a DuckDB oracle check of the Spark statistics job."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.domains.columns import generate_column, max_distinct
from repro.domains.corpus import CORPUS_PROFILES, build_corpus_pdf, corpus_stats, make_corpus
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("domain", ["country", "city", "date", "age_group", "code_mixed"])
def test_generate_column_distinct(domain):
    rng = np.random.default_rng(1)
    vals = generate_column(domain, 15, rng)
    assert len(vals) == len(set(vals))
    assert len(vals) <= 15


def test_generate_column_caps_at_vocab():
    rng = np.random.default_rng(2)
    vals = generate_column("sex", 50, rng)
    assert len(vals) <= max_distinct("sex") == 2


def test_generate_column_uncommon_fraction():
    rng = np.random.default_rng(3)
    from repro.domains.vocab import DOMAINS

    unc = set(DOMAINS["city"].uncommon)
    vals = [v for _ in range(50) for v in generate_column("city", 20, rng, uncommon_frac=0.3)]
    frac = sum(v in unc for v in vals) / len(vals)
    assert 0.1 < frac < 0.5


@pytest.mark.parametrize("profile", sorted(CORPUS_PROFILES))
def test_corpus_profile_shapes(profile):
    values, meta = build_corpus_pdf(CORPUS_PROFILES[profile], 300, seed=9)
    assert meta.col_id.nunique() == 300
    assert set(values.col_id) == set(meta.col_id)
    # dirty rate in the profile's ballpark
    assert meta.is_dirty.mean() <= CORPUS_PROFILES[profile].dirty_col_rate * 3 + 0.02


def test_corpus_deterministic():
    a, _ = build_corpus_pdf(CORPUS_PROFILES["relational"], 100, seed=5)
    b, _ = build_corpus_pdf(CORPUS_PROFILES["relational"], 100, seed=5)
    assert a.equals(b)


def test_spreadsheet_columns_shorter_than_relational():
    _, m_rel = build_corpus_pdf(CORPUS_PROFILES["relational"], 400, seed=7)
    _, m_st = build_corpus_pdf(CORPUS_PROFILES["spreadsheet"], 400, seed=7)
    assert m_st.n_distinct.median() < m_rel.n_distinct.median()


def test_spreadsheet_noisier_than_relational():
    _, m_rel = build_corpus_pdf(CORPUS_PROFILES["relational"], 800, seed=7)
    _, m_st = build_corpus_pdf(CORPUS_PROFILES["spreadsheet"], 800, seed=7)
    assert m_st.is_dirty.mean() > m_rel.is_dirty.mean()


def test_corpus_stats_oracle(spark, small_corpus):
    """Table-3 statistics job cross-checked against DuckDB."""
    stats = corpus_stats(small_corpus)
    values = small_corpus.values
    assert_equivalent(
        stats.select("total_cols", "mean_distinct"),
        """
        SELECT count(*) AS total_cols, avg(n) AS mean_distinct
        FROM (SELECT col_id, count(DISTINCT value) AS n FROM v GROUP BY col_id)
        """,
        v=values,
    )


def test_corpus_values_distinct_per_column(spark, small_corpus):
    dup = (
        small_corpus.values.groupBy("col_id", "value")
        .count()
        .where(F.col("count") > 1)
        .count()
    )
    assert dup == 0


def test_make_corpus_counts(spark, small_corpus):
    assert small_corpus.meta.count() == 400
    assert small_corpus.values.select("col_id").distinct().count() == 400
