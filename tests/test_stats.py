"""Tests for the statistical machinery (§5.2, Appendix B.1): numpy and
Spark-expression implementations must agree, and known paper values hold."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, strategies as st
from pyspark.sql import functions as F

from repro.core import stats


def test_cohens_h_paper_example5():
    # rho = 10/1000, rho_bar = 160000/200000 -> h = 2.01 (paper Example 5)
    h = stats.cohens_h(0.01, 0.8)
    assert h == pytest.approx(2.01, abs=0.01)


def test_cohens_h_zero_when_equal():
    assert stats.cohens_h(0.3, 0.3) == pytest.approx(0.0)


@given(st.floats(0, 1), st.floats(0, 1))
def test_cohens_h_symmetric_magnitude(a, b):
    assert stats.cohens_h(a, b) == pytest.approx(stats.cohens_h(b, a), abs=1e-9)


def test_chi2_known_value():
    # classic 2x2: [[10, 20], [30, 40]]
    got = stats.chi2_stat(10, 20, 30, 40)
    n = 100
    expect = n * (10 * 40 - 20 * 30) ** 2 / (30 * 70 * 40 * 60)
    assert got == pytest.approx(expect)


def test_chi2_zero_margin_guard():
    assert stats.chi2_stat(0, 0, 5, 5) == 0.0


def test_wilson_lower_bound_below_plain():
    cov_t, cov_not_t = np.array([2.0]), np.array([98.0])
    wilson = stats.wilson_lower_confidence(cov_t, cov_not_t)[0]
    plain = stats.plain_confidence(cov_t, cov_not_t)[0]
    assert wilson < plain == pytest.approx(0.98)


def test_wilson_zero_false_triggers_equals_upper_bound():
    c = stats.wilson_lower_confidence(np.array([0.0]), np.array([100.0]))[0]
    ub = stats.confidence_upper_bound(np.array([100.0]))[0]
    assert c == pytest.approx(ub, abs=1e-9)


def test_wilson_empty_coverage_zero():
    assert stats.wilson_lower_confidence(np.array([0.0]), np.array([0.0]))[0] == 0.0


@given(st.integers(0, 50), st.integers(1, 500))
def test_wilson_in_unit_interval(t, nt):
    c = stats.wilson_lower_confidence(np.array([float(t)]), np.array([float(nt)]))[0]
    assert 0.0 <= c <= 1.0


def test_min_cover_for_confidence_monotone():
    assert stats.min_cover_for_confidence(0.9) > stats.min_cover_for_confidence(0.8)
    n = stats.min_cover_for_confidence(0.9)
    assert stats.confidence_upper_bound(np.array([float(n)]))[0] >= 0.9
    assert stats.confidence_upper_bound(np.array([float(n - 1)]))[0] < 0.9


def test_spark_exprs_match_numpy(spark):
    pdf = pd.DataFrame(
        {
            "a": [10.0, 0.0, 5.0, 100.0],
            "b": [160000.0, 10.0, 5.0, 0.0],
            "c": [990.0, 90.0, 5.0, 50.0],
            "d": [40000.0, 900.0, 5.0, 1000.0],
        }
    )
    df = spark.createDataFrame(pdf)
    rho = F.col("a") / (F.col("a") + F.col("c"))
    rho_bar = F.col("b") / (F.col("b") + F.col("d"))
    out = df.select(
        stats.cohens_h_col(rho, rho_bar).alias("h"),
        stats.chi2_stat_col(F.col("a"), F.col("b"), F.col("c"), F.col("d")).alias("chi2"),
        stats.wilson_lower_confidence_col(F.col("a"), F.col("c")).alias("w"),
        stats.plain_confidence_col(F.col("a"), F.col("c")).alias("p"),
    ).toPandas()
    np_rho = pdf.a / (pdf.a + pdf.c)
    np_rho_bar = pdf.b / (pdf.b + pdf.d)
    assert np.allclose(out["h"], stats.cohens_h(np_rho, np_rho_bar), atol=1e-9)
    assert np.allclose(
        out["chi2"], stats.chi2_stat(pdf.a, pdf.b, pdf.c, pdf.d), atol=1e-6
    )
    assert np.allclose(
        out["w"], stats.wilson_lower_confidence(pdf.a, pdf.c), atol=1e-9
    )
    assert np.allclose(out["p"], stats.plain_confidence(pdf.a, pdf.c), atol=1e-9)


def test_chi2_critical_value():
    assert stats.CHI2_CRIT_05 == pytest.approx(3.841, abs=1e-3)
