"""Statistical machinery of paper §5.2 and Appendix B.1.

All formulas are closed-form so they can run both as numpy (driver-side,
tests) and as Spark SQL column expressions (corpus-scale contingency job):

- Cohen's h effect size between the covered-trigger rate rho and the
  background rate rho_bar (Equation 8);
- Pearson chi-squared statistic on the 2x2 contingency table (significance
  at 0.05 <=> statistic >= 3.841, 1 dof);
- Wilson score lower bound for the constraint confidence c (Equation 9,
  z = 1.65 at 95%);
- the confidence upper bound of Appendix B.1 (Equation 19) used for
  candidate pruning.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

Z_WILSON = 1.65
CHI2_CRIT_05 = 3.841  # chi-squared critical value, 1 dof, alpha = 0.05


# ---------------------------------------------------------------------------
# numpy versions
# ---------------------------------------------------------------------------

def cohens_h(rho: np.ndarray, rho_bar: np.ndarray) -> np.ndarray:
    """|2 (arcsin sqrt(rho) - arcsin sqrt(rho_bar))| (Equation 8).

    The paper's Example 5 reports h = 2.01 for rho = 0.01, rho_bar = 0.8,
    i.e. the magnitude; a *good* SDC additionally needs rho < rho_bar
    (rarely triggering in-domain), which callers filter separately.
    """
    rho = np.clip(np.asarray(rho, dtype=float), 0.0, 1.0)
    rho_bar = np.clip(np.asarray(rho_bar, dtype=float), 0.0, 1.0)
    return np.abs(2.0 * (np.arcsin(np.sqrt(rho)) - np.arcsin(np.sqrt(rho_bar))))


def chi2_stat(a: np.ndarray, b: np.ndarray, c: np.ndarray, d: np.ndarray) -> np.ndarray:
    """Pearson chi-squared statistic of the 2x2 table [[a, b], [c, d]].

    a = covered&triggered, b = notcovered&triggered, c = covered&not,
    d = notcovered&not (any consistent layout works).
    """
    a, b, c, d = (np.asarray(x, dtype=float) for x in (a, b, c, d))
    n = a + b + c + d
    denom = (a + b) * (c + d) * (a + c) * (b + d)
    with np.errstate(divide="ignore", invalid="ignore"):
        stat = n * (a * d - b * c) ** 2 / denom
    return np.where(denom > 0, stat, 0.0)


def wilson_lower_confidence(
    cov_t: np.ndarray, cov_not_t: np.ndarray, z: float = Z_WILSON
) -> np.ndarray:
    """Lower-bound confidence c of Equation 9.

    cov_t = |C_{C,T}| (false triggers among covered), cov_not_t = |C_{C,!T}|.
    c = 1 - WilsonUpper(false-trigger rate).
    """
    cov_t = np.asarray(cov_t, dtype=float)
    cov_not_t = np.asarray(cov_not_t, dtype=float)
    n = cov_t + cov_not_t
    with np.errstate(divide="ignore", invalid="ignore"):
        center = (cov_t + 0.5 * z * z) / (n + z * z)
        half = (z / (n + z * z)) * np.sqrt(cov_t * cov_not_t / n + z * z / 4.0)
        c = 1.0 - center - half
    return np.where(n > 0, np.clip(c, 0.0, 1.0), 0.0)


def plain_confidence(cov_t: np.ndarray, cov_not_t: np.ndarray) -> np.ndarray:
    """Heuristic estimate 1 - c_hat (ablation §6.6 'no Wilson score interval')."""
    cov_t = np.asarray(cov_t, dtype=float)
    cov_not_t = np.asarray(cov_not_t, dtype=float)
    n = cov_t + cov_not_t
    with np.errstate(divide="ignore", invalid="ignore"):
        c = 1.0 - cov_t / n
    return np.where(n > 0, c, 0.0)


def confidence_upper_bound(n_covered: np.ndarray, z: float = Z_WILSON) -> np.ndarray:
    """Appendix B.1 Equation 19: ub(r.c) assuming zero observed false triggers."""
    n_covered = np.asarray(n_covered, dtype=float)
    return 1.0 - z * z / (n_covered + z * z)


def min_cover_for_confidence(c_thres: float, z: float = Z_WILSON) -> int:
    """Observation 1: smallest |C_C^r| with ub(r.c) >= c_thres.

    Solves 1 - z^2/(n + z^2) >= c_thres for n (paper's example: 34 columns
    for c_thres = 0.9 with z = 1.65... z^2 * c/(1-c) rounded up).
    """
    if c_thres >= 1.0:
        return 10**9
    return int(np.ceil(z * z * c_thres / (1.0 - c_thres)))


# ---------------------------------------------------------------------------
# Spark column-expression versions (same math, run inside the contingency job)
# ---------------------------------------------------------------------------

def cohens_h_col(rho: Column, rho_bar: Column) -> Column:
    return F.abs(2.0 * (F.asin(F.sqrt(rho)) - F.asin(F.sqrt(rho_bar))))


def chi2_stat_col(a: Column, b: Column, c: Column, d: Column) -> Column:
    n = a + b + c + d
    denom = (a + b) * (c + d) * (a + c) * (b + d)
    return F.when(denom > 0, n * F.pow(a * d - b * c, 2) / denom).otherwise(F.lit(0.0))


def wilson_lower_confidence_col(cov_t: Column, cov_not_t: Column, z: float = Z_WILSON) -> Column:
    n = cov_t + cov_not_t
    center = (cov_t + 0.5 * z * z) / (n + z * z)
    half = (F.lit(z) / (n + z * z)) * F.sqrt(cov_t * cov_not_t / n + z * z / 4.0)
    c = F.lit(1.0) - center - half
    return F.when(n > 0, F.greatest(F.least(c, F.lit(1.0)), F.lit(0.0))).otherwise(F.lit(0.0))


def plain_confidence_col(cov_t: Column, cov_not_t: Column) -> Column:
    n = cov_t + cov_not_t
    return F.when(n > 0, F.lit(1.0) - cov_t / n).otherwise(F.lit(0.0))
