"""Tests for the LP machinery and CSS/FSS selection (paper §5.3).

The Frank-Wolfe LP is validated against exhaustive ILP optima on small
instances (the LP optimum upper-bounds the ILP optimum; the rounded
solution must reach the (1 - 1/e) factor the paper proves in expectation —
we assert it deterministically on these instances, where rounding with
repair is comfortably above the bound).
"""
import itertools

import numpy as np
import pandas as pd
import pytest

from repro.core.lp import solve_coverage_lp, solve_two_budget_linear
from repro.core.selection import coarse_select, fine_select


def brute_force_ilp(n_rules, fpr, k_sets, b_size, b_fpr):
    best = 0
    for r in range(0, min(b_size, n_rules) + 1):
        for combo in itertools.combinations(range(n_rules), r):
            if sum(fpr[i] for i in combo) > b_fpr + 1e-12:
                continue
            sel = set(combo)
            cov = sum(1 for k in k_sets if sel & set(k))
            best = max(best, cov)
    return best


def test_two_budget_linear_simple():
    c = np.array([3.0, 2.0, 1.0])
    f = np.array([0.0, 0.0, 0.0])
    x = solve_two_budget_linear(c, f, b1=2, b2=10)
    assert x.tolist() == [1.0, 1.0, 0.0]


def test_two_budget_linear_fpr_binding():
    c = np.array([1.0, 1.0])
    f = np.array([1.0, 1.0])
    x = solve_two_budget_linear(c, f, b1=2, b2=1.0)
    assert f @ x <= 1.0 + 1e-9
    assert c @ x == pytest.approx(1.0, abs=1e-6)  # LP optimum


def test_two_budget_linear_prefers_cost_effective():
    c = np.array([1.0, 1.0])
    f = np.array([0.1, 1.0])
    x = solve_two_budget_linear(c, f, b1=2, b2=0.5)
    assert x[0] > x[1]


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_coverage_lp_beats_ilp_bound(seed):
    rng = np.random.default_rng(seed)
    n_rules, n_syn = 8, 12
    fpr = rng.random(n_rules) * 0.05
    k_sets = [
        np.array(sorted(rng.choice(n_rules, size=rng.integers(1, 4), replace=False)))
        for _ in range(n_syn)
    ]
    b_size, b_fpr = 3, 0.08
    x, lp_obj = solve_coverage_lp(n_rules, fpr, k_sets, b_size, b_fpr)
    opt = brute_force_ilp(n_rules, fpr, k_sets, b_size, b_fpr)
    # the smoothed-FW objective is within the (1 - 1/e)-factor ballpark of
    # the ILP optimum; exactness is restored downstream by rounding + greedy
    assert lp_obj >= (1 - 1 / np.e) * opt
    assert x.sum() <= b_size + 1e-6
    assert fpr @ x <= b_fpr + 1e-6


def _stats_frame(n_rules, fpr, conf=None):
    return pd.DataFrame(
        {
            "cand_id": np.arange(n_rules),
            "fpr": fpr,
            "conf": conf if conf is not None else np.linspace(0.9, 0.99, n_rules),
        }
    )


def _pairs(k_sets):
    rows = [(i, j) for j, k in enumerate(k_sets) for i in k]
    return pd.DataFrame(rows, columns=["cand_id", "syn_id"])


@pytest.mark.parametrize("seed", [3, 4])
def test_coarse_select_budgets_and_ratio(seed):
    rng = np.random.default_rng(seed)
    n_rules, n_syn = 10, 15
    fpr = rng.random(n_rules) * 0.04
    k_sets = [
        np.array(sorted(rng.choice(n_rules, size=rng.integers(1, 4), replace=False)))
        for _ in range(n_syn)
    ]
    stats = _stats_frame(n_rules, fpr)
    res = coarse_select(stats, _pairs(k_sets), b_size=4, b_fpr=0.08, n_rounds=30)
    assert len(res.selected) <= 4
    assert res.selected["fpr"].sum() <= 0.08 + 1e-9
    opt = brute_force_ilp(n_rules, fpr, k_sets, 4, 0.08)
    assert res.realized_objective >= (1 - 1 / np.e) * opt - 1


def test_fine_select_delta_one_reduces_to_coarse():
    rng = np.random.default_rng(9)
    n_rules, n_syn = 8, 10
    fpr = rng.random(n_rules) * 0.02
    k_sets = [
        np.array(sorted(rng.choice(n_rules, size=2, replace=False))) for _ in range(n_syn)
    ]
    stats = _stats_frame(n_rules, fpr)
    c = coarse_select(stats, _pairs(k_sets), b_size=4, b_fpr=1.0, seed=5, n_rounds=20)
    f = fine_select(stats, _pairs(k_sets), b_size=4, b_fpr=1.0, delta=1.0, seed=5, n_rounds=20)
    # identical K_j structure -> identical LP -> identical rounding draws
    assert f.realized_objective == c.realized_objective


def test_fine_select_confidence_restriction():
    # rule 0 detects both columns with low conf; rule 1 detects column 0
    # with high conf. With small delta, column 0's K_j excludes rule 0.
    stats = _stats_frame(2, np.array([0.0, 0.0]), conf=np.array([0.5, 0.99]))
    pairs = pd.DataFrame({"cand_id": [0, 0, 1], "syn_id": [0, 1, 0]})
    res = fine_select(stats, pairs, b_size=1, b_fpr=1.0, delta=1e-3, n_rounds=30)
    # choosing rule 1 covers col 0 within delta; rule 0 covers only col 1
    assert res.realized_objective == 1


def test_empty_detection_pairs():
    stats = _stats_frame(3, np.zeros(3))
    res = coarse_select(stats, _pairs([]), b_size=2, b_fpr=1.0)
    assert res.realized_objective == 0
    assert len(res.selected) == 0


def test_selection_deterministic():
    rng = np.random.default_rng(11)
    fpr = rng.random(6) * 0.02
    k_sets = [np.array([i % 6, (i + 1) % 6]) for i in range(8)]
    stats = _stats_frame(6, fpr)
    a = coarse_select(stats, _pairs(k_sets), b_size=3, b_fpr=0.05, seed=7)
    b = coarse_select(stats, _pairs(k_sets), b_size=3, b_fpr=0.05, seed=7)
    assert a.selected["cand_id"].tolist() == b.selected["cand_id"].tolist()
