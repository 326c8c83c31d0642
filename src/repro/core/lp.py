"""Dependency-free LP machinery for the CSS/FSS relaxations.

The paper solves CSS-LP with "the solver in SciPy"; SciPy is not available
in this container, so we solve the same relaxation with a Frank-Wolfe
scheme specialized to its structure (documented as a substitution in
DESIGN.md):

    maximize   F(x) = sum_j min(1, sum_{i in K_j} x_i)
    subject to sum_i x_i <= B_size,  sum_i fpr_i x_i <= B_FPR,  0 <= x <= 1

F is exactly the CSS-LP objective with the y_j variables eliminated
(y_j* = min(1, sum_{K_j} x_i) at optimum), and it is concave, so Frank-Wolfe
converges to the LP optimum at rate O(1/k). Each FW step maximizes a linear
function over the two-budget box polytope, which we solve via Lagrangian
bisection on the FPR multiplier (exact up to one fractional boundary item).
"""
from __future__ import annotations

import numpy as np


def solve_two_budget_linear(
    c: np.ndarray, f: np.ndarray, b1: float, b2: float
) -> np.ndarray:
    """max c.x s.t. sum(x) <= b1, f.x <= b2, 0 <= x <= 1.

    Lagrangian on the second constraint: for multiplier lam the problem is a
    top-b1 selection on reduced costs (c - lam*f)+. Bisection finds the
    smallest lam making the selection FPR-feasible; the marginal item is
    shaved fractionally to meet the budget exactly.
    """
    c = np.asarray(c, dtype=float)
    f = np.maximum(np.asarray(f, dtype=float), 0.0)

    def _x_of(lam: float) -> np.ndarray:
        r = c - lam * f
        pos = r > 1e-12
        x = np.zeros_like(c)
        k = int(np.floor(b1 + 1e-9))
        if pos.sum() <= k:
            x[pos] = 1.0
        else:
            idx = np.flatnonzero(pos)
            top = idx[np.argsort(-r[idx])[:k]]
            x[top] = 1.0
        return x

    x = _x_of(0.0)
    if f @ x <= b2 + 1e-12:
        return x
    lo, hi = 0.0, 1.0
    while f @ _x_of(hi) > b2 and hi < 1e9:
        hi *= 2.0
    for _ in range(60):
        mid = 0.5 * (lo + hi)
        if f @ _x_of(mid) > b2:
            lo = mid
        else:
            hi = mid
    # take the (infeasible-side) selection at lo and shave the least
    # cost-effective items fractionally down to the budget — the standard
    # LP-knapsack boundary adjustment (complementary slackness at lam*).
    x = _x_of(lo)
    over = f @ x - b2
    if over > 1e-12:
        sel = np.flatnonzero((x > 0) & (f > 0))
        order = sel[np.argsort(c[sel] / f[sel])]
        for i in order:
            cut = min(x[i], over / f[i])
            x[i] -= cut
            over -= cut * f[i]
            if over <= 1e-12:
                break
    return x


def solve_coverage_lp(
    n_rules: int,
    fpr: np.ndarray,
    k_sets: list[np.ndarray],
    b_size: float,
    b_fpr: float,
    *,
    iters: int = 800,
    mu: float = 0.05,
) -> tuple[np.ndarray, float]:
    """Frank-Wolfe on the eliminated CSS-LP; returns (x, objective F(x)).

    min(1, s) is non-smooth, which stalls vanilla FW, so we optimize the
    Huber-smoothed surrogate h(s) = s below 1-mu, 1 above 1+mu, and the
    matching concave quadratic in between (C^1, gradient-Lipschitz): FW then
    converges at O(1/k) to within O(mu) per synthetic column of the true LP
    optimum — negligible against the randomized-rounding variance.
    """
    if not k_sets:
        return np.zeros(n_rules), 0.0
    # sparse incidence (pair_j[p], pair_i[p]) for each (syn column j, rule i)
    pair_j = np.concatenate([np.full(len(k), j) for j, k in enumerate(k_sets)])
    pair_i = np.concatenate(k_sets).astype(int)
    n_syn = len(k_sets)
    x = np.zeros(n_rules)

    def _coverage(xv: np.ndarray) -> np.ndarray:
        return np.bincount(pair_j, weights=xv[pair_i], minlength=n_syn)

    def _hgrad(s: np.ndarray) -> np.ndarray:
        """dh/ds of the smoothed cap."""
        g = np.clip((1.0 + mu - s) / (2.0 * mu), 0.0, 1.0)
        g[s <= 1.0 - mu] = 1.0
        return g

    for k in range(iters):
        s = _coverage(x)
        gs = _hgrad(s)
        grad = np.bincount(pair_i, weights=gs[pair_j], minlength=n_rules)
        d = solve_two_budget_linear(grad, fpr, b_size, b_fpr)
        gamma = 2.0 / (k + 2.0)
        x = (1.0 - gamma) * x + gamma * d
    obj = float(np.minimum(1.0, _coverage(x)).sum())
    return x, obj
