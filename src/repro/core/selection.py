"""SDC selection: CSS (Coarse-Select) and FSS (Fine-Select), paper §5.3.

Both problems follow the paper's scheme: transform to the CSS-ILP
(Equations 14-18), relax to CSS-LP, and apply randomized rounding
(Algorithm 1). The paper solves the LP with SciPy; SciPy is unavailable in
this container, so the LP is solved by the structure-specialized Frank-
Wolfe scheme in ``core.lp`` (same relaxation, same optimum up to FW
tolerance — DESIGN.md substitution table). The paper's guarantees hold in
expectation; to return a deterministic artifact we draw several seeded
roundings, repair budget violations (drop lowest-LP-mass / highest-FPR
rules first), and keep the draw with the best realized objective — each
draw is one run of Algorithm 1.

FSS differs only in K_j (Definition 5): a rule counts towards synthetic
column j only if its confidence is within delta of conf(C_j, R_all), so the
selected set preserves the calibrated confidence ranking.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.lp import solve_coverage_lp


@dataclass
class SelectionResult:
    selected: pd.DataFrame  # rows of cand_stats for the chosen rules
    lp_objective: float
    realized_objective: int
    feasible: bool


def _round_and_repair(
    x: np.ndarray,
    fpr: np.ndarray,
    k_sets: list[np.ndarray],
    b_size: int,
    b_fpr: float,
    rng: np.random.Generator,
) -> tuple[np.ndarray, int]:
    """One randomized-rounding draw + budget repair + greedy completion.

    The draw and repair implement Algorithm 1 with feasibility enforced
    deterministically (the paper's guarantees are in expectation). Greedy
    completion then spends any remaining budget on the rules with the best
    marginal coverage — classic max-coverage greedy, which on its own
    carries the same (1 - 1/e) factor, so the combination is never worse.
    """
    sel = rng.random(len(x)) < x
    # repair size: drop smallest-x selected rules
    if sel.sum() > b_size:
        idx = np.flatnonzero(sel)
        order = idx[np.argsort(x[idx])]
        drop = order[: sel.sum() - b_size]
        sel[drop] = False
    # repair FPR: drop worst fpr-per-mass rules
    while sel.any() and fpr[sel].sum() > b_fpr:
        idx = np.flatnonzero(sel)
        worst = idx[np.argmax(fpr[idx] / np.maximum(x[idx], 1e-9))]
        sel[worst] = False
    # greedy completion on leftover budget (lazy-heap max-coverage greedy)
    import heapq

    rule_sets: dict[int, set[int]] = {}
    for j, k in enumerate(k_sets):
        for i in k:
            rule_sets.setdefault(int(i), set()).add(j)
    covered_js = {j for j, k in enumerate(k_sets) if len(k) and sel[k].any()}
    budget_fpr = b_fpr - fpr[sel].sum()
    heap = [
        (-len(js), i) for i, js in rule_sets.items() if not sel[i]
    ]
    heapq.heapify(heap)
    n_sel = int(sel.sum())
    while heap and n_sel < b_size:
        neg_gain, i = heapq.heappop(heap)
        if sel[i] or fpr[i] > budget_fpr + 1e-12:
            continue
        gain = len(rule_sets[i] - covered_js)
        if gain <= 0:
            continue
        if -neg_gain > gain and heap and -heap[0][0] > gain:
            heapq.heappush(heap, (-gain, i))  # stale bound: re-queue
            continue
        sel[i] = True
        n_sel += 1
        budget_fpr -= fpr[i]
        covered_js |= rule_sets[i]
    return sel, len(covered_js)


def _select(
    cand_stats: pd.DataFrame,
    k_sets: list[np.ndarray],
    b_size: int,
    b_fpr: float,
    seed: int,
    n_rounds: int,
) -> SelectionResult:
    n_rules = len(cand_stats)
    fpr = cand_stats["fpr"].to_numpy(dtype=float)
    x, lp_obj = solve_coverage_lp(n_rules, fpr, k_sets, b_size, b_fpr)
    rng = np.random.default_rng(seed)
    best_sel, best_obj = None, -1
    for _ in range(n_rounds):
        sel, obj = _round_and_repair(x, fpr, k_sets, b_size, b_fpr, rng)
        if obj > best_obj:
            best_sel, best_obj = sel, obj
    selected = cand_stats.loc[best_sel].reset_index(drop=True)
    feasible = len(selected) <= b_size and selected["fpr"].sum() <= b_fpr + 1e-9
    return SelectionResult(selected, lp_obj, best_obj, feasible)


def _coverage_sets(
    cand_stats: pd.DataFrame, detect_pairs: pd.DataFrame
) -> tuple[list[np.ndarray], np.ndarray]:
    """K_j as row-index arrays into cand_stats, plus the syn_id order."""
    pos = pd.Series(np.arange(len(cand_stats)), index=cand_stats["cand_id"].to_numpy())
    pairs = detect_pairs[detect_pairs["cand_id"].isin(pos.index)]
    syn_ids = np.sort(pairs["syn_id"].unique())
    grouped = pairs.groupby("syn_id")["cand_id"].apply(list)
    k_sets = [pos[grouped[j]].to_numpy() for j in syn_ids]
    return k_sets, syn_ids


def coarse_select(
    cand_stats: pd.DataFrame,
    detect_pairs: pd.DataFrame,
    *,
    b_size: int,
    b_fpr: float,
    seed: int = 41,
    n_rounds: int = 20,
) -> SelectionResult:
    """CSS / Algorithm 1 (Coarse-Select)."""
    k_sets, _ = _coverage_sets(cand_stats, detect_pairs)
    return _select(cand_stats, k_sets, b_size, b_fpr, seed, n_rounds)


def fine_select(
    cand_stats: pd.DataFrame,
    detect_pairs: pd.DataFrame,
    *,
    b_size: int,
    b_fpr: float,
    delta: float = 1e-3,
    seed: int = 43,
    n_rounds: int = 20,
) -> SelectionResult:
    """FSS (Fine-Select): K_j restricted to rules whose confidence is within
    ``delta`` of conf(C_j, R_all) = max confidence over all detecting rules.

    With delta >= 1 this reduces exactly to CSS (paper Definition 5)."""
    conf = pd.Series(
        cand_stats["conf"].to_numpy(), index=cand_stats["cand_id"].to_numpy()
    )
    pairs = detect_pairs[detect_pairs["cand_id"].isin(conf.index)].copy()
    pairs["conf"] = conf[pairs["cand_id"]].to_numpy()
    best = pairs.groupby("syn_id")["conf"].transform("max")
    pairs = pairs[pairs["conf"] >= best - delta]
    k_sets, _ = _coverage_sets(cand_stats, pairs[["cand_id", "syn_id"]])
    return _select(cand_stats, k_sets, b_size, b_fpr, seed, n_rounds)
