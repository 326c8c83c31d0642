"""Semantic-Domain Constraints (paper Definition 2).

An SDC r = (P, S, c) for a type t defined by a domain-evaluation function
f_t: pre-condition P(C, f_t, d_in, m) gates application to a column C;
post-condition S(C, f_t, d_out) flags values beyond the outer ball;
confidence c calibrates the prediction.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class SDC:
    """One constraint. ``func_id`` points into the evaluator registry;
    ``kind/family/name`` are carried for explainability (paper feature 5)."""

    cand_id: int
    func_id: int
    kind: str
    family: str
    name: str
    d_in: float
    d_out: float
    m: float
    conf: float = float("nan")

    def pre_condition(self, dists: np.ndarray) -> bool:
        """P: at least fraction m of the column's values inside the inner ball."""
        n = len(dists)
        return n > 0 and (np.count_nonzero(dists <= self.d_in) / n) >= self.m - 1e-12

    def post_condition(self, dists: np.ndarray) -> np.ndarray:
        """S: boolean mask of values outside the outer ball (predicted errors)."""
        return dists > self.d_out

    def covers(self, dists: np.ndarray) -> bool:
        return self.pre_condition(dists)

    def triggers(self, dists: np.ndarray) -> bool:
        """Column-level trigger: covered and at least one flagged value."""
        return self.pre_condition(dists) and bool(np.any(self.post_condition(dists)))

    def describe(self) -> str:
        """Human-readable rendering in the style of paper Table 1."""
        pre = (
            f"{self.m:.0%} col vals have {self.family}:{self.name} "
            f"distance <= {self.d_in:g}"
        )
        post = f"values with {self.family}:{self.name} distance > {self.d_out:g}"
        return f"[{self.kind}] Pre: {pre} | Post: {post} | conf={self.conf:.3f}"
