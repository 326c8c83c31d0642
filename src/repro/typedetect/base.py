"""Shared abstractions for domain-evaluation functions.

Every column-type detection method is exposed as a *distance* function
f_t^d(v) (paper Definition 1): smaller = more "in-domain". Each *kind* of
method has a fixed grid of candidate distance thresholds; candidate SDCs are
(func, d_in, d_out, m) tuples drawn from these grids (paper §5.1 grid
search).
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class EvalFunctionSpec:
    """One domain-evaluation function f_t^d.

    ``name`` identifies the type: a CTA type name ("type-country"), an
    embedding centroid value ("seattle"), a generalized pattern string, a
    validator name, or a hash-function id.
    """

    func_id: int
    kind: str  # 'cta' | 'emb' | 'pattern' | 'function' | 'hash'
    family: str  # 'sherlock' | 'doduo' | 'glove' | 'sbert' | 'regex' | 'validator' | 'hash'
    name: str


@dataclass(frozen=True)
class KindGrid:
    """Distance-threshold grid for one method kind.

    ``thresholds`` is the full ordered list used for the per-(column, func)
    CDF aggregation; d_in is drawn from ``thresholds[:n_in]`` and d_out from
    ``thresholds[-n_out:]`` (always d_out > d_in). Binary-distance kinds
    (pattern/function) have a single threshold 0.5: dist <= 0.5 means match.
    """

    thresholds: tuple[float, ...]
    n_in: int
    n_out: int

    @property
    def d_in_values(self) -> tuple[float, ...]:
        return self.thresholds[: self.n_in]

    @property
    def d_out_values(self) -> tuple[float, ...]:
        return self.thresholds[len(self.thresholds) - self.n_out:]


KIND_GRIDS: dict[str, KindGrid] = {
    # Euclidean distance between unit vectors, range [0, 2]: in-domain ~0.5,
    # OOV/unrelated ~1.41.
    "emb": KindGrid((0.3, 0.5, 0.7, 0.9, 1.1, 1.3), n_in=3, n_out=3),
    # dist = 1 - classifier score: common ~<0.25, uncommon ~0.35-0.75,
    # out-of-type ~>0.85.
    "cta": KindGrid((0.15, 0.25, 0.45, 0.75, 0.9, 0.97), n_in=3, n_out=3),
    "pattern": KindGrid((0.5,), n_in=1, n_out=1),
    "function": KindGrid((0.5,), n_in=1, n_out=1),
    # Adversarial random-hash distances are uniform on [0, 1]: no setting of
    # the balls yields in/out separation, so all candidates must be rejected
    # by the statistical tests (paper §6.5 robustness experiment).
    "hash": KindGrid((0.2, 0.4, 0.6, 0.8), n_in=2, n_out=2),
}

# Matching-percentage grid m (paper enumerates with step 0.05).
M_GRID: tuple[float, ...] = (0.98, 0.95, 0.9, 0.85, 0.8, 0.75)


def normalize_value(v: str) -> str:
    """Canonical form every evaluator sees: lowercase, trimmed."""
    return str(v).strip().lower()


def stable_unit(*parts: str, lo: float = 0.0, hi: float = 1.0) -> float:
    """Deterministic pseudo-uniform in [lo, hi) keyed by ``parts``.

    Used for simulated classifier jitter and the adversarial hash functions;
    independent of Python's randomized str hash (blake2-based).
    """
    h = hashlib.blake2b("\x1f".join(parts).encode(), digest_size=8).digest()
    u = int.from_bytes(h, "big") / 2**64
    return lo + u * (hi - lo)


def stable_rng(*parts: str) -> np.random.Generator:
    """Deterministic numpy Generator keyed by ``parts``."""
    h = hashlib.blake2b("\x1f".join(parts).encode(), digest_size=8).digest()
    return np.random.default_rng(int.from_bytes(h, "big"))
