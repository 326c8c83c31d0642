"""Column-type-detection baselines with z-score thresholding (paper §6.2).

"For each method, we compute the domain evaluation score f_t(v) for each
value v in column C, and use the standard z-score on the resulting
distribution of f_t(v) to identify potential errors" — one baseline per
method family: Sherlock, Doduo (CTA), Glove, SentenceBERT (embedding),
Regex (column-majority pattern), DataPrep, Validators (functions).

Per column the best-fitting function of the family is chosen (minimum mean
distance — the family's own type prediction for the column), then each
value's z-score on that distance distribution becomes its error score
(monotone map to [0, 1]; the harness sweeps the threshold for PR curves).
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import register_scorer
from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect import cta as cta_mod
from repro.typedetect import embedding as emb_mod
from repro.typedetect import function as fun_mod
from repro.typedetect import pattern as pat_mod
from repro.typedetect.base import normalize_value

_Z_SCALE = 6.0  # z-score -> [0,1] monotone normalization


def _z_scores(dists: np.ndarray) -> np.ndarray:
    mu, sd = float(dists.mean()), float(dists.std())
    if sd < 1e-12:
        return np.zeros_like(dists)
    return np.clip((dists - mu) / sd / _Z_SCALE, 0.0, 1.0)


class _BestFitScorer:
    """Pick the family's best-fitting function, z-score its distances."""

    def __init__(self, dist_fn_by_type: dict[str, callable]):
        self.dist_fn_by_type = dist_fn_by_type

    def score(self, values: list[str]) -> np.ndarray:
        norm = [normalize_value(v) for v in values]
        best, best_mean = None, np.inf
        for t, fn in self.dist_fn_by_type.items():
            d = np.array([fn(v) for v in norm])
            m = float(d.mean())
            if m < best_mean:
                best, best_mean = d, m
        if best is None:
            return np.zeros(len(values))
        return _z_scores(best)


@register_scorer("sherlock")
def _sherlock(params: dict):
    return _BestFitScorer(
        {t: (lambda v, t=t: cta_mod.cta_distance("sherlock", t, v))
         for t in cta_mod.sherlock_types()}
    )


@register_scorer("doduo")
def _doduo(params: dict):
    return _BestFitScorer(
        {t: (lambda v, t=t: cta_mod.cta_distance("doduo", t, v))
         for t in cta_mod.doduo_types()}
    )


def _default_centroids(n: int = 60, seed: int = 5) -> list[str]:
    """Centroid pool for the embedding baselines: random well-known values
    (the stand-in for the paper's 1000 sampled centroids)."""
    rng = np.random.default_rng(seed)
    pool = sorted({normalize_value(v) for d in nl_domains() for v in DOMAINS[d].common})
    idx = rng.choice(len(pool), size=min(n, len(pool)), replace=False)
    return [pool[i] for i in idx]


class _EmbScorer:
    def __init__(self, space: str, centroids: list[str]):
        self.space = space
        self.cmat = emb_mod.emb_matrix(space, centroids)

    def score(self, values: list[str]) -> np.ndarray:
        vmat = emb_mod.emb_matrix(self.space, [normalize_value(v) for v in values])
        cos = np.clip(vmat @ self.cmat.T, -1.0, 1.0)
        dists = np.sqrt(np.maximum(0.0, 2.0 - 2.0 * cos))  # (n, C)
        best = int(np.argmin(dists.mean(axis=0)))
        return _z_scores(dists[:, best])


@register_scorer("glove")
def _glove(params: dict):
    return _EmbScorer("glove", _default_centroids())


@register_scorer("sbert")
def _sbert(params: dict):
    return _EmbScorer("sbert", _default_centroids())


class _RegexScorer:
    """Column-majority inferred pattern; z-score of the 0/1 match distance."""

    def score(self, values: list[str]) -> np.ndarray:
        shapes = [pat_mod.generalize(v) for v in values]
        uniq, counts = np.unique(shapes, return_counts=True)
        top = uniq[int(np.argmax(counts))]
        d = np.array([0.0 if s == top else 1.0 for s in shapes])
        return _z_scores(d)


@register_scorer("regex")
def _regex(params: dict):
    return _RegexScorer()


# Overlapping coverage, like the paper's DataPrep vs Validators libraries.
_DATAPREP = ("validate_date", "validate_time", "validate_num_unit", "validate_zip")
_VALIDATORS = tuple(fun_mod.VALIDATORS)


@register_scorer("dataprep")
def _dataprep(params: dict):
    return _BestFitScorer(
        {n: (lambda v, n=n: fun_mod.function_distance(n, v)) for n in _DATAPREP}
    )


@register_scorer("validators")
def _validators(params: dict):
    return _BestFitScorer(
        {n: (lambda v, n=n: fun_mod.function_distance(n, v)) for n in _VALIDATORS}
    )
