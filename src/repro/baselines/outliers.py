"""Classical outlier-detection baselines (paper §6.2): RKDE, PPCA, IForest,
SVDD, DBOD, LOF.

As the paper notes (Related Work), these operate on *local statistical
features of the single target column* with no corpus-level semantics. Each
value is featurized by simple string statistics, and the detector scores
outliers within the column's point cloud. All implementations are
self-contained numpy (no sklearn in this container); SVDD uses the
centroid-radius approximation of the separating sphere (the full QP adds
nothing at these dimensionalities — noted in DESIGN.md).
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import register_scorer
from repro.typedetect.base import normalize_value, stable_rng


def featurize(values: list[str]) -> np.ndarray:
    """Local column features: length, char-class fractions, token count,
    mean char code, and in-column character-trigram typicality (how common
    the value's trigrams are among the column's values — typos contain
    locally-rare trigrams). All signals are computable from the single
    column, which is precisely the outlier-detection setting the paper
    contrasts with corpus-level reasoning."""
    from collections import Counter

    norm = [normalize_value(v) for v in values]
    tri_counts: Counter[str] = Counter()
    for v in norm:
        s = f"^{v}$"
        tri_counts.update({s[i: i + 3] for i in range(max(1, len(s) - 2))})
    feats = []
    for v in norm:
        n = max(len(v), 1)
        digits = sum(c.isdigit() for c in v)
        alphas = sum(c.isalpha() for c in v)
        spaces = sum(c.isspace() for c in v)
        punct = n - digits - alphas - spaces
        s = f"^{v}$"
        grams = [s[i: i + 3] for i in range(max(1, len(s) - 2))]
        typicality = float(np.mean([tri_counts[g] for g in grams])) / max(len(norm), 1)
        feats.append(
            [
                len(v) / 30.0,
                digits / n,
                alphas / n,
                spaces / n,
                punct / n,
                v.count(" ") + 1,
                (sum(ord(c) for c in v) / n) / 128.0,
                typicality,
            ]
        )
    x = np.asarray(feats, dtype=float)
    mu, sd = x.mean(axis=0), x.std(axis=0)
    return (x - mu) / np.where(sd < 1e-9, 1.0, sd)


def _normalize_scores(s: np.ndarray) -> np.ndarray:
    """Cross-column-comparable squashing: robust (median/MAD) gap, then
    1 - exp(-gap/6). Homogeneous columns give low scores everywhere; a value
    that truly stands out in its column gives a high score — so the global
    threshold sweep ranks strong outliers from different columns together
    (per-column min-max would put one ~1.0 cell in *every* column)."""
    med = float(np.median(s))
    mad = float(np.median(np.abs(s - med)))
    if mad < 1e-12:
        mad = float(s.std()) or 1.0
    gap = np.maximum(s - med, 0.0) / mad
    return gap / (gap + 8.0)  # strictly monotone, no saturation ties


def _pairwise_sq(x: np.ndarray) -> np.ndarray:
    g = x @ x.T
    d = np.diag(g)
    return np.maximum(d[:, None] + d[None, :] - 2 * g, 0.0)


class _FeatScorer:
    def __init__(self, fn):
        self.fn = fn

    def score(self, values: list[str]) -> np.ndarray:
        if len(values) < 3:
            return np.zeros(len(values))
        x = featurize(values)
        return _normalize_scores(self.fn(x, values))


def _dbod(x: np.ndarray, values) -> np.ndarray:
    """Distance-based outliers (Knorr & Ng): mean distance to all points."""
    return np.sqrt(_pairwise_sq(x)).mean(axis=1)


def _lof(x: np.ndarray, values, k: int = 5) -> np.ndarray:
    """Local Outlier Factor with k nearest neighbours."""
    n = len(x)
    k = min(k, n - 1)
    d = np.sqrt(_pairwise_sq(x))
    np.fill_diagonal(d, np.inf)
    knn_idx = np.argsort(d, axis=1)[:, :k]
    kdist = d[np.arange(n)[:, None], knn_idx][:, -1]
    reach = np.maximum(d[np.arange(n)[:, None], knn_idx], kdist[knn_idx])
    lrd = 1.0 / np.maximum(reach.mean(axis=1), 1e-12)
    lof = (lrd[knn_idx].mean(axis=1)) / lrd
    return lof


def _svdd(x: np.ndarray, values) -> np.ndarray:
    """Centroid-radius approximation of the SVDD sphere: distance to the
    (trimmed) mean, in radius units."""
    center = np.median(x, axis=0)
    return np.linalg.norm(x - center, axis=1)


def _rkde(x: np.ndarray, values) -> np.ndarray:
    """Robust Gaussian KDE: score = negative log density with a median-
    heuristic bandwidth and one robust reweighting step."""
    sq = _pairwise_sq(x)
    med = np.median(sq[sq > 0]) if (sq > 0).any() else 1.0
    bw = max(med, 1e-6)
    kern = np.exp(-sq / (2 * bw))
    dens = kern.mean(axis=1)
    w = dens / dens.sum()  # robust step: low-density points downweighted
    dens_r = (kern * w[None, :]).sum(axis=1)
    return -np.log(np.maximum(dens_r, 1e-12))


def _ppca(x: np.ndarray, values, q: int = 2) -> np.ndarray:
    """Probabilistic PCA reconstruction error with q principal components."""
    xc = x - x.mean(axis=0)
    _, _, vt = np.linalg.svd(xc, full_matrices=False)
    w = vt[:q].T
    recon = xc @ w @ w.T
    return np.linalg.norm(xc - recon, axis=1)


def _iforest(x: np.ndarray, values, n_trees: int = 50, sub: int = 64) -> np.ndarray:
    """Isolation Forest (Liu et al.): average isolation depth over random
    axis-parallel trees, deterministic in the column content."""
    rng = stable_rng("iforest", *values[:5])
    n, d = x.shape
    depths = np.zeros(n)

    def _grow(idx: np.ndarray, depth: int, limit: int) -> None:
        if depth >= limit or len(idx) <= 1:
            # unbuilt subtree correction: average path length of BST with |idx| nodes
            m = len(idx)
            c = 2 * (np.log(m - 1) + 0.5772) - 2 * (m - 1) / m if m > 2 else (1 if m == 2 else 0)
            depths[idx] += depth + c
            return
        f = int(rng.integers(0, d))
        lo, hi = x[idx, f].min(), x[idx, f].max()
        if hi - lo < 1e-12:
            depths[idx] += depth
            return
        split = rng.uniform(lo, hi)
        left = idx[x[idx, f] < split]
        right = idx[x[idx, f] >= split]
        _grow(left, depth + 1, limit)
        _grow(right, depth + 1, limit)

    sub = min(sub, n)
    limit = int(np.ceil(np.log2(max(sub, 2)))) + 2
    for _ in range(n_trees):
        samp = rng.choice(n, size=sub, replace=False)
        # score all points against the tree grown on the subsample by
        # growing on the full set but limiting depth (simplified variant)
        _grow(np.arange(n), 0, limit)
    avg = depths / n_trees
    return -avg  # shorter average path = more isolated = higher score


for _name, _fn in [
    ("dbod", _dbod), ("lof", _lof), ("svdd", _svdd),
    ("rkde", _rkde), ("ppca", _ppca), ("iforest", _iforest),
]:
    register_scorer(_name)(lambda params, _fn=_fn: _FeatScorer(_fn))
