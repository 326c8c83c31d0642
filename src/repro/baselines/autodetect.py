"""Auto-Detect analog (Huang & He 2018): corpus-driven pattern co-occurrence.

Auto-Detect flags a value whose syntactic pattern rarely co-occurs with the
column's dominant pattern across a large corpus. We train the co-occurrence
table offline from our corpus (P(shape | majority shape of the column)) and
score 1 - smoothed co-occurrence probability. Like the original, it is
*pattern-only*, which limits its coverage (paper Related Work / Table 4).
"""
from __future__ import annotations

from collections import Counter, defaultdict

import numpy as np
import pandas as pd

from repro.baselines.base import register_scorer
from repro.typedetect import pattern as pat_mod
from repro.typedetect.base import normalize_value


def train_cooccurrence(
    values_pdf: pd.DataFrame, sample_frac: float = 0.4, seed: int = 29
) -> dict[str, dict[str, float]]:
    """P(shape | column-majority shape) from corpus columns (col_id, value).

    ``sample_frac`` subsamples corpus columns: the original Auto-Detect's
    co-occurrence statistics are sparse relative to the space of patterns,
    so legitimate-but-rare pattern pairs are often unseen (its FP source);
    training on a fraction of our (generator-aligned) corpus keeps that
    sparsity realistic instead of handing the baseline an oracle.
    """
    counts: dict[str, Counter] = defaultdict(Counter)
    df = pd.DataFrame(
        {
            "col_id": values_pdf["col_id"].to_numpy(),
            "shape": values_pdf["value"].map(lambda v: pat_mod.generalize(normalize_value(v))),
        }
    )
    if sample_frac < 1.0:
        rng = np.random.default_rng(seed)
        cols = df["col_id"].unique()
        keep = set(rng.choice(cols, size=int(len(cols) * sample_frac), replace=False))
        df = df[df["col_id"].isin(keep)]
    for _, grp in df.groupby("col_id"):
        c = Counter(grp["shape"])
        maj, cnt = c.most_common(1)[0]
        if cnt / len(grp) >= 0.5:
            for s, k in c.items():
                counts[maj][s] += k
    return {
        maj: {s: k / sum(c.values()) for s, k in c.items()} for maj, c in counts.items()
    }


@register_scorer("autodetect")
def _autodetect(params: dict):
    model: dict[str, dict[str, float]] = params.get("model", {})

    class _A:
        def score(self, values: list[str]) -> np.ndarray:
            shapes = [pat_mod.generalize(normalize_value(v)) for v in values]
            uniq, counts = np.unique(shapes, return_counts=True)
            maj = str(uniq[int(np.argmax(counts))])
            if counts.max() / len(values) < 0.5:
                return np.zeros(len(values))
            cond = model.get(maj, {})
            out = np.zeros(len(values))
            for i, s in enumerate(shapes):
                if s == maj:
                    continue
                p = cond.get(s, 0.0)
                out[i] = max(0.0, 1.0 - p / 0.25)  # p >= 0.25 deemed compatible
            return out

    return _A()
