"""Katara analog (paper §6.2): knowledge-base mapping with static thresholds.

Katara maps a column to a KB type (city, country, ...) and flags values
absent from the KB. The KB here is the *common* tier of each NL domain
(knowledge bases list well-known entities, not rare ones) — so valid rare
values become false positives, and the heuristic static threshold yields a
single uncalibrated operating point, reproducing Katara's weak Table-4 row.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import register_scorer
from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect.base import normalize_value


@register_scorer("katara")
def _katara(params: dict):
    kb = {
        d: {normalize_value(v) for v in DOMAINS[d].common} for d in nl_domains()
    }

    class _K:
        def score(self, values: list[str]) -> np.ndarray:
            norm = [normalize_value(v) for v in values]
            best_dom, best_cov = None, 0.0
            for d, vocab in kb.items():
                cov = sum(v in vocab for v in norm) / len(norm)
                if cov > best_cov:
                    best_dom, best_cov = d, cov
            if best_dom is None or best_cov < 0.5:  # static mapping threshold
                return np.zeros(len(values))
            return np.array([0.0 if v in kb[best_dom] else 1.0 for v in norm])

    return _K()
