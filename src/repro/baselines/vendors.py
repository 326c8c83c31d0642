"""Commercial end-user cleaning tools, Vendor-A / Vendor-B analogs (§6.2).

Both are simple static-threshold detectors of the style shipped in
spreadsheet products: Vendor-A flags values breaking a >=90% dominant
syntactic pattern; Vendor-B is a dictionary spell-checker (flags alphabetic
values absent from its word list). Single uncalibrated operating points,
reproducing the near-zero Table-4 rows.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import register_scorer
from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect import pattern as pat_mod
from repro.typedetect.base import normalize_value


@register_scorer("vendor_a")
def _vendor_a(params: dict):
    class _V:
        def score(self, values: list[str]) -> np.ndarray:
            shapes = [pat_mod.generalize(normalize_value(v)) for v in values]
            uniq, counts = np.unique(shapes, return_counts=True)
            if counts.max() / len(values) < 0.9:
                return np.zeros(len(values))
            maj = str(uniq[int(np.argmax(counts))])
            return np.array([0.0 if s == maj else 1.0 for s in shapes])

    return _V()


@register_scorer("vendor_b")
def _vendor_b(params: dict):
    dictionary = {
        normalize_value(v) for d in nl_domains() for v in DOMAINS[d].common
    }

    class _V:
        def score(self, values: list[str]) -> np.ndarray:
            norm = [normalize_value(v) for v in values]
            alpha_frac = sum(v.replace(" ", "").isalpha() for v in norm) / len(norm)
            if alpha_frac < 0.6:  # only "texty" columns get spell-checked
                return np.zeros(len(values))
            return np.array(
                [
                    1.0 if v.replace(" ", "").isalpha() and v not in dictionary else 0.0
                    for v in norm
                ]
            )

    return _V()
