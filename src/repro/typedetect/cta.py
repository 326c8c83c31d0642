"""Simulated CTA classifiers (paper's Sherlock / Doduo).

A CTA classifier for type t maps a value v to a score in [0, 1]
(f_cta(t, v)), standardized to a distance 1 - score (Equation 1). The
simulation reproduces the score regimes real CTA classifiers exhibit
(DESIGN.md §2):

- well-known in-type values     -> high scores (0.72-0.98)
- valid-but-rare in-type values -> mid/low scores (0.25-0.65)  [Fig.-3 FPs]
- values of *other* NL types    -> low scores (0.05-0.2)
- everything else (codes/typos) -> ~0 (0-0.08)

"sherlock" covers a subset of NL domains, "doduo" covers all of them with a
slightly sharper score profile — mirroring the paper's 78- vs 121-type
classifiers with overlapping coverage.
"""
from __future__ import annotations

from functools import lru_cache

from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect.base import normalize_value, stable_unit

# Sherlock's (smaller) type inventory: first 16 NL domains; Doduo: all.
def sherlock_types() -> list[str]:
    return nl_domains()[:16]


def doduo_types() -> list[str]:
    return nl_domains()


@lru_cache(maxsize=1)
def _tier_index() -> tuple[dict[str, set[str]], dict[str, set[str]], set[str]]:
    """(domain -> common set, domain -> uncommon set, union of all NL vocab)."""
    common: dict[str, set[str]] = {}
    uncommon: dict[str, set[str]] = {}
    allv: set[str] = set()
    for name in nl_domains():
        d = DOMAINS[name]
        common[name] = {normalize_value(v) for v in d.common}
        uncommon[name] = {normalize_value(v) for v in d.uncommon}
        allv |= common[name] | uncommon[name]
    return common, uncommon, allv


def cta_score(family: str, type_domain: str, value: str) -> float:
    """Simulated classifier score f_cta(t, v) in [0, 1]. Deterministic."""
    v = normalize_value(value)
    common, uncommon, allv = _tier_index()
    base = 0.04 if family == "sherlock" else 0.0  # sherlock is a bit noisier
    if v in common[type_domain]:
        return min(1.0, stable_unit(family, type_domain, v, lo=0.72, hi=0.98) + base)
    if v in uncommon[type_domain]:
        return stable_unit(family, type_domain, v, lo=0.25, hi=0.65)
    if v in allv:  # valid value of a *different* NL type (confusable)
        return stable_unit(family, type_domain, v, lo=0.05, hi=0.20) + base
    return stable_unit(family, type_domain, v, lo=0.0, hi=0.08) + base


def cta_distance(family: str, type_domain: str, value: str) -> float:
    """f_cta^d = 1 - f_cta (paper Equation 1)."""
    return 1.0 - cta_score(family, type_domain, value)
