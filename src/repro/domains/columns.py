"""Single-column generators: one column = distinct values of one semantic domain.

The paper models a corpus as a collection of columns (Section 4, "Problem
Statement") and reports per-column *distinct*-value statistics (Table 3); we
generate columns directly as distinct value sets.
"""
from __future__ import annotations

import numpy as np

from repro.domains.vocab import DOMAINS, DomainSpec


def generate_column(
    domain: str,
    n_distinct: int,
    rng: np.random.Generator,
    *,
    uncommon_frac: float = 0.15,
) -> list[str]:
    """Distinct values of one column drawn from ``domain``.

    For NL domains, values come from the common tier with probability
    ``1 - uncommon_frac`` and the uncommon tier otherwise (rare-but-valid
    values are the paper's Fig.-3 false-positive source and must be present
    in training columns so Auto-Test's calibration can learn to tolerate
    them). For code domains the generator is invoked; for mixed domains the
    enumerable vocab (plus generator minority) is used.
    """
    spec: DomainSpec = DOMAINS[domain]
    values: list[str] = []
    seen: set[str] = set()
    if spec.columnar:
        # columnar generators fix per-column structure; one batched call
        for v in spec.generator(rng, n_distinct * 3):
            if v not in seen:
                seen.add(v)
                values.append(v)
            if len(values) == n_distinct:
                break
        return values
    budget = n_distinct * 30
    while len(values) < n_distinct and budget > 0:
        budget -= 1
        v = _draw(spec, rng, uncommon_frac)
        if v not in seen:
            seen.add(v)
            values.append(v)
    return values


def _draw(spec: DomainSpec, rng: np.random.Generator, uncommon_frac: float) -> str:
    if spec.kind == "code":
        return spec.generator(rng, 1)[0]
    if spec.kind == "mixed":
        if spec.generator is not None:
            return spec.generator(rng, 1)[0]
        return str(spec.common[rng.integers(0, len(spec.common))])
    # nl
    if spec.uncommon and rng.random() < uncommon_frac:
        return str(spec.uncommon[rng.integers(0, len(spec.uncommon))])
    return str(spec.common[rng.integers(0, len(spec.common))])


def max_distinct(domain: str) -> int:
    """Upper bound on distinct values a domain can yield (∞ for generators)."""
    spec = DOMAINS[domain]
    if spec.generator is not None:
        return 10**9
    return len(spec.common) + len(spec.uncommon)
