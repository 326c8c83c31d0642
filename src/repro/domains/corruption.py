"""Error injection: typos, semantically-incompatible values, metadata strings.

Mirrors the paper's error taxonomy (Fig. 2): a dirty cell is either a typo of
a valid value ("Liechstein", "febuary"), a value from a different semantic
domain ("Germany" in a state column), or a stray metadata string ("fy
definition", "new facility").
"""
from __future__ import annotations

import numpy as np

from repro.domains.vocab import DOMAINS, DomainSpec

METADATA_STRINGS = (
    "n/a", "empty", "nan", "unknown", "see notes", "fy definition",
    "new facility", "total", "sample_size", "dummy_type", "tbd", "none",
    "missing", "not applicable",
)

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def typo(value: str, rng: np.random.Generator) -> str:
    """One character-level corruption (delete / swap / replace / duplicate).

    Guaranteed to differ from the input (retries with a different op/position
    until it does; a 1-char input falls back to appending a char).
    """
    if len(value) < 2:
        return value + _ALPHABET[rng.integers(0, 26)]
    for _ in range(20):
        op = rng.integers(0, 4)
        i = int(rng.integers(0, len(value)))
        if op == 0 and len(value) > 2:  # delete
            out = value[:i] + value[i + 1:]
        elif op == 1 and i < len(value) - 1:  # swap adjacent
            out = value[:i] + value[i + 1] + value[i] + value[i + 2:]
        elif op == 2:  # replace
            out = value[:i] + _ALPHABET[rng.integers(0, 26)] + value[i + 1:]
        else:  # duplicate
            out = value[:i] + value[i] + value[i:]
        if out != value:
            return out
    return value + _ALPHABET[rng.integers(0, 26)]


def incompatible_value(domain: str, rng: np.random.Generator) -> str:
    """A valid value drawn from a *different* domain (semantic incompatibility)."""
    names = [n for n in DOMAINS if n != domain]
    other: DomainSpec = DOMAINS[names[rng.integers(0, len(names))]]
    return other.sample_value(rng)


def metadata_string(rng: np.random.Generator) -> str:
    return METADATA_STRINGS[rng.integers(0, len(METADATA_STRINGS))]


def make_error(domain: str, clean_values: list[str], rng: np.random.Generator) -> str:
    """One error for a column of ``domain`` holding ``clean_values``.

    Mix (weights from the paper's qualitative analysis): 45% typo of an
    existing value, 35% incompatible value from another domain, 20% metadata
    string. The result is guaranteed not to collide with a clean value.
    """
    for _ in range(30):
        u = rng.random()
        if u < 0.45 and clean_values:
            base = clean_values[rng.integers(0, len(clean_values))]
            err = typo(str(base), rng)
        elif u < 0.80:
            err = incompatible_value(domain, rng)
        else:
            err = metadata_string(rng)
        if err not in clean_values:
            return err
    return "##error##"
