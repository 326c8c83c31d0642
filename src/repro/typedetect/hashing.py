"""Adversarial random-hash evaluation functions (paper §6.5 robustness).

f_hash^d(h_i, v) = h_i(v) with h_i a hash mapping values uniformly to
[0, 1]. These correspond to no semantic domain, so every SDC candidate built
on them must be rejected by the statistical tests — the robustness property
verified in tests/test_robustness_hash.py.
"""
from __future__ import annotations

from repro.typedetect.base import normalize_value, stable_unit


def hash_distance(name: str, value: str) -> float:
    return stable_unit("adversarial-hash", name, normalize_value(value))
