"""Simulated GPT-4 baselines (paper §6.2; substitution in DESIGN.md §2).

The paper reports that GPT-4 "can detect many data errors (around 80%), but
also produces a large number of false-positives (especially on columns
involving code-names, abbreviations, and proprietary vocabularies)", with
flat, uncalibrated confidence — every GPT row of Table 4 has F1@P=0.8 = 0.

The simulation encodes exactly that operating profile with deterministic
hash-driven decisions: high detection probability on typos / incompatible
values / metadata strings, a small FP rate on rare in-domain values, and a
larger FP rate on code-like columns. Variants (few/zero-shot x CoT,
finetuned) differ only in those rates; no live model is involved.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import register_scorer
from repro.domains.corruption import METADATA_STRINGS
from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect import pattern as pat_mod
from repro.typedetect.base import normalize_value, stable_unit

_META = {normalize_value(v) for v in METADATA_STRINGS}


def _vocab_index():
    common, full = {}, {}
    for d in nl_domains():
        spec = DOMAINS[d]
        common[d] = {normalize_value(v) for v in spec.common}
        full[d] = common[d] | {normalize_value(v) for v in spec.uncommon}
    return common, full


class _GptScorer:
    def __init__(
        self, p_detect: float, p_shape: float, p_fp_rare: float, p_fp_code: float, tag: str
    ):
        self.p_detect = p_detect  # detection prob on semantic errors / metadata
        self.p_shape = p_shape  # prob of flagging a minority-format value in a code column
        self.p_fp_rare = p_fp_rare  # FP prob on valid rare NL values
        self.p_fp_code = p_fp_code  # FP prob on conforming code values
        self.tag = tag
        self.common, self.full = _vocab_index()

    def _flag_prob(self, v: str, col_domain: str | None, maj_shape: str | None) -> float:
        if v in _META:
            return self.p_detect
        if col_domain is not None:
            if v in self.full[col_domain]:
                # valid value; rare ones occasionally (wrongly) questioned
                return 0.0 if v in self.common[col_domain] else self.p_fp_rare
            return self.p_detect  # typo or incompatible value
        if maj_shape is not None:
            if pat_mod.generalize(v) != maj_shape:
                # might be an error or a legitimate minority format — the
                # model can only guess (COT variants guess more cautiously)
                return self.p_shape
            return self.p_fp_code  # hallucinated complaints on code values
        return 0.0

    def score(self, values: list[str]) -> np.ndarray:
        norm = [normalize_value(v) for v in values]
        # the "LLM's read" of the column: best-covered NL domain, else shape
        best_dom, best_cov = None, 0.0
        for d, vocab in self.full.items():
            cov = sum(v in vocab for v in norm) / len(norm)
            if cov > best_cov:
                best_dom, best_cov = d, cov
        col_domain = best_dom if best_cov >= 0.6 else None
        maj_shape = None
        if col_domain is None:
            shapes = [pat_mod.generalize(v) for v in norm]
            uniq, counts = np.unique(shapes, return_counts=True)
            if counts.max() / len(norm) >= 0.7:
                maj_shape = str(uniq[int(np.argmax(counts))])
        col_key = f"{col_domain}|{maj_shape}|{norm[0] if norm else ''}"
        out = np.zeros(len(values))
        for i, v in enumerate(norm):
            p = self._flag_prob(v, col_domain, maj_shape)
            if p > 0 and stable_unit(self.tag, col_key, v) < p:
                # flat-ish uncalibrated confidence (no useful ranking)
                out[i] = 0.6 + 0.3 * stable_unit(self.tag, "conf", v)
        return out


_VARIANTS = {
    # (p_detect, p_shape, p_fp_rare, p_fp_code)
    "gpt_few_cot": (0.88, 0.08, 0.010, 0.005),
    "gpt_few_nocot": (0.88, 0.12, 0.015, 0.008),
    "gpt_zero_cot": (0.85, 0.18, 0.025, 0.015),
    "gpt_zero_nocot": (0.80, 0.28, 0.040, 0.030),
    "gpt_finetuned": (0.90, 0.60, 0.120, 0.100),
}

for _name, (_pd, _ps, _pr, _pc) in _VARIANTS.items():
    register_scorer(_name)(
        lambda params, n=_name, a=_pd, s=_ps, b=_pr, c=_pc: _GptScorer(a, s, b, c, n)
    )
