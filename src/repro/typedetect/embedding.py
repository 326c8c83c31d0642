"""Simulated text-embedding spaces (paper's GloVe / SentenceBERT).

Both spaces embed a value into a 32-d unit vector; the domain-evaluation
function is the Euclidean distance to a *centroid* value (paper Equation 2).
The two spaces reproduce the phenomena Auto-Test's calibration depends on:

- ``glove`` (word-level): words in the *common* tier of an NL domain cluster
  around a per-domain direction; everything else — typos, rare names, codes —
  is out-of-vocabulary and lands on a hash-random direction (distance ~1.41
  from any cluster). This is the paper's false-positive source on rare
  values (Fig. 3: "omayra" is not in GloVe's vocabulary).
- ``sbert`` (subword-aware): knows the *uncommon* tier too (placed slightly
  looser in the cluster), and blends in a character-trigram component so
  typos land *between* the cluster and the OOV shell.

Everything is deterministic (hash-seeded); no training, no model files.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np

from repro.domains.vocab import DOMAINS, nl_domains
from repro.typedetect.base import normalize_value, stable_rng

DIM = 32
_GLOVE_SPREAD = 0.35  # in-cluster noise scale (common tier)
_SBERT_SPREAD = 0.45  # sbert places known words slightly looser
_SBERT_WORD_W = 0.8  # sbert = 0.8 * word-level + 0.2 * char-trigram


def _unit(x: np.ndarray) -> np.ndarray:
    n = float(np.linalg.norm(x))
    return x / n if n > 0 else x


@lru_cache(maxsize=1)
def _word_index() -> tuple[dict[str, str], dict[str, str]]:
    """(token -> primary domain) for common tier and for common+uncommon.

    Whole vocabulary entries are indexed as-is (so multi-word entries like
    "new york" match at value level) and additionally split into tokens.
    Primary domain = lexicographically-first owner (deterministic).
    """
    common: dict[str, str] = {}
    known: dict[str, str] = {}

    def _add(idx: dict[str, str], key: str, dom: str) -> None:
        if key not in idx or dom < idx[key]:
            idx[key] = dom

    for name in nl_domains():
        d = DOMAINS[name]
        for v in d.common:
            v = normalize_value(v)
            _add(common, v, name)
            _add(known, v, name)
            for tok in v.split():
                _add(common, tok, name)
                _add(known, tok, name)
        for v in d.uncommon:
            v = normalize_value(v)
            _add(known, v, name)
            for tok in v.split():
                _add(known, tok, name)
    return common, known


@lru_cache(maxsize=4096)
def domain_centroid(domain: str) -> np.ndarray:
    """Fixed unit direction for an NL domain's cluster."""
    return _unit(stable_rng("centroid", domain).normal(size=DIM))


@lru_cache(maxsize=200_000)
def _word_vec(space: str, word: str) -> np.ndarray:
    """Word-level vector: in-cluster if the space knows the word, else random."""
    common, known = _word_index()
    vocab = common if space == "glove" else known
    if word in vocab:
        dom = vocab[word]
        spread = _GLOVE_SPREAD if space == "glove" else _SBERT_SPREAD
        noise = stable_rng("wordnoise", space, word).normal(size=DIM)
        return _unit(domain_centroid(dom) + spread * _unit(noise))
    return _unit(stable_rng("oov", space, word).normal(size=DIM))


@lru_cache(maxsize=200_000)
def _char_vec(value: str) -> np.ndarray:
    """Character-trigram hashing vector (sbert's subword component)."""
    s = f"^{value}$"
    grams = [s[i: i + 3] for i in range(max(1, len(s) - 2))]
    acc = np.zeros(DIM)
    for g in grams:
        acc += stable_rng("trigram", g).normal(size=DIM)
    return _unit(acc)


@lru_cache(maxsize=200_000)
def embed(space: str, value: str) -> np.ndarray:
    """Unit embedding of a (normalized) value in the given space."""
    v = normalize_value(value)
    common, known = _word_index()
    vocab = common if space == "glove" else known
    # whole-value lookup first (multi-word vocab entries), else token average
    if v in vocab or " " not in v:
        word_part = _word_vec(space, v)
    else:
        toks = v.split()
        word_part = _unit(np.sum([_word_vec(space, t) for t in toks], axis=0))
    if space == "glove":
        return word_part
    return _unit(_SBERT_WORD_W * word_part + (1 - _SBERT_WORD_W) * _char_vec(v))


def emb_distance(space: str, centroid_value: str, value: str) -> float:
    """f_emb^d(c, v): Euclidean distance between unit embeddings (range [0,2])."""
    return float(np.linalg.norm(embed(space, centroid_value) - embed(space, value)))


def emb_matrix(space: str, values: list[str]) -> np.ndarray:
    """Stacked embeddings for a batch of values, shape (n, DIM)."""
    return np.stack([embed(space, v) for v in values]) if values else np.zeros((0, DIM))
