"""Evaluator registry: assemble all domain-evaluation functions and compute
distances at corpus scale inside Spark.

Paper §5.1 instantiates f_t from four method families (199 CTA classifiers,
2000 embedding centroids, 45 patterns, 8 validators). We build the same
structure at reduced scale (DESIGN.md §5 scale note): all simulated CTA
types, ``n_centroids`` embedding centroids *sampled from the corpus* per
space (the paper samples centroids from corpus values too), corpus-induced
patterns, and the eight validators.

The distance stage is the distributed part: ``compute_distances`` maps every
distinct corpus value through every evaluation function with ``mapInPandas``
(vectorized numpy per batch), yielding a long (value_id, func_id, dist)
DataFrame that downstream contingency aggregation consumes.
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.typedetect import cta as cta_mod
from repro.typedetect import embedding as emb_mod
from repro.typedetect import function as fun_mod
from repro.typedetect import hashing as hash_mod
from repro.typedetect import pattern as pat_mod
from repro.typedetect.base import EvalFunctionSpec, normalize_value

ALL_KINDS = ("cta", "emb", "pattern", "function")


@dataclass
class Registry:
    """Dense-indexed list of evaluation functions (func_id == list index)."""

    specs: list[EvalFunctionSpec]

    def token(self) -> str:
        h = hashlib.blake2b(digest_size=8)
        for s in self.specs:
            h.update(f"{s.kind}|{s.family}|{s.name}".encode())
        return h.hexdigest()

    def by_kind(self, kind: str) -> list[EvalFunctionSpec]:
        return [s for s in self.specs if s.kind == kind]

    def spec_pdf(self) -> pd.DataFrame:
        return pd.DataFrame(
            [(s.func_id, s.kind, s.family, s.name) for s in self.specs],
            columns=["func_id", "kind", "family", "name"],
        )


def build_registry(
    corpus_values_pdf: pd.DataFrame | None = None,
    *,
    n_centroids: int = 50,
    seed: int = 23,
    include_kinds: tuple[str, ...] = ALL_KINDS,
    n_hash: int = 0,
    patterns: list[str] | None = None,
    top_k_patterns: int = 45,
) -> Registry:
    """Assemble the evaluator registry.

    ``corpus_values_pdf`` (col_id, value) supplies embedding centroids and
    induced patterns; omit it only when 'emb'/'pattern' are excluded or
    ``patterns`` is given. ``n_hash`` > 0 adds adversarial random-hash
    functions (robustness experiment §6.5). ``include_kinds`` drives the
    Table-7 ablations (no-CTA / no-embedding / ...).
    """
    specs: list[EvalFunctionSpec] = []

    def _add(kind: str, family: str, name: str) -> None:
        specs.append(EvalFunctionSpec(len(specs), kind, family, name))

    if "cta" in include_kinds:
        for t in cta_mod.sherlock_types():
            _add("cta", "sherlock", t)
        for t in cta_mod.doduo_types():
            _add("cta", "doduo", t)

    if "emb" in include_kinds:
        if corpus_values_pdf is None:
            raise ValueError("embedding centroids require corpus values")
        pool = _centroid_pool(corpus_values_pdf)
        for i, space in enumerate(("glove", "sbert")):
            rng = np.random.default_rng(seed + i)
            take = min(n_centroids, len(pool))
            for c in rng.choice(pool, size=take, replace=False):
                _add("emb", space, str(c))

    if "pattern" in include_kinds:
        if patterns is None:
            if corpus_values_pdf is None:
                raise ValueError("pattern induction requires corpus values")
            patterns = pat_mod.induce_patterns(corpus_values_pdf, top_k=top_k_patterns)
        for p in patterns:
            _add("pattern", "regex", p)

    if "function" in include_kinds:
        for name in fun_mod.VALIDATORS:
            _add("function", "validator", name)

    for i in range(n_hash):
        _add("hash", "hash", f"h{i}")

    return Registry(specs)


def _centroid_pool(values_pdf: pd.DataFrame) -> np.ndarray:
    """Alphabetic distinct corpus values (embedding centroids only make sense
    for natural-language content; the paper samples values as centroids)."""
    vals = values_pdf["value"].astype(str).str.strip().str.lower().unique()
    mask = [bool(v) and all(ch.isalpha() or ch == " " for ch in v) for v in vals]
    return vals[np.asarray(mask, dtype=bool)]


# ---------------------------------------------------------------------------
# Distance evaluation
# ---------------------------------------------------------------------------


class DistanceEvaluator:
    """Computes the (n_values x n_funcs) distance matrix for value batches.

    Construction is cheap (indexes only); embedding centroids are embedded
    lazily on first use. Instances are cached per executor process keyed by
    the registry token (see ``_evaluator_for``).
    """

    def __init__(self, specs: list[EvalFunctionSpec]):
        self.specs = specs
        self._emb_centroids: dict[str, tuple[list[int], np.ndarray]] = {}
        for space in ("glove", "sbert"):
            ids = [s.func_id for s in specs if s.kind == "emb" and s.family == space]
            if ids:
                mat = emb_mod.emb_matrix(space, [specs[i].name for i in ids])
                self._emb_centroids[space] = (ids, mat)

    def matrix(self, values: list[str]) -> np.ndarray:
        n, f = len(values), len(self.specs)
        out = np.ones((n, f), dtype=np.float64)
        norm = [normalize_value(v) for v in values]
        shapes = [pat_mod.generalize(v) for v in norm]
        for space, (ids, cmat) in self._emb_centroids.items():
            vmat = emb_mod.emb_matrix(space, norm)
            cos = np.clip(vmat @ cmat.T, -1.0, 1.0)
            out[:, ids] = np.sqrt(np.maximum(0.0, 2.0 - 2.0 * cos))
        for s in self.specs:
            if s.kind == "cta":
                col = [cta_mod.cta_distance(s.family, s.name, v) for v in norm]
            elif s.kind == "pattern":
                col = [0.0 if sh == s.name else 1.0 for sh in shapes]
            elif s.kind == "function":
                fn = fun_mod.VALIDATORS[s.name]
                col = [0.0 if fn(v) else 1.0 for v in norm]
            elif s.kind == "hash":
                col = [hash_mod.hash_distance(s.name, v) for v in norm]
            else:
                continue
            out[:, s.func_id] = col
        return out


_EVAL_CACHE: dict[str, DistanceEvaluator] = {}


def _evaluator_for(token: str, spec_rows: list[tuple[int, str, str, str]]) -> DistanceEvaluator:
    ev = _EVAL_CACHE.get(token)
    if ev is None:
        specs = [EvalFunctionSpec(*r) for r in spec_rows]
        ev = _EVAL_CACHE[token] = DistanceEvaluator(specs)
    return ev


def make_value_dim(spark: SparkSession, values_df: DataFrame) -> DataFrame:
    """(value_id, value) dimension over the distinct values of a corpus.

    Ids are assigned deterministically (sorted order) so runs are
    reproducible; the dimension is small (distinct strings), the heavy
    per-function work stays distributed.
    """
    vals = sorted(r[0] for r in values_df.select("value").distinct().collect())
    pdf = pd.DataFrame({"value_id": np.arange(len(vals), dtype=np.int64), "value": vals})
    return spark.createDataFrame(pdf)


_DIST_SCHEMA = T.StructType(
    [
        T.StructField("value_id", T.LongType()),
        T.StructField("func_id", T.IntegerType()),
        T.StructField("dist", T.DoubleType()),
    ]
)


def compute_distances(
    spark: SparkSession, value_dim: DataFrame, registry: Registry
) -> DataFrame:
    """Long (value_id, func_id, dist) distances for every (value, func) pair.

    Runs as ``mapInPandas`` over the value dimension: one vectorized
    evaluator call per Arrow batch, executed in parallel across cores.
    """
    token = registry.token()
    spec_rows = [(s.func_id, s.kind, s.family, s.name) for s in registry.specs]
    n_funcs = len(spec_rows)
    func_ids = np.arange(n_funcs, dtype=np.int32)

    def _eval(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        ev = _evaluator_for(token, spec_rows)
        for pdf in batches:
            if pdf.empty:
                continue
            mat = ev.matrix(pdf["value"].tolist())
            n = len(pdf)
            yield pd.DataFrame(
                {
                    "value_id": np.repeat(pdf["value_id"].to_numpy(), n_funcs),
                    "func_id": np.tile(func_ids, n),
                    "dist": mat.reshape(-1),
                }
            )

    n_part = max(spark.sparkContext.defaultParallelism, 8)
    return value_dim.repartition(n_part).mapInPandas(_eval, schema=_DIST_SCHEMA)
