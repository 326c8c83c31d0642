"""Baseline scorer registry + distributed runner.

A scorer is created by name (plus picklable params) so it can be rebuilt
lazily inside Spark executors; ``run_scorer_on_bench`` distributes scoring
with ``applyInPandas`` grouped by column.
"""
from __future__ import annotations

from typing import Callable, Protocol

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T


class ColumnScorer(Protocol):
    def score(self, values: list[str]) -> np.ndarray: ...


# name -> factory(params dict) -> ColumnScorer
SCORERS: dict[str, Callable[[dict], ColumnScorer]] = {}


def register_scorer(name: str):
    def deco(factory):
        SCORERS[name] = factory
        return factory
    return deco


def make_scorer(name: str, params: dict | None = None) -> ColumnScorer:
    # imports register the scorers on first use
    from repro.baselines import autodetect, katara, llm, outliers, vendors, zscore  # noqa: F401

    return SCORERS[name](params or {})


_CACHE: dict[str, ColumnScorer] = {}


def _cached_scorer(name: str, params: dict) -> ColumnScorer:
    key = f"{name}|{sorted(params.items())!r}"
    if key not in _CACHE:
        _CACHE[key] = make_scorer(name, params)
    return _CACHE[key]


_PRED_SCHEMA = T.StructType(
    [
        T.StructField("col_id", T.LongType()),
        T.StructField("value", T.StringType()),
        T.StructField("score", T.DoubleType()),
    ]
)


def run_scorer_on_bench(
    spark: SparkSession, values_df: DataFrame, name: str, params: dict | None = None
) -> DataFrame:
    """Scored cells (col_id, value, score > 0) for one baseline over a bench."""
    params = params or {}

    def _apply(key, pdf):
        scorer = _cached_scorer(name, params)
        vals = pdf["value"].tolist()
        scores = np.asarray(scorer.score(vals), dtype=float)
        mask = scores > 0
        return pd.DataFrame(
            {
                "col_id": np.full(int(mask.sum()), key[0], dtype=np.int64),
                "value": [v for v, m_ in zip(vals, mask) if m_],
                "score": scores[mask],
            }
        )

    return (
        values_df.select("col_id", "value")
        .groupBy("col_id")
        .applyInPandas(_apply, schema=_PRED_SCHEMA)
    )
