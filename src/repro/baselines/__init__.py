"""Baselines compared in paper §6.2.

Every baseline is a *column scorer*: ``score(values) -> np.ndarray`` of
error scores in [0, 1] (0 = not flagged). ``base.py`` holds the scorer
registry and the Spark ``applyInPandas`` runner used by the harness.
"""

from repro.baselines.base import SCORERS, make_scorer, run_scorer_on_bench

__all__ = ["SCORERS", "make_scorer", "run_scorer_on_bench"]
