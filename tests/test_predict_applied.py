"""Tests for the coverage-inspection path used by the Table-9 experiment."""
import numpy as np


def test_applied_rules_on_date_column(trained):
    from repro.core.predict import ColumnPredictor

    pred = ColumnPredictor(trained.all_constraints)
    col = [f"{m}/{d}/2021" for m in range(1, 13) for d in (2, 11, 27)]
    applied = pred.applied_rules(col)
    # a pure date column should be covered by at least one SDC
    assert len(applied) > 0
    # and the covering rules' pre-conditions genuinely hold
    mat = pred.evaluator.matrix(col)
    for r in applied.itertuples():
        frac = np.count_nonzero(mat[:, int(r.func_id)] <= r.d_in) / len(col)
        assert frac >= r.m - 1e-12


def test_applied_rules_empty_column(trained):
    from repro.core.predict import ColumnPredictor

    pred = ColumnPredictor(trained.fine)
    assert len(pred.applied_rules([])) == 0


def test_applied_rules_gibberish_column_uncovered(trained):
    from repro.core.predict import ColumnPredictor

    pred = ColumnPredictor(trained.fine)
    col = [f"}}{i}~~@@##&&**{i*7}" for i in range(12)]
    applied = pred.applied_rules(col)
    # a nonsense-shaped column should match few/no semantic domains
    assert len(applied) <= 2


def test_flags_subset_of_applied_rules_outer_balls(trained):
    from repro.core.predict import ColumnPredictor

    pred = ColumnPredictor(trained.all_constraints)
    col = [f"{m}/{d}/2020" for m in range(1, 13) for d in (3, 14)] + ["not a date"]
    scores = pred.predict_column(col)
    assert scores[-1] > 0
    assert (scores[:-1] == 0).all()
