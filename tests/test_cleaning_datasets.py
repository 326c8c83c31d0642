"""Tests for the 9 data-cleaning datasets (paper Tables 9-11)."""
from collections import Counter

from repro.domains.cleaning_datasets import (
    DATASET_SHAPE,
    build_cleaning_datasets,
    make_cleaning_bench,
    to_bench_frames,
)


def test_dataset_column_counts_match_table9():
    cols = build_cleaning_datasets()
    counts = Counter(c.dataset for c in cols)
    assert counts == {ds: total for ds, (total, _) in DATASET_SHAPE.items()}


def test_covered_by_existing_gt_counts_match_table9():
    cols = build_cleaning_datasets()
    covered = Counter(c.dataset for c in cols if c.covered_by_existing_gt)
    assert covered == {ds: n for ds, (_, n) in DATASET_SHAPE.items() if n > 0}


def test_total_85_columns_36_covered():
    cols = build_cleaning_datasets()
    assert len(cols) == 85
    assert sum(c.covered_by_existing_gt for c in cols) == 36


def test_unlabeled_errors_present():
    cols = build_cleaning_datasets()
    unlabeled = {v for c in cols for v in c.unlabeled_errors}
    assert {"empty", "nan", "childern's service facility"} <= unlabeled


def test_movies_id_has_many_errors():
    cols = build_cleaning_datasets()
    movies_id = next(c for c in cols if c.dataset == "movies" and c.column == "id")
    assert len(movies_id.labeled_errors) >= 50


def test_frames_consistency():
    cols = build_cleaning_datasets()
    values, meta = to_bench_frames(cols)
    assert values.col_id.nunique() == len(cols)
    assert (values.is_error_adjusted | ~values.is_error).all()  # labeled => adjusted
    assert int(values.is_error_adjusted.sum()) >= int(values.is_error.sum())


def test_errors_deduped_from_clean_values():
    cols = build_cleaning_datasets()
    for c in cols:
        assert len(c.values) == len(set(c.values)), (c.dataset, c.column)


def test_make_cleaning_bench_spark(spark):
    values, meta, cols = make_cleaning_bench(spark)
    assert meta.count() == 85
    assert values.count() == sum(len(c.values) for c in cols)
