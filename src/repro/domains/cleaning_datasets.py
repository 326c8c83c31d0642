"""The 9 data-cleaning benchmark datasets of paper Tables 9-11.

The originals (adults, beers, flights, food, hospital, movies, rayyan,
soccer, tax) are small categorical datasets from prior cleaning work
[Rahimi+, Mahdavi+, ...]. We synthesize each with:

- the column inventory of Table 9 (total categorical columns per dataset,
  and how many are covered by existing expert ground-truth constraints),
- the specific columns of Table 10 on which the paper's learned SDCs fire
  (beers.city, hospital.sample, movies.id, ...), populated from our domains,
- labelled error cells (counts shaped after Table 9's true-positive row), and
- a few *unlabelled* errors ("empty", "nan", "childern's ...") reproducing
  the Table 11 missed-errors-in-ground-truth phenomenon behind the adjusted
  precision numbers.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.domains.columns import generate_column


@dataclass
class CleaningColumn:
    dataset: str
    column: str
    domain: str | None  # our semantic domain, None for generic filler
    values: list[str]
    labeled_errors: set[str] = field(default_factory=set)
    unlabeled_errors: set[str] = field(default_factory=set)  # real errors missing from GT
    covered_by_existing_gt: bool = False

    @property
    def all_errors(self) -> set[str]:
        return self.labeled_errors | self.unlabeled_errors


# (dataset, total categorical cols, cols covered by existing ground truth) — paper Table 9.
DATASET_SHAPE = {
    "adults": (9, 1),
    "beers": (6, 3),
    "flights": (6, 4),
    "food": (10, 1),
    "hospital": (16, 12),
    "movies": (14, 0),
    "rayyan": (8, 8),
    "soccer": (8, 1),
    "tax": (8, 6),
}

_FILLER_DOMAINS = ("product_category", "product_code", "mktsegment", "order_num",
                   "zip", "phone", "company", "currency_code")


def _col(
    dataset: str,
    column: str,
    domain: str,
    n: int,
    rng: np.random.Generator,
    labeled: list[str] | None = None,
    unlabeled: list[str] | None = None,
    covered: bool = False,
) -> CleaningColumn:
    vals = generate_column(domain, n, rng, uncommon_frac=0.1)
    labeled = labeled or []
    unlabeled = unlabeled or []
    vals = [v for v in vals if v not in set(labeled) | set(unlabeled)]
    return CleaningColumn(
        dataset, column, domain, vals + labeled + unlabeled,
        set(labeled), set(unlabeled), covered,
    )


def build_cleaning_datasets(seed: int = 17) -> list[CleaningColumn]:
    """All columns of all 9 datasets, deterministic in ``seed``."""
    rng = np.random.default_rng(seed)
    cols: list[CleaningColumn] = []

    # --- columns of Table 10 (SDC-relevant), with Table-11 unlabelled errors ---
    cols += [
        _col("adults", "race", "race", 7, rng, labeled=["wite", "seattle"]),
        _col("adults", "sex", "sex", 2, rng, labeled=["femele"]),
        _col("beers", "city", "city", 40, rng,
             labeled=["louisvilla", "maine", "9th ave.", "seettle", "montain viw"],
             covered=True),
        _col("beers", "state", "state_abbr", 30, rng, labeled=["xk", "us"], covered=True),
        _col("food", "facility type", "facility_type", 10, rng,
             labeled=["koisk", "asia"], unlabeled=["childern's service facility"]),
        _col("food", "city", "city", 35, rng, labeled=["chiago"]),
        _col("food", "state", "state_abbr", 8, rng, labeled=["usa"], covered=True),
        _col("hospital", "sample", "sample_size", 40, rng,
             labeled=["x patients", "3x patients"], unlabeled=["empty"]),
        _col("hospital", "state", "state_abbr", 25, rng, labeled=["ax", "xl"], covered=True),
        _col("hospital", "hospital type", "hospital_type", 5, rng,
             labeled=["acute caer", "london"], covered=True),
        _col("hospital", "emergency service", "yes_no", 2, rng,
             labeled=["yxs", "emergency", "95503"], covered=True),
        # movies.id: many title-style errors mixed into tt-ids (the paper's
        # biggest cell-level detection pool, 161 TPs); the valid majority
        # must stay above the pre-condition matching percentage.
        _col("movies", "id", "movie_id", 600, rng,
             labeled=[f"movie_title_{i}" for i in range(58)]
             + ["iron_man_3", "dark_tide"]),
        _col("movies", "duration", "duration", 60, rng,
             labeled=["2 hr 30 min", "nan"] + [f"about {i} minutes" for i in range(60, 64)]),
        _col("rayyan", "article created_at", "date_short", 45, rng,
             labeled=["june"], unlabeled=["nan"], covered=True),
        _col("soccer", "position", "position", 7, rng, labeled=["strikor", "difensore"],
             covered=True),
        _col("soccer", "city", "city", 30, rng, labeled=["cardif", "744-9007"]),
        _col("tax", "state", "state_abbr", 40, rng, labeled=["xk", "us"], covered=True),
    ]

    # --- flights: covered by existing GT only; no new SDC columns (Table 9: 0) ---
    cols += [
        _col("flights", "sched dep time", "time", 40, rng, covered=True),
        _col("flights", "act dep time", "time", 40, rng, covered=True),
        _col("flights", "sched arr time", "time", 40, rng, covered=True),
        _col("flights", "act arr time", "time", 40, rng, covered=True),
    ]

    # --- generic filler columns to reach Table 9's per-dataset column counts ---
    for ds, (total, n_covered) in DATASET_SHAPE.items():
        have = [c for c in cols if c.dataset == ds]
        covered_have = sum(c.covered_by_existing_gt for c in have)
        for i in range(total - len(have)):
            d = _FILLER_DOMAINS[rng.integers(0, len(_FILLER_DOMAINS))]
            c = _col(ds, f"attr_{i}", d, int(rng.integers(8, 40)), rng)
            # mark enough fillers as GT-covered to hit Table 9's covered counts
            if covered_have < n_covered:
                c.covered_by_existing_gt = True
                covered_have += 1
            cols.append(c)
    return cols


def to_bench_frames(cols: list[CleaningColumn]) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Flatten to (values, meta) frames keyed by a global col_id.

    ``is_error`` uses *labelled* ground truth only (strict evaluation);
    ``is_error_adjusted`` additionally marks the unlabelled errors (the
    paper's augmented ground truth for adjusted precision).
    """
    rows, meta = [], []
    for cid, c in enumerate(cols):
        for v in c.values:
            rows.append((cid, v, v in c.labeled_errors, v in c.all_errors))
        meta.append((cid, c.dataset, c.column, c.domain, c.covered_by_existing_gt,
                     len(c.labeled_errors) > 0))
    values = pd.DataFrame(rows, columns=["col_id", "value", "is_error", "is_error_adjusted"])
    meta_pdf = pd.DataFrame(
        meta, columns=["col_id", "dataset", "column", "domain", "covered_by_existing_gt", "is_dirty"]
    )
    return values, meta_pdf


def make_cleaning_bench(spark: SparkSession, seed: int = 17):
    """Spark frames for the 9-dataset experiment (Table 9)."""
    cols = build_cleaning_datasets(seed)
    values, meta = to_bench_frames(cols)
    return spark.createDataFrame(values).cache(), spark.createDataFrame(meta).cache(), cols
