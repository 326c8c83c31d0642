"""End-to-end offline training (paper Figure 5, left).

``train`` runs: evaluator-registry construction over the corpus, the
distributed distance + CDF + contingency pipeline, statistical pruning to
R_all (All-Constraints), distant-supervision detection matrix over C_syn,
and the CSS/FSS LP selections — returning three rule sets matching the
paper's variants (All-Constraints / Coarse-Select / Fine-Select).

Rule sets serialize to JSON under ``artifacts/`` so the per-table jobs can
share one trained model (``fit_cached``).
"""
from __future__ import annotations

import hashlib
import json
import time
from dataclasses import dataclass, field, asdict
from pathlib import Path

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import selection
from repro.core.candidates import generate_candidates
from repro.core.contingency import column_func_cdf, contingency_table, func_dim
from repro.core.stats import CHI2_CRIT_05, min_cover_for_confidence
from repro.core.synth_errors import detection_matrix, sample_syn_columns
from repro.domains.corpus import Corpus, make_corpus
from repro.typedetect.base import M_GRID, EvalFunctionSpec
from repro.typedetect.registry import (
    ALL_KINDS,
    Registry,
    build_registry,
    compute_distances,
    make_value_dim,
)

RULE_COLUMNS = [
    "cand_id", "func_id", "kind", "family", "name",
    "d_in", "d_out", "m", "d_in_idx", "d_out_idx", "conf", "fpr",
]


@dataclass(frozen=True)
class TrainConfig:
    """Knobs of the offline stage; defaults follow paper §6.2."""

    n_centroids: int = 40  # embedding centroids per space (paper: 1000 total)
    seed: int = 23
    include_kinds: tuple[str, ...] = ALL_KINDS  # Table-7 ablations drop one
    n_hash: int = 0  # adversarial hash functions (robustness §6.5)
    m_grid: tuple[float, ...] = M_GRID
    # statistical tests (§5.2); switches drive the Table-8 ablations
    h_threshold: float = 0.8
    use_cohens_h: bool = True
    use_wilson: bool = True
    chi2_crit: float = CHI2_CRIT_05
    prune_conf: float = 0.8  # Appendix B.1 pruning threshold c_thres: rules
    # must both cover enough columns for ub(c) >= c_thres (Observation 1)
    # and achieve calibrated confidence >= c_thres. This is also what
    # rejects the adversarial random-hash candidates (§6.5): they can only
    # be "covered" by chance on tiny columns, where their trigger rate
    # among covered columns is far too high for a confident constraint.
    # selection (§5.3)
    b_size: int = 500
    b_fpr: float = 0.1
    delta: float = 1e-3
    n_syn: int = 1200
    n_rounds: int = 20

    def key(self) -> str:
        return hashlib.blake2b(
            json.dumps(asdict(self), sort_keys=True).encode(), digest_size=8
        ).hexdigest()


@dataclass
class RuleSet:
    """A named set of SDCs plus the evaluator registry they reference."""

    name: str
    rules: pd.DataFrame  # RULE_COLUMNS
    registry: Registry

    def __len__(self) -> int:
        return len(self.rules)

    def compact(self) -> "RuleSet":
        """Re-index to only the evaluation functions the rules use (the
        Appendix-B.2 latency optimization starts here: fewer functions to
        evaluate online)."""
        used = sorted(self.rules["func_id"].unique())
        remap = {f: i for i, f in enumerate(used)}
        specs = [
            EvalFunctionSpec(remap[s.func_id], s.kind, s.family, s.name)
            for s in self.registry.specs
            if s.func_id in remap
        ]
        rules = self.rules.copy()
        rules["func_id"] = rules["func_id"].map(remap)
        return RuleSet(self.name, rules, Registry(specs))

    def to_json(self) -> str:
        return json.dumps(
            {
                "name": self.name,
                "specs": [
                    (s.func_id, s.kind, s.family, s.name) for s in self.registry.specs
                ],
                "rules": self.rules[RULE_COLUMNS].to_dict(orient="list"),
            }
        )

    _DTYPES = {
        "cand_id": "int64", "func_id": "int64", "kind": "object",
        "family": "object", "name": "object", "d_in": "float64",
        "d_out": "float64", "m": "float64", "d_in_idx": "int64",
        "d_out_idx": "int64", "conf": "float64", "fpr": "float64",
    }

    @staticmethod
    def from_json(s: str) -> "RuleSet":
        d = json.loads(s)
        specs = [EvalFunctionSpec(*row) for row in d["specs"]]
        rules = pd.DataFrame(d["rules"]).astype(RuleSet._DTYPES)
        return RuleSet(d["name"], rules, Registry(specs))


@dataclass
class TrainResult:
    registry: Registry
    candidates: pd.DataFrame
    cand_stats: pd.DataFrame  # all candidates with contingency + stats
    r_all: pd.DataFrame  # candidates surviving the statistical tests
    detect_pairs: pd.DataFrame  # (cand_id, syn_id)
    all_constraints: RuleSet
    coarse: RuleSet
    fine: RuleSet
    timings: dict[str, float] = field(default_factory=dict)

    def ruleset(self, variant: str) -> RuleSet:
        return {
            "all": self.all_constraints,
            "coarse": self.coarse,
            "fine": self.fine,
        }[variant]


def train(spark: SparkSession, corpus: Corpus, config: TrainConfig = TrainConfig()) -> TrainResult:
    timings: dict[str, float] = {}
    t0 = time.perf_counter()

    values_pdf = corpus.values.toPandas()
    registry = build_registry(
        values_pdf,
        n_centroids=config.n_centroids,
        seed=config.seed,
        include_kinds=config.include_kinds,
        n_hash=config.n_hash,
    )
    candidates = generate_candidates(registry, config.m_grid)
    timings["candidate_gen_setup"] = time.perf_counter() - t0

    # --- distributed distance / CDF / contingency pipeline -----------------
    t1 = time.perf_counter()
    value_dim = make_value_dim(spark, corpus.values).cache()
    dists = compute_distances(spark, value_dim, registry).cache()
    funcs = func_dim(spark, registry)
    cdf = column_func_cdf(corpus.values, value_dim, dists, funcs).cache()
    cand_df = spark.createDataFrame(
        candidates[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )
    cont = contingency_table(
        cdf, cand_df, corpus.n_cols, use_wilson=config.use_wilson
    ).toPandas()
    cand_stats = candidates.merge(cont, on="cand_id", how="left").fillna(
        {"cov_t": 0, "cov_not_t": 0, "notcov_t": 0, "notcov_not_t": 0, "n_covered": 0}
    )
    timings["candidate_assessment"] = time.perf_counter() - t1

    # --- statistical pruning -> R_all (All-Constraints) ---------------------
    min_cover = min_cover_for_confidence(config.prune_conf)
    keep = (
        (cand_stats["n_covered"] >= min_cover)
        & (cand_stats["conf"] >= config.prune_conf)
        & cand_stats["rho_below_background"].fillna(False)
        & (cand_stats["chi2"] >= config.chi2_crit)
    )
    if config.use_cohens_h:
        keep &= cand_stats["h"] >= config.h_threshold
    r_all = cand_stats[keep].reset_index(drop=True)

    # --- distant supervision (C_syn) ----------------------------------------
    t2 = time.perf_counter()
    syn_pdf = sample_syn_columns(values_pdf, config.n_syn, config.seed + 5)
    detect_pairs = detection_matrix(
        spark, syn_pdf, cdf, dists, value_dim, cand_df
    ).toPandas()
    detect_pairs = detect_pairs[detect_pairs["cand_id"].isin(set(r_all["cand_id"]))]
    timings["distant_supervision"] = time.perf_counter() - t2

    # --- selection ----------------------------------------------------------
    t3 = time.perf_counter()
    coarse_res = selection.coarse_select(
        r_all, detect_pairs, b_size=config.b_size, b_fpr=config.b_fpr,
        seed=config.seed + 7, n_rounds=config.n_rounds,
    )
    timings["coarse_select"] = time.perf_counter() - t3
    t4 = time.perf_counter()
    fine_res = selection.fine_select(
        r_all, detect_pairs, b_size=config.b_size, b_fpr=config.b_fpr,
        delta=config.delta, seed=config.seed + 9, n_rounds=config.n_rounds,
    )
    timings["fine_select"] = time.perf_counter() - t4
    timings["total"] = time.perf_counter() - t0

    dists.unpersist()
    value_dim.unpersist()

    def _ruleset(name: str, rules: pd.DataFrame) -> RuleSet:
        return RuleSet(name, rules[RULE_COLUMNS].reset_index(drop=True), registry)

    return TrainResult(
        registry=registry,
        candidates=candidates,
        cand_stats=cand_stats,
        r_all=r_all,
        detect_pairs=detect_pairs,
        all_constraints=_ruleset("all-constraints", r_all),
        coarse=_ruleset("coarse-select", coarse_res.selected),
        fine=_ruleset("fine-select", fine_res.selected),
        timings=timings,
    )


# ---------------------------------------------------------------------------
# Artifact cache (shared across the per-table jobs)
# ---------------------------------------------------------------------------

ARTIFACT_DIR = Path(__file__).resolve().parents[3] / "artifacts"


def fit_cached(
    spark: SparkSession,
    profile_name: str,
    *,
    n_cols: int = 2000,
    corpus_seed: int = 7,
    config: TrainConfig = TrainConfig(),
    refresh: bool = False,
) -> dict[str, RuleSet]:
    """Train (or load) the three rule-set variants for one corpus profile."""
    key = f"{profile_name}-{n_cols}-{corpus_seed}-{config.key()}"
    path = ARTIFACT_DIR / f"rulesets-{key}.json"
    if path.exists() and not refresh:
        blob = json.loads(path.read_text())
        return {k: RuleSet.from_json(v) for k, v in blob.items()}
    corpus = make_corpus(spark, profile_name, n_cols=n_cols, seed=corpus_seed)
    result = train(spark, corpus, config)
    out = {
        "all": result.all_constraints,
        "coarse": result.coarse,
        "fine": result.fine,
    }
    ARTIFACT_DIR.mkdir(exist_ok=True)
    path.write_text(json.dumps({k: rs.to_json() for k, rs in out.items()}))
    return out
