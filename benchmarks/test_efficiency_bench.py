"""Benchmarks for Figure 14 (offline training) and its dominant stage (the
distributed candidate-assessment dataflow)."""


def test_distance_stage(benchmark, spark, bench_corpus):
    from repro.typedetect.registry import build_registry, compute_distances, make_value_dim

    values_pdf = bench_corpus.values.toPandas()
    registry = build_registry(values_pdf, n_centroids=20)
    value_dim = make_value_dim(spark, bench_corpus.values)

    def run():
        return compute_distances(spark, value_dim, registry).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n > 0


def test_contingency_stage(benchmark, spark, bench_corpus):
    from repro.core.candidates import generate_candidates
    from repro.core.contingency import column_func_cdf, contingency_table, func_dim
    from repro.typedetect.registry import build_registry, compute_distances, make_value_dim

    values_pdf = bench_corpus.values.toPandas()
    registry = build_registry(values_pdf, n_centroids=20)
    value_dim = make_value_dim(spark, bench_corpus.values)
    dists = compute_distances(spark, value_dim, registry).cache()
    dists.count()
    funcs = func_dim(spark, registry)
    cdf = column_func_cdf(bench_corpus.values, value_dim, dists, funcs).cache()
    cdf.count()
    cands = generate_candidates(registry)
    cand_df = spark.createDataFrame(
        cands[["cand_id", "func_id", "d_in", "d_out", "m", "d_in_idx", "d_out_idx"]]
    )

    def run():
        return contingency_table(cdf, cand_df, bench_corpus.n_cols).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n == len(cands)


def test_offline_training_small(benchmark, spark):
    from repro.core.train import TrainConfig, train
    from repro.domains.corpus import make_corpus

    corpus = make_corpus(spark, "relational", n_cols=300, seed=3)
    cfg = TrainConfig(n_centroids=10, n_syn=200, b_size=200, n_rounds=5)

    def run():
        return train(spark, corpus, cfg)

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(res.r_all) > 0


def test_selection_lp(benchmark, bench_trained):
    from repro.core.selection import fine_select

    def run():
        return fine_select(
            bench_trained.r_all, bench_trained.detect_pairs, b_size=300, b_fpr=0.1
        )

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(res.selected) > 0
