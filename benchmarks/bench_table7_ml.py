"""Benchmark behind Tables 7/11: retrieval + join + GBT train/eval round."""
import pytest

from repro.eval.ml_discovery import (
    _lake_token_sets,
    augment_with_join,
    build_ml_corpus,
    retrieve_syntactic,
    train_eval_gbt,
)


@pytest.fixture(scope="module")
def ml_corpus(spark):
    return build_ml_corpus(spark, n_tasks=2, n_filler=4, seed=31)


def test_bench_syntactic_retrieval(benchmark, ml_corpus):
    tasks, lake = ml_corpus
    token_sets = _lake_token_sets(lake)
    tid, _, _ = benchmark(retrieve_syntactic, tasks[0], lake, token_sets, "overlap")
    assert tid is not None


def test_bench_gbt_round(benchmark, spark, ml_corpus, bench_prep):
    tasks, lake = ml_corpus
    t = tasks[0]
    joined = augment_with_join(spark, t, lake, t.good_tid, "Entity", 0).cache()
    joined.count()

    mse = benchmark.pedantic(
        lambda: train_eval_gbt(joined, bench_prep.embedder, max_iter=6),
        rounds=2, iterations=1,
    )
    benchmark.extra_info["mse"] = round(mse, 4)
    assert mse >= 0
