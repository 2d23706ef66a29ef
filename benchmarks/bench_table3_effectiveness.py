"""Benchmark behind Table 3: offline stages + effectiveness query path."""
from repro.core.encoder import MultiColumnEncoder, collect_table_views
from repro.eval.metrics import evaluate_rankings
from repro.experiments.common import run_union_search


def test_bench_contrastive_training_epoch(benchmark, bench_prep):
    views = collect_table_views(bench_prep.prep_df, bench_prep.embedder)

    def one_epoch():
        enc = MultiColumnEncoder(d_in=bench_prep.embedder.dim, seed=0)
        enc.train(views, op="drop_col", n_epochs=1, embedder=bench_prep.embedder)
        return enc

    benchmark.pedantic(one_epoch, rounds=3, iterations=1)


def test_bench_effectiveness_eval(benchmark, bench_lake, bench_starmie):
    def run():
        r = run_union_search(bench_starmie, bench_lake.queries, k=10, mode="pruning")
        return evaluate_rankings(r.rankings, bench_lake.ground_truth, 10)

    ev = benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["map@10"] = round(ev["map"], 3)
    assert ev["map"] > 0.5
