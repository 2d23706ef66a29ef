"""Benchmark behind Table 4: the negative-classes micro-benchmark pipeline."""
from repro.datalake.generator import microbench_lake
from repro.eval.metrics import evaluate_rankings
from repro.experiments.common import build_method, prepare, run_union_search


def test_bench_microbench_pipeline(benchmark, spark):
    lake = microbench_lake(spark, n_negative_classes=4, n_tables=48, n_queries=4)
    prep = prepare(spark, lake)

    def run():
        bundle = build_method(prep, "starmie", op="drop_col", epochs=3)
        r = run_union_search(bundle, lake.queries, k=20, mode="pruning")
        return evaluate_rankings(r.rankings, lake.ground_truth, 20)

    ev = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info["map@20"] = round(ev["map"], 3)
