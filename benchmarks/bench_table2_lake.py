"""Benchmark behind Table 2: lake generation + statistics aggregation."""
from repro.datalake.generator import santos_lake
from repro.datalake.io import lake_stats


def test_bench_lake_generation(benchmark, spark):
    def gen():
        return santos_lake(
            spark, name="bench_gen", n_domains=8, tables_per_domain=4,
            rows_range=(30, 60), n_queries=4, seed=3,
        )

    lake = benchmark.pedantic(gen, rounds=3, iterations=1)
    assert len(lake.tables()) == 32


def test_bench_lake_stats(benchmark, spark, bench_lake):
    st = benchmark.pedantic(
        lambda: lake_stats(bench_lake.df, "bench_santos", size_bytes=0),
        rounds=3, iterations=1,
    )
    assert st.n_tables == 128
