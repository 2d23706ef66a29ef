"""Benchmark behind Table 6: index build time + memory accounting."""
import pytest

from repro.search.engine import SearchEngine


@pytest.mark.parametrize("mode", ["lsh", "hnsw"])
def test_bench_index_build(benchmark, bench_starmie, mode):
    def build():
        return SearchEngine(store=bench_starmie.store, mode=mode,
                            tau=bench_starmie.tau, seed=0)

    eng = benchmark.pedantic(build, rounds=3, iterations=1)
    benchmark.extra_info["memory_mb"] = round(eng.memory_bytes() / (1 << 20), 3)
    benchmark.extra_info["store_mb"] = round(
        bench_starmie.store.memory_bytes() / (1 << 20), 3
    )
    assert eng.memory_bytes() > 0
