"""Shared fixtures for the pytest-benchmark suite.

One small-but-real lake is prepared once per session; benchmarks then
time the per-table kernels (query modes, index builds, training steps,
clustering, GBT) against it.
"""
from __future__ import annotations

import pytest

from repro.datalake.generator import santos_lake, tus_lake
from repro.experiments.common import build_method, prepare


@pytest.fixture(scope="session")
def bench_lake(spark):
    return santos_lake(
        spark, name="bench_santos", n_domains=16, tables_per_domain=8,
        rows_range=(30, 80), n_queries=8, seed=7,
    )


@pytest.fixture(scope="session")
def bench_prep(spark, bench_lake):
    return prepare(spark, bench_lake)


@pytest.fixture(scope="session")
def bench_starmie(bench_prep):
    return build_method(bench_prep, "starmie", op="drop_col", epochs=8)


@pytest.fixture(scope="session")
def bench_tus_lake(spark):
    return tus_lake(
        spark, name="bench_tus", n_bases=8, partitions_per_base=20,
        n_queries=8, seed=11,
    )
