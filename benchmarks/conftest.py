"""Benchmark fixtures: one moderate-scale dataset (SF~0.1-equivalent)
shared across all pytest-benchmark suites."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.common import collect_series
from repro.storage.disk_model import DiskConfig
from repro.synth_data import query_workload, series_collection

N_SERIES = 4000
LENGTH = 128
W, BITS = 8, 8
CAPACITY = 100


@pytest.fixture(scope="session")
def bench_cfg() -> DiskConfig:
    # Memory restricted to 10% of the dataset: the regime where the
    # paper's construction contrasts appear.
    return DiskConfig(
        block_series=32, memory_series=N_SERIES // 10,
        series_bytes=LENGTH * 8, summary_bytes=24,
    )


@pytest.fixture(scope="session")
def bench_df(spark):
    df = series_collection(
        spark, n_series=N_SERIES, length=LENGTH, kind="walk", seed=0
    ).persist()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def bench_numpy(bench_df):
    return collect_series(bench_df)


@pytest.fixture(scope="session")
def bench_queries() -> np.ndarray:
    return query_workload(n_queries=10, length=LENGTH, kind="walk")
