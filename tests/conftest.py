"""Shared fixtures: one small dataset and one built index per variant,
session-scoped so the Spark builds are paid once across the suite."""
from __future__ import annotations

import shutil

import numpy as np
import pytest

from repro.baselines.dstree import DSTreeIndex
from repro.baselines.isax_index import ISaxIndex
from repro.baselines.rtree import RTreeIndex
from repro.baselines.vertical import VerticalIndex
from repro.core.coconut_tree import build_coconut_tree
from repro.core.coconut_trie import build_coconut_trie
from repro.storage.disk_model import DiskConfig
from repro.synth_data import query_workload, series_collection, series_matrix

N_SERIES = 400
LENGTH = 64
W, BITS = 8, 4
CAPACITY = 50


@pytest.fixture(scope="session")
def disk_cfg() -> DiskConfig:
    return DiskConfig(
        block_series=32, memory_series=100, series_bytes=LENGTH * 8, summary_bytes=24
    )


@pytest.fixture(scope="session")
def walk_df(spark):
    df = series_collection(
        spark, n_series=N_SERIES, length=LENGTH, kind="walk", seed=0
    ).persist()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def walk_mat() -> np.ndarray:
    return series_matrix(n_series=N_SERIES, length=LENGTH, kind="walk", seed=0)


@pytest.fixture(scope="session")
def ids() -> np.ndarray:
    return np.arange(N_SERIES)


@pytest.fixture(scope="session")
def queries() -> np.ndarray:
    return query_workload(n_queries=5, length=LENGTH, kind="walk")


def _mk_coconut(builder, spark, walk_df, tmp, disk_cfg, *, materialized):
    idx = builder(
        spark, walk_df, path=str(tmp), w=W, bits=BITS, leaf_capacity=CAPACITY,
        materialized=materialized, disk_config=disk_cfg,
    )
    yield idx
    idx.close()
    shutil.rmtree(tmp, ignore_errors=True)


@pytest.fixture(scope="session")
def ctree(spark, walk_df, tmp_path_factory, disk_cfg):
    yield from _mk_coconut(
        build_coconut_tree, spark, walk_df,
        tmp_path_factory.mktemp("ctree"), disk_cfg, materialized=False,
    )


@pytest.fixture(scope="session")
def ctree_full(spark, walk_df, tmp_path_factory, disk_cfg):
    yield from _mk_coconut(
        build_coconut_tree, spark, walk_df,
        tmp_path_factory.mktemp("ctree_full"), disk_cfg, materialized=True,
    )


@pytest.fixture(scope="session")
def ctrie(spark, walk_df, tmp_path_factory, disk_cfg):
    yield from _mk_coconut(
        build_coconut_trie, spark, walk_df,
        tmp_path_factory.mktemp("ctrie"), disk_cfg, materialized=False,
    )


@pytest.fixture(scope="session")
def ctrie_full(spark, walk_df, tmp_path_factory, disk_cfg):
    yield from _mk_coconut(
        build_coconut_trie, spark, walk_df,
        tmp_path_factory.mktemp("ctrie_full"), disk_cfg, materialized=True,
    )


@pytest.fixture(scope="session")
def ads_full(ids, walk_mat, disk_cfg):
    return ISaxIndex(
        ids, walk_mat, w=W, bits=BITS, leaf_capacity=CAPACITY,
        materialized=True, disk_config=disk_cfg,
    )


@pytest.fixture(scope="session")
def ads_plus(ids, walk_mat, disk_cfg):
    return ISaxIndex(
        ids, walk_mat, w=W, bits=BITS, leaf_capacity=CAPACITY,
        materialized=False, disk_config=disk_cfg,
    )


@pytest.fixture(scope="session")
def rtree(ids, walk_mat, disk_cfg):
    return RTreeIndex(
        ids, walk_mat, w=W, leaf_capacity=CAPACITY, materialized=True,
        disk_config=disk_cfg,
    )


@pytest.fixture(scope="session")
def dstree(ids, walk_mat, disk_cfg):
    return DSTreeIndex(
        ids, walk_mat, w=W, leaf_capacity=CAPACITY, disk_config=disk_cfg
    )


@pytest.fixture(scope="session")
def vertical(ids, walk_mat, disk_cfg):
    return VerticalIndex(ids, walk_mat, disk_config=disk_cfg)
