"""Figure 8 benchmarks: index construction, every system.

Wall-clock is what pytest-benchmark measures; the disk-model simulated
seconds (the axis comparable to the paper's memory sweeps) are attached
as ``extra_info`` on each benchmark record.
"""
import shutil
import tempfile

import pytest

from benchmarks.conftest import BITS, CAPACITY, LENGTH, N_SERIES, W
from repro.baselines.dstree import DSTreeIndex
from repro.baselines.isax_index import ISaxIndex
from repro.baselines.rtree import RTreeIndex
from repro.baselines.vertical import VerticalIndex
from repro.core.coconut_tree import build_coconut_tree
from repro.core.coconut_trie import build_coconut_trie


def _bench_coconut(benchmark, spark, bench_df, bench_cfg, builder, materialized):
    paths = []

    def run():
        p = tempfile.mkdtemp(prefix="bench_idx_")
        paths.append(p)
        idx = builder(
            spark, bench_df, path=p, w=W, bits=BITS, leaf_capacity=CAPACITY,
            materialized=materialized, disk_config=bench_cfg,
        )
        idx.close()
        return idx

    idx = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["sim_s"] = idx.build_disk.seconds()
    benchmark.extra_info["n_leaves"] = idx.n_leaves
    benchmark.extra_info["fill"] = round(idx.fill_factor, 3)
    for p in paths:
        shutil.rmtree(p, ignore_errors=True)


def _bench_baseline(benchmark, bench_numpy, make):
    ids, series = bench_numpy
    idx = benchmark.pedantic(lambda: make(ids, series), rounds=1, iterations=1)
    benchmark.extra_info["sim_s"] = idx.build_disk.seconds()
    benchmark.extra_info["n_leaves"] = idx.n_leaves
    benchmark.extra_info["fill"] = round(float(idx.fill_factor), 3)


class TestFig8aMaterializedBuild:
    def test_build_ctree_full(self, benchmark, spark, bench_df, bench_cfg):
        _bench_coconut(benchmark, spark, bench_df, bench_cfg, build_coconut_tree, True)

    def test_build_ctrie_full(self, benchmark, spark, bench_df, bench_cfg):
        _bench_coconut(benchmark, spark, bench_df, bench_cfg, build_coconut_trie, True)

    def test_build_ads_full(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: ISaxIndex(ids, s, w=W, bits=BITS, leaf_capacity=CAPACITY,
                                     materialized=True, disk_config=bench_cfg),
        )

    def test_build_rtree(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: RTreeIndex(ids, s, w=W, leaf_capacity=CAPACITY,
                                      materialized=True, disk_config=bench_cfg),
        )

    def test_build_dstree(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: DSTreeIndex(ids, s, w=W, leaf_capacity=CAPACITY,
                                       disk_config=bench_cfg),
        )

    def test_build_vertical(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: VerticalIndex(ids, s, disk_config=bench_cfg),
        )


class TestFig8bSecondaryBuild:
    def test_build_ctree(self, benchmark, spark, bench_df, bench_cfg):
        _bench_coconut(benchmark, spark, bench_df, bench_cfg, build_coconut_tree, False)

    def test_build_ctrie(self, benchmark, spark, bench_df, bench_cfg):
        _bench_coconut(benchmark, spark, bench_df, bench_cfg, build_coconut_trie, False)

    def test_build_ads_plus(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: ISaxIndex(ids, s, w=W, bits=BITS, leaf_capacity=CAPACITY,
                                     materialized=False, disk_config=bench_cfg),
        )

    def test_build_rtree_plus(self, benchmark, bench_numpy, bench_cfg):
        _bench_baseline(
            benchmark, bench_numpy,
            lambda ids, s: RTreeIndex(ids, s, w=W, leaf_capacity=CAPACITY,
                                      materialized=False, disk_config=bench_cfg),
        )


class TestFig8cSpace:
    def test_space_overhead_table(self, benchmark, spark, bench_df, bench_numpy, bench_cfg):
        """Fig 8c: one run building the two flagship indexes and checking
        the fill/space contrast; timed as a single benchmark round."""
        ids, series = bench_numpy

        def run():
            p = tempfile.mkdtemp(prefix="bench_space_")
            tree = build_coconut_tree(
                spark, bench_df, path=p, w=W, bits=BITS, leaf_capacity=CAPACITY,
                materialized=False, disk_config=bench_cfg,
            )
            ads = ISaxIndex(ids, series, w=W, bits=BITS, leaf_capacity=CAPACITY,
                            materialized=False, disk_config=bench_cfg)
            out = (tree.fill_factor, tree.index_bytes, ads.fill_factor, ads.index_bytes)
            tree.close()
            shutil.rmtree(p, ignore_errors=True)
            return out

        tf, tb, af, ab = benchmark.pedantic(run, rounds=1, iterations=1)
        benchmark.extra_info.update(
            ctree_fill=round(tf, 3), ctree_bytes=tb, ads_fill=round(af, 3), ads_bytes=ab
        )
        assert tf > af and tb < ab
