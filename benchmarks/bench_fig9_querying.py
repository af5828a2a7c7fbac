"""Figure 9 benchmarks: query latency, quality and visited records over
prebuilt indexes (the build cost is paid once in session fixtures)."""
import shutil
import tempfile

import numpy as np
import pytest

from benchmarks.conftest import BITS, CAPACITY, LENGTH, N_SERIES, W
from repro.baselines.isax_index import ISaxIndex
from repro.core.coconut_tree import build_coconut_tree
from repro.core.query import approximate_search, exact_search


@pytest.fixture(scope="module")
def ctree_full_idx(spark, bench_df, bench_cfg):
    p = tempfile.mkdtemp(prefix="bench_q_tree_")
    idx = build_coconut_tree(
        spark, bench_df, path=p, w=W, bits=BITS, leaf_capacity=CAPACITY,
        materialized=True, disk_config=bench_cfg,
    )
    yield idx
    idx.close()
    shutil.rmtree(p, ignore_errors=True)


@pytest.fixture(scope="module")
def ads_full_idx(bench_numpy, bench_cfg):
    ids, series = bench_numpy
    return ISaxIndex(ids, series, w=W, bits=BITS, leaf_capacity=CAPACITY,
                     materialized=True, disk_config=bench_cfg)


class TestFig9aExact:
    def test_exact_ctree_full(self, benchmark, ctree_full_idx, bench_queries):
        it = iter(np.tile(bench_queries, (50, 1, 1)).reshape(-1, LENGTH))
        r = benchmark.pedantic(
            lambda: exact_search(ctree_full_idx, next(it)), rounds=5, iterations=1
        )
        benchmark.extra_info["sim_s"] = r.disk.seconds()
        benchmark.extra_info["visited"] = r.visited_records

    def test_exact_ads_full(self, benchmark, ads_full_idx, bench_queries):
        it = iter(np.tile(bench_queries, (50, 1, 1)).reshape(-1, LENGTH))
        r = benchmark.pedantic(
            lambda: ads_full_idx.exact(next(it)), rounds=5, iterations=1
        )
        benchmark.extra_info["sim_s"] = r.disk.seconds()
        benchmark.extra_info["visited"] = r.visited_records


class TestFig9bApproximate:
    def test_approx_ctree_full(self, benchmark, ctree_full_idx, bench_queries):
        it = iter(np.tile(bench_queries, (50, 1, 1)).reshape(-1, LENGTH))
        r = benchmark.pedantic(
            lambda: approximate_search(ctree_full_idx, next(it)), rounds=5, iterations=1
        )
        benchmark.extra_info["sim_s"] = r.disk.seconds()

    def test_approx_ads_full(self, benchmark, ads_full_idx, bench_queries):
        it = iter(np.tile(bench_queries, (50, 1, 1)).reshape(-1, LENGTH))
        r = benchmark.pedantic(
            lambda: ads_full_idx.approximate(next(it)), rounds=5, iterations=1
        )
        benchmark.extra_info["sim_s"] = r.disk.seconds()


class TestFig9dQuality:
    def test_quality_and_visited(self, benchmark, ctree_full_idx, ads_full_idx, bench_queries):
        """Fig 9d/9f in one benchmark round: average approximate ED and
        exact-search visited records for CTree(1), CTree(10), ADSFull."""

        def run():
            out = {}
            for radius in (1, 10):
                a = [approximate_search(ctree_full_idx, q, radius=radius).distance
                     for q in bench_queries]
                v = [exact_search(ctree_full_idx, q, radius=radius).visited_records
                     for q in bench_queries]
                out[f"ctree_r{radius}"] = (float(np.mean(a)), float(np.mean(v)))
            a = [ads_full_idx.approximate(q).distance for q in bench_queries]
            v = [ads_full_idx.exact(q).visited_records for q in bench_queries]
            out["ads"] = (float(np.mean(a)), float(np.mean(v)))
            return out

        out = benchmark.pedantic(run, rounds=1, iterations=1)
        for k, (ed, visited) in out.items():
            benchmark.extra_info[f"{k}_approx_ed"] = round(ed, 4)
            benchmark.extra_info[f"{k}_visited"] = visited
        # Paper Fig 9d/9f shape: radius widens -> quality improves;
        # CTree(10) clearly beats ADS on quality (paper: 94% of
        # queries); CTree(1) is a statistical tie-or-better (paper: 69%,
        # so small samples can tie) — allow 2%.
        assert out["ctree_r10"][0] <= out["ctree_r1"][0] + 1e-9
        assert out["ctree_r10"][0] <= out["ads"][0] + 1e-9
        assert out["ctree_r1"][0] <= out["ads"][0] * 1.02
        assert out["ctree_r10"][1] <= out["ads"][1] * 1.05
