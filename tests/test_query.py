"""Query correctness tests: approximate and exact search on Coconut."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.brute_force import exact_nn_numpy, exact_nn_spark, unpivot_series
from repro.core.distance import euclidean
from repro.core.query import (
    approximate_search,
    exact_search,
    query_summary,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def ground_truth(walk_mat, queries, ids):
    return [exact_nn_numpy(ids, walk_mat, q) for q in queries]


class TestApproximateSearch:
    @pytest.mark.parametrize("fixture", ["ctree", "ctree_full", "ctrie", "ctrie_full"])
    def test_returns_real_member(self, fixture, request, walk_mat, queries):
        idx = request.getfixturevalue(fixture)
        r = approximate_search(idx, queries[0])
        assert 0 <= r.id < len(walk_mat)
        assert r.distance == pytest.approx(euclidean(walk_mat[r.id], queries[0]))

    def test_distance_upper_bounds_truth(self, ctree, queries, ground_truth):
        for q, (gid, gd) in zip(queries, ground_truth):
            r = approximate_search(ctree, q)
            assert r.distance >= gd - 1e-9

    def test_radius_improves_quality(self, ctree_full, queries, ground_truth):
        """Wider radius never worsens the answer; on average it helps
        (Fig 9d: CTree(10) better than CTree(1))."""
        d1 = [approximate_search(ctree_full, q, radius=1).distance for q in queries]
        d5 = [approximate_search(ctree_full, q, radius=5).distance for q in queries]
        assert all(b <= a + 1e-9 for a, b in zip(d1, d5))

    def test_full_radius_is_exact(self, ctree_full, queries, ground_truth):
        """Radius covering every leaf degenerates to a full scan."""
        for q, (gid, gd) in zip(queries[:2], ground_truth[:2]):
            r = approximate_search(ctree_full, q, radius=ctree_full.n_leaves)
            assert r.distance == pytest.approx(gd)

    def test_visits_requested_leaf_count(self, ctree, queries):
        r = approximate_search(ctree, queries[0], radius=3)
        assert r.leaves_visited == 3

    def test_sequential_leaf_io(self, ctree_full, queries):
        """Contiguous leaves: the leaf read is sequential, not random."""
        r = approximate_search(ctree_full, queries[0], radius=4)
        assert r.disk.random_reads == 0
        assert r.disk.seq_read_blocks > 0

    def test_secondary_pays_random_raw_fetches(self, ctree, queries):
        r = approximate_search(ctree, queries[0])
        assert r.disk.random_reads == r.visited_records

    def test_query_length_mismatch_raises(self, ctree):
        with pytest.raises(ValueError, match="query length"):
            approximate_search(ctree, np.zeros(13))


class TestExactSearch:
    @pytest.mark.parametrize("fixture", ["ctree", "ctree_full", "ctrie", "ctrie_full"])
    def test_matches_brute_force(self, fixture, request, queries, ground_truth):
        idx = request.getfixturevalue(fixture)
        for q, (gid, gd) in zip(queries, ground_truth):
            r = exact_search(idx, q)
            assert r.distance == pytest.approx(gd)

    def test_matches_spark_brute_force(self, ctree, walk_df, queries):
        q = queries[0]
        sid, sd = exact_nn_spark(walk_df, q)
        r = exact_search(ctree, q)
        assert r.distance == pytest.approx(sd)

    def test_matches_duckdb_oracle(self, spark, ctree, walk_mat, ids, queries):
        """End-to-end oracle: the exact NN distance equals the DuckDB SQL
        answer over unpivoted series."""
        q = queries[1]
        r = exact_search(ctree, q)
        got = spark.createDataFrame(
            pd.DataFrame({"nn_dist": [round(r.distance, 6)]})
        )
        long = unpivot_series(ids, walk_mat)
        qdf = pd.DataFrame({"pos": np.arange(len(q)), "qv": q})
        assert_equivalent(
            got,
            """
            SELECT round(min(dist), 6) AS nn_dist FROM (
              SELECT s.id, sqrt(sum((s.value - q.qv)^2)) AS dist
              FROM long s JOIN qdf q ON s.pos = q.pos GROUP BY s.id)
            """,
            long=long,
            qdf=qdf,
        )

    def test_answer_id_is_argmin(self, ctree_full, walk_mat, queries, ground_truth):
        for q, (gid, gd) in zip(queries, ground_truth):
            r = exact_search(ctree_full, q)
            # Distance ties allowed: check the returned id achieves gd.
            assert euclidean(walk_mat[r.id], q) == pytest.approx(gd)

    def test_visited_leq_candidates_leq_n(self, ctree, queries):
        r = exact_search(ctree, queries[0])
        assert r.visited_records <= r.extra["candidates"] <= ctree.n_series

    def test_pruning_happens(self, ctree, queries):
        """SIMS should prune most of the dataset on random-walk data."""
        r = exact_search(ctree, queries[0])
        assert r.visited_records < ctree.n_series / 2

    def test_radius_reduces_visited(self, ctree_full, queries):
        """Better initial bsf (larger radius) prunes at least as much
        (Fig 9f)."""
        v1 = np.mean([exact_search(ctree_full, q, radius=1).visited_records for q in queries])
        v5 = np.mean([exact_search(ctree_full, q, radius=5).visited_records for q in queries])
        assert v5 <= v1 + 1e-9

    def test_approx_distance_recorded(self, ctree, queries):
        r = exact_search(ctree, queries[0])
        assert r.distance <= r.approx_distance + 1e-12

    def test_exact_on_seismic_kind(self, spark, tmp_path):
        """Exact search is correct on the dense (harder) dataset too."""
        from repro.core.coconut_tree import build_coconut_tree
        from repro.synth_data import query_workload, series_collection, series_matrix

        df = series_collection(spark, n_series=200, length=64, kind="seismic", seed=3)
        mat = series_matrix(n_series=200, length=64, kind="seismic", seed=3)
        idx = build_coconut_tree(
            spark, df, path=str(tmp_path / "seis"), w=8, bits=4, leaf_capacity=50
        )
        qs = query_workload(n_queries=3, length=64, kind="seismic")
        for q in qs:
            gid, gd = exact_nn_numpy(np.arange(200), mat, q)
            assert exact_search(idx, q).distance == pytest.approx(gd)
        idx.close()


class TestQuerySummary:
    def test_zkey_consistent_with_dataset(self, ctree, walk_mat):
        from repro.core.zorder import zkeys

        qp, qs, qz = query_summary(ctree, walk_mat[0])
        assert qz == zkeys(walk_mat[:1], ctree.w, ctree.bits)[0]

    def test_shapes(self, ctree, queries):
        qp, qs, qz = query_summary(ctree, queries[0])
        assert qp.shape == (ctree.w,) and qs.shape == (ctree.w,)
        assert isinstance(qz, str)


class TestCostAccounting:
    def test_first_exact_query_loads_summaries(self, spark, walk_df, tmp_path, queries):
        from repro.core.coconut_tree import build_coconut_tree

        idx = build_coconut_tree(
            spark, walk_df, path=str(tmp_path / "fresh"), w=8, bits=4, leaf_capacity=50
        )
        r1 = exact_search(idx, queries[0])
        r2 = exact_search(idx, queries[0])
        assert r1.disk.seq_read_blocks > r2.disk.seq_read_blocks  # one-time load
        idx.close()

    def test_exact_disk_nonzero(self, ctree, queries):
        r = exact_search(ctree, queries[0])
        assert r.disk.seconds() > 0
