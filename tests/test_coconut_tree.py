"""Unit + integration tests for the Coconut-Tree bulk loader."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.zorder import zkeys
from repro.oracle import assert_equivalent
from tests.conftest import CAPACITY, N_SERIES


class TestStructure:
    def test_all_series_indexed(self, ctree):
        assert ctree.n_series == N_SERIES
        assert ctree.summaries.count() == N_SERIES

    def test_leaves_are_balanced_median_splits(self, ctree):
        """Every leaf except the last is exactly full — the UB-tree bulk
        load packs densely (paper: ~97% utilization)."""
        counts = ctree.directory.sort_values("min_rank")["count"].to_list()
        assert all(c == CAPACITY for c in counts[:-1])
        assert 0 < counts[-1] <= CAPACITY

    def test_fill_factor_high(self, ctree):
        assert ctree.fill_factor > 0.75

    def test_leaf_key_ranges_disjoint_and_ordered(self, ctree):
        d = ctree.directory
        assert list(d["min_zkey"]) == sorted(d["min_zkey"])
        for i in range(len(d) - 1):
            assert d.iloc[i]["max_zkey"] <= d.iloc[i + 1]["min_zkey"]

    def test_ranks_contiguous_within_leaf(self, ctree):
        pdf = ctree.summaries.select("leaf_id", "rank").toPandas()
        for lid, grp in pdf.groupby("leaf_id"):
            r = sorted(grp["rank"])
            assert r == list(range(r[0], r[0] + len(r)))

    def test_zkeys_match_recomputation(self, ctree, walk_mat):
        pdf = ctree.summaries.select("id", "zkey").toPandas().sort_values("id")
        expected = zkeys(walk_mat, ctree.w, ctree.bits)
        assert list(pdf["zkey"]) == expected

    def test_file_order_is_key_order(self, ctree):
        pdf = ctree.summaries.select("rank", "zkey").toPandas().sort_values("rank")
        assert list(pdf["zkey"]) == sorted(pdf["zkey"])

    def test_directory_against_oracle(self, ctree):
        """Leaf directory aggregates equal a DuckDB GROUP BY."""
        got = ctree.summaries.groupBy("leaf_id").agg(
            F.min("zkey").alias("min_zkey"),
            F.max("zkey").alias("max_zkey"),
            F.count("*").alias("cnt"),
        )
        pdf = ctree.summaries.select("leaf_id", "zkey").toPandas()
        assert_equivalent(
            got,
            "SELECT leaf_id, min(zkey) AS min_zkey, max(zkey) AS max_zkey, "
            "count(*) AS cnt FROM s GROUP BY leaf_id",
            s=pdf,
        )

    def test_directory_matches_index_attribute(self, ctree):
        d = ctree.directory
        assert d["count"].sum() == N_SERIES
        assert ctree.n_leaves == len(d)

    def test_sax_bounds_cover_members(self, ctree):
        pdf = ctree.summaries.select("leaf_id", "sax").toPandas()
        for _, row in ctree.directory.iterrows():
            members = np.stack(
                pdf[pdf["leaf_id"] == row["leaf_id"]]["sax"].to_numpy()
            )
            for j in range(ctree.w):
                assert members[:, j].min() == row[f"sax_lo_{j}"]
                assert members[:, j].max() == row[f"sax_hi_{j}"]


class TestPersistedLayout:
    def test_leaves_parquet_partitioned(self, ctree, spark):
        df = spark.read.parquet(f"{ctree.path}/leaves")
        assert df.count() == N_SERIES
        assert "leaf_id" in df.columns

    def test_secondary_has_raw_file(self, ctree, spark):
        raw = spark.read.parquet(f"{ctree.path}/raw")
        assert raw.count() == N_SERIES
        assert set(raw.columns) == {"id", "series"}

    def test_secondary_leaves_hold_no_series(self, ctree, spark):
        df = spark.read.parquet(f"{ctree.path}/leaves")
        assert "series" not in df.columns

    def test_materialized_leaves_hold_series(self, ctree_full, spark):
        df = spark.read.parquet(f"{ctree_full.path}/leaves")
        assert "series" in df.columns

    def test_read_leaves_partition_pruned(self, ctree):
        lid = int(ctree.directory.iloc[0]["leaf_id"])
        pdf = ctree.read_leaves([lid])
        assert len(pdf) == int(ctree.directory.iloc[0]["count"])
        assert set(pdf["leaf_id"]) == {lid}

    def test_fetch_raw_by_id(self, ctree, walk_mat):
        pdf = ctree.fetch_raw([0, 5, 7])
        pdf = pdf.sort_values("id")
        assert np.allclose(np.stack(pdf["series"].to_numpy()), walk_mat[[0, 5, 7]])

    def test_materialized_series_roundtrip(self, ctree_full, walk_mat):
        lid = int(ctree_full.directory.iloc[0]["leaf_id"])
        pdf = ctree_full.read_leaves([lid]).sort_values("id")
        for _, row in pdf.iterrows():
            assert np.allclose(np.asarray(row["series"]), walk_mat[int(row["id"])])


class TestConstructionCost:
    def test_no_random_io(self, ctree, ctree_full):
        """Bulk loading is all-sequential (the paper's core claim)."""
        for idx in (ctree, ctree_full):
            assert idx.build_disk.random_reads == 0
            assert idx.build_disk.random_writes == 0

    def test_materialized_costs_more_than_secondary(self, ctree, ctree_full):
        assert ctree_full.build_disk.seconds() > ctree.build_disk.seconds()

    def test_index_bytes_formula(self, ctree):
        assert ctree.index_bytes == ctree.n_leaves * CAPACITY * 24

    def test_cost_scales_with_memory(self, spark, walk_df):
        """Shrinking M adds external-sort passes for the Full variant."""
        import shutil
        import tempfile

        from repro.core.coconut_tree import build_coconut_tree
        from repro.storage.disk_model import DiskConfig

        secs = []
        for mem in (10_000, 40):
            cfg = DiskConfig(block_series=32, memory_series=mem, series_bytes=512)
            p = tempfile.mkdtemp()
            idx = build_coconut_tree(
                spark, walk_df, path=p, w=8, bits=4, leaf_capacity=50,
                materialized=True, disk_config=cfg,
            )
            secs.append(idx.build_disk.seconds())
            idx.close()
            shutil.rmtree(p, ignore_errors=True)
        assert secs[1] > secs[0]


class TestLeafCapacityVariants:
    @pytest.mark.parametrize("capacity", [10, 100])
    def test_capacity_controls_leaf_count(self, spark, walk_df, tmp_path, capacity):
        from repro.core.coconut_tree import build_coconut_tree

        idx = build_coconut_tree(
            spark, walk_df, path=str(tmp_path / f"c{capacity}"), w=8, bits=4,
            leaf_capacity=capacity, materialized=False,
        )
        assert idx.n_leaves == -(-N_SERIES // capacity)
        idx.close()
