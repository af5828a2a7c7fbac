"""Unit tests for the distributed global sort + rank."""
import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.core.sort_rank import global_sort_with_rank
from repro.oracle import assert_equivalent


def _df(spark, n=200, seed=0):
    g = np.random.default_rng(seed)
    pdf = pd.DataFrame({
        "id": np.arange(n),
        "key": [f"{v:08x}" for v in g.integers(0, 2**32, n)],
    })
    return spark.createDataFrame(pdf), pdf


class TestGlobalSortWithRank:
    def test_ranks_are_dense(self, spark):
        df, _ = _df(spark)
        out = global_sort_with_rank(df, "key")
        ranks = sorted(r["rank"] for r in out.select("rank").collect())
        assert ranks == list(range(200))
        out.unpersist()

    def test_rank_order_matches_key_order(self, spark):
        df, pdf = _df(spark, seed=1)
        out = global_sort_with_rank(df, "key").toPandas().sort_values("rank")
        assert list(out["key"]) == sorted(pdf["key"])
        out_df = None

    def test_matches_sql_row_number_oracle(self, spark):
        df, pdf = _df(spark, seed=2)
        out = global_sort_with_rank(df, "key").select("id", "key", "rank")
        assert_equivalent(
            out,
            "SELECT id, key, row_number() OVER (ORDER BY key, id) - 1 AS rank FROM t",
            t=pdf,
        )
        out.unpersist()

    def test_duplicate_keys_tiebroken_by_id(self, spark):
        pdf = pd.DataFrame({"id": [3, 1, 2, 0], "key": ["a", "a", "a", "a"]})
        out = (
            global_sort_with_rank(spark.createDataFrame(pdf), "key")
            .toPandas()
            .sort_values("rank")
        )
        assert list(out["id"]) == [0, 1, 2, 3]

    def test_stable_across_recomputation(self, spark):
        """Ranks are frozen by persist: two actions see identical ranks."""
        df, _ = _df(spark, seed=3)
        out = global_sort_with_rank(df, "key")
        a = out.toPandas().sort_values("id")["rank"].to_numpy()
        b = out.toPandas().sort_values("id")["rank"].to_numpy()
        assert np.array_equal(a, b)
        out.unpersist()

    def test_schema_keeps_all_columns(self, spark):
        df, _ = _df(spark)
        out = global_sort_with_rank(df, "key")
        assert set(out.columns) == {"id", "key", "rank"}
        out.unpersist()

    def test_small_input_fewer_rows_than_partitions(self, spark):
        pdf = pd.DataFrame({"id": [0, 1], "key": ["b", "a"]})
        out = (
            global_sort_with_rank(spark.createDataFrame(pdf), "key", num_partitions=8)
            .toPandas()
            .sort_values("rank")
        )
        assert list(out["id"]) == [1, 0]

    def test_does_not_mutate_input_schema(self, spark):
        df, _ = _df(spark)
        before = [f.name for f in df.schema.fields]
        out = global_sort_with_rank(df, "key")
        assert [f.name for f in df.schema.fields] == before
        out.unpersist()

    def test_partitions_are_range_disjoint(self, spark):
        """Max key of partition p < min key of partition p+1 (the merge
        phase of the external sort is implicit in range partitioning)."""
        df, _ = _df(spark, n=500, seed=4)
        out = global_sort_with_rank(df, "key", num_partitions=4)
        pid = out.withColumn("pid", F.spark_partition_id())
        stats = (
            pid.groupBy("pid")
            .agg(F.min("key").alias("lo"), F.max("key").alias("hi"))
            .toPandas()
            .sort_values("lo")
        )
        his = list(stats["hi"])
        los = list(stats["lo"])
        for i in range(len(stats) - 1):
            assert his[i] <= los[i + 1]
        out.unpersist()
