"""Shared layout for Coconut indexes (Tree and Trie variants).

Both variants produce the same on-disk shape, which is what makes their
comparison (paper §4.2 vs §4.3) clean:

- ``<path>/leaves``  — Parquet, partitioned by ``leaf_id``, rows sorted
  by z-key: the contiguous leaf level ("columnar index structure").
- ``<path>/raw``     — Parquet (id, series): stands in for the paper's
  raw series file; only written for non-materialized (secondary)
  indexes, whose leaves hold ids ("offsets") instead of series.
- a driver-side *leaf directory* (min/max z-key, count, per-segment
  symbol bounds): the in-memory internal levels of the tree/trie.
- a persisted Spark DataFrame of summaries in file order: the paper's
  "in-memory summarizations" used by the SIMS exact search.

They differ only in how ranks map to leaves (median/equi split vs
prefix split) and in construction cost accounting.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.storage.disk_model import DiskConfig, DiskModel

SUMMARY_COLS = ["id", "zkey", "sax", "paa", "rank", "leaf_id"]


@dataclass
class CoconutIndex:
    """A built Coconut index plus everything a query needs to run."""

    spark: SparkSession
    variant: str                 # "tree" | "trie"
    path: str
    w: int
    bits: int
    length: int                  # raw series length n
    leaf_capacity: int
    materialized: bool
    n_series: int
    directory: pd.DataFrame      # leaf_id,min_zkey,max_zkey,count (+sax bounds)
    summaries: DataFrame         # persisted, file (rank) order
    build_disk: DiskModel        # construction I/O accounting
    disk_config: DiskConfig
    summaries_loaded: bool = False  # SIMS lazy-load flag (Algorithm 5 l.3-4)
    extra: dict = field(default_factory=dict)

    # -- derived stats (Fig 8c) -------------------------------------------
    @property
    def n_leaves(self) -> int:
        return len(self.directory)

    @property
    def fill_factor(self) -> float:
        """Mean leaf occupancy relative to capacity (paper: ~0.97 for
        median splits, ~0.10 for prefix splits)."""
        return self.n_series / (self.n_leaves * self.leaf_capacity)

    @property
    def record_bytes(self) -> int:
        c = self.disk_config
        return c.series_bytes if self.materialized else c.summary_bytes

    @property
    def index_bytes(self) -> int:
        """Modeled on-disk footprint: leaves are allocated at full
        capacity (free space in sparse leaves is the paper's space
        amplification)."""
        return self.n_leaves * self.leaf_capacity * self.record_bytes

    def leaf_blocks(self, count: int) -> int:
        """Disk blocks occupied by ``count`` leaf records."""
        c = self.disk_config
        per_block = c.block_series if self.materialized else c.summaries_per_block
        return max(1, -(-count // per_block))

    # -- leaf access -------------------------------------------------------
    def read_leaves(self, leaf_ids: list[int]) -> pd.DataFrame:
        """Fetch leaf contents via partition-pruned Parquet read."""
        if not leaf_ids:
            return pd.DataFrame(columns=SUMMARY_COLS)
        df = self.spark.read.parquet(f"{self.path}/leaves").where(
            F.col("leaf_id").isin([int(i) for i in leaf_ids])
        )
        return df.toPandas()

    def fetch_raw(self, ids: list[int]) -> pd.DataFrame:
        """Fetch raw series by id (secondary indexes only): the paper's
        'go to the raw data file' step."""
        if not ids:
            return pd.DataFrame(columns=["id", "series"])
        df = self.spark.read.parquet(f"{self.path}/raw").where(
            F.col("id").isin([int(i) for i in ids])
        )
        return df.toPandas()

    def close(self) -> None:
        self.summaries.unpersist()


def directory_from_summaries(summaries: DataFrame, w: int) -> pd.DataFrame:
    """Aggregate the leaf directory: per-leaf z-key range, count, and
    per-segment symbol bounds (the internal-node SAX masks)."""
    aggs = [
        F.min("zkey").alias("min_zkey"),
        F.max("zkey").alias("max_zkey"),
        F.count("*").alias("count"),
        F.min("rank").alias("min_rank"),
    ]
    for j in range(w):
        aggs.append(F.min(F.col("sax")[j]).alias(f"sax_lo_{j}"))
        aggs.append(F.max(F.col("sax")[j]).alias(f"sax_hi_{j}"))
    pdf = summaries.groupBy("leaf_id").agg(*aggs).toPandas()
    pdf = pdf.sort_values("min_zkey").reset_index(drop=True)
    return pdf


def directory_sax_bounds(directory: pd.DataFrame, w: int) -> tuple[np.ndarray, np.ndarray]:
    """(n_leaves, w) lower/upper symbol bound matrices for node pruning."""
    lo = directory[[f"sax_lo_{j}" for j in range(w)]].to_numpy()
    hi = directory[[f"sax_hi_{j}" for j in range(w)]].to_numpy()
    return lo, hi


def write_index_files(
    summaries: DataFrame,
    raw_df: DataFrame | None,
    path: str,
    *,
    materialized: bool,
) -> None:
    """Write the leaf level (and the stand-in raw file for secondary
    indexes) to the local filesystem."""
    cols = list(SUMMARY_COLS)
    if materialized:
        cols.append("series")
    summaries.select(*cols).write.mode("overwrite").partitionBy("leaf_id").parquet(
        f"{path}/leaves"
    )
    if not materialized:
        if raw_df is None:
            raise ValueError("secondary index requires the raw series DataFrame")
        raw_df.select("id", "series").write.mode("overwrite").parquet(f"{path}/raw")
