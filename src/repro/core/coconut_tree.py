"""Coconut-Tree: bottom-up bulk-loading of a balanced index (Algorithm 3).

Pipeline (the paper's lines map directly onto Spark stages):

1. lines 2–8   — one scan of the raw series computing (invSAX, position):
   ``mapInPandas`` summarization pass.
2. lines 9–12  — external sort by invSAX: ``repartitionByRange`` +
   ``sortWithinPartitions`` + global rank (``repro.core.sort_rank``).
3. line 13     — UB-tree-style bulk load on the sorted stream: with the
   data sorted, median-based splitting of a leaf level is simply
   ``leaf_id = rank // leaf_capacity`` — every leaf (except the last) is
   exactly full, the tree over the leaf ranges is balanced by
   construction.  Leaves are written as z-key-sorted Parquet partitions,
   and the directory (internal levels) is aggregated per leaf.

``materialized=True`` is Coconut-Tree-Full (series stored in the
leaves); otherwise the leaves hold ids and a stand-in raw file is
written.  ``merge_batch`` implements the bulk-update path of Fig 10a:
sort the new batch and merge-rewrite, all sequential I/O.
"""
from __future__ import annotations

import time
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.coconut_common import (
    CoconutIndex,
    directory_from_summaries,
    write_index_files,
)
from repro.core.paa import paa
from repro.core.sax import symbols_from_paa
from repro.core.sort_rank import global_sort_with_rank
from repro.core.zorder import interleave
from repro.storage.disk_model import DiskConfig, DiskModel, external_sort_cost


def summarize_series(series_df: DataFrame, w: int, bits: int, *, keep_series: bool) -> DataFrame:
    """(id, series) -> (id, zkey, sax, paa[, series]): Algorithm 3 lines 2–8."""

    schema = "id long, zkey string, sax array<int>, paa array<double>"
    if keep_series:
        schema += ", series array<double>"

    def compute(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                continue
            mat = np.stack(pdf["series"].to_numpy())
            p = paa(mat, w)
            s = symbols_from_paa(p, bits)
            out = {
                "id": pdf["id"].to_numpy(),
                "zkey": interleave(s, bits),
                "sax": list(s.astype(np.int32)),
                "paa": list(p),
            }
            if keep_series:
                out["series"] = list(pdf["series"])
            yield pd.DataFrame(out)

    return series_df.select("id", "series").mapInPandas(compute, schema=schema)


def _series_length(series_df: DataFrame) -> int:
    return int(series_df.select(F.size("series").alias("n")).first()["n"])


def charge_tree_build(
    disk: DiskModel, n: int, *, materialized: bool
) -> None:
    """Disk-access-model cost of Algorithm 3 (§3.1 analysis, O(N/B)).

    Sequential scan of the raw file; external sort of the sort payload
    (raw series for the Full variant — the paper observes this dominates
    CTreeFull — or just summaries otherwise); sequential write of the
    leaf level.
    """
    c = disk.config
    raw_blocks = -(-n // c.block_series)
    disk.seq_read(raw_blocks)  # summarization scan
    disk.cpu_summarize(n)
    disk.cpu_sort(n)
    if materialized:
        memory_items = c.memory_series
        external_sort_cost(disk, n, c.block_series, memory_items)
        disk.seq_write(raw_blocks)  # leaf level holds raw series
    else:
        mem_bytes = c.memory_series * c.series_bytes
        memory_items = max(1, mem_bytes // c.summary_bytes)
        external_sort_cost(disk, n, c.summaries_per_block, memory_items)
        disk.seq_write(max(1, -(-n // c.summaries_per_block)))  # leaf level


def build_coconut_tree(
    spark: SparkSession,
    series_df: DataFrame,
    *,
    path: str,
    w: int = 8,
    bits: int = 4,
    leaf_capacity: int = 100,
    materialized: bool = False,
    disk_config: DiskConfig | None = None,
) -> CoconutIndex:
    """Bulk-load a Coconut-Tree index over ``series_df`` (id, series)."""
    cfg = disk_config or DiskConfig()
    disk = DiskModel(config=cfg)
    t0 = time.perf_counter()
    length = _series_length(series_df)

    summaries = summarize_series(series_df, w, bits, keep_series=materialized)
    ranked = global_sort_with_rank(summaries, "zkey")
    with_leaf = ranked.withColumn(
        "leaf_id", (F.col("rank") / F.lit(leaf_capacity)).cast("long")
    ).persist()
    n = with_leaf.count()
    ranked.unpersist()

    write_index_files(
        with_leaf, None if materialized else series_df, path, materialized=materialized
    )
    directory = directory_from_summaries(with_leaf, w)
    charge_tree_build(disk, n, materialized=materialized)

    return CoconutIndex(
        spark=spark,
        variant="tree",
        path=path,
        w=w,
        bits=bits,
        length=length,
        leaf_capacity=leaf_capacity,
        materialized=materialized,
        n_series=n,
        directory=directory,
        summaries=with_leaf,
        build_disk=disk,
        disk_config=cfg,
        extra={"build_wall_s": time.perf_counter() - t0},
    )


def merge_batch(
    index: CoconutIndex, batch_df: DataFrame, *, path: str | None = None
) -> CoconutIndex:
    """Bulk-update: sort the batch, merge with the existing sorted leaf
    level, rewrite (Fig 10a; the LSM-flavored path the paper motivates).

    Sequential cost: summarize the batch, sort it, then stream-merge old
    index + new run.  Contrast with ADS top-down inserts, which pay a
    random I/O per touched leaf.
    """
    spark = index.spark
    new_path = path or f"{index.path}__merged"
    # Existing series: reconstruct the raw input (ids + series) from the
    # index files, union with the batch, rebuild via the same bulk path.
    if index.materialized:
        old_raw = spark.read.parquet(f"{index.path}/leaves").select("id", "series")
    else:
        old_raw = spark.read.parquet(f"{index.path}/raw")
    all_raw = old_raw.unionByName(batch_df.select("id", "series"))
    merged = build_coconut_tree(
        spark,
        all_raw,
        path=new_path,
        w=index.w,
        bits=index.bits,
        leaf_capacity=index.leaf_capacity,
        materialized=index.materialized,
        disk_config=index.disk_config,
    )
    # Replace the generic build charge with the merge cost: the batch is
    # scanned+sorted, the old run is streamed in, the merged run streamed
    # out — no random I/O.
    b = batch_df.count()
    n_old = index.n_series
    disk = DiskModel(config=index.disk_config)
    c = index.disk_config
    per_block = c.block_series if index.materialized else c.summaries_per_block
    disk.seq_read(max(1, -(-b // c.block_series)))            # scan batch
    external_sort_cost(
        disk, b, per_block,
        c.memory_series if index.materialized
        else max(1, c.memory_series * c.series_bytes // c.summary_bytes),
    )
    disk.seq_read(max(1, -(-n_old // per_block)))             # stream old run
    disk.seq_write(max(1, -(-(n_old + b) // per_block)))      # write merged
    disk.cpu_summarize(b)
    disk.cpu_sort(b)
    disk.charge_cpu((n_old + b) * c.cpu_sort_item_s)          # merge pass
    merged.build_disk = disk
    index.close()
    return merged
