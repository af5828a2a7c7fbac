"""Coconut-Trie: bottom-up bulk-loading of a prefix-split index (Algorithm 2).

Like Coconut-Tree, the build starts by summarizing and externally
sorting by invSAX.  But leaves are constrained to *prefix boundaries* of
the z-order key (= common iSAX prefixes across all segments, §4.2):
within each root subtree we split recursively on the next interleaved
bit until a group fits the leaf capacity.  Stopping at the shallowest
fitting depth is exactly the fixpoint of the paper's ``insertBottomUp``
+ ``CompactSubtree`` (build at full resolution, then merge sibling
leaves while they fit): both yield the minimal prefix partition.

Because groups can only merge at prefix boundaries, leaves end up
sparse (paper: ~10% full) — the contrast Coconut-Tree removes.  The
per-subtree recursion runs distributed via ``applyInPandas`` over the
first-level (1 bit/segment) subtrees, matching Algorithm 2's
subtree-at-a-time processing.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf

from repro.core.coconut_common import (
    CoconutIndex,
    directory_from_summaries,
    write_index_files,
)
from repro.core.coconut_tree import _series_length, summarize_series
from repro.core.sort_rank import global_sort_with_rank
from repro.storage.disk_model import DiskConfig, DiskModel, external_sort_cost

#: Prefix depth beyond which a group becomes an (oversized) leaf — 62
#: interleaved bits is far deeper than any real split needs and keeps
#: prefixes in int64 range.
MAX_DEPTH = 62


def _first64(zkey_hex: str) -> int:
    """The first 64 interleaved bits of a z-key as an unsigned int."""
    return int(zkey_hex[:16].ljust(16, "0"), 16)


def assign_prefix_leaves(
    keys64: np.ndarray, *, start_depth: int, capacity: int, max_depth: int = MAX_DEPTH
) -> list[tuple[int, int]]:
    """Split a *sorted* array of 64-bit key prefixes into prefix leaves.

    Returns one ``(depth, prefix)`` label per key.  A group splits on its
    next interleaved bit until it fits ``capacity`` (or ``max_depth`` —
    normally the number of real, non-padding key bits — is reached, at
    which point all keys are identical and the leaf is oversized);
    this is median-free, boundary-constrained splitting.
    """
    max_depth = min(max_depth, MAX_DEPTH)
    n = len(keys64)
    labels: list[tuple[int, int]] = [(0, 0)] * n
    if n == 0:
        return labels
    root_prefix = int(keys64[0]) >> (64 - start_depth) if start_depth else 0
    stack = [(0, n, start_depth, root_prefix)]
    while stack:
        lo, hi, depth, prefix = stack.pop()
        if hi - lo <= capacity or depth >= max_depth:
            for i in range(lo, hi):
                labels[i] = (depth, prefix)
            continue
        # First key whose bit at position ``depth`` is 1 — the range is
        # sorted, so the 0-child precedes the 1-child contiguously.
        boundary = (2 * prefix + 1) << (64 - depth - 1)
        split = lo + int(np.searchsorted(keys64[lo:hi], boundary, side="left"))
        if split > lo:
            stack.append((lo, split, depth + 1, 2 * prefix))
        if split < hi:
            stack.append((split, hi, depth + 1, 2 * prefix + 1))
    return labels


def charge_trie_build(disk: DiskModel, n: int, n_leaves: int, leaf_capacity: int, *, materialized: bool) -> None:
    """Disk-access-model cost of Algorithm 2.

    Both variants sort only the summaries.  The Full variant then pays
    the paper's "last pass": gathering raw series by offset into the
    sorted leaves — random reads once the raw file exceeds memory
    (Fig 8a: CTrieFull degrades steeply as memory shrinks).  Compaction
    adds two streaming passes over the summaries.  Leaves are allocated
    at full capacity, so sparse leaves inflate the final write.
    """
    c = disk.config
    raw_blocks = -(-n // c.block_series)
    sum_blocks = max(1, -(-n // c.summaries_per_block))
    disk.seq_read(raw_blocks)  # summarization scan
    disk.cpu_summarize(n)
    disk.cpu_sort(n)
    # CompactSubtree: repeated sibling-merge sweeps over the leaf level
    # (the paper: CTrie "spends a significant time in compacting").
    disk.charge_cpu(3 * n * c.cpu_insert_item_s)
    mem_summaries = max(1, c.memory_series * c.series_bytes // c.summary_bytes)
    external_sort_cost(disk, n, c.summaries_per_block, mem_summaries)
    disk.seq_read(sum_blocks)  # compaction pass over summaries
    disk.seq_write(sum_blocks)
    if materialized:
        uncached = max(0, n - c.memory_series)
        disk.rand_read(uncached)  # fetch raw series into sorted leaves
        alloc_blocks = n_leaves * max(1, -(-leaf_capacity // c.block_series))
        disk.seq_write(alloc_blocks)
    else:
        alloc_blocks = n_leaves * max(1, -(-leaf_capacity // c.summaries_per_block))
        disk.seq_write(alloc_blocks)


def build_coconut_trie(
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
    """Bulk-load a Coconut-Trie index over ``series_df`` (id, series)."""
    cfg = disk_config or DiskConfig()
    disk = DiskModel(config=cfg)
    t0 = time.perf_counter()
    length = _series_length(series_df)
    capacity = leaf_capacity
    start_depth = w  # first trie level: 1 bit from each of the w segments

    summaries = summarize_series(series_df, w, bits, keep_series=materialized)
    ranked = global_sort_with_rank(summaries, "zkey")

    @pandas_udf("long")
    def root_of(zkey: pd.Series) -> pd.Series:
        return zkey.map(lambda z: _first64(z) >> (64 - start_depth))

    rooted = ranked.withColumn("root", root_of(F.col("zkey")))
    # Fresh StructType: StructType.add mutates the cached schema in place.
    from pyspark.sql.types import StringType, StructField, StructType

    out_schema = StructType(
        ranked.schema.fields + [StructField("leaf_label", StringType())]
    )

    def split_subtree(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values(["zkey", "id"]).reset_index(drop=True)
        keys64 = np.array([_first64(z) for z in pdf["zkey"]], dtype=np.uint64)
        labels = assign_prefix_leaves(
            keys64, start_depth=start_depth, capacity=capacity,
            max_depth=min(w * bits, MAX_DEPTH),
        )
        pdf = pdf.drop(columns=["root"])
        pdf["leaf_label"] = [f"{d:02d}:{p:016x}" for d, p in labels]
        return pdf

    labeled = rooted.groupBy("root").applyInPandas(split_subtree, schema=out_schema)

    # Dense leaf ids ordered by file position (labels are unique ranges).
    label_rank = labeled.groupBy("leaf_label").agg(F.min("rank").alias("min_rank"))
    label_pdf = label_rank.toPandas().sort_values("min_rank").reset_index(drop=True)
    label_pdf["leaf_id"] = label_pdf.index.astype("int64")
    mapping = spark.createDataFrame(label_pdf[["leaf_label", "leaf_id"]])
    with_leaf = (
        labeled.join(mapping, on="leaf_label", how="inner").drop("leaf_label").persist()
    )
    n = with_leaf.count()
    ranked.unpersist()

    write_index_files(
        with_leaf, None if materialized else series_df, path, materialized=materialized
    )
    directory = directory_from_summaries(with_leaf, w)
    charge_trie_build(disk, n, len(directory), capacity, materialized=materialized)

    return CoconutIndex(
        spark=spark,
        variant="trie",
        path=path,
        w=w,
        bits=bits,
        length=length,
        leaf_capacity=capacity,
        materialized=materialized,
        n_series=n,
        directory=directory,
        summaries=with_leaf,
        build_disk=disk,
        disk_config=cfg,
        extra={"build_wall_s": time.perf_counter() - t0},
    )
