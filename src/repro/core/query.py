"""Query processing over Coconut indexes.

``approximate_search`` is Algorithm 4: locate the leaf where the
query's invSAX key would be inserted (binary search over the leaf
directory — the in-memory internal levels) and scan ``radius``
neighboring leaves, which are *contiguous on disk* because the leaf
level is a sorted file; return the best true Euclidean distance found.

``exact_search`` is Algorithm 5 (CoconutTreeSIMS): seed a best-so-far
from the approximate answer, compute the MINDIST lower bound for every
in-memory summarization in file order (a Spark ``mapInPandas`` scan —
the paper's "multiple threads computing bounds in parallel"), then
perform the skip-sequential visit: fetch the raw series only for
records whose bound beats the *running* bsf, in file order.  The number
of visited records (Fig 9f) and the block traffic are accounted against
the disk model.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd

from repro.core.coconut_common import CoconutIndex
from repro.core.distance import euclidean
from repro.core.mindist import mindist_paa_sax
from repro.core.paa import paa
from repro.core.sax import symbols_from_paa
from repro.core.zorder import interleave
from repro.storage.disk_model import DiskModel


@dataclass
class SearchResult:
    """Outcome of one query: answer id/distance plus cost accounting."""

    id: int
    distance: float
    leaves_visited: int = 0
    visited_records: int = 0          # raw records touched (Fig 9f)
    approx_distance: float = float("nan")
    disk: DiskModel | None = None
    wall_s: float = 0.0
    extra: dict = field(default_factory=dict)


def query_summary(index: CoconutIndex, query: np.ndarray) -> tuple[np.ndarray, np.ndarray, str]:
    """(paa, sax, zkey) of the query under the index's parameters."""
    q = np.asarray(query, dtype=np.float64)
    if q.shape[-1] != index.length:
        raise ValueError(f"query length {q.shape[-1]} != index length {index.length}")
    qp = paa(q, index.w)
    qs = symbols_from_paa(qp, index.bits)
    return qp, qs, interleave(qs[None, :], index.bits)[0]


def _target_leaf_pos(index: CoconutIndex, zkey: str) -> int:
    """Directory position of the leaf whose key range would hold ``zkey``."""
    mins = index.directory["min_zkey"].to_numpy()
    pos = int(np.searchsorted(mins, zkey, side="right")) - 1
    return max(0, pos)


def _leaf_window(index: CoconutIndex, pos: int, radius: int) -> list[int]:
    """``radius`` directory positions centered on ``pos`` (clamped)."""
    n = index.n_leaves
    lo = max(0, pos - (radius - 1) // 2)
    hi = min(n, lo + radius)
    lo = max(0, hi - radius)
    return list(range(lo, hi))


def _true_distances(
    index: CoconutIndex, leaf_pdf: pd.DataFrame, query: np.ndarray, disk: DiskModel
) -> pd.DataFrame:
    """(id, dist) for every record in ``leaf_pdf``, fetching raw series
    from the stand-in raw file when the index is secondary."""
    if index.materialized:
        mat = np.stack(leaf_pdf["series"].to_numpy())
        ids = leaf_pdf["id"].to_numpy()
    else:
        raw = index.fetch_raw(list(leaf_pdf["id"]))
        # Secondary leaves point into the raw file at arbitrary offsets:
        # each uncached fetch is a random block read.
        disk.rand_read(len(raw))
        mat = np.stack(raw["series"].to_numpy())
        ids = raw["id"].to_numpy()
    return pd.DataFrame({"id": ids, "dist": euclidean(mat, np.asarray(query))})


def approximate_search(
    index: CoconutIndex, query: np.ndarray, *, radius: int = 1
) -> SearchResult:
    """Algorithm 4: best true distance within ``radius`` contiguous leaves."""
    t0 = time.perf_counter()
    disk = DiskModel(config=index.disk_config)
    _, _, qz = query_summary(index, query)
    window = _leaf_window(index, _target_leaf_pos(index, qz), radius)
    leaf_ids = [int(index.directory.iloc[p]["leaf_id"]) for p in window]
    counts = [int(index.directory.iloc[p]["count"]) for p in window]
    # Contiguous leaves: one sequential run covering the window.
    disk.seq_read(sum(index.leaf_blocks(c) for c in counts))
    leaf_pdf = index.read_leaves(leaf_ids)
    if not index.materialized:
        # Secondary index: the paper retrieves "all data series in a
        # specific radius from this point ... usually a disk page" — a
        # page of raw records around the query's sorted position per
        # radius step, not every offset in the (densely packed) leaves.
        leaf_pdf = leaf_pdf.sort_values("zkey").reset_index(drop=True)
        pos = int(leaf_pdf["zkey"].searchsorted(qz))
        half = max(1, index.disk_config.block_series * radius // 2)
        lo = max(0, min(pos - half, len(leaf_pdf) - 2 * half))
        leaf_pdf = leaf_pdf.iloc[lo : lo + 2 * half]
    dists = _true_distances(index, leaf_pdf, query, disk)
    best = dists.loc[dists["dist"].idxmin()]
    return SearchResult(
        id=int(best["id"]),
        distance=float(best["dist"]),
        leaves_visited=len(window),
        visited_records=len(dists),
        approx_distance=float(best["dist"]),
        disk=disk,
        wall_s=time.perf_counter() - t0,
    )


def _ensure_summaries_loaded(index: CoconutIndex, disk: DiskModel) -> None:
    """Algorithm 5 lines 3–4: first query pays one sequential load of the
    summarizations into memory; afterwards they are resident."""
    if not index.summaries_loaded:
        c = index.disk_config
        disk.seq_read(max(1, -(-index.n_series // c.summaries_per_block)))
        index.summaries_loaded = True


def exact_search(
    index: CoconutIndex, query: np.ndarray, *, radius: int = 1
) -> SearchResult:
    """Algorithm 5 (CoconutTreeSIMS): exact nearest neighbor."""
    t0 = time.perf_counter()
    disk = DiskModel(config=index.disk_config)
    _ensure_summaries_loaded(index, disk)

    approx = approximate_search(index, query, radius=radius)
    disk.merge(approx.disk)
    # In-memory lower-bound computation over all N summaries (parallel
    # threads in the paper): CPU-only, one compare-scale op per summary.
    disk.charge_cpu(index.n_series * index.disk_config.cpu_sort_item_s)
    bsf = approx.distance
    bsf_id = approx.id

    qp, _, _ = query_summary(index, query)
    n, w, bits = index.length, index.w, index.bits
    materialized = index.materialized
    bsf0 = bsf

    schema = "rank long, id long, md double"
    if materialized:
        schema += ", series array<double>"

    def bounds(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                continue
            sax_mat = np.stack(pdf["sax"].to_numpy())
            md = mindist_paa_sax(qp, sax_mat, n, bits)
            keep = md < bsf0
            if not keep.any():
                # Skip empty outputs: an all-filtered batch would give the
                # "series" column dtype float64, which Arrow cannot cast
                # to list<double>.
                continue
            out = {
                "rank": pdf["rank"].to_numpy()[keep],
                "id": pdf["id"].to_numpy()[keep],
                "md": md[keep],
            }
            if materialized:
                out["series"] = list(pdf["series"].to_numpy()[keep])
            yield pd.DataFrame(out)

    cols = ["rank", "id", "sax"] + (["series"] if materialized else [])
    cands = (
        index.summaries.select(*cols)
        .mapInPandas(bounds, schema=schema)
        .toPandas()
        .sort_values("rank")
        .reset_index(drop=True)
    )

    # Raw series for candidates. Secondary: fetch from the raw file once,
    # then visit in file order (SIMS's synchronized skip-sequential scan).
    if materialized:
        series_by_row = list(cands["series"])
    else:
        raw = index.fetch_raw(list(cands["id"]))
        lookup = {int(r.id): np.asarray(r.series) for r in raw.itertuples()}
        series_by_row = [lookup[int(i)] for i in cands["id"]]

    q = np.asarray(query, dtype=np.float64)
    visited = 0
    visited_ranks: list[int] = []
    for i in range(len(cands)):
        if cands["md"].iat[i] >= bsf:
            continue  # pruned by the (shrinking) running bsf — skipped
        visited += 1
        visited_ranks.append(int(cands["rank"].iat[i]))
        d = float(euclidean(np.asarray(series_by_row[i], dtype=np.float64), q))
        if d < bsf:
            bsf = d
            bsf_id = int(cands["id"].iat[i])

    # Skip-sequential disk charge: visited records grouped into blocks in
    # file order; each contiguous block run pays one seek.
    c = index.disk_config
    per_block = c.block_series  # raw records are what get visited
    blocks = sorted({r // per_block for r in visited_ranks})
    run_len = 0
    for j, b in enumerate(blocks):
        if j > 0 and b == blocks[j - 1] + 1:
            run_len += 1
        else:
            if run_len:
                disk.seq_read(run_len)
            run_len = 1
    if run_len:
        disk.seq_read(run_len)

    return SearchResult(
        id=bsf_id,
        distance=bsf,
        leaves_visited=approx.leaves_visited,
        visited_records=visited,
        approx_distance=approx.distance,
        disk=disk,
        wall_s=time.perf_counter() - t0,
        extra={"candidates": len(cands)},
    )
