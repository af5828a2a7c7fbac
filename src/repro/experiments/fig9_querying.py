"""Figure 9 experiments: query performance and quality.

- 9a — exact query time vs dataset size.
- 9b — approximate query time vs dataset size.
- 9c — approximate query time at a fixed size, incl. CTree radius 1/10.
- 9d — approximate answer quality: average ED of the approximate answer
  to the query, plus the fraction of queries where Coconut's answer
  beats ADSFull's.
- 9e — exact query time at the fixed size (radius variants).
- 9f — records visited during exact search.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.experiments.harness import build_system, disk_config_for, run_queries
from repro.synth_data import query_workload, series_collection


def _build_handles(
    spark, systems, *, n_series, length, w, bits, leaf_capacity, mem_frac, kind, workdir
):
    df = series_collection(spark, n_series=n_series, length=length, kind=kind).persist()
    df.count()
    cfg = disk_config_for(n_series, length, mem_frac=mem_frac, leaf_capacity=leaf_capacity)
    handles = {
        name: build_system(
            name, spark, df, w=w, bits=bits, leaf_capacity=leaf_capacity,
            disk_config=cfg, workdir=workdir,
        )
        for name in systems
    }
    df.unpersist()
    return handles


def query_vs_datasize(
    spark: SparkSession,
    *,
    systems: list[str],
    sizes: tuple[int, ...] = (500, 1000, 2000),
    n_queries: int = 10,
    length: int = 64,
    w: int = 8,
    bits: int = 4,
    leaf_capacity: int = 100,
    mem_frac: float = 0.25,
    kind: str = "walk",
    workdir: str | None = None,
) -> list[dict]:
    """Fig 9a (exact) and 9b (approximate): one row per (system, N, mode)."""
    queries = query_workload(n_queries=n_queries, length=length, kind=kind)
    rows = []
    for n in sizes:
        handles = _build_handles(
            spark, systems, n_series=n, length=length, w=w, bits=bits,
            leaf_capacity=leaf_capacity, mem_frac=mem_frac, kind=kind, workdir=workdir,
        )
        for name, h in handles.items():
            for mode in ("approx", "exact"):
                r = run_queries(h, queries, mode=mode)
                r.pop("distances")
                r["n_series"] = n
                rows.append(r)
            h.close()
    return rows


def quality_and_radius(
    spark: SparkSession,
    *,
    n_series: int = 2000,
    n_queries: int = 20,
    length: int = 64,
    w: int = 8,
    bits: int = 4,
    leaf_capacity: int = 100,
    mem_frac: float = 0.25,
    radii: tuple[int, ...] = (1, 10),
    baseline: str = "ADSFull",
    coconut: str = "CTreeFull",
    kind: str = "walk",
    workdir: str | None = None,
) -> list[dict]:
    """Fig 9c–9f at one dataset size: CTree(radius) vs the ADS baseline.

    Reports, per configuration: approximate time and ED (9c/9d), exact
    time (9e), visited records (9f), and the fraction of queries where
    Coconut's approximate answer is strictly better than the baseline's
    (the paper: CTree(1) 69%, CTree(10) 94%).
    """
    queries = query_workload(n_queries=n_queries, length=length, kind=kind)
    handles = _build_handles(
        spark, [baseline, coconut], n_series=n_series, length=length, w=w,
        bits=bits, leaf_capacity=leaf_capacity, mem_frac=mem_frac, kind=kind,
        workdir=workdir,
    )
    rows = []
    base_approx = run_queries(handles[baseline], queries, mode="approx")
    base_exact = run_queries(handles[baseline], queries, mode="exact")
    for r in (base_approx, base_exact):
        r["config"] = baseline
        r["beats_baseline_frac"] = float("nan")
        r["beats_or_ties_frac"] = float("nan")
    base_dists = np.array(base_approx.pop("distances"))
    base_exact.pop("distances")
    rows.extend([base_approx, base_exact])
    for radius in radii:
        ca = run_queries(handles[coconut], queries, mode="approx", radius=radius)
        ce = run_queries(handles[coconut], queries, mode="exact", radius=radius)
        cdists = np.array(ca.pop("distances"))
        ce.pop("distances")
        # Strictly-better fraction (the paper's 69%/94% metric) plus a
        # ties-inclusive fraction: at small N both searches often land
        # on the identical nearest neighbor, which the strict metric
        # counts as a loss.
        ca["beats_baseline_frac"] = float(np.mean(cdists < base_dists - 1e-12))
        ca["beats_or_ties_frac"] = float(np.mean(cdists <= base_dists + 1e-12))
        ce["beats_baseline_frac"] = float("nan")
        ce["beats_or_ties_frac"] = float("nan")
        for r in (ca, ce):
            r["config"] = f"{coconut}({radius})"
        rows.extend([ca, ce])
    for h in handles.values():
        h.close()
    return rows
