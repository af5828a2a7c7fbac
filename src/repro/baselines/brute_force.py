"""Brute-force exact nearest neighbor — the correctness ground truth.

Every index's exact search must return the same (id, distance) as the
full scan here.  Two paths: a distributed Spark scan (DataFrame API)
and a numpy scan; a DuckDB-oracle SQL formulation over unpivoted
(id, pos, value) rows lives in the tests.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.distance import distances_to_query, euclidean


def exact_nn_spark(series_df: DataFrame, query: np.ndarray) -> tuple[int, float]:
    """Distributed full-scan NN: (id, distance) of the closest series."""
    row = (
        distances_to_query(series_df, query)
        .orderBy(F.col("dist").asc(), F.col("id").asc())
        .first()
    )
    return int(row["id"]), float(row["dist"])


def exact_nn_numpy(
    ids: np.ndarray, series: np.ndarray, query: np.ndarray
) -> tuple[int, float]:
    d = euclidean(series, np.asarray(query, dtype=np.float64))
    k = int(np.argmin(d))
    return int(ids[k]), float(d[k])


def unpivot_series(ids: np.ndarray, series: np.ndarray):
    """(id, pos, value) long-format pandas frame for the DuckDB oracle."""
    import pandas as pd

    n, m = series.shape
    return pd.DataFrame(
        {
            "id": np.repeat(ids, m),
            "pos": np.tile(np.arange(m), n),
            "value": series.ravel(),
        }
    )
