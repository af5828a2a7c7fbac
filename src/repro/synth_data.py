"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


# --------------------------------------------------------------------------
# Data series collections (Coconut reproduction).
#
# The paper evaluates on (a) random-walk synthetic series ("extensively
# used ... models real-world financial data"), (b) seismic waves from
# IRIS, (c) astronomy series of celestial objects.  We cannot download
# (b) and (c); `kind="seismic"` and `kind="astro"` are synthetic
# substitutes that reproduce the property the paper relies on: they are
# *denser* (series more alike, so SAX pruning is less effective) and,
# for astro, value-skewed (Fig 7).  All series are z-normalized, as the
# paper requires.  Generation is deterministic per (seed, id) so the
# driver-side matrix path and the distributed DataFrame path produce
# bit-identical series for the same ids.
# --------------------------------------------------------------------------

SERIES_KINDS = ("walk", "seismic", "astro")


def _one_series(kind: str, length: int, seed: int, sid: int) -> np.ndarray:
    g = np.random.default_rng([seed, sid])
    if kind == "walk":
        x = np.cumsum(g.standard_normal(length))
    elif kind == "seismic":
        # Background noise plus an oscillatory burst at a random offset —
        # a band-limited wave-train like a windowed seismogram. A small
        # set of discrete carrier frequencies keeps the collection dense.
        t = np.arange(length)
        freq = g.choice([4.0, 6.0, 8.0]) / length
        phase = g.uniform(0, 2 * np.pi)
        start = g.integers(0, max(1, length // 2))
        env = np.exp(-0.5 * ((t - start - length / 4) / (length / 8)) ** 2)
        x = np.sin(2 * np.pi * freq * t + phase) * env * 3.0
        x = x + 0.3 * g.standard_normal(length)
    elif kind == "astro":
        # Slow random walk with occasional large positive flares —
        # right-skewed values like AGN hard-X-ray light curves.
        x = np.cumsum(0.3 * g.standard_normal(length))
        n_flares = int(g.integers(0, 3))
        t = np.arange(length)
        for _ in range(n_flares):
            c = g.integers(0, length)
            x = x + g.uniform(2, 8) * np.exp(-0.5 * ((t - c) / (length / 20)) ** 2)
    else:
        raise ValueError(f"unknown series kind {kind!r}; one of {SERIES_KINDS}")
    mu, sd = x.mean(), x.std()
    return (x - mu) / sd if sd > 1e-12 else np.zeros(length)


def series_matrix(
    *, n_series: int, length: int = 64, kind: str = "walk", seed: int = 0,
    id_offset: int = 0,
) -> np.ndarray:
    """Driver-side (n_series, length) float64 matrix of z-normalized series.

    Row ``i`` is the series with id ``id_offset + i`` — identical to what
    :func:`series_collection` yields for that id.
    """
    return np.stack(
        [_one_series(kind, length, seed, id_offset + i) for i in range(n_series)]
    )


def series_collection(
    spark: SparkSession, *, n_series: int, length: int = 64, kind: str = "walk",
    seed: int = 0, id_offset: int = 0, partitions: int | None = None,
) -> DataFrame:
    """Distributed data series collection: (id long, series array<double>).

    Generated with ``spark.range`` + ``mapInPandas`` so nothing large
    ever sits on the driver; per-id seeding keeps it deterministic
    regardless of partitioning.
    """
    import pandas as pd  # local: keep worker-side imports explicit

    ids = spark.range(id_offset, id_offset + n_series, 1, partitions or 8)

    def gen(batches):
        for pdf in batches:
            if len(pdf) == 0:
                continue
            rows = [_one_series(kind, length, seed, int(i)) for i in pdf["id"]]
            yield pd.DataFrame({"id": pdf["id"].to_numpy(), "series": rows})

    return ids.mapInPandas(gen, schema="id long, series array<double>")


def query_workload(
    *, n_queries: int, length: int = 64, kind: str = "walk", seed: int = 10_000_000
) -> np.ndarray:
    """Query series drawn from the same process as the dataset (paper §5
    Workloads), under a disjoint seed so they are not dataset members."""
    return series_matrix(n_series=n_queries, length=length, kind=kind, seed=seed)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )
