"""Unit tests for the data series generators (incl. Fig 7 sanity)."""
import numpy as np
import pytest

from repro.synth_data import (
    SERIES_KINDS,
    query_workload,
    series_collection,
    series_matrix,
)


class TestSeriesMatrix:
    @pytest.mark.parametrize("kind", SERIES_KINDS)
    def test_shape(self, kind):
        m = series_matrix(n_series=10, length=32, kind=kind, seed=0)
        assert m.shape == (10, 32)

    @pytest.mark.parametrize("kind", SERIES_KINDS)
    def test_znormalized(self, kind):
        m = series_matrix(n_series=20, length=64, kind=kind, seed=1)
        assert np.allclose(m.mean(axis=1), 0, atol=1e-9)
        assert np.allclose(m.std(axis=1), 1, atol=1e-9)

    def test_deterministic(self):
        a = series_matrix(n_series=5, length=16, seed=7)
        b = series_matrix(n_series=5, length=16, seed=7)
        assert np.array_equal(a, b)

    def test_seed_changes_data(self):
        a = series_matrix(n_series=5, length=16, seed=1)
        b = series_matrix(n_series=5, length=16, seed=2)
        assert not np.array_equal(a, b)

    def test_id_offset_slices_same_collection(self):
        full = series_matrix(n_series=10, length=16, seed=3)
        tail = series_matrix(n_series=4, length=16, seed=3, id_offset=6)
        assert np.array_equal(full[6:], tail)

    def test_unknown_kind_raises(self):
        with pytest.raises(ValueError, match="unknown series kind"):
            series_matrix(n_series=1, length=8, kind="nope")

    def test_astro_skew_direction(self):
        """Fig 7: astronomy data are skewed relative to random walk."""
        walk = series_matrix(n_series=200, length=64, kind="walk", seed=4).ravel()
        astro = series_matrix(n_series=200, length=64, kind="astro", seed=4).ravel()

        def skew(x):
            return float(np.mean(((x - x.mean()) / x.std()) ** 3))

        assert abs(skew(astro)) > abs(skew(walk))

    def test_seismic_denser_than_walk(self):
        """The real-data substitutes are denser: average pairwise NN
        distance is smaller than for random walks (the property that
        makes pruning harder, §5.3)."""
        def mean_nn(m):
            d = np.sqrt(
                ((m[:, None, :] - m[None, :, :]) ** 2).sum(-1)
            )
            np.fill_diagonal(d, np.inf)
            return d.min(axis=1).mean()

        walk = series_matrix(n_series=60, length=64, kind="walk", seed=5)
        seis = series_matrix(n_series=60, length=64, kind="seismic", seed=5)
        assert mean_nn(seis) < mean_nn(walk)


class TestSeriesCollection:
    def test_matches_matrix(self, spark):
        df = series_collection(spark, n_series=20, length=32, kind="walk", seed=9)
        pdf = df.toPandas().sort_values("id")
        mat = series_matrix(n_series=20, length=32, kind="walk", seed=9)
        assert np.allclose(np.stack(pdf["series"].to_numpy()), mat)

    def test_row_count(self, spark):
        assert series_collection(spark, n_series=57, length=16).count() == 57

    def test_partitioning_does_not_change_data(self, spark):
        a = series_collection(spark, n_series=30, length=16, seed=2, partitions=2)
        b = series_collection(spark, n_series=30, length=16, seed=2, partitions=7)
        pa = a.toPandas().sort_values("id").reset_index(drop=True)
        pb = b.toPandas().sort_values("id").reset_index(drop=True)
        assert all(np.allclose(x, y) for x, y in zip(pa["series"], pb["series"]))

    @pytest.mark.parametrize("kind", SERIES_KINDS)
    def test_kinds_work_distributed(self, spark, kind):
        df = series_collection(spark, n_series=8, length=32, kind=kind)
        assert df.count() == 8


class TestQueryWorkload:
    def test_disjoint_from_dataset(self):
        data = series_matrix(n_series=10, length=32, seed=0)
        qs = query_workload(n_queries=10, length=32, kind="walk")
        for q in qs:
            assert not any(np.allclose(q, d) for d in data)

    def test_shape(self):
        assert query_workload(n_queries=3, length=64).shape == (3, 64)
