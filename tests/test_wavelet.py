"""Unit tests for the wavelet filter banks and sparse/dense DWT paths."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core.wavelet import WAVELETS, cell_cols, dwt_dense, dwt_spark, get_wavelet

ALL_WAVELETS = sorted(WAVELETS)


class TestFilterBanks:
    @pytest.mark.parametrize("name", ALL_WAVELETS)
    def test_lowpass_sum_is_sqrt2(self, name):
        # every orthonormal/biorthogonal analysis low-pass sums to sqrt(2)
        w = WAVELETS[name]
        assert sum(w.taps) == pytest.approx(np.sqrt(2.0), abs=1e-10)

    @pytest.mark.parametrize("name", ["haar", "db2"])
    def test_orthonormal_filters_unit_energy(self, name):
        w = WAVELETS[name]
        assert sum(h * h for h in w.taps) == pytest.approx(1.0, abs=1e-10)

    @pytest.mark.parametrize("name", ALL_WAVELETS)
    def test_center_in_range(self, name):
        w = WAVELETS[name]
        assert 0 <= w.center < len(w.taps)

    def test_haar_fanout_one(self):
        assert WAVELETS["haar"].max_fanout == 1

    @pytest.mark.parametrize("name,fanout", [("db2", 2), ("cdf2.2", 3), ("cdf4.2", 5)])
    def test_fanouts(self, name, fanout):
        assert WAVELETS[name].max_fanout == fanout

    def test_get_wavelet_by_name_and_passthrough(self):
        w = get_wavelet("haar")
        assert get_wavelet(w) is w

    def test_get_wavelet_unknown_raises(self):
        with pytest.raises(ValueError, match="unknown wavelet"):
            get_wavelet("sym9")

    def test_cell_cols(self):
        assert cell_cols(3) == ["c0", "c1", "c2"]


class TestDenseDWT:
    def test_haar_1d_pairs_average(self):
        # haar low-pass of [a, b] -> (a + b)/sqrt(2) at the paired index
        a = np.array([2.0, 4.0, 6.0, 8.0])
        out = dwt_dense(a, "haar", levels=1)
        nz = out[out != 0]
        assert np.allclose(sorted(nz), sorted([(2 + 4) / np.sqrt(2), (6 + 8) / np.sqrt(2)]))

    def test_haar_mass_scaling(self):
        # each haar pass multiplies the total mass by 1/sqrt(2) per dim
        g = np.random.default_rng(0)
        a = g.random((8, 8))
        out = dwt_dense(a, "haar", levels=1)
        assert out.sum() == pytest.approx(a.sum() / 2.0)  # two dims

    def test_levels_shrink(self):
        a = np.ones((16, 16))
        out = dwt_dense(a, "haar", levels=2)
        assert out.shape == (4, 4)

    @pytest.mark.parametrize("name", ALL_WAVELETS)
    def test_constant_signal_stays_flat_inside(self, name):
        # a constant region maps to a constant region (per pass scaled by
        # sum(taps at each parity) = sqrt(2)/... for haar exactly)
        a = np.ones(64)
        out = dwt_dense(a, name, levels=1)
        interior = out[4:-4]
        assert np.allclose(interior, interior[0])

    def test_2d_peak_spreads(self):
        # a single spike spreads over the filter footprint; its largest
        # coefficient is spike * (center tap)^2 for an even-aligned spike
        a = np.zeros((16, 16))
        a[8, 8] = 100.0
        out = dwt_dense(a, "cdf2.2", levels=1)
        assert out.max() == pytest.approx(100.0 * (0.75 * np.sqrt(2)) ** 2)
        assert (np.abs(out) > 1e-12).sum() > 1  # it did spread


class TestSparseSparkDWT:
    @pytest.fixture()
    def grid_df(self, spark):
        def make(arr_2d):
            rows = [
                {"c0": int(i), "c1": int(j), "density": float(v)}
                for (i, j), v in np.ndenumerate(arr_2d)
                if v != 0
            ]
            return spark.createDataFrame(pd.DataFrame(rows))

        return make

    @pytest.mark.parametrize("name", ALL_WAVELETS)
    @pytest.mark.parametrize("levels", [1, 2])
    def test_sparse_matches_dense_values(self, spark, grid_df, name, levels):
        g = np.random.default_rng(hash((name, levels)) % 2**31)
        a = np.where(g.random((12, 12)) < 0.3, g.random((12, 12)) * 10, 0.0)
        if a.sum() == 0:
            a[3, 3] = 5.0
        dense = dwt_dense(a, name, levels=levels)
        sparse = dwt_spark(grid_df(a), 2, name, levels=levels).toPandas()
        got = np.sort(sparse[np.abs(sparse.density) > 1e-9].density.to_numpy())
        want = np.sort(dense[np.abs(dense) > 1e-9].ravel())
        assert np.allclose(got, want, atol=1e-9), f"{name} L{levels}"

    def test_haar_output_count_never_grows(self, spark, grid_df):
        g = np.random.default_rng(1)
        a = np.where(g.random((16, 16)) < 0.1, 1.0, 0.0)
        n_in = int((a != 0).sum())
        out = dwt_spark(grid_df(a), 2, "haar", levels=1)
        assert out.count() <= n_in

    def test_1d_sparse(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"c0": [0, 1, 5], "density": [1.0, 1.0, 2.0]}))
        out = dwt_spark(df, 1, "haar", levels=1).toPandas().sort_values("c0")
        # cells 0,1 pair into output 0; cell 5 (odd) pairs into output 2
        assert out.c0.tolist() == [0, 2]
        assert np.allclose(out.density.to_numpy(), [2 / np.sqrt(2), 2 / np.sqrt(2)])

    def test_deterministic(self, spark, grid_df):
        a = np.zeros((8, 8))
        a[2, 2] = 3.0
        a[5, 6] = 1.0
        r1 = dwt_spark(grid_df(a), 2, "cdf2.2", 1).toPandas().sort_values(["c0", "c1"])
        r2 = dwt_spark(grid_df(a), 2, "cdf2.2", 1).toPandas().sort_values(["c0", "c1"])
        pd.testing.assert_frame_equal(r1.reset_index(drop=True), r2.reset_index(drop=True))

    def test_3d_haar(self, spark):
        rows = [
            {"c0": 0, "c1": 0, "c2": 0, "density": 4.0},
            {"c0": 1, "c1": 1, "c2": 1, "density": 4.0},
        ]
        df = spark.createDataFrame(pd.DataFrame(rows))
        out = dwt_spark(df, 3, "haar", 1).toPandas()
        # both cells map to transformed cell (0,0,0); mass 8 / sqrt(2)^3
        assert len(out) == 1
        assert out.density.iloc[0] == pytest.approx(8.0 / 2 ** 1.5)
