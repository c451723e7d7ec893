"""Tests for the synthetic dataset suites."""
import json

import numpy as np
import pandas as pd
import pytest

from repro import datasets


class TestWaveform:
    @pytest.mark.parametrize("kind", datasets.WAVE_KINDS)
    def test_unit_amplitude(self, kind):
        w = datasets.waveform(kind, 20, 400)
        assert np.max(np.abs(w)) <= 1.0 + 1e-9
        assert np.max(np.abs(w)) > 0.9

    @pytest.mark.parametrize("kind", datasets.WAVE_KINDS)
    def test_periodicity(self, kind):
        w = datasets.waveform(kind, 25, 500)
        np.testing.assert_allclose(w[:100], w[25:125], atol=1e-9)

    def test_unknown_kind(self):
        with pytest.raises(ValueError):
            datasets.waveform("saw", 10, 100)


class TestSyntheticSeries:
    def test_deterministic(self):
        a = datasets.synthetic_series(seed=1)
        b = datasets.synthetic_series(seed=1)
        np.testing.assert_array_equal(a, b)

    def test_different_seeds_differ(self):
        assert not np.allclose(datasets.synthetic_series(seed=1),
                               datasets.synthetic_series(seed=2))

    def test_length(self):
        assert datasets.synthetic_series(n=777).size == 777

    def test_outlier_count(self):
        clean = datasets.synthetic_series(noise_var=0.0, outlier_ratio=0.0,
                                          seed=3)
        dirty = datasets.synthetic_series(noise_var=0.0, outlier_ratio=0.05,
                                          seed=3)
        n_out = np.sum(np.abs(dirty - clean) > 4.0)
        assert n_out == pytest.approx(50, abs=5)

    def test_trend_amplitude(self):
        y = datasets.synthetic_series(noise_var=0.0, outlier_ratio=0.0,
                                      trend=True, seed=4)
        yn = datasets.synthetic_series(noise_var=0.0, outlier_ratio=0.0,
                                       trend=False, seed=4)
        assert np.max(y - yn) == pytest.approx(10.0, abs=0.1)


class TestSuites:
    def test_suite_shapes(self):
        data, truth = datasets.synthetic_suite(n_series=5, n=100)
        assert len(data) == 500
        assert len(truth) == 5
        assert set(data.columns) == {"dataset", "series_id", "t", "y"}

    def test_truth_json_roundtrip(self):
        _, truth = datasets.synthetic_suite(n_series=2, periods=(20, 50))
        assert json.loads(truth.iloc[0]["periods"]) == [20, 50]

    def test_cran_like_properties(self):
        data, truth = datasets.cran_like(n_series=82)
        assert len(truth) == 82
        lengths = data.groupby("series_id")["t"].count()
        assert lengths.min() >= 16 and lengths.max() <= 3024
        for _, r in truth.iterrows():
            (T,) = json.loads(r["periods"])
            assert 2 <= T <= 52

    def test_cran_deterministic(self):
        d1, _ = datasets.cran_like(seed=3)
        d2, _ = datasets.cran_like(seed=3)
        pd.testing.assert_frame_equal(d1, d2)

    @pytest.mark.parametrize("which", ["A3", "A4"])
    def test_yahoo_like(self, which):
        data, truth = datasets.yahoo_like(which, n_series=3)
        assert data.groupby("series_id")["t"].count().eq(1680).all()
        assert json.loads(truth.iloc[0]["periods"]) == [12, 24, 168]

    def test_yahoo_a4_has_outliers(self):
        d3, _ = datasets.yahoo_like("A3", n_series=3)
        d4, _ = datasets.yahoo_like("A4", n_series=3)
        def spikiness(d):
            g = d.groupby("series_id")["y"]
            return ((g.max() - g.quantile(0.99)) / g.std()).mean()
        assert spikiness(d4) > spikiness(d3)

    def test_yahoo_invalid(self):
        with pytest.raises(ValueError):
            datasets.yahoo_like("A5")

    def test_cloud_like_structure(self):
        data, truth = datasets.cloud_like()
        assert sorted(truth["series_id"]) == [1, 2, 3, 4, 5, 6]
        lengths = data.groupby("series_id")["t"].count()
        assert lengths[1] == 4320 and lengths[5] == 7200
        assert datasets.truth_periods(truth, "cloud", 4) == [24, 168]
        assert datasets.truth_periods(truth, "cloud", 5) == [1440]

    def test_cloud_like_no_nans_after_interp(self):
        data, _ = datasets.cloud_like()
        assert data["y"].notna().all()

    def test_cloud_like_block_missing_applied(self):
        # Data-6 has more interpolated (locally-linear) runs than Data-5.
        data, _ = datasets.cloud_like()
        def flatness(sid):
            y = data[data.series_id == sid].sort_values("t")["y"].to_numpy()
            dd = np.abs(np.diff(y, 2))
            return np.mean(dd < 1e-12)
        assert flatness(6) > flatness(5) > 0.05

    def test_truth_periods_accessor(self):
        _, truth = datasets.synthetic_suite(n_series=2, name="x",
                                            periods=(10,))
        assert datasets.truth_periods(truth, "x", 1) == [10]
