"""Tests for the harmonic-regression forecaster (TBATS substitute)."""
import numpy as np
import pytest

from repro.forecast.harmonic import (clean_periods, evaluate_forecast,
                                     fit_predict, mae, rmse)


def _multi(n, periods, amps, noise=0.0, seed=0):
    rng = np.random.default_rng(seed)
    t = np.arange(n)
    y = sum(a * np.sin(2 * np.pi * t / T) for a, T in zip(amps, periods))
    return y + rng.normal(0, noise, n)


class TestCleanPeriods:
    def test_dedup_sort(self):
        assert clean_periods([24, 12, 24], 840) == [12, 24]

    def test_drops_out_of_range(self):
        assert clean_periods([1, 500, 24], 840) == [24]

    def test_empty(self):
        assert clean_periods([], 840) == []


class TestFitPredict:
    def test_perfect_on_pure_signal(self):
        y = _multi(400, [20, 50], [1.0, 2.0])
        pred = fit_predict(y[:300], [20, 50], 100)
        np.testing.assert_allclose(pred, y[300:], atol=1e-6)

    def test_horizon_length(self):
        y = _multi(300, [20], [1.0])
        assert fit_predict(y[:200], [20], 77).size == 77

    def test_no_periods_trend_only(self):
        t = np.arange(300, dtype=float)
        y = 1.0 + 0.01 * t
        pred = fit_predict(y[:200], [], 50)
        np.testing.assert_allclose(pred, y[200:250], atol=1e-8)

    def test_correct_periods_beat_wrong_periods(self):
        y = _multi(1680, [12, 24, 168], [1, 1, 2], noise=0.1, seed=1)
        good = fit_predict(y[:840], [12, 24, 168], 168)
        bad = fit_predict(y[:840], [17, 90], 168)
        actual = y[840:1008]
        assert rmse(good, actual) < rmse(bad, actual)

    def test_missing_period_hurts(self):
        y = _multi(1680, [12, 24, 168], [1, 1, 2], noise=0.1, seed=2)
        full = fit_predict(y[:840], [12, 24, 168], 168)
        part = fit_predict(y[:840], [12, 24], 168)
        actual = y[840:1008]
        assert rmse(full, actual) < rmse(part, actual)


class TestMetrics:
    def test_rmse_zero_on_equal(self):
        a = np.arange(10.0)
        assert rmse(a, a) == 0.0

    def test_mae_known_value(self):
        assert mae(np.array([1.0, 2.0]), np.array([2.0, 4.0])) == 1.5

    def test_rmse_ge_mae(self):
        rng = np.random.default_rng(3)
        a, b = rng.normal(0, 1, (2, 100))
        assert rmse(a, b) >= mae(a, b)


class TestEvaluate:
    def test_keys_and_positive(self):
        y = _multi(1680, [12, 24, 168], [1, 1, 2], noise=0.2, seed=4)
        out = evaluate_forecast(y, 840, (84, 168), [12, 24, 168])
        assert set(out) == {84, 168}
        for h in out.values():
            assert h["rmse"] > 0 and h["mae"] > 0
