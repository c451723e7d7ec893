"""Unit tests for ordinary/Huber/LAD periodograms."""
import numpy as np
import pytest

from repro.core.huber_periodogram import (huber_periodogram, lad_periodogram,
                                          m_periodogram, ordinary_periodogram)


def _sin(n, T, amp=1.0, phase=0.3):
    return amp * np.sin(2 * np.pi * np.arange(n) / T + phase)


class TestOrdinaryPeriodogram:
    def test_length(self):
        assert ordinary_periodogram(np.zeros(100)).size == 51

    def test_parseval(self):
        # Σ_k full-range P_k = Σ x² (DFT energy identity, Eq. 5 scaling).
        rng = np.random.default_rng(0)
        x = rng.normal(0, 1, 128)
        P = ordinary_periodogram(x)
        full = np.concatenate([P, P[1:-1][::-1]])
        assert full.sum() == pytest.approx((x**2).sum(), rel=1e-9)

    def test_peak_at_true_frequency(self):
        x = _sin(512, 32)
        P = ordinary_periodogram(x)
        assert np.argmax(P[1:]) + 1 == 16

    def test_sinusoid_peak_height(self):
        # |DFT|²/N at the exact bin = N·amp²/4.
        n, T = 512, 32
        P = ordinary_periodogram(_sin(n, T))
        assert P[n // T] == pytest.approx(n / 4.0, rel=1e-6)


class TestMPeriodogramEquivalences:
    def test_huber_equals_ordinary_on_clean_data(self):
        # With no outliers, residuals stay inside ζ·σ̂ and the Huber fit
        # reduces to OLS = the ordinary periodogram at Fourier bins.
        x = _sin(256, 16, amp=0.5)
        Ph = huber_periodogram(x)
        Po = ordinary_periodogram(x)
        assert Ph[16] == pytest.approx(Po[16], rel=0.05)

    def test_gaussian_noise_close_to_ordinary(self):
        rng = np.random.default_rng(1)
        x = rng.normal(0, 1, 256)
        Ph = huber_periodogram(x)
        Po = ordinary_periodogram(x)
        # Same order of magnitude on the bulk (Huber ≈ L2 for Gaussian).
        ratio = (Ph[1:] + 1e-6) / (Po[1:] + 1e-6)
        assert np.median(ratio) == pytest.approx(1.0, abs=0.3)

    def test_huber_robust_to_outliers(self):
        n, T = 512, 32
        x = _sin(n, T, amp=1.0)
        xc = x.copy()
        rng = np.random.default_rng(2)
        idx = rng.choice(n, 25, replace=False)
        xc[idx] += rng.uniform(5, 15, 25) * rng.choice([-1, 1], 25)
        Ph = huber_periodogram(xc)
        Po = ordinary_periodogram(xc)
        k = n // T
        # Huber: peak-to-background ratio much better than ordinary.
        bg_h = np.median(Ph[1:])
        bg_o = np.median(Po[1:])
        assert Ph[k] / max(bg_h, 1e-9) > Po[k] / max(bg_o, 1e-9)

    def test_exact_band_outside_is_ordinary(self):
        rng = np.random.default_rng(3)
        x = rng.normal(0, 1, 200)
        P = huber_periodogram(x, exact_band=(20, 40))
        Po = ordinary_periodogram(x)
        np.testing.assert_allclose(P[:20], Po[:20])
        np.testing.assert_allclose(P[41:], Po[41:])

    def test_exact_band_inside_differs_under_outliers(self):
        x = _sin(400, 20)
        x[::37] += 20.0
        P = huber_periodogram(x, exact_band=(15, 25))
        Po = ordinary_periodogram(x)
        assert not np.allclose(P[15:26], Po[15:26])

    def test_chunking_invariance(self):
        x = _sin(300, 30) + np.random.default_rng(4).normal(0, 0.3, 300)
        P1 = huber_periodogram(x, chunk=8)
        P2 = huber_periodogram(x, chunk=512)
        np.testing.assert_allclose(P1, P2, rtol=1e-4, atol=1e-8)

    def test_n_data_prefix_scale(self):
        # Padded series: scale must come from the unpadded prefix, so the
        # big spectral peak survives the robust fit.
        n, T = 400, 40
        w = _sin(n, T)
        xp = np.concatenate([w, np.zeros(n)])
        P = huber_periodogram(xp, n_data=n)
        k = 2 * n // T
        assert np.argmax(P[1:]) + 1 == k

    def test_zero_series(self):
        P = huber_periodogram(np.zeros(64))
        np.testing.assert_allclose(P, 0.0)

    def test_lad_differs_from_huber_under_outliers(self):
        x = _sin(256, 16)
        x[10] += 50
        Pl = lad_periodogram(x)
        Ph = huber_periodogram(x)
        assert not np.allclose(Pl, Ph)

    def test_invalid_band_returns_ordinary(self):
        x = _sin(128, 8)
        P = m_periodogram(x, exact_band=(60, 10))
        np.testing.assert_allclose(P, ordinary_periodogram(x))
