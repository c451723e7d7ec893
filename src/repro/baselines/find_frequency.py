"""findFrequency baseline (Hyndman et al., R ``forecast::findfrequency``).

The R routine fits an AR model (order chosen by AIC, Yule–Walker
estimates) to the detrended series, evaluates the AR spectral density on
a fine grid, and returns ``round(1/f*)`` for the density's dominant
frequency — or 1 when no usable peak exists.  Re-implemented here with a
Levinson–Durbin recursion (no scipy/statsmodels offline).
"""
from __future__ import annotations

import numpy as np

from repro.core.preprocess import detrend_normalize


def _autocovariance(x: np.ndarray, max_lag: int) -> np.ndarray:
    n = x.size
    x = x - x.mean()
    f = np.fft.rfft(x, 2 * n)
    acov = np.fft.irfft(f.real**2 + f.imag**2, 2 * n)[: max_lag + 1] / n
    return acov


def _levinson(acov: np.ndarray, order: int):
    """Levinson–Durbin: AR(order) coefficients and innovation variance."""
    a = np.zeros(order + 1)
    a[0] = 1.0
    e = acov[0]
    for k in range(1, order + 1):
        if e <= 0:
            break
        lam = -(acov[1:k + 1][::-1] @ a[:k]) / e
        a[1:k + 1] = a[1:k + 1] + lam * a[:k][::-1]
        e *= (1.0 - lam**2)
    return a, max(e, 1e-12)


def ar_spectrum(x: np.ndarray, *, max_order: int | None = None,
                n_freq: int = 500):
    """AIC-selected Yule–Walker AR spectral density on ``n_freq`` points
    of (0, 0.5].  Returns (freqs, density)."""
    n = x.size
    if max_order is None:
        max_order = int(min(n - 1, 10 * np.log10(n)))
    acov = _autocovariance(x, max_order)
    best = (np.inf, None, None)
    for p in range(0, max_order + 1):
        a, e = _levinson(acov, p)
        aic = n * np.log(e) + 2 * (p + 1)
        if aic < best[0]:
            best = (aic, a[:p + 1], e)
    _, a, e = best
    freqs = np.linspace(0.5 / n_freq, 0.5, n_freq)
    z = np.exp(-2j * np.pi * np.outer(freqs, np.arange(a.size)))
    denom = np.abs(z @ a) ** 2
    dens = e / np.maximum(denom, 1e-12)
    return freqs, dens


def find_frequency(y: np.ndarray) -> int:
    """Dominant period by AR spectral density argmax (1 = none found)."""
    y = np.asarray(y, dtype=float)
    if y.size < 8:
        return 1
    x = detrend_normalize(y)
    freqs, dens = ar_spectrum(x)
    k = int(np.argmax(dens))
    # Mirror the R routine: an argmax at the very low end means "no finite
    # period"; walk to the next local max, else give up.
    if k == 0:
        rising = np.where(np.diff(dens) > 0)[0]
        if rising.size == 0:
            return 1
        seg = dens[rising[0] + 1:]
        k = rising[0] + 1 + int(np.argmax(seg))
    period = int(round(1.0 / freqs[k]))
    if period <= 1 or period > y.size // 2:
        return 1
    return period


def detect(y: np.ndarray) -> list[int]:
    """Uniform list-valued interface for the evaluation harness."""
    p = find_frequency(y)
    return [p] if p > 1 else []
