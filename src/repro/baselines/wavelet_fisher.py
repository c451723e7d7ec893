"""Wavelet-Fisher baseline (Almasri 2011): decimated DWT decouples
periodicities; Fisher's test detects a single period per detail level.

A period detected at index k of level-j detail coefficients (length
``N_j = N/2^j``, sampled every ``2^j`` points) maps back to the original
sampling as ``(N_j / k) · 2^j``.
"""
from __future__ import annotations

import numpy as np

from repro.core.fisher import fisher_test
from repro.core.huber_periodogram import ordinary_periodogram
from repro.core.preprocess import detrend_normalize
from repro.core.robust_period import merge_periods


def detect(y: np.ndarray, *, wavelet: str = "db4", max_level: int = 8,
           alpha: float = 0.01, min_period: int = 2) -> list[int]:
    """Periods from per-level Fisher tests (near-duplicates merged)."""
    from repro.core.wavelets import dwt

    y = np.asarray(y, dtype=float)
    n = y.size
    if n < 32:
        return []
    x = detrend_normalize(y)
    level = max(1, min(max_level, int(np.log2(n)) - 3))
    details, _ = dwt(x, wavelet, level)
    found: list[tuple[int, float]] = []
    for j, d in enumerate(details, start=1):
        if d.size < 8:
            continue
        P = ordinary_periodogram(d)
        sig, k_star, _ = fisher_test(P, alpha=alpha)
        if not sig or k_star < 1:
            continue
        period = int(round(d.size / k_star * 2**j))
        if min_period <= period <= n // 2:
            found.append((period, float(np.var(d))))
    return merge_periods(found)
