"""AUTOPERIOD baseline (Vlachos, Yu & Castelli, SDM 2005).

Two-stage time/frequency method:

1. *Candidate generation*: periodogram ordinates whose power exceeds a
   permutation-derived threshold (the max periodogram power of shuffled
   copies, 95th percentile) become period hints ``N'/k``.
2. *Validation*: a hint is a true period iff it lies on a *hill* of the
   ACF — the ACF has an interior local maximum inside the hint's
   resolution interval; the refined period is that ACF peak.
"""
from __future__ import annotations

import numpy as np

from repro.core.ablations import acf_hill_valid
from repro.core.acf import classic_acf
from repro.core.huber_periodogram import ordinary_periodogram
from repro.core.preprocess import detrend_normalize


def _permutation_threshold(x: np.ndarray, n_perm: int, seed: int,
                           quantile: float) -> float:
    rng = np.random.default_rng(seed)
    maxima = np.empty(n_perm)
    for i in range(n_perm):
        xp = rng.permutation(x)
        P = ordinary_periodogram(np.concatenate([xp, np.zeros(x.size)]))
        maxima[i] = P[1:].max()
    return float(np.quantile(maxima, quantile))


def detect(y: np.ndarray, *, n_perm: int = 32, quantile: float = 0.95,
           seed: int = 0, min_period: int = 2) -> list[int]:
    """Validated periods (deduped, sorted)."""
    y = np.asarray(y, dtype=float)
    n = y.size
    if n < 16:
        return []
    x = detrend_normalize(y)
    xp = np.concatenate([x, np.zeros(n)])
    P = ordinary_periodogram(xp)
    thresh = _permutation_threshold(x, n_perm, seed, quantile)
    above = P > thresh
    above[0] = False
    # Collapse contiguous exceeding ordinates to their local maximum.
    ks = []
    i = 1
    while i < above.size:
        if above[i]:
            j = i
            while j + 1 < above.size and above[j + 1]:
                j += 1
            ks.append(int(np.argmax(P[i:j + 1])) + i)
            i = j + 1
        else:
            i += 1
    a = classic_acf(x)
    out = []
    for k in ks:
        cand = 2 * n / k
        if cand < min_period or cand > n // 2:
            continue
        ok, refined = acf_hill_valid(a, k, 2 * n)
        if ok:
            out.append(refined)
    return sorted(set(out))
