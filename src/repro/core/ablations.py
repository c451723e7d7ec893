"""Ablation variants of RobustPeriod (paper §4.3.1, Table 5).

* **Huber-Fisher** — no MODWT decoupling: Huber-periodogram on the whole
  (preprocessed, zero-padded) series + Fisher's test → at most one period.
* **Huber-Siegel-ACF** — Huber-periodogram + Siegel's multi-peak test for
  candidates, validated by the AUTOPERIOD-style ACF hill check.
* **NR-RobustPeriod** — the full RobustPeriod procedure with every robust
  estimator swapped for its classical counterpart (plain wavelet
  variance, ordinary periodogram, classic ACF).
"""
from __future__ import annotations

import numpy as np

from .acf import classic_acf, resolution_interval
from .fisher import fisher_test, siegel_candidates
from .huber_periodogram import huber_periodogram
from .preprocess import preprocess
from .robust_period import detect as _rp_detect


def acf_hill_valid(acf_vals: np.ndarray, k: int, n_prime: int
                   ) -> tuple[bool, int]:
    """AUTOPERIOD validation: the candidate from periodogram index ``k``
    is kept iff the ACF has an interior local maximum ("hill") inside the
    candidate's resolution interval R_k; the refined period is that peak.
    """
    n = acf_vals.size
    lo, hi = resolution_interval(k, n_prime)
    lo_i = max(2, int(np.floor(lo)))
    hi_i = min(n - 2, int(np.ceil(hi)))
    if hi_i - lo_i < 2:
        return False, 0
    seg = acf_vals[lo_i:hi_i + 1]
    t_rel = int(np.argmax(seg))
    t = lo_i + t_rel
    interior = 0 < t_rel < (hi_i - lo_i)
    if interior and acf_vals[t] > 0 and acf_vals[t] > acf_vals[lo_i] \
            and acf_vals[t] > acf_vals[hi_i]:
        return True, t
    return False, 0


def huber_fisher(y: np.ndarray, *, alpha: float = 0.01,
                 min_period: int = 4) -> list[int]:
    """Huber-periodogram + Fisher's test, no wavelet decoupling."""
    y = np.asarray(y, dtype=float)
    n = y.size
    if n < 16:
        return []
    x = preprocess(y)
    xp = np.concatenate([x, np.zeros(n)])
    P = huber_periodogram(xp, n_data=n)
    sig, k_star, _ = fisher_test(P, alpha=alpha)
    if not sig or k_star < 1:
        return []
    period = int(round(2 * n / k_star))
    return [period] if min_period <= period <= n // 2 else []


def huber_siegel_acf(y: np.ndarray, *, alpha: float = 0.01,
                     min_period: int = 4) -> list[int]:
    """Huber-periodogram + Siegel candidates + ACF-hill validation."""
    y = np.asarray(y, dtype=float)
    n = y.size
    if n < 16:
        return []
    x = preprocess(y)
    xp = np.concatenate([x, np.zeros(n)])
    P = huber_periodogram(xp, n_data=n)
    ks = siegel_candidates(P, alpha=alpha)
    a = classic_acf(x)
    out = []
    for k in ks:
        cand = int(round(2 * n / k))
        if cand < min_period or cand > n // 2:
            continue
        ok, refined = acf_hill_valid(a, k, 2 * n)
        if ok:
            out.append(refined)
    return sorted(set(out))


def nr_robust_period(y: np.ndarray, **kw) -> list[int]:
    """Non-robust RobustPeriod: same procedure, classical estimators."""
    return _rp_detect(y, huber=False, robust_variance=False,
                      use_huber_acf=False, **kw)
