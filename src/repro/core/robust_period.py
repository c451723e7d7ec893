"""The RobustPeriod pipeline (paper §3, Fig. 1).

``detect(y)`` →  sorted list of detected integer periods.

Steps: preprocess (§3.2) → MODWT decoupling + robust unbiased wavelet
variance ranking (§3.3) → per-level Huber-periodogram + Fisher's test for
a candidate, Huber-ACF-Med for validation (§3.4) → cross-level merge.

Per-level diagnostics (variance, p-value, candidate, final period) are
returned for the Fig. 5-style introspection tests.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from .acf import acf_med_period, huber_acf
from .fisher import fisher_test
from .huber_periodogram import huber_periodogram, ordinary_periodogram
from .preprocess import preprocess
from .wavelets import max_usable_level, modwt, robust_wavelet_variance


@dataclass
class LevelResult:
    """Diagnostics for one wavelet level (one row of the paper's Fig. 5)."""
    level: int
    variance: float
    selected: bool = False
    pvalue: float = 1.0
    candidate: int = 0          # period from Fisher's test (N'/k*), 0 = none
    k_star: int = 0
    period: int = 0             # final period after Huber-ACF-Med, 0 = none


@dataclass
class RobustPeriodResult:
    periods: list[int] = field(default_factory=list)
    levels: list[LevelResult] = field(default_factory=list)


def merge_periods(cands: list[tuple[int, float]],
                  rel_tol: float = 0.1) -> list[int]:
    """Collapse near-duplicate periods detected at adjacent levels.

    ``cands`` is (period, weight) — the weight is the level's wavelet
    variance; within a cluster (relative gap ≤ rel_tol) the highest-weight
    period wins.  Returns sorted unique periods.
    """
    if not cands:
        return []
    cands = sorted(cands)
    out: list[tuple[int, float]] = []
    for p, w in cands:
        if out and abs(p - out[-1][0]) <= rel_tol * max(p, out[-1][0]):
            if w > out[-1][1]:
                out[-1] = (p, w)
        else:
            out.append((p, w))
    return sorted(p for p, _ in out)


def detect_full(
    y: np.ndarray,
    *,
    wavelet: str = "db10",
    max_level: int = 12,
    energy_frac: float = 0.05,
    alpha: float = 0.01,
    lamb: float | None = None,
    c: float = 3.0,
    min_period: int = 4,
    huber: bool = True,
    robust_variance: bool = True,
    use_huber_acf: bool = True,
) -> RobustPeriodResult:
    """Run RobustPeriod with diagnostics.

    The ``huber``/``robust_variance``/``use_huber_acf`` switches exist for
    the NR-RobustPeriod ablation (Table 5) which shares this procedure
    with all robust estimators replaced by their classical counterparts.

    ``max_level`` is a ceiling only; the usable depth is governed by the
    series length (``max_usable_level``).  The paper's Fig. 5 runs 8
    levels on N=1000; a daily period at minute resolution (T=1440, the
    cloud datasets of Table 4) needs level 10, hence the default of 12.
    """
    y = np.asarray(y, dtype=float)
    n = y.size
    res = RobustPeriodResult()
    if n < 16:
        return res
    x = preprocess(y, lamb=lamb, c=c)
    J = max_usable_level(n, wavelet, max_level)
    W, _ = modwt(x, wavelet, J)
    nu2 = robust_wavelet_variance(W, wavelet, robust=robust_variance)
    total = float(nu2.sum())
    order = np.argsort(nu2)[::-1]
    res.levels = [LevelResult(level=j + 1, variance=float(nu2[j]))
                  for j in range(J)]
    n_prime = 2 * n
    found: list[tuple[int, float]] = []
    for j in order:
        lev = res.levels[j]
        if total > 0 and nu2[j] < energy_frac * total:
            continue
        lev.selected = True
        w = W[j]
        xp = np.concatenate([w, np.zeros(n)])
        band_lo = n_prime // 2 ** (j + 2)
        band_hi = n_prime // 2 ** (j + 1)
        if huber:
            P = huber_periodogram(xp, exact_band=(band_lo, band_hi), n_data=n)
        else:
            P = ordinary_periodogram(xp)
        sig, k_star, p = fisher_test(P, alpha=alpha)
        lev.pvalue = p
        if not sig or k_star < 1:
            continue
        cand = int(round(n_prime / k_star))
        lev.k_star = k_star
        lev.candidate = cand
        if cand < min_period or cand > n // 2:
            continue
        if use_huber_acf:
            a = huber_acf(P, n)
        else:
            from .acf import classic_acf
            a = classic_acf(w)
        period = acf_med_period(a, k_star, n)
        lev.period = period
        if period >= min_period:
            found.append((period, float(nu2[j])))
    res.periods = merge_periods(found)
    return res


def detect(y: np.ndarray, **kw) -> list[int]:
    """Detected periods of the input series (sorted ascending)."""
    return detect_full(y, **kw).periods
