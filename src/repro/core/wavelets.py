"""Daubechies wavelet filters, MODWT/DWT transforms, and the robust
unbiased wavelet variance of Eq. 4.

No pywt/scipy in this container, so the filters are built here:

* db1 (Haar) and db2 use the exact closed-form coefficients;
* db3..db10 are computed by spectral factorization (roots of the
  Daubechies polynomial via ``numpy.roots``), the standard construction
  from Daubechies (1992) — property tests assert Σh=√2, unit energy and
  orthonormality of even shifts.

Conventions follow Percival & Walden (2000), the reference the paper
cites for MODWT: ``g`` is the *scaling* (low-pass) filter, ``h`` the
*wavelet* (high-pass) filter with the QMF relation
``h_l = (−1)^l · g_{L−1−l}``.  MODWT uses the rescaled filters
``h̃ = h/√2``, ``g̃ = g/√2`` and circular filtering, giving the
energy-preserving, shift-invariant transform of §3.3 whose level-j
wavelet coefficients carry the nominal octave band
``1/2^{j+1} ≤ |f| ≤ 1/2^j`` (period band ``[2^j, 2^{j+1}]``).
"""
from __future__ import annotations

from functools import lru_cache
from math import comb

import numpy as np

from .robust_stats import biweight_midvariance

_SQRT2 = np.sqrt(2.0)

# Exact closed forms for the two smallest filters (cross-checks for the
# spectral factorization path).
_EXACT_SCALING = {
    1: np.array([1.0, 1.0]) / _SQRT2,
    2: np.array(
        [1 + np.sqrt(3.0), 3 + np.sqrt(3.0), 3 - np.sqrt(3.0), 1 - np.sqrt(3.0)]
    )
    / (4.0 * _SQRT2),
}


@lru_cache(maxsize=None)
def daubechies_scaling(p: int) -> np.ndarray:
    """Length-2p scaling (low-pass) filter of the Daubechies wavelet with
    ``p`` vanishing moments (extremal-phase / minimum-delay variant).

    Construction: the Daubechies polynomial
    ``P(y) = Σ_{k<p} C(p−1+k, k) y^k`` is factored; each root ``y0`` maps
    to the quadratic ``z² + (4y0 − 2)z + 1 = 0`` via ``y = (2−z−z⁻¹)/4``,
    from which the root inside the unit circle is kept.  The filter is
    ``h0(z) ∝ (1+z)^p · Π (z − z_i)``, normalized to Σ = √2.
    """
    if p < 1:
        raise ValueError("vanishing moments must be >= 1")
    if p in _EXACT_SCALING:
        return _EXACT_SCALING[p].copy()
    # Roots of P(y).
    coeffs = [comb(p - 1 + k, k) for k in range(p - 1, -1, -1)]  # highest first
    yroots = np.roots(coeffs)
    zroots = []
    for y0 in yroots:
        # z² + (4y0−2) z + 1 = 0
        b = 4.0 * y0 - 2.0
        disc = np.sqrt(b * b - 4.0 + 0j)
        for z in ((-b + disc) / 2.0, (-b - disc) / 2.0):
            if abs(z) < 1.0:
                zroots.append(z)
                break
    # Build polynomial (1+z)^p * prod(z - z_i); poly coefficients via convolve.
    poly = np.array([1.0 + 0j])
    for _ in range(p):
        poly = np.convolve(poly, np.array([1.0, 1.0]))  # (z + 1)
    for z0 in zroots:
        poly = np.convolve(poly, np.array([1.0, -z0]))
    g = np.real(poly)
    g = g * (_SQRT2 / g.sum())
    # Orthonormality fix-up: scale so Σg² = 1 exactly (they coincide
    # analytically; renormalize against accumulated floating error).
    g = g / np.sqrt(np.sum(g * g))
    return g


def daubechies_wavelet(p: int) -> np.ndarray:
    """Wavelet (high-pass) filter via the QMF relation."""
    g = daubechies_scaling(p)
    L = g.size
    return np.array([(-1) ** l * g[L - 1 - l] for l in range(L)])


def _parse_wavelet(name: str) -> int:
    if not name.startswith("db"):
        raise ValueError(f"unsupported wavelet {name!r}; use 'dbN'")
    return int(name[2:])


def filter_width(j: int, L1: int) -> int:
    """Level-j equivalent filter width ``L_j = (2^j − 1)(L1 − 1) + 1``."""
    return (2**j - 1) * (L1 - 1) + 1


def max_usable_level(n: int, wavelet: str = "db2", requested: int = 8) -> int:
    """Largest level J ≤ requested whose period band still fits at least
    two full cycles in the series: ``2^{J+1} ≤ n/2``.  (Deeper levels can
    never yield a validatable period; the paper's level-8 rows on N=1000
    are all rejected.)"""
    j = int(np.floor(np.log2(max(n, 8) / 4.0)))
    return max(1, min(requested, j))


def modwt(x: np.ndarray, wavelet: str = "db2", level: int = 8):
    """Maximal-overlap DWT (circular, pyramid algorithm).

    Returns ``(W, v)`` where ``W`` is a (level, N) array of wavelet
    coefficients ``w_{j,t}`` and ``v`` the final (level-J) scaling
    coefficients.  Satisfies ``||x||² = Σ_j ||W[j]||² + ||v||²``.
    """
    x = np.asarray(x, dtype=float)
    n = x.size
    p = _parse_wavelet(wavelet)
    g = daubechies_scaling(p) / _SQRT2
    h = daubechies_wavelet(p) / _SQRT2
    L = g.size
    W = np.empty((level, n))
    v = x.copy()
    t = np.arange(n)
    for j in range(1, level + 1):
        stride = 2 ** (j - 1)
        wj = np.zeros(n)
        vj = np.zeros(n)
        for l in range(L):
            idx = (t - stride * l) % n
            vl = v[idx]
            wj += h[l] * vl
            vj += g[l] * vl
        W[j - 1] = wj
        v = vj
    return W, v


def dwt(x: np.ndarray, wavelet: str = "db2", level: int = 4):
    """Decimated circular DWT (for the Wavelet-Fisher baseline).

    The input is truncated to a multiple of ``2^level``.  Returns the list
    of detail coefficient arrays ``[d_1, …, d_J]`` and the final
    approximation ``a_J``.
    """
    x = np.asarray(x, dtype=float)
    p = _parse_wavelet(wavelet)
    g = daubechies_scaling(p)
    h = daubechies_wavelet(p)
    L = g.size
    n = (x.size // 2**level) * 2**level
    v = x[:n].copy()
    details = []
    for _ in range(level):
        m = v.size
        t2 = 2 * np.arange(m // 2) + 1
        d = np.zeros(m // 2)
        a = np.zeros(m // 2)
        for l in range(L):
            idx = (t2 - l) % m
            vl = v[idx]
            d += h[l] * vl
            a += g[l] * vl
        details.append(d)
        v = a
    return details, v


def robust_wavelet_variance(W: np.ndarray, wavelet: str = "db2",
                            robust: bool = True) -> np.ndarray:
    """Per-level robust unbiased wavelet variance (Eq. 4).

    Boundary coefficients (the first ``L_j − 1``, affected by circular
    wrap-around) are excluded; the biweight midvariance replaces the plain
    variance for robustness.  ``robust=False`` gives the classical
    variance on the same non-boundary window (NR-RobustPeriod ablation).
    """
    L1 = daubechies_scaling(_parse_wavelet(wavelet)).size
    n = W.shape[1]
    out = np.zeros(W.shape[0])
    for j in range(1, W.shape[0] + 1):
        lj = filter_width(j, L1)
        # Strict unbiasedness needs L_j ≤ N; at deep levels of long filters
        # (the paper runs 8 levels on N=1000, where L_8 > N for any db≥2)
        # we cap the trim at N/2 so the estimate keeps ≥ half the sample.
        start = min(lj - 1, n // 2)
        w = W[j - 1, start:]
        out[j - 1] = biweight_midvariance(w) if robust else float(np.var(w))
    return out
