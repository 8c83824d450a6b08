"""Lightweight Empirical Mode Decomposition (EMD).

FiCSUM's "Entropy of intrinsic mode functions 1 & 2" meta-information
feature (Ding & Luo 2019) requires the first two IMFs of a short window.
Full EMD uses cubic-spline envelopes; scipy is not a dependency here, so
sifting uses linear-interpolated extrema envelopes instead. On the short
(w<=100) windows FiCSUM operates on, this isolates the same fast
oscillation modes the entropy feature consumes (see DESIGN.md
substitution #4).
"""
from __future__ import annotations

import numpy as np

_MAX_SIFT = 3


def _extrema(x: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Indices of local maxima and minima (interior points)."""
    d = np.sign(np.diff(x))
    prod = d[:-1] * d[1:]
    turn = np.flatnonzero(prod < 0) + 1
    maxima = turn[d[turn - 1] > 0]
    minima = turn[d[turn - 1] < 0]
    return maxima, minima


def _envelope(x: np.ndarray, idx: np.ndarray) -> np.ndarray:
    """Linear envelope through ``x[idx]``, padded with the end values."""
    n = len(x)
    pts_i = np.concatenate(([0], idx, [n - 1]))
    pts_v = np.concatenate(([x[idx[0]]], x[idx], [x[idx[-1]]]))
    return np.interp(np.arange(n), pts_i, pts_v)


def _sift(x: np.ndarray) -> np.ndarray | None:
    """One IMF from ``x`` via envelope-mean sifting; None if monotone."""
    h = x.astype(float)
    for _ in range(_MAX_SIFT):
        maxima, minima = _extrema(h)
        if len(maxima) < 2 or len(minima) < 2:
            return None if np.allclose(h, x) else h
        mean = 0.5 * (_envelope(h, maxima) + _envelope(h, minima))
        nh = h - mean
        if np.sum((h - nh) ** 2) <= 1e-10 * (np.sum(h**2) + 1e-12):
            break
        h = nh
    return h


def imfs(x: np.ndarray, n_imfs: int = 2) -> list[np.ndarray]:
    """First ``n_imfs`` intrinsic mode functions of ``x``.

    Returns fewer than ``n_imfs`` modes when the residue becomes
    monotone (short or trendless windows).
    """
    out: list[np.ndarray] = []
    residue = np.asarray(x, dtype=float)
    for _ in range(n_imfs):
        imf = _sift(residue)
        if imf is None:
            break
        out.append(imf)
        residue = residue - imf
    return out


def _mode_entropy(m: np.ndarray, bins: int) -> float:
    if np.ptp(m) <= 1e-12:
        return 0.0
    hist, _ = np.histogram(m, bins=bins)
    p = hist / hist.sum()
    p = p[p > 0]
    return float(-(p * np.log(p)).sum())


def imf_entropies(x: np.ndarray, n_imfs: int = 2, bins: int = 10) -> list[float]:
    """Shannon entropies (nats) of the first ``n_imfs`` IMFs, from a
    single decomposition. Missing modes (constant/monotone windows have
    no oscillation) yield the stable sentinel 0.0."""
    modes = imfs(x, n_imfs=n_imfs)
    out = [_mode_entropy(m, bins) for m in modes]
    out += [0.0] * (n_imfs - len(out))
    return out


def imf_entropy(x: np.ndarray, k: int, bins: int = 10) -> float:
    """Entropy of the k-th IMF (1-based); 0.0 when it does not exist."""
    return imf_entropies(x, n_imfs=k, bins=bins)[k - 1]
