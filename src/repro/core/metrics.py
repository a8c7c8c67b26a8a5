"""Compression metrics from the paper's §4 plus the §6.2 diagnostics.

CR, bit rate, PSNR (Eq. 3), max pointwise error (Eq. 2), speed
(Eq. 4), Shannon entropy and lag-1 autocorrelation (Table 2).
"""
from __future__ import annotations

import numpy as np


def compression_ratio(original_bytes: int, compressed_bytes: int) -> float:
    return original_bytes / compressed_bytes


def bit_rate(compressed_bytes: int, n_values: int) -> float:
    """Average bits stored per data element (paper §4)."""
    return compressed_bytes * 8.0 / n_values


def max_error(original: np.ndarray, decoded: np.ndarray) -> float:
    """Eq. 2 — maximum absolute pointwise error."""
    return float(np.abs(np.asarray(original) - np.asarray(decoded)).max())


def psnr(original: np.ndarray, decoded: np.ndarray) -> float:
    """Eq. 3 — 20*log10(range / RMSE) over all coordinate values."""
    o = np.asarray(original, dtype=np.float64)
    d = np.asarray(decoded, dtype=np.float64)
    rng = float(o.max() - o.min())
    mse = float(np.mean((o - d) ** 2))
    if mse == 0.0:
        return float("inf")
    return 20.0 * np.log10(rng / np.sqrt(mse))


def speed_mb_s(n_bytes: int, seconds: float) -> float:
    """Eq. 4 — original MB processed per second."""
    return n_bytes / 1e6 / seconds


def shannon_entropy(values: np.ndarray) -> float:
    """Entropy in bits of the empirical symbol distribution (Table 2)."""
    _, counts = np.unique(np.asarray(values), return_counts=True)
    probs = counts / counts.sum()
    return float(-(probs * np.log2(probs)).sum())


def lag1_autocorrelation(values: np.ndarray) -> float:
    """Lag-1 autocorrelation of a sequence (Table 2). Returns 1.0 for a
    constant sequence (perfectly predictable, the limit blocking drives
    toward)."""
    v = np.asarray(values, dtype=np.float64)
    if len(v) < 2:
        return 1.0
    a, b = v[:-1], v[1:]
    sa, sb = a.std(), b.std()
    if sa == 0.0 or sb == 0.0:
        return 1.0
    return float(np.mean((a - a.mean()) * (b - b.mean())) / (sa * sb))
