"""Delta and zigzag transforms (§6.2.2, first stage of the coding chain).

The paper replaces each value by its difference from the previous one
before entropy coding; deltas can be negative, so the entropy stages
see them through the standard zigzag map (0,-1,1,-2,2 → 0,1,2,3,4),
which keeps small-magnitude values small and non-negative.
"""
from __future__ import annotations

import numpy as np


def delta_encode(a: np.ndarray) -> np.ndarray:
    """``out[0] = a[0]; out[i] = a[i] - a[i-1]`` as int64."""
    a = np.asarray(a, dtype=np.int64)
    if len(a) == 0:
        return a.copy()
    out = np.empty_like(a)
    out[0] = a[0]
    np.subtract(a[1:], a[:-1], out=out[1:])
    return out


def delta_decode(d: np.ndarray) -> np.ndarray:
    d = np.asarray(d, dtype=np.int64)
    return np.cumsum(d, dtype=np.int64)


def zigzag_encode(a: np.ndarray) -> np.ndarray:
    """Map signed int64 to unsigned: 0,-1,1,-2,2 → 0,1,2,3,4."""
    a = np.asarray(a, dtype=np.int64)
    return ((a << 1) ^ (a >> 63)).astype(np.uint64)


def zigzag_decode(u: np.ndarray) -> np.ndarray:
    u = np.asarray(u, dtype=np.uint64)
    return ((u >> np.uint64(1)).astype(np.int64)) ^ -(u & np.uint64(1)).astype(
        np.int64
    )
