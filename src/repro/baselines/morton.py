"""3-D Morton (Z-order) codes — substrate for the Draco- and
TMC13-like point-cloud coders (space-filling-curve ordering, octree
level extraction). Standard bit-spreading implementation, vectorized;
supports up to 21 bits per dimension (63-bit codes).
"""
from __future__ import annotations

import numpy as np

_MASKS = [
    (np.uint64(0x1FFFFF), np.uint64(0)),
    (np.uint64(0x1F00000000FFFF), np.uint64(32)),
    (np.uint64(0x1F0000FF0000FF), np.uint64(16)),
    (np.uint64(0x100F00F00F00F00F), np.uint64(8)),
    (np.uint64(0x10C30C30C30C30C3), np.uint64(4)),
    (np.uint64(0x1249249249249249), np.uint64(2)),
]


def _spread(v: np.ndarray) -> np.ndarray:
    v = v.astype(np.uint64) & _MASKS[0][0]
    for mask, shift in _MASKS[1:]:
        v = (v | (v << shift)) & mask
    return v


def _compact(v: np.ndarray) -> np.ndarray:
    v = v.astype(np.uint64) & _MASKS[5][0]
    v = (v ^ (v >> np.uint64(2))) & _MASKS[4][0]
    v = (v ^ (v >> np.uint64(4))) & _MASKS[3][0]
    v = (v ^ (v >> np.uint64(8))) & _MASKS[2][0]
    v = (v ^ (v >> np.uint64(16))) & _MASKS[1][0]
    v = (v ^ (v >> np.uint64(32))) & _MASKS[0][0]
    return v


def encode(xyz: np.ndarray) -> np.ndarray:
    """Interleave (N, 3) non-negative ints (< 2^21 each) into Morton
    codes."""
    xyz = np.asarray(xyz, dtype=np.int64)
    if xyz.size and xyz.max() >= (1 << 21):
        raise ValueError("morton supports < 2^21 per dimension")
    if xyz.size and xyz.min() < 0:
        raise ValueError("morton needs non-negative coordinates")
    return (
        _spread(xyz[:, 0])
        | (_spread(xyz[:, 1]) << np.uint64(1))
        | (_spread(xyz[:, 2]) << np.uint64(2))
    )


def decode(codes: np.ndarray) -> np.ndarray:
    codes = np.asarray(codes, dtype=np.uint64)
    return np.stack(
        [
            _compact(codes),
            _compact(codes >> np.uint64(1)),
            _compact(codes >> np.uint64(2)),
        ],
        axis=1,
    ).astype(np.int64)
