"""Binary container framing shared by every codec in this repo.

A *container* is a flat concatenation of length-prefixed blobs plus a
small JSON-free header of numpy scalars. Keeping the framing in one
place means every codec (LCP-S, LCP-T, baselines) serializes the same
way, and the size accounting in benchmarks counts exactly the bytes a
real on-disk format would need.
"""
from __future__ import annotations

import struct

import numpy as np

_LEN = struct.Struct("<Q")


def pack_blobs(*blobs: bytes) -> bytes:
    """Concatenate ``blobs`` with little-endian u64 length prefixes."""
    out = bytearray()
    for b in blobs:
        out += _LEN.pack(len(b))
        out += b
    return bytes(out)


def unpack_blobs(data: bytes, n: int) -> list[bytes]:
    """Split ``data`` (produced by :func:`pack_blobs`) into ``n`` blobs."""
    blobs, off = [], 0
    for _ in range(n):
        (ln,) = _LEN.unpack_from(data, off)
        off += _LEN.size
        blobs.append(bytes(data[off : off + ln]))
        off += ln
    if off != len(data):
        raise ValueError(f"trailing bytes in container: {len(data) - off}")
    return blobs


def pack_f64(*vals: float) -> bytes:
    """Serialize float64 scalars (used for per-frame mins / error bounds)."""
    return np.asarray(vals, dtype="<f8").tobytes()


def unpack_f64(data: bytes) -> np.ndarray:
    return np.frombuffer(data, dtype="<f8")


def pack_i64(*vals: int) -> bytes:
    """Serialize int64 scalars (counts, widths, shapes)."""
    return np.asarray(vals, dtype="<i8").tobytes()


def unpack_i64(data: bytes) -> np.ndarray:
    return np.frombuffer(data, dtype="<i8")
