"""Vectorized fixed- and variable-width bit packing.

This is the "fixed-length coding" stage of the paper's §6.2.2 coding
chain, and the bit-level substrate underneath the Huffman coder: both
need "write value *v* using *w* bits, MSB first" over millions of
values without a Python-level loop per value.

``pack_bits`` loops over *bit positions within a code* (bounded by the
maximum code width, <= 64 iterations) and is vectorized over values;
``unpack_fixed`` gathers 64-bit windows at arbitrary bit offsets, so it
is fully vectorized. Widths above 57 bits would straddle a 9-byte
window and are rejected on the unpack path — quantized particle data
never gets near that (see ``core/blocks.py``).
"""
from __future__ import annotations

import numpy as np

MAX_FIXED_WIDTH = 57


def width_for(max_value: int) -> int:
    """Bits needed to store values in ``[0, max_value]`` (min 1)."""
    if max_value < 0:
        raise ValueError("fixed-width coding needs non-negative values")
    return max(1, int(max_value).bit_length())


def pack_bits(values: np.ndarray, widths: np.ndarray | int) -> bytes:
    """Pack ``values[i]`` into ``widths[i]`` bits, MSB-first, contiguous."""
    values = np.asarray(values, dtype=np.uint64)
    n = len(values)
    if n == 0:
        return b""
    if np.isscalar(widths) or np.ndim(widths) == 0:
        widths = np.full(n, int(widths), dtype=np.int64)
    else:
        widths = np.asarray(widths, dtype=np.int64)
    total = int(widths.sum())
    starts = np.concatenate(([0], np.cumsum(widths)[:-1]))
    bits = np.zeros(total, dtype=np.uint8)
    max_w = int(widths.max())
    for k in range(max_w):
        mask = widths > k
        shift = (widths[mask] - 1 - k).astype(np.uint64)
        bits[starts[mask] + k] = (values[mask] >> shift) & np.uint64(1)
    return np.packbits(bits).tobytes()


def unpack_fixed(data: bytes, width: int, n: int) -> np.ndarray:
    """Inverse of :func:`pack_bits` with a scalar width; returns uint64."""
    if n == 0:
        return np.zeros(0, dtype=np.uint64)
    if width > MAX_FIXED_WIDTH:
        raise ValueError(f"width {width} exceeds {MAX_FIXED_WIDTH}")
    buf = np.frombuffer(data, dtype=np.uint8)
    # Pad so every 8-byte gather is in-bounds.
    buf = np.concatenate([buf, np.zeros(8, dtype=np.uint8)])
    pos = np.arange(n, dtype=np.int64) * width
    byte = pos >> 3
    shift = (pos & 7).astype(np.uint64)
    # Big-endian 64-bit window starting at `byte`.
    window = np.zeros(n, dtype=np.uint64)
    for j in range(8):
        window = (window << np.uint64(8)) | buf[byte + j].astype(np.uint64)
    out = (window << shift) >> np.uint64(64 - width)
    return out


def unpack_var(data: bytes, widths: np.ndarray) -> np.ndarray:
    """Inverse of :func:`pack_bits` with per-value widths (<= 57 bits)."""
    widths = np.asarray(widths, dtype=np.int64)
    n = len(widths)
    if n == 0:
        return np.zeros(0, dtype=np.uint64)
    if widths.max() > MAX_FIXED_WIDTH:
        raise ValueError("per-value width exceeds 57")
    buf = np.frombuffer(data, dtype=np.uint8)
    buf = np.concatenate([buf, np.zeros(8, dtype=np.uint8)])
    pos = np.concatenate(([0], np.cumsum(widths)[:-1]))
    byte = pos >> 3
    shift = (pos & 7).astype(np.uint64)
    window = np.zeros(n, dtype=np.uint64)
    for j in range(8):
        window = (window << np.uint64(8)) | buf[byte + j].astype(np.uint64)
    # width-w extraction: MSB-align at `shift`, then keep the top w bits.
    out = (window << shift) >> (64 - widths).astype(np.uint64)
    return out
