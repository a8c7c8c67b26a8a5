"""The paper's full §6.2.2 coding chain for one integer array.

``encode_ints`` = (optional) delta → min-offset → {Huffman |
fixed-length, whichever has the shorter *expected* length, per
Table 3's observation that the winner is data-dependent} → Zstd.
Min-offset (subtract the minimum, store it in the header) maps signed
values to the tightest non-negative alphabet — strictly narrower than
zigzag, worth a whole bit on the fixed-length path. Every LCP stream
(block ids, particle counts, relative locations, temporal diffs) and
several baselines go through this one chain.
"""
from __future__ import annotations

import numpy as np

from . import bitcodec, container, delta, dictcodec, huffman

METHOD_FIXED = 0
METHOD_HUFFMAN = 1


def _prepare(a: np.ndarray, use_delta: bool):
    """delta (optional) then min-offset; returns (u, vmin)."""
    a = np.asarray(a, dtype=np.int64)
    work = delta.delta_encode(a) if use_delta else a
    if len(work) == 0:
        return work.astype(np.uint64), 0
    vmin = int(work.min())
    return (work - vmin).astype(np.uint64), vmin


def encode_ints(a: np.ndarray, *, use_delta: bool = True, zstd: bool = True) -> bytes:
    """Encode an int64 array losslessly with the §6.2.2 chain."""
    u, vmin = _prepare(a, use_delta)
    n = len(u)
    if n == 0:
        body = container.pack_blobs(
            container.pack_i64(0, METHOD_FIXED, 1, int(use_delta), 0), b""
        )
        return dictcodec.compress(body) if zstd else body
    width = bitcodec.width_for(int(u.max()))
    fixed_bits = width * n
    huff_bits = huffman.expected_bits(u)
    # Header overhead of the Huffman table: symbols + lengths, roughly.
    n_sym = len(np.unique(u))
    huff_overhead = n_sym * (width + 8) + 5 * 64
    if huff_bits + huff_overhead < fixed_bits:
        method = METHOD_HUFFMAN
        payload = huffman.encode(u)
    else:
        method = METHOD_FIXED
        payload = bitcodec.pack_bits(u, width)
    body = container.pack_blobs(
        container.pack_i64(n, method, width, int(use_delta), vmin), payload
    )
    return dictcodec.compress(body) if zstd else body


def decode_ints(data: bytes, *, zstd: bool = True) -> np.ndarray:
    body = dictcodec.decompress(data) if zstd else data
    header, payload = container.unpack_blobs(body, 2)
    n, method, width, used_delta, vmin = container.unpack_i64(header)[:5]
    if n == 0:
        return np.zeros(0, dtype=np.int64)
    if method == METHOD_HUFFMAN:
        u = huffman.decode(payload)
    else:
        u = bitcodec.unpack_fixed(payload, int(width), int(n))
    work = u.astype(np.int64) + vmin
    return delta.delta_decode(work) if used_delta else work


def encoded_sizes(a: np.ndarray, *, use_delta: bool = True) -> dict[str, int]:
    """Byte sizes of the Huffman vs fixed-length alternatives for ``a``,
    each followed by Zstd — the measurement behind Table 3."""
    u, vmin = _prepare(a, use_delta)
    if len(u) == 0:
        return {"huffman": 0, "fixed": 0}
    width = bitcodec.width_for(int(u.max()))
    fixed = dictcodec.compress(
        container.pack_blobs(
            container.pack_i64(len(u), METHOD_FIXED, width, int(use_delta), vmin),
            bitcodec.pack_bits(u, width),
        )
    )
    huff = dictcodec.compress(
        container.pack_blobs(
            container.pack_i64(
                len(u), METHOD_HUFFMAN, width, int(use_delta), vmin
            ),
            huffman.encode(u),
        )
    )
    return {"huffman": len(huff), "fixed": len(fixed)}
