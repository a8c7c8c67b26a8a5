"""LCP-S — the error-bound aware block-wise spatial compressor (§6).

Pipeline per frame:
  1. quantize coordinates with the user error bound (Eq. 5);
  2. partition space into blocks of size ``2*eb*p`` (Eq. 6), keep only
     non-empty blocks;
  3. serialize the three §6.2.1 streams — delta-coded block ids,
     particle counts, per-dimension relative locations — each through
     delta → {Huffman | fixed-length} → Zstd (§6.2.2).

Decompression returns coordinates in *block-sorted order*; the
block-sort permutation is returned to the caller at compression time
(for temporal alignment and error verification) but never serialized
— see DESIGN.md, "Particle-order semantics".
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from . import blocks, container, intcodec, quantize

DEFAULT_P = 64  # block scale; tuned per input by core/optimize.py (§7.4.1)


@dataclass
class SpatialResult:
    payload: bytes  # self-contained compressed frame
    perm: np.ndarray  # block-sort permutation (not part of payload)
    recon: np.ndarray  # (N, d) reconstruction in block-sorted order
    stream_sizes: dict  # per-stream compressed bytes (for Fig. 5-style breakdown)


def compress(coords: np.ndarray, eb: float, p: int = DEFAULT_P) -> SpatialResult:
    coords = np.asarray(coords, dtype=np.float64)
    n, d = coords.shape
    if n == 0:
        raise ValueError("LCP-S frames must contain at least one particle")
    q, mins = quantize.quantize(coords, eb)
    asg = blocks.assign(q, p)
    id_blob = intcodec.encode_ints(asg.block_ids, use_delta=True)
    cnt_blob = intcodec.encode_ints(asg.counts, use_delta=True)
    rel_blobs = [
        intcodec.encode_ints(asg.rel[:, k], use_delta=True) for k in range(d)
    ]
    header = container.pack_blobs(
        container.pack_i64(n, d, p, *asg.bn),
        container.pack_f64(eb, *mins),
    )
    payload = container.pack_blobs(header, id_blob, cnt_blob, *rel_blobs)
    q_recon = blocks.reconstruct_q(asg.block_ids, asg.counts, asg.rel, asg.bn, p)
    recon = quantize.dequantize(q_recon, eb, mins)
    return SpatialResult(
        payload=payload,
        perm=asg.perm,
        recon=recon,
        stream_sizes={
            "block_id": len(id_blob),
            "count": len(cnt_blob),
            "relative": sum(len(b) for b in rel_blobs),
        },
    )


def decompress(payload: bytes) -> np.ndarray:
    """Rebuild coordinates (block-sorted order) from an LCP-S payload."""
    # Header is blob 0; we don't know d until it is read, so peel it first.
    header_blob = container.unpack_blobs(
        payload[: 8 + int.from_bytes(payload[:8], "little")], 1
    )[0]
    ints_blob, floats_blob = container.unpack_blobs(header_blob, 2)
    ints = container.unpack_i64(ints_blob)
    n, d, p = int(ints[0]), int(ints[1]), int(ints[2])
    bn = ints[3 : 3 + d]
    floats = container.unpack_f64(floats_blob)
    eb, mins = float(floats[0]), floats[1 : 1 + d]
    blobs = container.unpack_blobs(payload, 3 + d)
    id_blob, cnt_blob, rel_blobs = blobs[1], blobs[2], blobs[3:]
    block_ids = intcodec.decode_ints(id_blob)
    counts = intcodec.decode_ints(cnt_blob)
    rel = np.stack([intcodec.decode_ints(b) for b in rel_blobs], axis=1)
    q = blocks.reconstruct_q(block_ids, counts, rel, bn, p)
    if len(q) != n:
        raise ValueError(f"decoded {len(q)} particles, expected {n}")
    return quantize.dequantize(q, eb, mins)
