"""LCP-T — the temporal compressor (§7.1).

Quantizes the current frame with the LCP-S error-bound-aware scheme
(Eq. 5), predicts it from the previous frame's *reconstruction*
(re-quantized onto the current frame's grid so mixed error bounds —
e.g. a precision-scaled anchor, §7.4.2 — compose exactly), and codes
the integer difference with Huffman + Zstd.

Both sides must present ``prev_recon`` in the same (canonical)
particle order; the multi-frame driver in ``core/lcp.py`` maintains
that order. The error bound holds by construction: the decoder
recovers the *exact* quantized bins of the current frame.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from . import container, intcodec, quantize


@dataclass
class TemporalResult:
    payload: bytes
    recon: np.ndarray  # (N, d) reconstruction, same order as prev_recon


def compress(
    coords: np.ndarray, prev_recon: np.ndarray, eb: float
) -> TemporalResult:
    coords = np.asarray(coords, dtype=np.float64)
    prev_recon = np.asarray(prev_recon, dtype=np.float64)
    if coords.shape != prev_recon.shape:
        raise ValueError("LCP-T needs matching particle counts across frames")
    n, d = coords.shape
    q, mins = quantize.quantize(coords, eb)
    q_prev_hat, _ = quantize.quantize(prev_recon, eb, mins)
    diff = q - q_prev_hat
    blobs = [intcodec.encode_ints(diff[:, k], use_delta=False) for k in range(d)]
    header = container.pack_blobs(
        container.pack_i64(n, d), container.pack_f64(eb, *mins)
    )
    payload = container.pack_blobs(header, *blobs)
    recon = quantize.dequantize(q, eb, mins)
    return TemporalResult(payload=payload, recon=recon)


def decompress(payload: bytes, prev_recon: np.ndarray) -> np.ndarray:
    prev_recon = np.asarray(prev_recon, dtype=np.float64)
    header_blob = container.unpack_blobs(
        payload[: 8 + int.from_bytes(payload[:8], "little")], 1
    )[0]
    ints_blob, floats_blob = container.unpack_blobs(header_blob, 2)
    n, d = (int(v) for v in container.unpack_i64(ints_blob)[:2])
    floats = container.unpack_f64(floats_blob)
    eb, mins = float(floats[0]), floats[1 : 1 + d]
    blobs = container.unpack_blobs(payload, 1 + d)
    diff = np.stack([intcodec.decode_ints(b) for b in blobs[1:]], axis=1)
    q_prev_hat, _ = quantize.quantize(prev_recon, eb, mins)
    q = q_prev_hat + diff
    return quantize.dequantize(q, eb, mins)
