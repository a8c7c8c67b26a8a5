"""SZ2-like baseline: Lorenzo-predicted error-bounded compression.

SZ2 [35] quantizes the residual of a (1-D, storage-order) Lorenzo
prediction. In the integer-quantized domain used throughout this repo,
quantized-Lorenzo is exactly delta coding of the quantized values —
``code[i] = q[i] - q[i-1]`` with reconstruction ``q[i] = q[i-1] +
code[i]`` — which preserves the Eq. 2 bound exactly and is what SZ's
"linear-scaling quantization + prediction" collapses to on scattered
particle coordinates. Residuals go through Huffman + Zstd, SZ's own
back-end. Storage order != spatial order is precisely why this
underperforms LCP-S on particles (paper §6.2).
"""
from __future__ import annotations

import numpy as np

from ..core import intcodec, quantize
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame


class SZ2(BaseCodec):
    name = "sz2"

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        q, mins = quantize.quantize(coords, eb)
        blobs = [intcodec.encode_ints(q[:, k], use_delta=True) for k in range(d)]
        payload = pack_frame(n, d, eb, mins, blobs)
        recon = quantize.dequantize(q, eb, mins)
        return FrameResult(payload=payload, perm=np.arange(n), recon=recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, _, eb, mins, blobs = unpack_frame(payload)
        q = np.stack([intcodec.decode_ints(b) for b in blobs], axis=1)
        return quantize.dequantize(q, eb, mins)
