"""ZFP-like baseline [38]: transform coding of storage-order blocks.

ZFP partitions each array into fixed blocks (4 values in 1-D), applies
an orthogonal-ish integer lifting transform to decorrelate, and codes
the coefficients. In accuracy mode the quantization step is tied to
the tolerance. We reproduce that shape: per-coordinate column →
eb quantization (bound exact) → reversible 2-level integer Haar
lifting on blocks of 4 → per-block maximum-magnitude bit width
("block-floating-point" style) → fixed-length packing → Zstd.

Because particle storage order carries almost no smoothness, the
transform decorrelates nothing and ZFP's ratios/PSNR collapse on
particle data — the behaviour the paper reports (Fig. 14: PSNR 6.84
at CR 11.8 on Copper).
"""
from __future__ import annotations

import numpy as np

from ..core import bitcodec, container, dictcodec, quantize
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame


def _haar_forward(q: np.ndarray) -> np.ndarray:
    """Reversible integer Haar lifting on rows of 4 (S-transform)."""
    a, b, c, d = q[:, 0], q[:, 1], q[:, 2], q[:, 3]
    s0, d0 = (a + b) >> 1, a - b
    s1, d1 = (c + d) >> 1, c - d
    s2, d2 = (s0 + s1) >> 1, s0 - s1
    return np.stack([s2, d2, d0, d1], axis=1)


def _haar_inverse(t: np.ndarray) -> np.ndarray:
    s2, d2, d0, d1 = t[:, 0], t[:, 1], t[:, 2], t[:, 3]
    s0 = s2 + ((d2 + 1) >> 1)
    s1 = s0 - d2
    a = s0 + ((d0 + 1) >> 1)
    b = a - d0
    c = s1 + ((d1 + 1) >> 1)
    d = c - d1
    return np.stack([a, b, c, d], axis=1)


def _transform_column(v: np.ndarray) -> tuple[np.ndarray, int]:
    n = len(v)
    pad = (-n) % 4
    if pad:
        v = np.concatenate([v, np.repeat(v[-1:], pad)])
    return _haar_forward(v.reshape(-1, 4)), pad


class ZFP(BaseCodec):
    name = "zfp"

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        q, mins = quantize.quantize(coords, eb)
        blobs = []
        for k in range(d):
            t, pad = _transform_column(q[:, k])
            # zigzag per coefficient, per-block max width, bit-packed.
            zz = ((t << 1) ^ (t >> 63)).astype(np.uint64)
            bw = np.zeros(len(t), dtype=np.int64)
            m = zz.max(axis=1)
            bw = np.maximum(
                np.ceil(np.log2(m.astype(np.float64) + 1)), 1
            ).astype(np.int64)
            widths = np.repeat(bw, 4)
            packed = bitcodec.pack_bits(zz.ravel(), widths)
            bw_blob = bitcodec.pack_bits(bw.astype(np.uint64), 6)
            blobs.append(
                dictcodec.compress(
                    container.pack_blobs(
                        container.pack_i64(len(t), pad), bw_blob, packed
                    )
                )
            )
        payload = pack_frame(n, d, eb, mins, blobs)
        recon = quantize.dequantize(q, eb, mins)
        return FrameResult(payload=payload, perm=np.arange(n), recon=recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, _, eb, mins, blobs = unpack_frame(payload)
        cols = []
        for blob in blobs:
            body = dictcodec.decompress(blob)
            head, bw_blob, packed = container.unpack_blobs(body, 3)
            n_blk, pad = (int(x) for x in container.unpack_i64(head)[:2])
            bw = bitcodec.unpack_fixed(bw_blob, 6, n_blk).astype(np.int64)
            widths = np.repeat(bw, 4)
            zz = bitcodec.unpack_var(packed, widths)
            t = (
                (zz >> np.uint64(1)).astype(np.int64)
                ^ -(zz & np.uint64(1)).astype(np.int64)
            ).reshape(-1, 4)
            v = _haar_inverse(t).ravel()
            cols.append(v[: len(v) - pad] if pad else v)
        q = np.stack(cols, axis=1)
        return quantize.dequantize(q, eb, mins)
