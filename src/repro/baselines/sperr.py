"""SPERR-like baseline [33]: wavelet transform + outlier correction.

SPERR runs a multi-level wavelet transform, codes quantized
coefficients, and then — its signature trick — corrects any point
whose reconstruction error exceeds the bound with an explicit outlier
list, which is also why it is slow (a full reconstruct-and-check pass
inside compression). We reproduce exactly that structure with a
multi-level orthonormal Haar transform per coordinate column:
coefficients uniformly quantized with step proportional to eb, then an
encoder-side verification pass emits (index, residual) corrections so
Eq. 2 always holds. On particle storage order the wavelet spectrum is
flat, so ratios are poor and the outlier list is large — matching the
paper's observations (significant degradation at matched sizes,
slowest-tier speed).
"""
from __future__ import annotations

import numpy as np

from ..core import container, dictcodec, intcodec
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame

_SQRT2 = np.sqrt(2.0)


def _levels(n: int) -> int:
    """Dyadic levels over the largest power-of-two prefix (max 8)."""
    lv = 0
    size = 1
    while size * 2 <= n and lv < 8:
        size *= 2
        lv += 1
    return lv


def _haar_fwd(v: np.ndarray, levels: int) -> np.ndarray:
    """Orthonormal Haar over the 2^levels prefix; the remainder passes
    through untransformed (it is simply quantized as coefficients)."""
    out = v.astype(np.float64).copy()
    m = 1 << levels
    for _ in range(levels):
        a, b = out[:m:2].copy(), out[1:m:2].copy()
        out[: m // 2] = (a + b) / _SQRT2
        out[m // 2 : m] = (a - b) / _SQRT2
        m //= 2
    return out


def _haar_inv(v: np.ndarray, levels: int, n_total: int) -> np.ndarray:
    out = v.astype(np.float64).copy()
    m = 2
    for _ in range(levels):
        s = out[: m // 2].copy()
        d = out[m // 2 : m].copy()
        out[:m:2] = (s + d) / _SQRT2
        out[1:m:2] = (s - d) / _SQRT2
        m *= 2
    return out


class SPERR(BaseCodec):
    name = "sperr"

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        mins = coords.min(axis=0)
        levels = _levels(n)
        step = eb  # coefficient quantization step; outliers fix the rest
        blobs = []
        recon = np.empty_like(coords)
        for k in range(d):
            w = _haar_fwd(coords[:, k] - mins[k], levels)
            qc = np.round(w / step).astype(np.int64)
            rec = _haar_inv(qc * step, levels, n)
            err = (coords[:, k] - mins[k]) - rec
            out_idx = np.flatnonzero(np.abs(err) > eb)
            # Quantize the outlier residuals onto an eb grid so the
            # corrected value is within eb/1 of the original.
            out_fix = np.round(err[out_idx] / eb).astype(np.int64)
            rec[out_idx] += out_fix * eb
            recon[:, k] = rec + mins[k]
            blobs.append(
                container.pack_blobs(
                    intcodec.encode_ints(qc, use_delta=False),
                    intcodec.encode_ints(out_idx, use_delta=True),
                    intcodec.encode_ints(out_fix, use_delta=False),
                )
            )
        payload = pack_frame(n, d, eb, mins, blobs, extra_ints=(levels,))
        return FrameResult(payload=payload, perm=np.arange(n), recon=recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, extra, eb, mins, blobs = unpack_frame(payload)
        levels = extra[0]
        step = eb
        cols = []
        for k, blob in enumerate(blobs):
            qc_b, idx_b, fix_b = container.unpack_blobs(blob, 3)
            qc = intcodec.decode_ints(qc_b)
            out_idx = intcodec.decode_ints(idx_b)
            out_fix = intcodec.decode_ints(fix_b)
            rec = _haar_inv(qc * step, levels, n)
            rec[out_idx] += out_fix * eb
            cols.append(rec + mins[k])
        return np.stack(cols, axis=1)
