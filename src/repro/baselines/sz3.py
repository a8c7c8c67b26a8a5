"""SZ3-like baseline: multi-level interpolation prediction.

SZ3 [37, 60] predicts each value by (linear/spline) interpolation
between already-reconstructed neighbours, level by level, and
quantizes the residuals. We run the same scheme in the quantized
integer domain along the storage order: level ``s`` predicts
``q[i]`` from ``(q[i-s] + q[i+s]) // 2`` for midpoints of a stride
hierarchy, which is exact to invert and keeps the Eq. 2 bound. On
mesh data this beats Lorenzo; on particle storage order there is
little smoothness to interpolate — the paper's point (§8.1.3: "SZ3
has sub-optimal results on particle data").
"""
from __future__ import annotations

import numpy as np

from ..core import intcodec, quantize
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame


def _interp_residuals(q: np.ndarray) -> np.ndarray:
    """Residual transform: multi-level midpoint interpolation along the
    sequence. Returns residual array of the same length; invertible by
    :func:`_interp_reconstruct`."""
    n = len(q)
    res = q.astype(np.int64).copy()
    # Coarsest level keeps raw deltas of the stride-s subsampled
    # sequence; finer levels store midpoint residuals.
    s = 1
    while s * 2 < n:
        s *= 2
    # Top level: delta code the anchor sequence q[::s].
    res[::s] = np.diff(np.concatenate(([0], q[::s])))
    while s >= 2:
        h = s // 2
        mids = np.arange(h, n, s)
        left = mids - h
        right = mids + h
        # At the right edge the coarser-level neighbour doesn't exist;
        # predict from the left neighbour alone (it is always an
        # anchor of a coarser level, so decode-side availability holds).
        has_right = right <= n - 1
        pred = np.where(
            has_right, (q[left] + q[np.minimum(right, n - 1)]) // 2, q[left]
        )
        res[mids] = q[mids] - pred
        s = h
    return res


def _interp_reconstruct(res: np.ndarray) -> np.ndarray:
    n = len(res)
    q = np.zeros(n, dtype=np.int64)
    s = 1
    while s * 2 < n:
        s *= 2
    q[::s] = np.cumsum(res[::s])
    level = s
    while level >= 2:
        h = level // 2
        mids = np.arange(h, n, level)
        left = mids - h
        right = mids + h
        has_right = right <= n - 1
        pred = np.where(
            has_right, (q[left] + q[np.minimum(right, n - 1)]) // 2, q[left]
        )
        q[mids] = pred + res[mids]
        level = h
    return q


class SZ3(BaseCodec):
    name = "sz3"

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        q, mins = quantize.quantize(coords, eb)
        blobs = [
            intcodec.encode_ints(_interp_residuals(q[:, k]), use_delta=False)
            for k in range(d)
        ]
        payload = pack_frame(n, d, eb, mins, blobs)
        recon = quantize.dequantize(q, eb, mins)
        return FrameResult(payload=payload, perm=np.arange(n), recon=recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, _, eb, mins, blobs = unpack_frame(payload)
        q = np.stack(
            [_interp_reconstruct(intcodec.decode_ints(b)) for b in blobs], axis=1
        )
        return quantize.dequantize(q, eb, mins)
