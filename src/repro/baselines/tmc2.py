"""TMC2-like baseline [45]: MPEG V-PCC video-based point-cloud coding.

Implemented only to demonstrate the paper's §8.2 exclusion rationale,
which our tests verify directly:
  1. point count is NOT preserved (projection to depth maps with a
     limited layer count drops co-projected points);
  2. quantization is fixed 16-bit — no arbitrary error bound;
  3. it is orders of magnitude slower than direct coders (per-pixel
     video-style processing).

Scheme: quantize to 16-bit, orthographically project along z onto an
(x, y) pixel grid keeping two depth layers per pixel (V-PCC's
near/far maps), and compress the depth images with the Zstd stage
standing in for the H.265 video codec.
"""
from __future__ import annotations

import numpy as np

from ..core import container, dictcodec
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame

BITS = 16
GRID = 512  # pixels per side of the projection plane


class TMC2(BaseCodec):
    name = "tmc2"
    supports_arbitrary_eb = False
    set_semantics = True
    preserves_count = False

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        mins = coords.min(axis=0)
        rng = np.maximum(coords.max(axis=0) - mins, 1e-12)
        q = np.minimum(
            ((coords - mins) / rng * ((1 << BITS) - 1)).astype(np.int64),
            (1 << BITS) - 1,
        )
        px = (q[:, 0] * GRID) >> BITS
        py = (q[:, 1] * GRID) >> BITS
        pix = px * GRID + py
        # Two depth layers per pixel: nearest and farthest z.
        near = np.full(GRID * GRID, -1, dtype=np.int64)
        far = np.full(GRID * GRID, -1, dtype=np.int64)
        # Also record in-pixel offsets so geometry is recoverable.
        nearxy = np.zeros((GRID * GRID, 2), dtype=np.int64)
        farxy = np.zeros((GRID * GRID, 2), dtype=np.int64)
        order = np.argsort(q[:, 2], kind="stable")
        # Farthest-written-last fills `far`; reversed fills `near`.
        far[pix[order]] = q[order, 2]
        farxy[pix[order]] = q[order][:, :2]
        rorder = order[::-1]
        near[pix[rorder]] = q[rorder, 2]
        nearxy[pix[rorder]] = q[rorder][:, :2]
        blobs = [
            dictcodec.compress(arr.astype("<i8").tobytes())
            for arr in (near, far, nearxy, farxy)
        ]
        payload = pack_frame(
            n, d, eb, np.concatenate([mins, rng]), blobs, extra_ints=(BITS, GRID)
        )
        return FrameResult(payload=payload, perm=None, recon=None)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        header = container.unpack_blobs(
            payload[: 8 + int.from_bytes(payload[:8], "little")], 1
        )[0]
        ints_blob, floats_blob = container.unpack_blobs(header, 2)
        ints = container.unpack_i64(ints_blob)
        n, d = int(ints[0]), int(ints[1])
        floats = container.unpack_f64(floats_blob)
        mins, rng = floats[1 : 1 + d], floats[1 + d : 1 + 2 * d]
        blobs = container.unpack_blobs(payload, 5)[1:]
        near, far, nearxy, farxy = (
            np.frombuffer(dictcodec.decompress(b), dtype="<i8") for b in blobs
        )
        nearxy = nearxy.reshape(-1, 2)
        farxy = farxy.reshape(-1, 2)
        pts = []
        mask_n = near >= 0
        pts.append(
            np.column_stack([nearxy[mask_n], near[mask_n]])
        )
        mask_f = (far >= 0) & (far != near)
        pts.append(np.column_stack([farxy[mask_f], far[mask_f]]))
        q = np.concatenate(pts)
        return q / ((1 << BITS) - 1) * rng + mins
