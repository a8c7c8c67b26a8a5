"""LCP wrapped in the common evaluation interface, so harnesses sweep
it alongside the baselines. Single-frame mode is LCP-S with dynamic
block-size optimization; multi-frame mode is the full §7 hybrid
(Algorithm 1 with FSM, anchors, and dynamic optimizations).
"""
from __future__ import annotations

import numpy as np

from ..core import lcp, lcp_s, optimize
from .base import Archive, BaseCodec, FrameResult


class LCP(BaseCodec):
    name = "lcp"

    def __init__(self, p: int | None = None, optimize_block: bool = True,
                 use_temporal: bool = True, eb_scale: float | None = None):
        self.p = p
        self.optimize_block = optimize_block
        self.use_temporal = use_temporal
        self.eb_scale = eb_scale

    def _block_scale(self, coords: np.ndarray, eb: float) -> int:
        if self.p is not None:
            return self.p
        if self.optimize_block:
            return optimize.best_block_size(coords, eb)
        return lcp_s.DEFAULT_P

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        p = self._block_scale(coords, eb)
        r = lcp_s.compress(coords, eb, p)
        return FrameResult(payload=r.payload, perm=r.perm, recon=r.recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        return lcp_s.decompress(payload)

    def compress_frames(self, frames, eb: float, batch_size: int = 16):
        frames = [np.asarray(f, dtype=np.float64) for f in frames]
        p = self._block_scale(frames[0], eb)
        arch = lcp.compress_frames(
            frames, eb, batch_size=batch_size, p=p,
            eb_scale=self.eb_scale, use_temporal=self.use_temporal,
        )
        return arch

    def decompress_archive(self, arch) -> list[np.ndarray]:
        if isinstance(arch, Archive):  # single-frame style archive
            return super().decompress_archive(arch)
        dec = lcp.decompress_all(arch)
        return [dec[f] for f in sorted(dec)]
