"""Common interface for every compressor in the evaluation (§8.1.3).

Each baseline is a re-implementation of the comparator's *algorithmic
core* (see DESIGN.md §3) behind one interface, so the harnesses for
the paper's tables can sweep ``registry.all_codecs()`` uniformly.

Semantics flags:
  ``supports_arbitrary_eb`` — False for Draco-like (quantization bits
  only; harnesses map eb to the nearest bit level, giving the paper's
  staircase rate-distortion).
  ``set_semantics`` — True when decompression returns particles in an
  internal (e.g. Morton) order with no per-particle permutation; error
  is then checked against the sorted multisets (exact for grid
  quantizers).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class FrameResult:
    payload: bytes
    # perm[i] = original index of decompressed row i; None for
    # set-semantics codecs.
    perm: np.ndarray | None = None
    # reconstruction, in the decompressed order (compression side only)
    recon: np.ndarray | None = None


# Per-frame container bookkeeping, matching core.lcp.FRAME_OVERHEAD.
FRAME_OVERHEAD = 13


@dataclass
class Archive:
    """Multi-frame archive for per-frame (non-hybrid) codecs."""

    codec: str
    frames: list[bytes] = field(default_factory=list)
    perms: list[np.ndarray | None] = field(default_factory=list)

    def size_bytes(self) -> int:
        return sum(len(p) + FRAME_OVERHEAD for p in self.frames)


class BaseCodec:
    name: str = "base"
    supports_arbitrary_eb: bool = True
    set_semantics: bool = False

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        raise NotImplementedError

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        raise NotImplementedError

    def compress_frames(self, frames, eb: float, batch_size: int = 16) -> Archive:
        """Default multi-frame strategy: compress every frame spatially
        and independently (what non-temporal baselines do; batch size
        is irrelevant to them)."""
        arch = Archive(codec=self.name)
        for f in frames:
            r = self.compress_frame(np.asarray(f, dtype=np.float64), eb)
            arch.frames.append(r.payload)
            arch.perms.append(r.perm)
        return arch

    def decompress_archive(self, arch: Archive) -> list[np.ndarray]:
        return [self.decompress_frame(p) for p in arch.frames]


def pack_frame(n: int, d: int, eb: float, mins, blobs: list[bytes],
               extra_ints: tuple[int, ...] = ()) -> bytes:
    """Shared frame container for baselines: header + stream blobs."""
    from ..core import container

    header = container.pack_blobs(
        container.pack_i64(n, d, *extra_ints), container.pack_f64(eb, *mins)
    )
    return container.pack_blobs(header, *blobs)


def unpack_frame(payload: bytes, n_blobs_per_dim: int = 1, n_extra_blobs: int = 0):
    """Inverse of :func:`pack_frame`. Returns (n, d, extra_ints, eb,
    mins, blobs)."""
    from ..core import container

    header = container.unpack_blobs(
        payload[: 8 + int.from_bytes(payload[:8], "little")], 1
    )[0]
    ints_blob, floats_blob = container.unpack_blobs(header, 2)
    ints = container.unpack_i64(ints_blob)
    n, d = int(ints[0]), int(ints[1])
    extra = tuple(int(v) for v in ints[2:])
    floats = container.unpack_f64(floats_blob)
    eb, mins = float(floats[0]), floats[1 : 1 + d]
    blobs = container.unpack_blobs(
        payload, 1 + d * n_blobs_per_dim + n_extra_blobs
    )
    return n, d, extra, eb, mins, blobs[1:]


def sorted_rows(a: np.ndarray) -> np.ndarray:
    """Lexicographic row sort — canonical form for set-semantics
    comparisons."""
    a = np.asarray(a)
    return a[np.lexsort(a.T[::-1])]
