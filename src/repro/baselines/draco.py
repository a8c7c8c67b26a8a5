"""Draco-like baseline [16]: Google's point-cloud coder.

Key behaviours reproduced (paper §8.1.3): the user picks *quantization
bits* (a discrete quality level), not an error bound — so its
rate-distortion curve is a staircase and harnesses must map eb to the
nearest level without knowing the error in advance; coordinates are
quantized to a 2^bits grid over the bounding box, sorted along a
space-filling curve (Morton), delta-coded and entropy-coded; the
decompressed cloud is an unordered point set (set semantics), and no
temporal domain is used.
"""
from __future__ import annotations

import numpy as np

from ..core import intcodec, quantize
from . import morton
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame

MIN_BITS, MAX_BITS = 7, 20


def bits_for_eb(coords: np.ndarray, eb: float) -> int:
    """The level a user would pick for a target error eb: smallest bit
    count whose grid step keeps the per-axis error within eb (clamped
    to Draco's supported levels — outside them the bound is NOT met,
    exactly the paper's complaint)."""
    coords = np.asarray(coords, dtype=np.float64)
    rng = float((coords.max(axis=0) - coords.min(axis=0)).max())
    bits = int(np.ceil(np.log2(max(rng / (2 * eb), 1.0))))
    return int(np.clip(bits, MIN_BITS, MAX_BITS))


class Draco(BaseCodec):
    name = "draco"
    supports_arbitrary_eb = False
    set_semantics = True

    def __init__(self, bits: int | None = None):
        self.bits = bits

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        bits = self.bits if self.bits is not None else bits_for_eb(coords, eb)
        mins = coords.min(axis=0)
        rng = float((coords.max(axis=0) - mins).max())
        step = rng / (1 << bits) if rng > 0 else 1.0
        # Effective per-axis half-step error bound of this level.
        eff_eb = step / 2
        q = np.minimum(
            np.floor((coords - mins) / step).astype(np.int64), (1 << bits) - 1
        )
        codes = morton.encode(q)
        order = np.argsort(codes, kind="stable")
        blob = intcodec.encode_ints(
            codes[order].astype(np.int64), use_delta=True
        )
        payload = pack_frame(n, d, eff_eb, mins, [blob], extra_ints=(bits,))
        recon = (q + 0.5) * step + mins
        return FrameResult(payload=payload, perm=order, recon=recon[order])

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, extra, eff_eb, mins, blobs = unpack_frame(payload, 0, 1)
        bits = extra[0]
        codes = intcodec.decode_ints(blobs[0]).astype(np.uint64)
        q = morton.decode(codes)
        step = eff_eb * 2
        return (q + 0.5) * step + mins
