"""MDZ-like baseline [62]: molecular-dynamics particle compressor.

MDZ exploits solid-material MD structure with (a) a reference-frame
("vector") predictor — atoms oscillate around fixed sites, so frame t
is predicted from the batch's first frame — and (b) a preceding-frame
temporal predictor, choosing the best *per batch* (the paper contrasts
this with LCP's per-frame FSM selection). The first frame of each
batch is compressed spatially in storage order (no spatial blocking —
the gap LCP-S exploits). Mirroring the paper's evaluation note, the
first frame is counted in the compressed size here.
"""
from __future__ import annotations

import numpy as np

from ..core import intcodec, quantize
from .base import Archive, BaseCodec, FrameResult, pack_frame, unpack_frame

MODE_DIRECT = 0  # storage-order delta of quantized values (first frames)
MODE_PREV = 1  # diff vs previous frame's reconstruction
MODE_REF = 2  # diff vs batch reference frame's reconstruction


def _encode_q(q: np.ndarray, eb: float, mins, mode: int) -> bytes:
    d = q.shape[1]
    blobs = [
        intcodec.encode_ints(q[:, k], use_delta=(mode == MODE_DIRECT))
        for k in range(d)
    ]
    return pack_frame(len(q), d, eb, mins, blobs, extra_ints=(mode,))


class MDZ(BaseCodec):
    name = "mdz"

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, _ = coords.shape
        q, mins = quantize.quantize(coords, eb)
        payload = _encode_q(q, eb, mins, MODE_DIRECT)
        return FrameResult(
            payload=payload,
            perm=np.arange(n),
            recon=quantize.dequantize(q, eb, mins),
        )

    def decompress_frame(self, payload: bytes, prev_recon=None, ref_recon=None):
        n, d, extra, eb, mins, blobs = unpack_frame(payload)
        mode = extra[0]
        vals = np.stack([intcodec.decode_ints(b) for b in blobs], axis=1)
        if mode == MODE_DIRECT:
            q = vals
        else:
            base = prev_recon if mode == MODE_PREV else ref_recon
            q_base, _ = quantize.quantize(
                np.asarray(base, dtype=np.float64), eb, mins
            )
            q = q_base + vals
        return quantize.dequantize(q, eb, mins)

    def _diff_payload(self, coords, base_recon, eb, mode) -> bytes:
        q, mins = quantize.quantize(coords, eb)
        q_base, _ = quantize.quantize(base_recon, eb, mins)
        diff = q - q_base
        d = coords.shape[1]
        blobs = [
            intcodec.encode_ints(diff[:, k], use_delta=False) for k in range(d)
        ]
        return pack_frame(len(q), d, eb, mins, blobs, extra_ints=(mode,))

    def compress_frames(self, frames, eb: float, batch_size: int = 16) -> Archive:
        frames = [np.asarray(f, dtype=np.float64) for f in frames]
        arch = Archive(codec=self.name)
        for start in range(0, len(frames), batch_size):
            batch = frames[start : start + batch_size]
            first = self.compress_frame(batch[0], eb)
            ref_recon = first.recon
            if len(batch) == 1:
                arch.frames.append(first.payload)
                arch.perms.append(first.perm)
                continue
            # Batch-level mode selection: probe both temporal modes on
            # the second frame, commit to the winner for the batch.
            probe_prev = self._diff_payload(batch[1], ref_recon, eb, MODE_PREV)
            probe_ref = self._diff_payload(batch[1], ref_recon, eb, MODE_REF)
            mode = MODE_PREV if len(probe_prev) <= len(probe_ref) else MODE_REF
            arch.frames.append(first.payload)
            arch.perms.append(first.perm)
            prev_recon = ref_recon
            for f in batch[1:]:
                base = prev_recon if mode == MODE_PREV else ref_recon
                payload = self._diff_payload(f, base, eb, mode)
                arch.frames.append(payload)
                arch.perms.append(np.arange(len(f)))
                q, mins = quantize.quantize(f, eb)
                prev_recon = quantize.dequantize(q, eb, mins)
        return arch

    def decompress_archive(self, arch: Archive) -> list[np.ndarray]:
        out: list[np.ndarray] = []
        prev = ref = None
        for payload in arch.frames:
            coords = self.decompress_frame(payload, prev_recon=prev, ref_recon=ref)
            _, _, extra, _, _, _ = unpack_frame(payload)
            if extra[0] == MODE_DIRECT:
                ref = coords
            prev = coords
            out.append(coords)
        return out
