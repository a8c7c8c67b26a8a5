"""LCP — the dynamic multi-frame hybrid compressor (§7, Algorithm 1).

Frames are compressed in independent batches (partial retrieval,
§2.1.3). Within a batch, LCP-FSM picks LCP-S or LCP-T per frame; a
first-in-batch frame compressed by LCP-S becomes a *spatial anchor
frame* stored in a separate array, and a first-in-batch frame that
chooses LCP-T predicts from the most recent anchor (§7.3) — so no
batch ever depends on another batch's *interior*, only on one anchor.

Canonical particle order: an LCP-S frame's decompressed order is its
block-sort order (nothing else is serialized, matching the paper's
§6.2.1 storage format); every LCP-T frame inherits the order of its
predecessor. The compressor tracks that order (``perms``) so temporal
diffs align and tests can verify the Eq. 2 bound per particle; the
perms are compression-side metadata, never serialized.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from . import fsm as fsm_mod
from . import lcp_s, lcp_t, optimize

# Serialized per-frame bookkeeping a real container would need: frame
# id (u32), method/ref byte, payload length (u64) — counted into
# ``size_bytes`` so compression ratios are honest.
FRAME_OVERHEAD = 13


@dataclass
class CompressedFrame:
    frame: int
    batch: int
    method: str  # "spatial" | "temporal"
    ref: str | None  # for temporal: "prev" | "anchor"
    payload: bytes


@dataclass
class LCPArchive:
    eb: float
    p: int
    batch_size: int
    eb_scale: float
    n_particles: int
    n_dims: int
    frames: dict[int, CompressedFrame] = field(default_factory=dict)
    anchors: dict[int, bytes] = field(default_factory=dict)  # batch -> payload
    anchor_of: dict[int, int] = field(default_factory=dict)  # batch -> anchor batch
    perms: dict[int, np.ndarray] = field(default_factory=dict)  # side metadata
    tested_frames: int = 0  # frames where LCP-T was actually run for selection
    selected: dict[int, str] = field(default_factory=dict)

    def size_bytes(self) -> int:
        total = sum(len(f.payload) + FRAME_OVERHEAD for f in self.frames.values())
        total += sum(len(a) + FRAME_OVERHEAD for a in self.anchors.values())
        return total

    @property
    def n_frames(self) -> int:
        return len(self.frames) + len(self.anchors)


def compress_frames(
    frames,
    eb: float,
    batch_size: int = 16,
    p: int | None = None,
    eb_scale: float | None = None,
    use_temporal: bool = True,
) -> LCPArchive:
    """Algorithm 1. ``frames``: sequence of (N, d) coordinate arrays
    (constant N across frames, as in MD/trajectory data)."""
    frames = [np.asarray(f, dtype=np.float64) for f in frames]
    n, d = frames[0].shape
    if p is None:
        p = optimize.best_block_size(frames[0], eb)
    if eb_scale is None:
        n_batches = (len(frames) + batch_size - 1) // batch_size
        eb_scale = (
            optimize.choose_eb_scale(frames, eb, n_batches=n_batches, p=p)
            if use_temporal
            else 1.0
        )
    arch = LCPArchive(
        eb=eb, p=p, batch_size=batch_size, eb_scale=eb_scale,
        n_particles=n, n_dims=d,
    )
    machine = fsm_mod.LCPFSM()
    prev_recon: np.ndarray | None = None  # canonical-order reconstruction
    order: np.ndarray | None = None  # canonical pos -> original index
    anchor_recon: np.ndarray | None = None
    anchor_order: np.ndarray | None = None
    last_anchor_batch: int | None = None
    last_s_size: int | None = None

    for f_idx, coords in enumerate(frames):
        batch = f_idx // batch_size
        first_in_batch = f_idx % batch_size == 0
        if first_in_batch:
            ref_recon, ref_order, ref_kind = anchor_recon, anchor_order, "anchor"
        else:
            ref_recon, ref_order, ref_kind = prev_recon, order, "prev"

        method = "spatial"
        t_res = None
        tested = False
        if use_temporal and ref_recon is not None and len(coords) == len(ref_recon):
            if machine.should_test():
                tested = True
                arch.tested_frames += 1
                t_res = lcp_t.compress(coords[ref_order], ref_recon, eb)
                est_s = last_s_size if last_s_size is not None else 1 << 62
                method = (
                    "temporal" if len(t_res.payload) < est_s else "spatial"
                )
                machine.record(True, method)
            else:
                machine.record(False, None)
                method = "spatial"

        if method == "spatial":
            frame_eb = eb / eb_scale if first_in_batch else eb
            s_res = lcp_s.compress(coords, frame_eb, p)
            last_s_size = len(s_res.payload)
            prev_recon, order = s_res.recon, s_res.perm
            if first_in_batch:
                arch.anchors[batch] = s_res.payload
                anchor_recon, anchor_order = s_res.recon, s_res.perm
                last_anchor_batch = batch
            else:
                arch.frames[f_idx] = CompressedFrame(
                    f_idx, batch, "spatial", None, s_res.payload
                )
        else:
            arch.frames[f_idx] = CompressedFrame(
                f_idx, batch, "temporal", ref_kind, t_res.payload
            )
            if first_in_batch:
                arch.anchor_of[batch] = last_anchor_batch
            prev_recon, order = t_res.recon, ref_order
        arch.perms[f_idx] = order
        arch.selected[f_idx] = method
    return arch


@dataclass
class BatchOutput:
    """Result of compressing one batch in isolation (the Spark unit of
    work — see DESIGN.md "Anchor parallelization")."""

    batch: int
    frames: list[CompressedFrame]  # non-anchor frames of this batch
    own_anchor_payload: bytes | None  # set iff first frame chose LCP-S
    used_prev_anchor: bool  # first frame chose LCP-T vs prev anchor
    prev_anchor_payload: bytes | None  # LCP-S of prev batch's first frame
    perms: dict[int, np.ndarray]
    selected: dict[int, str]

    def size_bytes(self) -> int:
        total = sum(len(f.payload) + FRAME_OVERHEAD for f in self.frames)
        if self.own_anchor_payload is not None:
            total += len(self.own_anchor_payload) + FRAME_OVERHEAD
        return total


def compress_single_batch(
    batch_frames,
    batch: int,
    prev_first: np.ndarray | None,
    eb: float,
    p: int,
    batch_size: int,
    eb_scale: float = 1.0,
    use_temporal: bool = True,
) -> BatchOutput:
    """Compress one batch independently of every other batch.

    ``prev_first`` is the *raw* first frame of the previous batch; its
    LCP-S compression (the anchor candidate) is recomputed here, which
    is what makes batches embarrassingly parallel at the cost of one
    extra LCP-S per batch. The FSM restarts per batch (a bounded
    deviation from the sequential Algorithm 1, noted in DESIGN.md).
    """
    batch_frames = [np.asarray(f, dtype=np.float64) for f in batch_frames]
    machine = fsm_mod.LCPFSM()
    anchor_recon = anchor_order = None
    prev_anchor_payload = None
    if use_temporal and prev_first is not None:
        a_res = lcp_s.compress(
            np.asarray(prev_first, dtype=np.float64), eb / eb_scale, p
        )
        anchor_recon, anchor_order = a_res.recon, a_res.perm
        prev_anchor_payload = a_res.payload
    out = BatchOutput(
        batch=batch, frames=[], own_anchor_payload=None,
        used_prev_anchor=False, prev_anchor_payload=prev_anchor_payload,
        perms={}, selected={},
    )
    prev_recon = order = None
    last_s_size = (
        len(prev_anchor_payload) if prev_anchor_payload is not None else None
    )
    base = batch * batch_size
    for i, coords in enumerate(batch_frames):
        f_idx = base + i
        if i == 0:
            ref_recon, ref_order, ref_kind = anchor_recon, anchor_order, "anchor"
        else:
            ref_recon, ref_order, ref_kind = prev_recon, order, "prev"
        method = "spatial"
        t_res = None
        if (
            use_temporal
            and ref_recon is not None
            and len(coords) == len(ref_recon)
        ):
            if machine.should_test():
                t_res = lcp_t.compress(coords[ref_order], ref_recon, eb)
                est_s = last_s_size if last_s_size is not None else 1 << 62
                method = "temporal" if len(t_res.payload) < est_s else "spatial"
                machine.record(True, method)
            else:
                machine.record(False, None)
        if method == "spatial":
            frame_eb = eb / eb_scale if i == 0 else eb
            s_res = lcp_s.compress(coords, frame_eb, p)
            last_s_size = len(s_res.payload)
            prev_recon, order = s_res.recon, s_res.perm
            if i == 0:
                out.own_anchor_payload = s_res.payload
            else:
                out.frames.append(
                    CompressedFrame(f_idx, batch, "spatial", None, s_res.payload)
                )
        else:
            out.frames.append(
                CompressedFrame(f_idx, batch, "temporal", ref_kind, t_res.payload)
            )
            if i == 0:
                out.used_prev_anchor = True
            prev_recon, order = t_res.recon, ref_order
        out.perms[f_idx] = order
        out.selected[f_idx] = method
    return out


def decompress_single_batch(
    frame_rows: list[CompressedFrame],
    own_anchor_payload: bytes | None,
    prev_anchor_payload: bytes | None,
    batch: int,
    batch_size: int,
) -> dict[int, np.ndarray]:
    """Decompress a batch from exactly the rows partial retrieval
    fetches: its frames + (at most) its own and the previous anchor."""
    out: dict[int, np.ndarray] = {}
    prev: np.ndarray | None = None
    by_idx = {cf.frame: cf for cf in frame_rows}
    lo = batch * batch_size
    for f_idx in range(lo, lo + batch_size):
        cf = by_idx.get(f_idx)
        # A batch whose first frame chose LCP-S stores it ONLY as its
        # own anchor; a temporal first frame is a regular frame row
        # (the same frame's anchor payload, if present, exists for the
        # *next* batch's reference and must not shadow the frame row).
        if f_idx == lo and cf is None and own_anchor_payload is not None:
            prev = lcp_s.decompress(own_anchor_payload)
            out[f_idx] = prev
            continue
        if cf is None:
            break
        if cf.method == "spatial":
            prev = lcp_s.decompress(cf.payload)
        else:
            ref = (
                lcp_s.decompress(prev_anchor_payload)
                if cf.ref == "anchor"
                else prev
            )
            prev = lcp_t.decompress(cf.payload, ref)
        out[f_idx] = prev
    return out


def _decompress_anchor(arch: LCPArchive, batch: int) -> np.ndarray:
    return lcp_s.decompress(arch.anchors[batch])


def decompress_batch(arch: LCPArchive, batch: int) -> dict[int, np.ndarray]:
    """Decompress one batch using only its own rows plus (at most) one
    anchor payload — the paper's partial-retrieval guarantee."""
    lo = batch * arch.batch_size
    hi = lo + arch.batch_size
    out: dict[int, np.ndarray] = {}
    prev: np.ndarray | None = None
    for f_idx in range(lo, hi):
        if f_idx == lo and batch in arch.anchors:
            prev = _decompress_anchor(arch, batch)
            out[f_idx] = prev
            continue
        if f_idx not in arch.frames:
            break  # past the last frame
        cf = arch.frames[f_idx]
        if cf.method == "spatial":
            prev = lcp_s.decompress(cf.payload)
        else:
            if cf.ref == "anchor":
                ref = _decompress_anchor(arch, arch.anchor_of[batch])
            else:
                ref = prev
            prev = lcp_t.decompress(cf.payload, ref)
        out[f_idx] = prev
    return out


def decompress_all(arch: LCPArchive) -> dict[int, np.ndarray]:
    out: dict[int, np.ndarray] = {}
    batches = sorted(
        set(arch.anchors) | {cf.batch for cf in arch.frames.values()}
    )
    for b in batches:
        out.update(decompress_batch(arch, b))
    return out


def decompress_frame(arch: LCPArchive, f_idx: int) -> np.ndarray:
    return decompress_batch(arch, f_idx // arch.batch_size)[f_idx]
