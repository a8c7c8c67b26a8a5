"""TMC13-like baseline [44]: MPEG G-PCC geometry coding.

Reproduces G-PCC's octree geometry path: voxelize positions (voxel
size 2*eb, so voxel-centre reconstruction meets the bound), build the
occupancy octree over the Morton-sorted unique voxels, and code the
per-node occupancy bytes (G-PCC's context-adaptive arithmetic coder is
stood in for by Huffman + Zstd, see DESIGN.md §3). Duplicate points
are preserved via a per-voxel count stream, matching TMC13's
duplicate-point mode (this is why the paper keeps TMC13 in the
evaluation but drops TMC2). Set semantics: points come back in Morton
order.
"""
from __future__ import annotations

import numpy as np

from ..core import intcodec, quantize
from . import morton
from .base import BaseCodec, FrameResult, pack_frame, unpack_frame


def _occupancy_stream(codes: np.ndarray, depth: int) -> np.ndarray:
    """Per-level occupancy bytes of the octree over unique Morton codes
    (root first, breadth-first in Morton order)."""
    stream = []
    for level in range(depth, 0, -1):
        child_prefix = codes >> np.uint64(3 * (level - 1))
        uniq_children = np.unique(child_prefix)
        parent_of_child = uniq_children >> np.uint64(3)
        octant = (uniq_children & np.uint64(7)).astype(np.int64)
        # Group children by parent (parents appear in sorted order).
        uniq_parents, start_idx = np.unique(parent_of_child, return_index=True)
        occ = np.zeros(len(uniq_parents), dtype=np.int64)
        grp = np.searchsorted(uniq_parents, parent_of_child)
        np.bitwise_or.at(occ, grp, np.int64(1) << octant)
        stream.append(occ)
    return np.concatenate(stream) if stream else np.zeros(0, dtype=np.int64)


def _decode_occupancy(stream: np.ndarray, depth: int) -> np.ndarray:
    """Rebuild the sorted unique Morton codes from occupancy bytes."""
    nodes = np.zeros(1, dtype=np.uint64)  # root
    pos = 0
    octants = np.arange(8, dtype=np.uint64)
    for _level in range(depth, 0, -1):
        occ = stream[pos : pos + len(nodes)].astype(np.uint64)
        pos += len(nodes)
        # Expand each node into its occupied children, Morton order.
        present = (occ[:, None] >> octants[None, :]) & np.uint64(1)
        parent_rep = np.repeat(nodes, 8)
        child = (parent_rep << np.uint64(3)) | np.tile(octants, len(nodes))
        nodes = child[present.ravel().astype(bool)]
    return nodes


class TMC13(BaseCodec):
    name = "tmc13"
    set_semantics = True

    def compress_frame(self, coords: np.ndarray, eb: float) -> FrameResult:
        coords = np.asarray(coords, dtype=np.float64)
        n, d = coords.shape
        q, mins = quantize.quantize(coords, eb)  # voxel size 2*eb
        depth = max(1, int(q.max()).bit_length()) if n else 1
        codes = morton.encode(q)
        order = np.argsort(codes, kind="stable")
        uniq, counts = np.unique(codes, return_counts=True)
        occ = _occupancy_stream(uniq.copy(), depth)
        occ_blob = intcodec.encode_ints(occ, use_delta=False)
        cnt_blob = intcodec.encode_ints(counts.astype(np.int64), use_delta=True)
        payload = pack_frame(
            n, d, eb, mins, [occ_blob, cnt_blob], extra_ints=(depth,)
        )
        recon_q = np.repeat(morton.decode(uniq), counts, axis=0)
        recon = quantize.dequantize(recon_q, eb, mins)
        return FrameResult(payload=payload, perm=order, recon=recon)

    def decompress_frame(self, payload: bytes) -> np.ndarray:
        n, d, extra, eb, mins, blobs = unpack_frame(payload, 0, 2)
        depth = extra[0]
        occ = intcodec.decode_ints(blobs[0])
        counts = intcodec.decode_ints(blobs[1])
        uniq = _decode_occupancy(occ, depth)
        q = np.repeat(morton.decode(uniq), counts, axis=0)
        return quantize.dequantize(q, eb, mins)
