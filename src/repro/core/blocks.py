"""Spatial blocking of quantized particles (paper §6.2, Eq. 6).

Block size is ``2*eb*p`` so a particle's block index per dimension is
just ``q // p`` — derived from the quantized value, no second pass
over the floats. Blocks are *spatial* (grouping particles close in
space), not storage-order blocks; only non-empty blocks are kept.

``assign`` produces exactly the three streams §6.2.1 stores per
non-empty block: linear block ids (ascending), particle counts, and
in-block relative quantized coordinates, plus the block-sort
permutation (compression-side only; never serialized — see DESIGN.md
on particle-order semantics).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F


@dataclass
class BlockAssignment:
    """Streams of §6.2.1 for one frame, in block-sorted order."""

    block_ids: np.ndarray  # (B,) int64, ascending linear ids of non-empty blocks
    counts: np.ndarray  # (B,) int64, particles per non-empty block
    rel: np.ndarray  # (N, d) int64, q mod p, block-sorted
    perm: np.ndarray  # (N,) int64: perm[i] = original index of sorted row i
    bn: np.ndarray  # (d,) int64, number of blocks per dimension


def linear_block_id(bid: np.ndarray, bn: np.ndarray) -> np.ndarray:
    """Row-major linearization of per-dim block indices (Eq. 6)."""
    bid = np.asarray(bid, dtype=np.int64)
    out = bid[:, 0].copy()
    stride = np.int64(1)
    for d in range(1, bid.shape[1]):
        stride *= np.int64(bn[d - 1])
        out += bid[:, d] * stride
    return out


def unravel_block_id(linear: np.ndarray, bn: np.ndarray) -> np.ndarray:
    """Inverse of :func:`linear_block_id`."""
    linear = np.asarray(linear, dtype=np.int64)
    d = len(bn)
    out = np.empty((len(linear), d), dtype=np.int64)
    rem = linear.copy()
    for k in range(d):
        out[:, k] = rem % np.int64(bn[k])
        rem //= np.int64(bn[k])
    return out


def assign(q: np.ndarray, p: int) -> BlockAssignment:
    """Block-partition quantized coordinates ``q`` (N, d) with block
    scale ``p`` (block size = 2*eb*p)."""
    q = np.asarray(q, dtype=np.int64)
    n, d = q.shape
    bid = q // p
    rel = q - bid * p
    bn = bid.max(axis=0) + 1 if n else np.ones(d, dtype=np.int64)
    linear = linear_block_id(bid, bn)
    perm = np.argsort(linear, kind="stable")
    linear_sorted = linear[perm]
    block_ids, counts = np.unique(linear_sorted, return_counts=True)
    return BlockAssignment(
        block_ids=block_ids.astype(np.int64),
        counts=counts.astype(np.int64),
        rel=rel[perm],
        perm=perm.astype(np.int64),
        bn=np.asarray(bn, dtype=np.int64),
    )


def reconstruct_q(asg_block_ids, counts, rel, bn, p: int) -> np.ndarray:
    """Rebuild quantized coordinates (block-sorted order) from the three
    stored streams."""
    bid3 = unravel_block_id(np.asarray(asg_block_ids, dtype=np.int64), bn)
    per_particle_bid = np.repeat(bid3, np.asarray(counts, dtype=np.int64), axis=0)
    return per_particle_bid * p + np.asarray(rel, dtype=np.int64)


def block_id_expr(qcols: list[Column], p: int, bn: list[int]) -> Column:
    """Spark SQL twin of per-dim ``q // p`` + row-major linearization."""
    out = F.floor(qcols[0] / F.lit(p)).cast("long")
    stride = 1
    for d in range(1, len(qcols)):
        stride *= bn[d - 1]
        out = out + F.floor(qcols[d] / F.lit(p)).cast("long") * F.lit(stride)
    return out
