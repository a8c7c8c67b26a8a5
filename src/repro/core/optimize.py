"""Dynamic optimizations (§7.4): block-size search and anchor
error-bound scaling.

§7.4.1 — block size vs compression ratio is neither monotonic nor
unimodal, so instead of binary/ternary search LCP evaluates the
offline-derived candidate set ``p = 2^k, 0 <= k <= 16`` on a sample of
the input and keeps the best.

§7.4.2 — when the data is temporally correlated (most frames will be
LCP-T-compressed), anchors are compressed with ``eb / 5`` so anchor
error does not pollute the temporal predictions; for weakly correlated
data the scaling would only inflate the anchors, so it is disabled.
"""
from __future__ import annotations

import numpy as np

from . import lcp_s, lcp_t

BLOCK_SIZE_CANDIDATES = [2**k for k in range(0, 17)]
EB_SCALE = 5.0
# LCP-T must beat the LCP-S size by this factor on the probe frame for
# the input to count as "high temporal correlation" (§7.4.2).
TEMPORAL_WIN_FACTOR = 0.5


def best_block_size(
    coords: np.ndarray,
    eb: float,
    candidates: list[int] | None = None,
    sample: int = 10_000,
) -> int:
    """Evaluate candidate block scales on (a sample of) one frame and
    return the ``p`` with the smallest LCP-S payload."""
    coords = np.asarray(coords, dtype=np.float64)
    if len(coords) > sample:
        stride = len(coords) // sample
        coords = coords[::stride][:sample]
    best_p, best_size = None, None
    for p in candidates or BLOCK_SIZE_CANDIDATES:
        size = len(lcp_s.compress(coords, eb, p).payload)
        if best_size is None or size < best_size:
            best_p, best_size = p, size
    return best_p


def choose_eb_scale(
    frames, eb: float, n_batches: int = 2, p: int | None = None,
    sample: int = 50_000,
) -> float:
    """Decide the §7.4.2 anchor precision boost on a probe.

    Scaling is only worthwhile when (a) the data is temporally
    correlated (most frames go to LCP-T, so anchors are rare and each
    serves every batch's first frame) and (b) the measured temporal
    gain of a precise anchor across ``n_batches - 1`` referencing
    frames outweighs the one-off cost of storing the anchor at
    ``eb / 5`` — the "dynamically analyze input data and apply this
    scaling selectively" behaviour of the paper.
    """
    if len(frames) < 2 or n_batches < 2:
        return 1.0
    f0 = np.asarray(frames[0], dtype=np.float64)
    f1 = np.asarray(frames[1], dtype=np.float64)
    if len(f0) > sample:
        stride = len(f0) // sample
        f0, f1 = f0[::stride][:sample], f1[::stride][:sample]
    p = p if p is not None else lcp_s.DEFAULT_P
    s_plain = lcp_s.compress(f0, eb, p)
    t_plain = lcp_t.compress(f1[s_plain.perm], s_plain.recon, eb)
    if len(t_plain.payload) >= TEMPORAL_WIN_FACTOR * len(s_plain.payload):
        return 1.0  # weak temporal correlation: anchors dominate anyway
    s_scaled = lcp_s.compress(f0, eb / EB_SCALE, p)
    t_scaled = lcp_t.compress(f1[s_scaled.perm], s_scaled.recon, eb)
    anchor_cost = len(s_scaled.payload) - len(s_plain.payload)
    per_ref_gain = len(t_plain.payload) - len(t_scaled.payload)
    return EB_SCALE if per_ref_gain * (n_batches - 1) > anchor_cost else 1.0
