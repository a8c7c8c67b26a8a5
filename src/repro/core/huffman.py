"""Canonical, length-limited Huffman coding (§6.2.2 variable-length stage).

Encoding is vectorized via ``bitcodec.pack_bits``. Decoding of a
variable-length stream is inherently sequential *within* a stream, so
the encoder records the bit offset of every 4096-symbol chunk and the
decoder advances all chunks in lock-step with numpy gathers — one
table lookup per symbol *position*, vectorized across chunks. This
keeps decode throughput in the tens of MB/s from pure numpy, which is
what lets the repo's speed benchmarks (paper Figs. 16–18) compare
codecs on equal footing.

Code lengths are limited to 16 bits (single-level decode table of
2^16 entries) by iteratively halving frequencies until the tree is
shallow enough — the classic heuristic; optimality loss is negligible
for the alphabets produced by delta-coded particle data.

Stream layout (via ``container.pack_blobs``):
  header ints: n_values, n_symbols, max_len, chunk_size
  symbols:     u64 fixed-width packed (sorted ascending)
  lengths:     u8 per symbol
  offsets:     u64 bit offset of each chunk start
  payload:     packed code bits
"""
from __future__ import annotations

import heapq

import numpy as np

from . import bitcodec, container

MAX_CODE_LEN = 16
CHUNK = 4096  # upper bound; see _choose_chunk


def _choose_chunk(n: int) -> int:
    """Chunk length balancing decoder work: the lock-step decoder runs
    ``chunk`` sequential steps over ``n/chunk`` parallel lanes; the
    per-step Python overhead dominates, so lean toward many lanes —
    sqrt(n)/4 measured fastest (the 8-byte-per-chunk offset table
    stays well under 1 bit/symbol)."""
    return int(min(CHUNK, max(64, int(n**0.5) // 4)))


def code_lengths(freqs: np.ndarray) -> np.ndarray:
    """Huffman code lengths (<= MAX_CODE_LEN) for positive frequencies."""
    freqs = np.asarray(freqs, dtype=np.int64)
    if (freqs <= 0).any():
        raise ValueError("all frequencies must be positive")
    n = len(freqs)
    if n == 1:
        return np.array([1], dtype=np.int64)
    work = freqs.copy()
    while True:
        lengths = _tree_lengths(work)
        if lengths.max() <= MAX_CODE_LEN:
            return lengths
        work = (work + 1) >> 1  # flatten the distribution, retry

def _tree_lengths(freqs: np.ndarray) -> np.ndarray:
    n = len(freqs)
    # heap entries: (freq, tiebreak, node_id); leaves are 0..n-1.
    heap = [(int(f), i, i) for i, f in enumerate(freqs)]
    heapq.heapify(heap)
    parent = {}
    next_id = n
    tie = n
    while len(heap) > 1:
        f1, _, a = heapq.heappop(heap)
        f2, _, b = heapq.heappop(heap)
        parent[a] = next_id
        parent[b] = next_id
        heapq.heappush(heap, (f1 + f2, tie, next_id))
        next_id += 1
        tie += 1
    depth_cache: dict[int, int] = {heap[0][2]: 0}

    def depth(node: int) -> int:
        if node in depth_cache:
            return depth_cache[node]
        d = depth(parent[node]) + 1
        depth_cache[node] = d
        return d

    return np.array([depth(i) for i in range(n)], dtype=np.int64)


def canonical_codes(lengths: np.ndarray) -> np.ndarray:
    """Canonical codewords for symbols sorted ascending, as uint64.

    Canonical order: by (length, symbol index); symbols are already in
    ascending value order, so index order is value order.
    """
    lengths = np.asarray(lengths, dtype=np.int64)
    order = np.lexsort((np.arange(len(lengths)), lengths))
    codes = np.zeros(len(lengths), dtype=np.uint64)
    code = 0
    prev_len = 0
    for idx in order:
        ln = int(lengths[idx])
        code <<= ln - prev_len
        codes[idx] = code
        code += 1
        prev_len = ln
    return codes


def expected_bits(values: np.ndarray) -> int:
    """Exact encoded payload bit count (no header) — used by the
    paper's Huffman-vs-fixed-length selection (§6.2.2, Table 3)."""
    values = np.asarray(values, dtype=np.uint64)
    if len(values) == 0:
        return 0
    _, counts = np.unique(values, return_counts=True)
    lengths = code_lengths(counts)
    return int((lengths * counts).sum())


def encode(values: np.ndarray) -> bytes:
    """Huffman-encode non-negative ints; self-contained stream."""
    values = np.asarray(values, dtype=np.uint64)
    n = len(values)
    if n == 0:
        return container.pack_blobs(
            container.pack_i64(0, 0, 0, CHUNK, 1, 0, 1), b"", b"", b"", b""
        )
    symbols, inv, counts = np.unique(
        values, return_inverse=True, return_counts=True
    )
    lengths = code_lengths(counts)
    codes = canonical_codes(lengths)
    val_lens = lengths[inv]
    payload = bitcodec.pack_bits(codes[inv], val_lens)
    chunk = _choose_chunk(n)
    # Bit offsets of chunk starts, for the lock-step decoder — stored
    # as fixed-width deltas (~avg_code_len*chunk bits each), far
    # smaller than raw u64s now that chunks are short.
    cum = np.concatenate(([0], np.cumsum(val_lens)))
    offsets = cum[0 : n : chunk].astype(np.uint64)
    off_delta = np.diff(np.concatenate(([0], offsets))).astype(np.uint64)
    off_w = bitcodec.width_for(int(off_delta.max())) if len(off_delta) else 1
    sym_w = bitcodec.width_for(int(symbols.max()))
    header = container.pack_i64(
        n, len(symbols), int(lengths.max()), chunk, sym_w, len(offsets), off_w
    )
    return container.pack_blobs(
        header,
        bitcodec.pack_bits(symbols, sym_w),
        lengths.astype(np.uint8).tobytes(),
        bitcodec.pack_bits(off_delta, off_w),
        payload,
    )


def decode(data: bytes) -> np.ndarray:
    header, sym_blob, len_blob, off_blob, payload = container.unpack_blobs(data, 5)
    ints = container.unpack_i64(header)
    n, n_sym, max_len, chunk, sym_w, n_off, off_w = (int(v) for v in ints[:7])
    if n == 0:
        return np.zeros(0, dtype=np.uint64)
    symbols = bitcodec.unpack_fixed(sym_blob, int(sym_w), int(n_sym))
    lengths = np.frombuffer(len_blob, dtype=np.uint8).astype(np.int64)
    offsets = np.cumsum(bitcodec.unpack_fixed(off_blob, off_w, n_off))
    codes = canonical_codes(lengths)
    # Single-level decode table over max_len bits.
    L = int(max_len)
    table_sym = np.zeros(1 << L, dtype=np.uint64)
    table_len = np.zeros(1 << L, dtype=np.uint8)
    start = (codes << (L - lengths).astype(np.uint64)).astype(np.int64)
    span = (np.int64(1) << (L - lengths)).astype(np.int64)
    for i in range(int(n_sym)):
        table_sym[start[i] : start[i] + span[i]] = symbols[i]
        table_len[start[i] : start[i] + span[i]] = lengths[i]
    n = int(n)
    chunk = int(chunk)
    n_chunks = len(offsets)
    # Padded full-lane execution: the (single, short) last chunk keeps
    # decoding zero bits past the payload end — every table entry has
    # length >= 1, so positions advance at most 16 bits per step into
    # the zero padding and the surplus symbols are truncated at the
    # end. This removes all per-step active-lane bookkeeping.
    pad = 2 * chunk + 8
    buf = np.frombuffer(payload, dtype=np.uint8)
    buf = np.concatenate([buf, np.zeros(pad, dtype=np.uint8)])
    # 24-bit big-endian window starting at each byte, precomputed once:
    # one gather per step instead of three.
    W = (
        (buf[:-2].astype(np.uint32) << np.uint32(16))
        | (buf[1:-1].astype(np.uint32) << np.uint32(8))
        | buf[2:].astype(np.uint32)
    )
    mask = np.uint32((1 << L) - 1)
    base_shift = np.int64(24 - L)
    pos = offsets.astype(np.int64)
    out = np.empty((n_chunks, chunk), dtype=np.uint64)
    table_len64 = table_len.astype(np.int64)
    for step in range(chunk):
        byte = pos >> 3
        # ((w << (pos&7)) >> (24-L)) & mask == (w >> (24-L-(pos&7))) & mask
        idx = (W[byte] >> (base_shift - (pos & 7)).astype(np.uint32)) & mask
        idx = idx.astype(np.int64)
        out[:, step] = table_sym[idx]
        pos += table_len64[idx]
    return out.ravel()[:n]
