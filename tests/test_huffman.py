"""Unit tests for the canonical length-limited Huffman codec."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import huffman


def roundtrip(v):
    v = np.asarray(v, dtype=np.uint64)
    out = huffman.decode(huffman.encode(v))
    assert np.array_equal(out, v)
    return out


class TestCodeLengths:
    def test_single_symbol_gets_one_bit(self):
        assert huffman.code_lengths(np.array([100])).tolist() == [1]

    def test_two_equal_symbols(self):
        assert huffman.code_lengths(np.array([5, 5])).tolist() == [1, 1]

    def test_skewed_lengths_ordering(self):
        lengths = huffman.code_lengths(np.array([1000, 10, 10, 1]))
        assert lengths[0] == min(lengths)
        assert lengths[3] == max(lengths)

    def test_kraft_inequality_tight(self):
        g = np.random.default_rng(1)
        freqs = g.integers(1, 1000, 50)
        lengths = huffman.code_lengths(freqs)
        assert np.isclose(np.sum(2.0 ** -lengths), 1.0)

    def test_length_limit_respected(self):
        # Fibonacci-like frequencies force deep trees; the limiter must
        # cap at 16 while keeping a decodable (Kraft <= 1) code.
        freqs = np.array([1] * 2 + [2**i for i in range(1, 30)])
        lengths = huffman.code_lengths(freqs)
        assert lengths.max() <= huffman.MAX_CODE_LEN
        assert np.sum(2.0 ** -lengths) <= 1.0 + 1e-12

    def test_zero_freq_rejected(self):
        with pytest.raises(ValueError):
            huffman.code_lengths(np.array([1, 0]))


class TestCanonicalCodes:
    def test_prefix_free(self):
        lengths = huffman.code_lengths(np.array([50, 20, 20, 5, 5]))
        codes = huffman.canonical_codes(lengths)
        bits = [
            format(int(c), "b").zfill(int(ln)) for c, ln in zip(codes, lengths)
        ]
        for i, a in enumerate(bits):
            for j, b in enumerate(bits):
                if i != j:
                    assert not b.startswith(a)


class TestRoundtrip:
    def test_empty(self):
        roundtrip([])

    def test_single(self):
        roundtrip([42])

    def test_constant(self):
        roundtrip(np.zeros(5000, dtype=np.uint64))

    def test_two_values(self):
        roundtrip(np.tile([7, 9], 321))

    @pytest.mark.parametrize("n", [1, 2, 63, 64, 65, 1000, 4097, 100_000])
    def test_sizes(self, n):
        g = np.random.default_rng(n)
        roundtrip(g.integers(0, 97, n))

    def test_skewed_zipf(self):
        g = np.random.default_rng(3)
        roundtrip(g.zipf(1.3, 20_000) % 5000)

    def test_large_values(self):
        g = np.random.default_rng(4)
        roundtrip(g.integers(0, 1 << 45, 3000))

    def test_compresses_skewed_data(self):
        g = np.random.default_rng(5)
        v = np.where(g.random(50_000) < 0.95, 0, g.integers(1, 64, 50_000))
        enc = huffman.encode(v.astype(np.uint64))
        # ~0.3 bits/symbol entropy: must be far below 6-bit fixed coding.
        assert len(enc) * 8 < 0.35 * len(v) * 6

    @given(
        st.lists(st.integers(min_value=0, max_value=300), max_size=300)
    )
    @settings(max_examples=40, deadline=None)
    def test_hypothesis(self, vals):
        roundtrip(np.array(vals, dtype=np.uint64))


class TestExpectedBits:
    def test_matches_actual_payload_bits(self):
        g = np.random.default_rng(6)
        v = g.integers(0, 50, 10_000).astype(np.uint64)
        expect = huffman.expected_bits(v)
        _, counts = np.unique(v, return_counts=True)
        lengths = huffman.code_lengths(counts)
        assert expect == int((counts * lengths).sum())

    def test_empty(self):
        assert huffman.expected_bits(np.array([], dtype=np.uint64)) == 0


class TestChunkChoice:
    def test_bounds(self):
        assert huffman._choose_chunk(1) == 64
        assert huffman._choose_chunk(10**9) == huffman.CHUNK

    def test_monotone(self):
        sizes = [huffman._choose_chunk(n) for n in [10, 100, 10_000, 10**6]]
        assert sizes == sorted(sizes)
