"""Unit tests for the fixed/variable-width bit packer."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import bitcodec


class TestWidthFor:
    def test_zero(self):
        assert bitcodec.width_for(0) == 1

    def test_one(self):
        assert bitcodec.width_for(1) == 1

    @pytest.mark.parametrize("v,w", [(2, 2), (3, 2), (4, 3), (255, 8), (256, 9)])
    def test_powers(self, v, w):
        assert bitcodec.width_for(v) == w

    def test_negative_raises(self):
        with pytest.raises(ValueError):
            bitcodec.width_for(-1)


class TestFixedRoundtrip:
    @pytest.mark.parametrize("width", [1, 3, 7, 8, 13, 16, 31, 33, 57])
    def test_random_roundtrip(self, width):
        g = np.random.default_rng(width)
        v = g.integers(0, 1 << min(width, 62), 1000).astype(np.uint64) & (
            (np.uint64(1) << np.uint64(width)) - np.uint64(1)
        )
        packed = bitcodec.pack_bits(v, width)
        assert len(packed) == (1000 * width + 7) // 8
        out = bitcodec.unpack_fixed(packed, width, 1000)
        assert np.array_equal(out, v)

    def test_empty(self):
        assert bitcodec.pack_bits(np.array([], dtype=np.uint64), 5) == b""
        assert len(bitcodec.unpack_fixed(b"", 5, 0)) == 0

    def test_single_value(self):
        packed = bitcodec.pack_bits(np.array([5], dtype=np.uint64), 3)
        assert np.array_equal(bitcodec.unpack_fixed(packed, 3, 1), [5])

    def test_width_58_rejected_on_unpack(self):
        with pytest.raises(ValueError):
            bitcodec.unpack_fixed(b"\x00" * 64, 58, 1)

    def test_all_zeros(self):
        v = np.zeros(100, dtype=np.uint64)
        assert np.array_equal(
            bitcodec.unpack_fixed(bitcodec.pack_bits(v, 4), 4, 100), v
        )

    def test_all_max(self):
        v = np.full(100, 127, dtype=np.uint64)
        assert np.array_equal(
            bitcodec.unpack_fixed(bitcodec.pack_bits(v, 7), 7, 100), v
        )

    @given(
        st.lists(st.integers(min_value=0, max_value=(1 << 20) - 1), max_size=200)
    )
    @settings(max_examples=30, deadline=None)
    def test_hypothesis_roundtrip(self, vals):
        v = np.array(vals, dtype=np.uint64)
        out = bitcodec.unpack_fixed(bitcodec.pack_bits(v, 20), 20, len(v))
        assert np.array_equal(out, v)


class TestVarRoundtrip:
    def test_mixed_widths(self):
        g = np.random.default_rng(0)
        widths = g.integers(1, 40, 500)
        vals = np.array(
            [int(g.integers(0, 1 << int(w))) for w in widths], dtype=np.uint64
        )
        packed = bitcodec.pack_bits(vals, widths)
        out = bitcodec.unpack_var(packed, widths)
        assert np.array_equal(out, vals)

    def test_empty(self):
        assert (
            len(bitcodec.unpack_var(b"", np.array([], dtype=np.int64))) == 0
        )

    def test_bit_exact_layout(self):
        # Value 0b101 in 3 bits then 0b1 in 1 bit -> byte 1011_0000.
        packed = bitcodec.pack_bits(
            np.array([0b101, 0b1], dtype=np.uint64), np.array([3, 1])
        )
        assert packed == bytes([0b1011_0000])
