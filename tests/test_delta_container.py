"""Unit tests for delta/zigzag transforms and container framing."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import container, delta


class TestDelta:
    def test_roundtrip_simple(self):
        a = np.array([5, 7, 7, 3, -2])
        assert np.array_equal(delta.delta_decode(delta.delta_encode(a)), a)

    def test_empty(self):
        assert len(delta.delta_encode(np.array([], dtype=np.int64))) == 0
        assert len(delta.delta_decode(np.array([], dtype=np.int64))) == 0

    def test_single(self):
        assert delta.delta_encode(np.array([9])).tolist() == [9]

    def test_monotone_becomes_small(self):
        a = np.arange(0, 1000, 3)
        d = delta.delta_encode(a)
        assert (d[1:] == 3).all()

    @given(st.lists(st.integers(-(10**12), 10**12), max_size=300))
    @settings(max_examples=40, deadline=None)
    def test_hypothesis_roundtrip(self, vals):
        a = np.array(vals, dtype=np.int64)
        assert np.array_equal(delta.delta_decode(delta.delta_encode(a)), a)


class TestZigzag:
    @pytest.mark.parametrize(
        "signed,unsigned", [(0, 0), (-1, 1), (1, 2), (-2, 3), (2, 4)]
    )
    def test_known_mapping(self, signed, unsigned):
        assert delta.zigzag_encode(np.array([signed]))[0] == unsigned

    def test_roundtrip(self):
        g = np.random.default_rng(0)
        a = g.integers(-(10**9), 10**9, 10_000)
        assert np.array_equal(
            delta.zigzag_decode(delta.zigzag_encode(a)), a
        )

    def test_small_magnitudes_stay_small(self):
        a = np.array([-3, 3])
        assert delta.zigzag_encode(a).max() <= 6


class TestContainer:
    def test_roundtrip(self):
        blobs = [b"", b"x", b"hello" * 100]
        packed = container.pack_blobs(*blobs)
        assert container.unpack_blobs(packed, 3) == blobs

    def test_trailing_bytes_detected(self):
        packed = container.pack_blobs(b"a", b"b")
        with pytest.raises(ValueError):
            container.unpack_blobs(packed + b"!", 2)

    def test_scalars(self):
        assert container.unpack_i64(container.pack_i64(1, -5, 2**40)).tolist() == [
            1,
            -5,
            2**40,
        ]
        out = container.unpack_f64(container.pack_f64(1.5, -2.25))
        assert out.tolist() == [1.5, -2.25]

    def test_empty_blob_list(self):
        assert container.pack_blobs() == b""
        assert container.unpack_blobs(b"", 0) == []
