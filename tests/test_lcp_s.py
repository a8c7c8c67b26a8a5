"""LCP-S spatial codec tests: roundtrips, error bound (Eq. 2), stream
accounting, across all eight synthetic datasets and error bounds."""
import numpy as np
import pytest

from repro.core import lcp_s
from repro.datasets import particles

EBS = [1e-1, 1e-2, 1e-3]


@pytest.mark.parametrize("name", list(particles.INFO))
@pytest.mark.parametrize("eb", EBS)
def test_roundtrip_error_bound(name, eb):
    coords = particles.load(name, 1500, 1)[0]
    res = lcp_s.compress(coords, eb, 64)
    dec = lcp_s.decompress(res.payload)
    assert dec.shape == coords.shape
    assert np.abs(dec - coords[res.perm]).max() <= eb * (1 + 1e-9)


@pytest.mark.parametrize("p", [1, 2, 8, 64, 1024, 65536])
def test_roundtrip_all_block_scales(p):
    coords = particles.load("lj", 1200, 1)[0]
    res = lcp_s.compress(coords, 1e-2, p)
    dec = lcp_s.decompress(res.payload)
    assert np.abs(dec - coords[res.perm]).max() <= 1e-2 * (1 + 1e-9)


def test_decompress_matches_compressor_recon():
    coords = particles.load("hacc", 2000, 1)[0]
    res = lcp_s.compress(coords, 1e-2, 32)
    assert np.array_equal(lcp_s.decompress(res.payload), res.recon)


def test_perm_is_permutation():
    coords = particles.load("copper", 1000, 1)[0]
    res = lcp_s.compress(coords, 1e-2, 64)
    assert np.array_equal(np.sort(res.perm), np.arange(1000))


def test_stream_sizes_sum_close_to_payload():
    coords = particles.load("yiip", 3000, 1)[0]
    res = lcp_s.compress(coords, 1e-3, 64)
    stream_total = sum(res.stream_sizes.values())
    # payload = streams + header + framing
    assert stream_total <= len(res.payload) <= stream_total + 200


def test_compresses_vs_raw():
    coords = particles.load("copper", 5000, 1)[0]
    res = lcp_s.compress(coords, 1e-2, 64)
    assert len(res.payload) < coords.nbytes / 3


def test_block_sorted_output_order():
    # Decompressed order must be block-id order (the §6.2.1 layout).
    from repro.core import blocks, quantize

    coords = particles.load("warpx", 1000, 1)[0]
    eb, p = 1e-2, 16
    res = lcp_s.compress(coords, eb, p)
    q, _ = quantize.quantize(coords, eb)
    asg = blocks.assign(q, p)
    linear_sorted = blocks.linear_block_id(q[asg.perm] // p, asg.bn)
    assert (np.diff(linear_sorted) >= 0).all()
    assert np.array_equal(res.perm, asg.perm)


def test_empty_frame_rejected():
    with pytest.raises(ValueError):
        lcp_s.compress(np.zeros((0, 3)), 1e-2, 64)


def test_2d_data_supported():
    # The paper generalizes beyond 3-D (§6); exercise d=2.
    g = np.random.default_rng(0)
    coords = g.uniform(0, 10, (800, 2))
    res = lcp_s.compress(coords, 1e-3, 32)
    dec = lcp_s.decompress(res.payload)
    assert np.abs(dec - coords[res.perm]).max() <= 1e-3 * (1 + 1e-9)


def test_identical_points_supported():
    coords = np.ones((100, 3)) * 5.0
    res = lcp_s.compress(coords, 1e-2, 8)
    dec = lcp_s.decompress(res.payload)
    assert np.abs(dec - coords).max() <= 1e-2


def test_tiny_eb_large_ids():
    # Very small eb stresses wide block-id integers.
    coords = particles.load("dep3", 500, 1)[0]
    res = lcp_s.compress(coords, 1e-4, 8)
    dec = lcp_s.decompress(res.payload)
    assert np.abs(dec - coords[res.perm]).max() <= 1e-4 * (1 + 1e-9)
