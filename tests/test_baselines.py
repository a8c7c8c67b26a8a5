"""Baseline compressor tests: roundtrips, error-bound semantics, and
the behaviours the paper attributes to each comparator."""
import numpy as np
import pytest

from repro.baselines import registry
from repro.baselines.base import sorted_rows
from repro.baselines.draco import bits_for_eb
from repro.baselines.sz3 import _interp_reconstruct, _interp_residuals
from repro.baselines.zfp import _haar_forward, _haar_inverse
from repro.datasets import particles

EBS = [1e-1, 1e-2]
PERM_CODECS = ["sz2", "sz3", "mdz", "zfp", "sperr"]
SET_CODECS = ["draco", "tmc13"]


@pytest.mark.parametrize("name", PERM_CODECS)
@pytest.mark.parametrize("dataset", ["copper", "hacc", "dep3"])
@pytest.mark.parametrize("eb", EBS)
def test_perm_codec_error_bound(name, dataset, eb):
    codec = registry.make(name)
    coords = particles.load(dataset, 1200, 1)[0]
    r = codec.compress_frame(coords, eb)
    dec = codec.decompress_frame(r.payload)
    assert dec.shape == coords.shape
    assert np.abs(dec - coords[r.perm]).max() <= eb * (1 + 1e-9)
    assert np.array_equal(dec, r.recon)


@pytest.mark.parametrize("name", SET_CODECS)
@pytest.mark.parametrize("dataset", ["lj", "bunzipper"])
def test_set_codec_count_and_grid(name, dataset):
    codec = registry.make(name)
    coords = particles.load(dataset, 1500, 1)[0]
    eb = 1e-2
    r = codec.compress_frame(coords, eb)
    dec = codec.decompress_frame(r.payload)
    assert len(dec) == len(coords)  # point count preserved
    # Decompressed multiset equals the encoder-side reconstruction.
    assert np.allclose(sorted_rows(dec), sorted_rows(r.recon))
    # Per-particle error via the compression-side pairing.
    assert np.abs(r.recon - coords[r.perm]).max() <= max(
        eb, _effective_eb(codec, r)
    ) * (1 + 1e-9)


def _effective_eb(codec, r):
    if codec.name != "draco":
        return 0.0
    from repro.baselines.base import unpack_frame

    _, _, _, eff_eb, _, _ = unpack_frame(r.payload, 0, 1)
    return eff_eb


@pytest.mark.parametrize("name", registry.EVALUATED)
def test_multiframe_archive_roundtrip(name):
    codec = registry.make(name)
    data = particles.load("helium", 800, 6)
    arch = codec.compress_frames(list(data), 1e-2, batch_size=3)
    dec = codec.decompress_archive(arch)
    if not isinstance(dec, list):
        dec = [dec[f] for f in sorted(dec)]
    assert len(dec) == 6
    assert arch.size_bytes() < data.nbytes


class TestSZ3:
    def test_interp_transform_invertible(self):
        g = np.random.default_rng(0)
        for n in [1, 2, 3, 7, 64, 100, 1023]:
            q = g.integers(-1000, 1000, n)
            assert np.array_equal(
                _interp_reconstruct(_interp_residuals(q)), q
            )

    def test_residuals_small_on_smooth_data(self):
        # Interpolation beats Lorenzo/delta for the *typical* value on
        # smooth signals (coarse levels are large but rare, so compare
        # medians — what entropy coding responds to).
        q = (np.sin(np.linspace(0, 4 * np.pi, 512)) * 1000).astype(np.int64)
        res = _interp_residuals(q)
        assert np.median(np.abs(res[1:])) < np.median(np.abs(np.diff(q)))


class TestZFPTransform:
    def test_haar_invertible(self):
        g = np.random.default_rng(1)
        q = g.integers(-(10**6), 10**6, (500, 4))
        assert np.array_equal(_haar_inverse(_haar_forward(q)), q)

    def test_nonmultiple_of_4_lengths(self):
        codec = registry.make("zfp")
        g = np.random.default_rng(2)
        for n in [1, 2, 3, 5, 101]:
            coords = g.uniform(0, 10, (n, 3))
            r = codec.compress_frame(coords, 1e-2)
            dec = codec.decompress_frame(r.payload)
            assert dec.shape == coords.shape
            assert np.abs(dec - coords).max() <= 1e-2 * (1 + 1e-9)


class TestDraco:
    def test_no_arbitrary_eb_staircase(self):
        # Draco honours only discrete bit levels: two nearby error
        # bounds map to the same level -> identical compressed output.
        codec = registry.make("draco")
        coords = particles.load("bunzipper", 1000, 1)[0]
        r1 = codec.compress_frame(coords, 1.1e-2)
        r2 = codec.compress_frame(coords, 1.3e-2)
        assert r1.payload == r2.payload

    def test_bits_for_eb_clamped(self):
        coords = particles.load("bunzipper", 500, 1)[0]
        assert bits_for_eb(coords, 1e-12) == 20
        assert bits_for_eb(coords, 1e3) == 7

    def test_fixed_bits_constructor(self):
        codec = registry.make("draco", bits=10)
        coords = particles.load("lj", 800, 1)[0]
        r = codec.compress_frame(coords, 1e-9)  # eb ignored
        dec = codec.decompress_frame(r.payload)
        step = (coords.max(0) - coords.min(0)).max() / 1024
        assert np.abs(r.recon - coords[r.perm]).max() <= step


class TestTMC13:
    def test_duplicate_points_preserved(self):
        coords = np.repeat(
            np.random.default_rng(3).uniform(0, 10, (100, 3)), 3, axis=0
        )
        codec = registry.make("tmc13")
        r = codec.compress_frame(coords, 1e-2)
        dec = codec.decompress_frame(r.payload)
        assert len(dec) == 300

    def test_octree_matches_voxel_grid(self):
        from repro.core import quantize

        codec = registry.make("tmc13")
        coords = particles.load("hacc", 1000, 1)[0]
        eb = 1e-1
        r = codec.compress_frame(coords, eb)
        dec = codec.decompress_frame(r.payload)
        q, mins = quantize.quantize(coords, eb)
        expect = quantize.dequantize(q, eb, mins)
        assert np.allclose(sorted_rows(dec), sorted_rows(expect))


class TestMDZ:
    def test_batch_level_selection_modes(self):
        from repro.baselines.base import unpack_frame

        codec = registry.make("mdz")
        data = particles.load("copper", 800, 6)
        arch = codec.compress_frames(list(data), 1e-2, batch_size=3)
        modes = [unpack_frame(p)[2][0] for p in arch.frames]
        # First of each batch is DIRECT; followers share one batch mode.
        assert modes[0] == 0 and modes[3] == 0
        assert modes[1] == modes[2] and modes[4] == modes[5]

    def test_error_bound_multiframe(self):
        codec = registry.make("mdz")
        data = particles.load("helium", 700, 5)
        arch = codec.compress_frames(list(data), 1e-2, batch_size=5)
        dec = codec.decompress_archive(arch)
        for f in range(5):
            assert np.abs(dec[f] - data[f]).max() <= 1e-2 * (1 + 1e-9)


class TestTMC2Exclusion:
    """The paper's §8.2 reasons for excluding TMC2, verified."""

    def test_point_count_not_preserved(self):
        codec = registry.make("tmc2")
        coords = particles.load("hacc", 3000, 1)[0]
        r = codec.compress_frame(coords, 1e-3)
        dec = codec.decompress_frame(r.payload)
        assert len(dec) < len(coords)

    def test_no_error_bound_support(self):
        codec = registry.make("tmc2")
        assert not codec.supports_arbitrary_eb

    def test_excluded_from_evaluated_registry(self):
        assert "tmc2" not in registry.EVALUATED
        assert len(registry.EVALUATED) == 8  # LCP + 7 evaluated baselines


class TestSPERR:
    def test_outlier_correction_guarantees_bound(self):
        # Discontinuous signal defeats the wavelet; only the outlier
        # pass can save the bound.
        codec = registry.make("sperr")
        g = np.random.default_rng(4)
        coords = np.where(
            g.random((2000, 3)) < 0.5, g.uniform(0, 1, (2000, 3)),
            g.uniform(99, 100, (2000, 3)),
        )
        r = codec.compress_frame(coords, 1e-2)
        dec = codec.decompress_frame(r.payload)
        assert np.abs(dec - coords).max() <= 1e-2 * (1 + 1e-9)
