"""Tests for §7.4 dynamic optimizations and the §4 metrics."""
import numpy as np
import pytest

from repro.core import lcp_s, metrics, optimize
from repro.datasets import particles


class TestBlockSizeSearch:
    def test_returns_candidate(self):
        coords = particles.load("copper", 2000, 1)[0]
        p = optimize.best_block_size(coords, 1e-2)
        assert p in optimize.BLOCK_SIZE_CANDIDATES

    def test_beats_worst_candidate(self):
        coords = particles.load("hacc", 3000, 1)[0]
        eb = 1e-2
        p = optimize.best_block_size(coords, eb)
        sizes = {
            c: len(lcp_s.compress(coords, eb, c).payload)
            for c in [1, 64, 65536]
        }
        assert len(lcp_s.compress(coords, eb, p).payload) <= min(sizes.values())

    def test_restricted_candidates(self):
        coords = particles.load("lj", 1000, 1)[0]
        p = optimize.best_block_size(coords, 1e-2, candidates=[8, 16])
        assert p in (8, 16)

    def test_sampling_caps_cost(self):
        coords = particles.load("lj", 5000, 1)[0]
        p_full = optimize.best_block_size(coords, 1e-2, sample=10**9)
        p_sampled = optimize.best_block_size(coords, 1e-2, sample=1000)
        assert p_sampled in optimize.BLOCK_SIZE_CANDIDATES
        # Sampled choice must be near-optimal (>= 85% of best CR is the
        # paper's own Fig. 6 criterion).
        s_best = len(lcp_s.compress(coords, 1e-2, p_full).payload)
        s_got = len(lcp_s.compress(coords, 1e-2, p_sampled).payload)
        assert s_best / s_got >= 0.80


class TestEbScale:
    def test_uncorrelated_data_no_scaling(self):
        g = np.random.default_rng(0)
        frames = [g.uniform(0, 100, (1500, 3)) for _ in range(2)]
        assert optimize.choose_eb_scale(frames, 1e-2, n_batches=8) == 1.0

    def test_single_frame_no_scaling(self):
        coords = particles.load("lj", 500, 1)
        assert optimize.choose_eb_scale(list(coords), 1e-2, n_batches=8) == 1.0

    def test_returns_known_values(self):
        frames = list(particles.load("helium", 1500, 2))
        out = optimize.choose_eb_scale(frames, 1e-1, n_batches=64)
        assert out in (1.0, optimize.EB_SCALE)


class TestMetrics:
    def test_cr_and_bitrate(self):
        assert metrics.compression_ratio(1000, 100) == 10
        # 8 bytes for 4 values = 16 bits each
        assert metrics.bit_rate(8, 4) == 16.0

    def test_psnr_infinite_for_exact(self):
        a = np.array([1.0, 2.0, 3.0])
        assert metrics.psnr(a, a) == float("inf")

    def test_psnr_matches_formula(self):
        o = np.array([0.0, 10.0])
        d = np.array([1.0, 10.0])
        mse = 0.5
        expect = 20 * np.log10(10 / np.sqrt(mse))
        assert np.isclose(metrics.psnr(o, d), expect)

    def test_max_error(self):
        assert metrics.max_error(np.array([1.0, 2.0]), np.array([1.5, 1.0])) == 1.0

    def test_entropy_uniform(self):
        v = np.arange(64).repeat(10)
        assert np.isclose(metrics.shannon_entropy(v), 6.0)

    def test_entropy_constant(self):
        assert metrics.shannon_entropy(np.zeros(100)) == 0.0

    def test_autocorr_monotone_sequence_high(self):
        assert metrics.lag1_autocorrelation(np.arange(1000)) > 0.99

    def test_autocorr_constant_is_one(self):
        assert metrics.lag1_autocorrelation(np.ones(100)) == 1.0

    def test_autocorr_alternating_negative(self):
        v = np.tile([0.0, 1.0], 500)
        assert metrics.lag1_autocorrelation(v) < -0.99

    def test_speed(self):
        assert metrics.speed_mb_s(2_000_000, 2.0) == 1.0
