"""LCP-T temporal codec and LCP-FSM selection tests."""
import numpy as np
import pytest

from repro.core import fsm, lcp_s, lcp_t
from repro.datasets import particles


class TestLCPT:
    def test_roundtrip_error_bound(self):
        frames = particles.load("helium", 2000, 2)
        eb = 1e-2
        s = lcp_s.compress(frames[0], eb, 64)
        t = lcp_t.compress(frames[1][s.perm], s.recon, eb)
        dec = lcp_t.decompress(t.payload, s.recon)
        assert np.abs(dec - frames[1][s.perm]).max() <= eb * (1 + 1e-9)

    def test_recon_matches_decompress(self):
        frames = particles.load("copper", 1000, 2)
        s = lcp_s.compress(frames[0], 1e-2, 64)
        t = lcp_t.compress(frames[1][s.perm], s.recon, 1e-2)
        assert np.array_equal(lcp_t.decompress(t.payload, s.recon), t.recon)

    def test_smaller_than_spatial_on_correlated_frames(self):
        frames = particles.load("helium", 4000, 2)
        eb = 1e-2
        s0 = lcp_s.compress(frames[0], eb, 64)
        s1 = lcp_s.compress(frames[1], eb, 64)
        t1 = lcp_t.compress(frames[1][s0.perm], s0.recon, eb)
        assert len(t1.payload) < len(s1.payload)

    def test_mixed_precision_anchor(self):
        # §7.4.2: anchor at eb/5, temporal frame at eb — bound must
        # still hold exactly (re-quantization onto the current grid).
        frames = particles.load("helium", 2000, 2)
        eb = 1e-1
        s = lcp_s.compress(frames[0], eb / 5, 64)
        t = lcp_t.compress(frames[1][s.perm], s.recon, eb)
        dec = lcp_t.decompress(t.payload, s.recon)
        assert np.abs(dec - frames[1][s.perm]).max() <= eb * (1 + 1e-9)

    def test_shape_mismatch_rejected(self):
        with pytest.raises(ValueError):
            lcp_t.compress(np.zeros((5, 3)), np.zeros((6, 3)), 1e-2)

    def test_identical_frames_compress_tiny(self):
        coords = particles.load("lj", 3000, 1)[0]
        eb = 1e-2
        s = lcp_s.compress(coords, eb, 64)
        t = lcp_t.compress(coords[s.perm], s.recon, eb)
        # all-zero diffs collapse
        assert len(t.payload) < 1500


class TestFSM:
    def test_initial_state_compares(self):
        m = fsm.LCPFSM()
        assert m.state == "COMPARE"
        assert m.should_test()

    def test_spatial_wins_back_off(self):
        m = fsm.LCPFSM()
        m.record(True, "spatial")
        assert m.interval == 2
        assert m.state == "S2X"
        m.record(False, None)
        assert m.should_test()
        m.record(True, "spatial")
        assert m.interval == 4

    def test_temporal_win_resets(self):
        m = fsm.LCPFSM()
        for _ in range(4):
            m.record(True, "spatial")
        assert m.interval > 2
        m.record(True, "temporal")
        assert m.interval == 1
        assert m.should_test()

    def test_interval_capped(self):
        m = fsm.LCPFSM()
        for _ in range(20):
            m.record(True, "spatial")
        assert m.interval == fsm.MAX_INTERVAL

    def test_test_frequency_respects_interval(self):
        m = fsm.LCPFSM()
        m.interval = 4
        m.since_test = 0
        tests = []
        for _ in range(8):
            t = m.should_test()
            tests.append(t)
            m.record(t, "spatial" if t else None)
            if t:
                m.interval = 4  # hold interval fixed for the check
        assert sum(tests[:4]) == 1

    def test_selection_overhead_under_5_percent(self):
        # Paper §7.2: even when LCP-S wins every frame, the FSM keeps
        # LCP-T test executions (the selection overhead) bounded. With
        # exponential back-off over F frames, tests ~ log2 + F/MAX.
        m = fsm.LCPFSM()
        tested = 0
        frames = 2000
        for _ in range(frames):
            if m.should_test():
                tested += 1
                m.record(True, "spatial")
            else:
                m.record(False, None)
        assert tested <= frames * 0.05

    def test_reset(self):
        m = fsm.LCPFSM()
        m.record(True, "spatial")
        m.reset()
        assert m.state == "COMPARE" and m.since_test == 0
