"""Algorithm 1 (multi-frame hybrid LCP) invariants: error bound on
every frame, batch independence, anchor bookkeeping, partial
retrieval, and the batch-parallel worker equivalence."""
import numpy as np
import pytest

from repro.core import lcp
from repro.datasets import particles

EB = 1e-2


def _check_bound(arch, data, eb=EB):
    dec = lcp.decompress_all(arch)
    assert sorted(dec) == list(range(len(data)))
    for f in sorted(dec):
        err = np.abs(dec[f] - data[f][arch.perms[f]]).max()
        assert err <= eb * (1 + 1e-9), (f, err)
    return dec


@pytest.mark.parametrize("name", particles.MULTIFRAME)
def test_error_bound_all_frames(name):
    data = particles.load(name, 1200, 8)
    arch = lcp.compress_frames(list(data), EB, batch_size=4, p=64)
    _check_bound(arch, data)


@pytest.mark.parametrize("batch_size", [1, 2, 3, 8, 16])
def test_batch_sizes(batch_size):
    data = particles.load("helium", 800, 10)
    arch = lcp.compress_frames(list(data), EB, batch_size=batch_size, p=64)
    _check_bound(arch, data)


def test_first_frame_always_spatial_anchor():
    data = particles.load("lj", 800, 6)
    arch = lcp.compress_frames(list(data), EB, batch_size=3, p=64)
    assert 0 in arch.anchors  # frame 0 has no reference: must be LCP-S


def test_temporal_selected_on_correlated_data():
    data = particles.load("helium", 2000, 8)
    arch = lcp.compress_frames(list(data), EB, batch_size=4, p=64)
    assert sum(m == "temporal" for m in arch.selected.values()) >= 4


def test_spatial_selected_on_uncorrelated_data():
    # Independent frames (re-generated single-frame clouds) have no
    # temporal correlation: LCP must fall back to LCP-S.
    g = np.random.default_rng(0)
    data = [g.uniform(0, 100, (1500, 3)) for _ in range(6)]
    arch = lcp.compress_frames(data, EB, batch_size=3, p=64)
    assert all(m == "spatial" for m in arch.selected.values())


def test_batch_decompression_is_self_contained():
    # §7.3: decompressing a batch must need only its own rows + its
    # (single) anchor — build a stripped archive and verify.
    data = particles.load("helium", 1000, 12)
    arch = lcp.compress_frames(list(data), EB, batch_size=4, p=64)
    target_batch = 2
    stripped = lcp.LCPArchive(
        eb=arch.eb, p=arch.p, batch_size=arch.batch_size,
        eb_scale=arch.eb_scale, n_particles=arch.n_particles,
        n_dims=arch.n_dims,
        frames={
            f: cf for f, cf in arch.frames.items() if cf.batch == target_batch
        },
        anchors={
            b: a
            for b, a in arch.anchors.items()
            if b == target_batch or b == arch.anchor_of.get(target_batch)
        },
        anchor_of=dict(arch.anchor_of),
        perms=arch.perms,
    )
    dec = lcp.decompress_batch(stripped, target_batch)
    full = lcp.decompress_all(arch)
    for f in dec:
        assert np.array_equal(dec[f], full[f])


def test_decompress_frame_matches_full():
    data = particles.load("copper", 900, 9)
    arch = lcp.compress_frames(list(data), EB, batch_size=3, p=64)
    full = lcp.decompress_all(arch)
    for f in [0, 4, 8]:
        assert np.array_equal(lcp.decompress_frame(arch, f), full[f])


def test_size_accounting_counts_everything():
    data = particles.load("yiip", 700, 6)
    arch = lcp.compress_frames(list(data), EB, batch_size=3, p=64)
    payload_total = sum(len(cf.payload) for cf in arch.frames.values())
    payload_total += sum(len(a) for a in arch.anchors.values())
    assert arch.size_bytes() == payload_total + lcp.FRAME_OVERHEAD * arch.n_frames


def test_hybrid_beats_spatial_only_on_temporal_data():
    data = particles.load("helium", 2000, 12)
    hybrid = lcp.compress_frames(list(data), EB, batch_size=4, p=64)
    spatial = lcp.compress_frames(
        list(data), EB, batch_size=4, p=64, use_temporal=False
    )
    assert hybrid.size_bytes() < spatial.size_bytes()


def test_selection_overhead_bounded_when_spatial_dominates():
    g = np.random.default_rng(1)
    data = [g.uniform(0, 100, (800, 3)) for _ in range(32)]
    arch = lcp.compress_frames(data, EB, batch_size=8, p=64)
    # §7.2: LCP-T test executions stay a small fraction of frames.
    assert arch.tested_frames <= 2 + len(data) // 2


class TestSingleBatchWorker:
    def test_equivalent_to_manual_chain(self):
        data = particles.load("helium", 900, 8)
        b0 = lcp.compress_single_batch(list(data[:4]), 0, None, EB, 64, 4)
        b1 = lcp.compress_single_batch(list(data[4:]), 1, data[0], EB, 64, 4)
        d0 = lcp.decompress_single_batch(
            b0.frames, b0.own_anchor_payload, None, 0, 4
        )
        d1 = lcp.decompress_single_batch(
            b1.frames, b1.own_anchor_payload, b1.prev_anchor_payload, 1, 4
        )
        for f, dec in {**d0, **d1}.items():
            perm = (b0 if f < 4 else b1).perms[f]
            assert np.abs(dec - data[f][perm]).max() <= EB * (1 + 1e-9)

    def test_prev_anchor_recomputed_deterministically(self):
        data = particles.load("copper", 700, 5)
        b0 = lcp.compress_single_batch(list(data[:4]), 0, None, EB, 64, 4)
        b1 = lcp.compress_single_batch(list(data[4:]), 1, data[0], EB, 64, 4)
        assert b1.prev_anchor_payload == b0.own_anchor_payload

    def test_first_batch_has_no_prev(self):
        data = particles.load("lj", 600, 3)
        b0 = lcp.compress_single_batch(list(data), 0, None, EB, 64, 4)
        assert not b0.used_prev_anchor
        assert b0.prev_anchor_payload is None
        assert b0.own_anchor_payload is not None

    def test_temporal_first_frame_references_anchor(self):
        data = particles.load("helium", 2000, 8)
        b1 = lcp.compress_single_batch(list(data[4:]), 1, data[0], EB, 64, 4)
        if b1.used_prev_anchor:
            first = [cf for cf in b1.frames if cf.frame == 4]
            assert first and first[0].ref == "anchor"
