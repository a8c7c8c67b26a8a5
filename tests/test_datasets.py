"""Tests for the synthetic dataset generators (Table 1 stand-ins)."""
import numpy as np
import pytest

from repro.datasets import particles


@pytest.mark.parametrize("name", list(particles.INFO))
def test_shape_and_dtype(name):
    out = particles.load(name, 500, 2)
    assert out.shape == (2, 500, 3)
    assert out.dtype == np.float64
    assert np.isfinite(out).all()


@pytest.mark.parametrize("name", list(particles.INFO))
def test_deterministic(name):
    a = particles.load(name, 300, 2)
    b = particles.load(name, 300, 2)
    assert np.array_equal(a, b)


@pytest.mark.parametrize("name", list(particles.INFO))
def test_seed_changes_data(name):
    a = particles.load(name, 300, 1, seed=1)
    b = particles.load(name, 300, 1, seed=2)
    assert not np.array_equal(a, b)


def test_registry_flags():
    assert set(particles.MULTIFRAME) == {"copper", "helium", "lj", "yiip"}
    assert len(particles.INFO) == 8  # the paper's eight datasets


@pytest.mark.parametrize("name", particles.MULTIFRAME)
def test_multiframe_evolves_slowly(name):
    data = particles.load(name, 1000, 3)
    step = np.abs(data[1] - data[0]).mean()
    rng = data[0].max() - data[0].min()
    assert 0 < step < rng * 0.01  # temporal correlation exists


@pytest.mark.parametrize("name", ["bunzipper", "hacc", "warpx", "dep3"])
def test_singleframe_replicates(name):
    data = particles.load(name, 500, 2)
    assert np.array_equal(data[0], data[1])


def test_identity_consistent_across_frames():
    # Same index = same particle: displacement per particle is small,
    # which would be violated if frames were shuffled independently.
    data = particles.load("helium", 2000, 2)
    disp = np.linalg.norm(data[1] - data[0], axis=1)
    assert disp.max() < 1.0


def test_copper_lattice_regularity():
    # Nearest-stored-neighbour distance is tight for an ordered lattice.
    data = particles.load("copper", 2000, 1)[0]
    d = np.linalg.norm(np.diff(data, axis=0), axis=1)
    assert np.median(d) < 20.0


def test_hacc_is_clustered():
    data = particles.load("hacc", 5000, 1)[0]
    # Clustering: the densest octant holds far more than 1/8 of mass.
    hist, _ = np.histogramdd(data, bins=(4, 4, 4))
    assert hist.max() > 3 * len(data) / 64


def test_warpx_is_anisotropic():
    data = particles.load("warpx", 5000, 1)[0]
    stds = data.std(axis=0)
    assert stds[2] > 3 * stds[0]


def test_dep3_scanline_order():
    data = particles.load("dep3", 4000, 1)[0]
    # Scan order: consecutive x nearly sorted.
    assert (np.diff(data[:, 0]) >= -2.0).mean() > 0.95


def test_yiip_membrane_layer():
    data = particles.load("yiip", 6000, 1)[0]
    z = data[:, 2]
    near_mid = np.abs(z - 50) < 5
    assert near_mid.mean() > 0.35  # membrane + protein concentration
