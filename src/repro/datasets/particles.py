"""Synthetic stand-ins for the paper's eight particle datasets (Table 1).

Each generator returns ``(F, N, 3)`` float64 coordinates, deterministic
in ``seed``. The generators reproduce the properties LCP's evaluation
hinges on (see DESIGN.md §3):

* spatial distribution — lattice (Copper), gas (Helium), liquid (LJ),
  macromolecule + membrane (YIIP), 2-manifold surface (BUN-ZIPPER),
  halo clustering (HACC), beam streams (WarpX), terrain (3DEP);
* temporal evolution speed — slow oscillation (Copper), slow diffusion
  (Helium), moderate drift (LJ, YIIP), single-frame (the rest);
* storage order decoupled from spatial order — particle order is a
  fixed random permutation held constant across frames (identity is
  preserved, as in MD trajectory files), except 3DEP which keeps lidar
  scan order.

``load(name, n, frames, seed)`` is the single entry point; ``INFO``
describes each dataset (multi-frame or not, paper-side domain).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np

BOX = 100.0  # all datasets live in a ~[0, 100]^3 box so eb in
# {1e-1, 1e-2, 1e-3} spans the paper's relative-precision regimes.


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _shuffle(frames: np.ndarray, seed: int) -> np.ndarray:
    """Fixed random storage order, identical across frames (identity
    preserved) — models storage order != spatial order (§6.2)."""
    perm = _rng(seed ^ 0x5EED).permutation(frames.shape[1])
    return frames[:, perm, :]


def copper(n: int, frames: int, seed: int = 0) -> np.ndarray:
    """FCC copper lattice with small thermal oscillations: solid
    material MD — high spatial regularity, very high temporal
    correlation (the regime MDZ targets)."""
    g = _rng(seed)
    cells = int(np.ceil((n / 4) ** (1 / 3)))
    a = BOX / cells  # lattice constant
    base = np.array([[0, 0, 0], [0.5, 0.5, 0], [0.5, 0, 0.5], [0, 0.5, 0.5]])
    grid = np.stack(
        np.meshgrid(np.arange(cells), np.arange(cells), np.arange(cells),
                    indexing="ij"),
        axis=-1,
    ).reshape(-1, 1, 3)
    sites = ((grid + base) * a).reshape(-1, 3)[:n]
    amp = 0.03 * a
    phase = g.uniform(0, 2 * np.pi, (n, 3))
    freq = g.uniform(0.3, 0.5, (n, 3))
    t = np.arange(frames).reshape(-1, 1, 1)
    osc = amp * np.sin(freq * t + phase)
    noise = g.normal(0, 0.1 * amp, (frames, n, 3))
    out = sites + osc + noise
    # Storage order is *loosely* lattice order: MD packages write atoms
    # grouped by molecule/type, so the order correlates with space but
    # imperfectly (the paper's Table 2 reports no-block lag-1
    # autocorrelation 0.826 for Copper, not ~1). Scatter 25% of the
    # atoms to random storage positions, fixed across frames.
    g2 = _rng(seed ^ 0x0DD)
    moved = g2.choice(n, n // 4, replace=False)
    perm = np.arange(n)
    perm[np.sort(moved)] = perm[moved]
    return out[:, perm, :]


def helium(n: int, frames: int, seed: int = 1) -> np.ndarray:
    """Gas atoms diffusing in a box: no lattice structure, but slow
    per-frame displacement — the dataset where LCP-T wins most often."""
    g = _rng(seed)
    pos = g.uniform(0, BOX, (n, 3))
    out = np.empty((frames, n, 3))
    out[0] = pos
    sigma = 0.02  # small step => high temporal correlation
    for t in range(1, frames):
        pos = np.clip(pos + g.normal(0, sigma, (n, 3)), 0, BOX)
        out[t] = pos
    return _shuffle(out, seed)


def lj(n: int, frames: int, seed: int = 2) -> np.ndarray:
    """Lennard-Jones-like liquid: short-range exclusion structure and
    moderate drift per frame."""
    g = _rng(seed)
    # Jittered grid gives liquid-like short-range order without an
    # O(n^2) relaxation.
    side = int(np.ceil(n ** (1 / 3)))
    cell = BOX / side
    grid = np.stack(
        np.meshgrid(*[np.arange(side)] * 3, indexing="ij"), axis=-1
    ).reshape(-1, 3)[:n]
    pos = (grid + g.uniform(0.15, 0.85, (n, 3))) * cell
    out = np.empty((frames, n, 3))
    out[0] = pos
    sigma = 0.08 * cell
    for t in range(1, frames):
        pos = np.clip(pos + g.normal(0, sigma, (n, 3)), 0, BOX)
        out[t] = pos
    return _shuffle(out, seed)


def yiip(n: int, frames: int, seed: int = 3) -> np.ndarray:
    """Membrane-protein system: two protein blobs embedded in a planar
    membrane slab plus solvent — strongly non-uniform density."""
    g = _rng(seed)
    n_prot = n // 4
    n_mem = n // 3
    n_wat = n - n_prot - n_mem
    prot = np.concatenate(
        [
            g.normal([35, 50, 50], 6.0, (n_prot // 2, 3)),
            g.normal([65, 50, 50], 6.0, (n_prot - n_prot // 2, 3)),
        ]
    )
    mem = np.column_stack(
        [g.uniform(0, BOX, n_mem), g.uniform(0, BOX, n_mem),
         g.normal(50, 2.5, n_mem)]
    )
    wat = g.uniform(0, BOX, (n_wat, 3))
    pos = np.clip(np.concatenate([prot, mem, wat]), 0, BOX)
    out = np.empty((frames, n, 3))
    out[0] = pos
    sig = np.concatenate(
        [np.full(n_prot, 0.02), np.full(n_mem, 0.03), np.full(n_wat, 0.12)]
    ).reshape(-1, 1)
    for t in range(1, frames):
        pos = np.clip(pos + g.normal(0, 1.0, (n, 3)) * sig, 0, BOX)
        out[t] = pos
    return _shuffle(out, seed)


def bunzipper(n: int, frames: int = 1, seed: int = 4) -> np.ndarray:
    """Scanned 3-D model stand-in: points on a bumpy 2-manifold
    (sphere modulated by low-order harmonics), single frame."""
    g = _rng(seed)
    u = g.uniform(0, 2 * np.pi, n)
    v = np.arccos(g.uniform(-1, 1, n))
    r = 30.0 * (
        1.0
        + 0.18 * np.sin(3 * u) * np.sin(2 * v)
        + 0.12 * np.cos(5 * u + v)
        + 0.07 * np.sin(2 * u - 3 * v)
    )
    pts = np.column_stack(
        [
            r * np.sin(v) * np.cos(u),
            r * np.sin(v) * np.sin(u),
            r * 0.8 * np.cos(v),
        ]
    ) + BOX / 2
    pts += g.normal(0, 0.05, (n, 3))  # scanner noise
    return _shuffle(pts[None, :, :].repeat(frames, axis=0), seed)


def hacc(n: int, frames: int = 1, seed: int = 5) -> np.ndarray:
    """Cosmology stand-in: power-law halo mass function, Gaussian
    halos, 20% uniform background — extreme clustering, analyses are
    per-frame (paper §8.1.2)."""
    g = _rng(seed)
    n_bg = n // 5
    n_halo_pts = n - n_bg
    n_halos = max(8, n // 400)
    masses = (1.0 / g.power(2.2, n_halos)).clip(1, 50)
    weights = masses / masses.sum()
    centers = g.uniform(5, BOX - 5, (n_halos, 3))
    sizes = 0.8 + 1.2 * (masses / masses.max()) ** (1 / 3)
    which = g.choice(n_halos, n_halo_pts, p=weights)
    pts = centers[which] + g.normal(0, 1.0, (n_halo_pts, 3)) * sizes[which, None]
    bg = g.uniform(0, BOX, (n_bg, 3))
    out = np.clip(np.concatenate([pts, bg]), 0, BOX)
    return _shuffle(out[None, :, :].repeat(frames, axis=0), seed)


def warpx(n: int, frames: int = 1, seed: int = 6) -> np.ndarray:
    """Plasma accelerator stand-in: anisotropic particle beam —
    elongated in z, tight Gaussian core in x/y, plus a diffuse halo."""
    g = _rng(seed)
    n_core = int(n * 0.8)
    core = np.column_stack(
        [
            g.normal(BOX / 2, 1.2, n_core),
            g.normal(BOX / 2, 1.2, n_core),
            g.uniform(0, BOX, n_core),
        ]
    )
    halo = np.column_stack(
        [
            g.normal(BOX / 2, 8.0, n - n_core),
            g.normal(BOX / 2, 8.0, n - n_core),
            g.uniform(0, BOX, n - n_core),
        ]
    )
    out = np.clip(np.concatenate([core, halo]), 0, BOX)
    return _shuffle(out[None, :, :].repeat(frames, axis=0), seed)


def dep3(n: int, frames: int = 1, seed: int = 7) -> np.ndarray:
    """Lidar terrain stand-in (3DEP): fractal-ish heightfield sampled
    in scan-line order (storage order partially matches x/y but not the
    3-D spatial order)."""
    g = _rng(seed)
    side = int(np.ceil(np.sqrt(n)))
    ix, iy = np.meshgrid(np.arange(side), np.arange(side), indexing="ij")
    ix, iy = ix.ravel()[:n], iy.ravel()[:n]
    x = ix * (BOX / side) + g.uniform(0, BOX / side, n)
    y = iy * (BOX / side) + g.uniform(0, BOX / side, n)
    z = np.zeros(n)
    for k, amp in [(1, 12.0), (3, 5.0), (7, 2.0), (13, 0.8), (29, 0.3)]:
        phx, phy = g.uniform(0, 2 * np.pi, 2)
        z += amp * np.sin(2 * np.pi * k * x / BOX + phx) * np.cos(
            2 * np.pi * k * y / BOX + phy
        )
    z += 30.0 + g.normal(0, 0.05, n)
    return np.column_stack([x, y, z])[None, :, :].repeat(frames, axis=0)


@dataclass(frozen=True)
class DatasetInfo:
    name: str
    domain: str
    multiframe: bool
    gen: Callable[..., np.ndarray]


INFO: dict[str, DatasetInfo] = {
    "copper": DatasetInfo("copper", "Material Science (MD)", True, copper),
    "helium": DatasetInfo("helium", "Material Science (nuclear)", True, helium),
    "lj": DatasetInfo("lj", "Computational Physics", True, lj),
    "yiip": DatasetInfo("yiip", "Biology (MD)", True, yiip),
    "bunzipper": DatasetInfo("bunzipper", "Computer Vision", False, bunzipper),
    "hacc": DatasetInfo("hacc", "Cosmology", False, hacc),
    "warpx": DatasetInfo("warpx", "Plasma Physics", False, warpx),
    "dep3": DatasetInfo("dep3", "Geology (lidar)", False, dep3),
}

MULTIFRAME = [k for k, v in INFO.items() if v.multiframe]
SINGLEFRAME = [k for k, v in INFO.items() if not v.multiframe]


def load(name: str, n: int, frames: int = 1, seed: int | None = None) -> np.ndarray:
    """Generate dataset ``name`` with ``n`` particles and ``frames``
    frames. Single-frame datasets replicate their frame if more are
    requested (HACC/WarpX analyses are per-frame anyway)."""
    info = INFO[name]
    kwargs = {} if seed is None else {"seed": seed}
    return info.gen(n, frames, **kwargs)
