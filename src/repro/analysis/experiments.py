"""Experiment harnesses — one function per paper table/figure.

Each function returns a list of row dicts (printable with
``format_rows``) so pytest benchmarks, spark-submit jobs, and
EXPERIMENTS.md generation all share the same code. Scales default to
benchmark size (~100 MB-class behaviour at laptop-friendly particle
counts); tests call them with small ``n``.

Paper mapping:
  table2_blocking        → Table 2
  table3_coding          → Table 3
  ablation               → Fig. 8
  error_distribution     → Fig. 9
  ranking                → Fig. 10
  compression_ratio      → Fig. 11
  rate_distortion        → Figs. 12 (single-frame) / 13 (multi-frame)
  visual_quality         → Figs. 14 / 15 (their numeric annotations)
  speed                  → Figs. 16 / 17 / 18
"""
from __future__ import annotations

import time

import numpy as np

from ..baselines import registry
from ..core import blocks, lcp, metrics, optimize, quantize
from ..datasets import particles

EBS = [1e-1, 1e-2, 1e-3]


def format_rows(rows: list[dict], title: str = "") -> str:
    """Plain-text table for job stdout and EXPERIMENTS.md."""
    if not rows:
        return f"== {title} ==\n(no rows)\n"
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(_fmt(r.get(c))) for r in rows)) for c in cols
    }
    lines = [f"== {title} ==" if title else ""]
    lines.append(" | ".join(str(c).ljust(widths[c]) for c in cols))
    lines.append("-+-".join("-" * widths[c] for c in cols))
    for r in rows:
        lines.append(" | ".join(_fmt(r.get(c)).ljust(widths[c]) for c in cols))
    return "\n".join(lines) + "\n"


def _fmt(v) -> str:
    if isinstance(v, float):
        if v == 0 or 1e-3 <= abs(v) < 1e6:
            return f"{v:.3f}"
        return f"{v:.3e}"
    return str(v)


# --------------------------------------------------------------- Table 2
def table2_blocking(n: int = 40_000, eb: float = 1e-3) -> list[dict]:
    """Entropy / lag-1 autocorrelation of quantized data: no blocking
    (storage order) vs spatial blocks of size 64 and 8 (relative
    coordinates in block order)."""
    rows = []
    for name in ["copper", "yiip", "bunzipper"]:
        coords = particles.load(name, n, 1)[0]
        q, _ = quantize.quantize(coords, eb)
        row = {"dataset": name}
        # The streams the coder actually sees: without blocking, the
        # quantized coordinate values in storage order; with blocking,
        # the in-block relative values (entropy) and the per-particle
        # block-id sequence in block order (autocorrelation) — sorted
        # ids make the sequence near-monotone, hence ~1.
        row["entropy_noblock"] = metrics.shannon_entropy(q[:, 0])
        row["acorr_noblock"] = metrics.lag1_autocorrelation(q[:, 0])
        for p in (64, 8):
            asg = blocks.assign(q, p)
            row[f"entropy_bs{p}"] = metrics.shannon_entropy(asg.rel[:, 0])
            per_particle_id = np.repeat(asg.block_ids, asg.counts)
            row[f"acorr_bs{p}"] = metrics.lag1_autocorrelation(
                per_particle_id.astype(np.float64)
            )
        rows.append(row)
    return rows


# --------------------------------------------------------------- Table 3
def table3_coding(n: int = 40_000, ebs=EBS) -> list[dict]:
    """Huffman vs fixed-length coded sizes (after delta + Zstd) of the
    block-id and relative-position streams."""
    from ..core import intcodec

    rows = []
    for name in ["helium", "copper", "dep3"]:
        coords = particles.load(name, n, 1)[0]
        for eb in ebs:
            q, _ = quantize.quantize(coords, eb)
            asg = blocks.assign(q, optimize.best_block_size(coords, eb))
            id_sizes = intcodec.encoded_sizes(asg.block_ids, use_delta=True)
            rel_sizes = {
                k: sum(
                    intcodec.encoded_sizes(asg.rel[:, d], use_delta=True)[k]
                    for d in range(3)
                )
                for k in ("huffman", "fixed")
            }
            rows.append(
                {
                    "dataset": name,
                    "eb": eb,
                    "id_huffman_B": id_sizes["huffman"],
                    "id_fixed_B": id_sizes["fixed"],
                    "id_winner": min(id_sizes, key=id_sizes.get),
                    "rel_huffman_B": rel_sizes["huffman"],
                    "rel_fixed_B": rel_sizes["fixed"],
                    "rel_winner": min(rel_sizes, key=rel_sizes.get),
                }
            )
    return rows


# --------------------------------------------------------------- Fig. 8
ABLATION_VARIANTS = ["lcp_s", "lcp_s_blk", "lcp_s_blk_t", "lcp_full"]


def ablation(
    datasets=None, n: int = 20_000, frames: int = 16,
    ebs=(1e-2, 1e-3), batch_size: int = 16,
) -> list[dict]:
    """CR of the incremental LCP variants (LCP-S → +BLK → +LCP-T →
    +EB-scale), per dataset and error bound."""
    rows = []
    for name in datasets or particles.MULTIFRAME:
        data = particles.load(name, n, frames)
        raw = data.nbytes
        for eb in ebs:
            variants = {
                "lcp_s": registry.make(
                    "lcp", optimize_block=False, use_temporal=False
                ),
                "lcp_s_blk": registry.make("lcp", use_temporal=False),
                "lcp_s_blk_t": registry.make("lcp", eb_scale=1.0),
                "lcp_full": registry.make("lcp"),
            }
            row = {"dataset": name, "eb": eb}
            for vname, codec in variants.items():
                arch = codec.compress_frames(list(data), eb, batch_size)
                row[f"cr_{vname}"] = raw / arch.size_bytes()
            rows.append(row)
    return rows


# --------------------------------------------------------------- Fig. 9
def error_distribution(n: int = 40_000, frames: int = 8, eb: float = 0.1) -> list[dict]:
    """Pointwise error stats of LCP on Helium at eb=0.1."""
    data = particles.load("helium", n, frames)
    codec = registry.make("lcp")
    arch = codec.compress_frames(list(data), eb, batch_size=8)
    dec = lcp.decompress_all(arch)
    errs = np.concatenate(
        [np.abs(dec[f] - data[f][arch.perms[f]]).ravel() for f in sorted(dec)]
    )
    return [
        {
            "eb": eb,
            "max_err": float(errs.max()),
            "mean_err": float(errs.mean()),
            "p50": float(np.percentile(errs, 50)),
            "p99": float(np.percentile(errs, 99)),
            "within_bound": bool(errs.max() <= eb * (1 + 1e-9)),
        }
    ]


# -------------------------------------------------------------- Fig. 11
def compression_ratio(
    datasets=None, n: int = 20_000, frames: int = 16,
    ebs=(1e-2, 1e-3), batch_sizes=(8, 16), codecs=None,
) -> list[dict]:
    """Multi-frame CR of every codec per dataset x eb x batch size."""
    rows = []
    for name in datasets or particles.MULTIFRAME:
        data = particles.load(name, n, frames)
        raw = data.nbytes
        for eb in ebs:
            for bs in batch_sizes:
                row = {"dataset": name, "eb": eb, "batch": bs}
                for codec in codecs or registry.all_codecs():
                    arch = codec.compress_frames(list(data), eb, bs)
                    row[f"cr_{codec.name}"] = raw / arch.size_bytes()
                rows.append(row)
    return rows


# -------------------------------------------------- Figs. 12 / 13
def _frame_psnr(codec, coords: np.ndarray, eb: float):
    r = codec.compress_frame(coords, eb)
    paired = coords[r.perm] if r.perm is not None else coords
    if r.recon is not None and r.perm is not None:
        dec = r.recon
    else:
        dec = codec.decompress_frame(r.payload)
        if len(dec) != len(coords):  # count not preserved (TMC2)
            return None
    return (
        metrics.bit_rate(len(r.payload), coords.size),
        metrics.psnr(paired, dec),
        metrics.max_error(paired, dec),
    )


def rate_distortion_single(
    datasets=None, n: int = 20_000, ebs=EBS, codecs=None
) -> list[dict]:
    """Bit rate / PSNR per codec on the middle frame of each dataset."""
    rows = []
    for name in datasets or list(particles.INFO):
        frames = particles.load(name, n, 3)
        coords = frames[len(frames) // 2]
        for eb in ebs:
            row = {"dataset": name, "eb": eb}
            for codec in codecs or registry.all_codecs():
                res = _frame_psnr(codec, coords, eb)
                if res is None:
                    continue
                br, ps, _ = res
                row[f"br_{codec.name}"] = br
                row[f"psnr_{codec.name}"] = ps
            rows.append(row)
    return rows


def rate_distortion_multi(
    datasets=None, n: int = 20_000, frames: int = 16,
    ebs=(1e-2, 1e-3), batch_size: int = 16, codecs=None,
) -> list[dict]:
    """Bit rate / PSNR in batch (multi-frame) mode."""
    rows = []
    for name in datasets or particles.MULTIFRAME:
        data = particles.load(name, n, frames)
        for eb in ebs:
            row = {"dataset": name, "eb": eb}
            for codec in codecs or registry.all_codecs():
                arch = codec.compress_frames(list(data), eb, batch_size)
                dec, perms = _decode_any(codec, arch)
                paired = np.concatenate(
                    [
                        data[f][perms[f]] if perms[f] is not None else data[f]
                        for f in range(len(data))
                    ]
                )
                decoded = np.concatenate([dec[f] for f in range(len(data))])
                row[f"br_{codec.name}"] = metrics.bit_rate(
                    arch.size_bytes(), data.size
                )
                row[f"psnr_{codec.name}"] = metrics.psnr(paired, decoded)
            rows.append(row)
    return rows


def _decode_any(codec, arch):
    """Decode either archive flavour; returns (frames list, perms)."""
    if isinstance(arch, lcp.LCPArchive):
        dec_map = lcp.decompress_all(arch)
        frames = [dec_map[f] for f in sorted(dec_map)]
        perms = [arch.perms[f] for f in sorted(dec_map)]
        return frames, perms
    dec = codec.decompress_archive(arch)
    return dec, arch.perms


# -------------------------------------------------- Figs. 14 / 15
def visual_quality(
    datasets=("copper", "bunzipper"), n: int = 20_000, target_cr: float = 12.0,
    codecs=None,
) -> list[dict]:
    """PSNR at (approximately) matched compressed size: per codec,
    binary-search eb to the target CR, report achieved CR and PSNR."""
    rows = []
    for name in datasets:
        coords = particles.load(name, n, 1)[0]
        raw = coords.nbytes
        for codec in codecs or registry.all_codecs():
            lo, hi = 1e-6, 10.0
            best = None
            for _ in range(18):
                mid = np.sqrt(lo * hi)
                res = _frame_psnr(codec, coords, mid)
                if res is None:
                    break
                br, ps, _ = res
                cr = 64.0 / br if br else float("inf")
                best = {"eb": mid, "cr": cr, "psnr": ps}
                if cr < target_cr:
                    lo = mid
                else:
                    hi = mid
            if best is None:
                continue
            rows.append(
                {
                    "dataset": name,
                    "codec": codec.name,
                    "cr": best["cr"],
                    "psnr": best["psnr"],
                }
            )
    return rows


# -------------------------------------------------- Figs. 16 / 17 / 18
def speed(
    datasets=("hacc", "helium", "bunzipper", "dep3"), n: int = 40_000,
    eb: float = 1e-2, codecs=None,
) -> list[dict]:
    """Single-frame compression and decompression speed (MB/s)."""
    rows = []
    for name in datasets:
        coords = particles.load(name, n, 1)[0]
        raw = coords.nbytes
        for codec in codecs or registry.all_codecs():
            t0 = time.perf_counter()
            r = codec.compress_frame(coords, eb)
            t1 = time.perf_counter()
            codec.decompress_frame(r.payload)
            t2 = time.perf_counter()
            rows.append(
                {
                    "dataset": name,
                    "codec": codec.name,
                    "comp_MB_s": metrics.speed_mb_s(raw, t1 - t0),
                    "decomp_MB_s": metrics.speed_mb_s(raw, t2 - t1),
                }
            )
    return rows


def speed_batch(
    datasets=None, n: int = 20_000, frames: int = 16,
    eb: float = 1e-2, batch_size: int = 16, codecs=None,
) -> list[dict]:
    """Batch-mode retrieval speed (Fig. 18): decompress a whole batch."""
    rows = []
    for name in datasets or particles.MULTIFRAME:
        data = particles.load(name, n, frames)
        raw = data.nbytes
        for codec in codecs or registry.all_codecs():
            t0 = time.perf_counter()
            arch = codec.compress_frames(list(data), eb, batch_size)
            t1 = time.perf_counter()
            _decode_any(codec, arch)
            t2 = time.perf_counter()
            rows.append(
                {
                    "dataset": name,
                    "codec": codec.name,
                    "comp_MB_s": metrics.speed_mb_s(raw, t1 - t0),
                    "decomp_MB_s": metrics.speed_mb_s(raw, t2 - t1),
                }
            )
    return rows


# -------------------------------------------------------------- Fig. 10
def ranking(
    datasets=None, n: int = 10_000, frames: int = 8,
    ebs=(1e-2, 1e-3), batch_sizes=(8, 16), codecs=None,
) -> list[dict]:
    """Mean CR rank per codec across datasets x settings + Nemenyi CD."""
    from . import ranking as rk

    codecs = codecs or registry.all_codecs()
    results = {c.name: [] for c in codecs}
    cr_rows = compression_ratio(
        datasets=datasets, n=n, frames=frames, ebs=ebs,
        batch_sizes=batch_sizes, codecs=codecs,
    )
    for row in cr_rows:
        for c in codecs:
            results[c.name].append(row[f"cr_{c.name}"])
    mean_ranks = rk.rank_table(results)
    cd = rk.nemenyi_cd(len(codecs), len(cr_rows))
    out = [
        {"codec": name, "mean_rank": rank, "cd_05": cd}
        for name, rank in sorted(mean_ranks.items(), key=lambda kv: kv[1])
    ]
    return out
