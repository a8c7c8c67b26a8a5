"""Benchmark reproducing paper Figs. 12/13 (rate-distortion).

Run: pytest benchmarks/bench_rate_distortion.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_rate_distortion_single(benchmark):
    rows = benchmark.pedantic(
        E.rate_distortion_single, kwargs=dict(n=20_000), rounds=1, iterations=1
    )
    _save("rate_distortion_single.txt",
          E.format_rows(rows, "Fig. 12 - RD single frame"))


def test_rate_distortion_multi(benchmark):
    rows = benchmark.pedantic(
        E.rate_distortion_multi, kwargs=dict(n=20_000, frames=16),
        rounds=1, iterations=1,
    )
    _save("rate_distortion_multi.txt",
          E.format_rows(rows, "Fig. 13 - RD multi-frame (batch=16)"))
    for r in rows:
        assert r["br_lcp"] <= min(
            v for k, v in r.items() if k.startswith("br_")
        ) * 1.001
