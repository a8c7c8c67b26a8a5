"""Benchmark reproducing paper Fig. 11 (multi-frame compression ratios).

Run: pytest benchmarks/bench_compression_ratio.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_compression_ratio(benchmark):
    rows = benchmark.pedantic(
        E.compression_ratio,
        kwargs=dict(n=20_000, frames=16, ebs=(1e-2, 1e-3), batch_sizes=(8, 16)),
        rounds=1, iterations=1,
    )
    _save("compression_ratio.txt", E.format_rows(rows, "Fig. 11 - CR"))
    for r in rows:
        others = [v for k, v in r.items() if k.startswith("cr_") and k != "cr_lcp"]
        assert r["cr_lcp"] >= max(others)  # LCP highest CR everywhere
