"""Benchmark reproducing paper Fig. 8 (component ablation).

Run: pytest benchmarks/bench_ablation.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_ablation(benchmark):
    rows = benchmark.pedantic(
        E.ablation,
        kwargs=dict(n=20_000, frames=32, ebs=(1e-1, 1e-2, 1e-3), batch_size=16),
        rounds=1, iterations=1,
    )
    _save("ablation.txt", E.format_rows(rows, "Fig. 8 - ablation"))
    for r in rows:
        assert r["cr_lcp_full"] >= r["cr_lcp_s"] * 0.95
