"""Benchmark reproducing paper Fig. 9 (error distribution).

Run: pytest benchmarks/bench_error_bound.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_error_distribution(benchmark):
    rows = benchmark.pedantic(
        E.error_distribution, kwargs=dict(n=40_000, frames=8, eb=0.1),
        rounds=1, iterations=1,
    )
    _save("error_bound.txt", E.format_rows(rows, "Fig. 9 - error distribution"))
    assert rows[0]["within_bound"]
