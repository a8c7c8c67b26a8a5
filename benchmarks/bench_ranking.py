"""Benchmark reproducing paper Fig. 10 (mean CR ranks / CD diagram).

Run: pytest benchmarks/bench_ranking.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_ranking(benchmark):
    rows = benchmark.pedantic(
        E.ranking,
        kwargs=dict(n=10_000, frames=16, ebs=(1e-1, 1e-2, 1e-3),
                    batch_sizes=(8, 16)),
        rounds=1, iterations=1,
    )
    _save("ranking.txt", E.format_rows(rows, "Fig. 10 - mean CR rank"))
    assert rows[0]["codec"] == "lcp"
