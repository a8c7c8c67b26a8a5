"""Benchmark reproducing paper Table 2 (blocking vs entropy/autocorrelation).

Run: pytest benchmarks/bench_table2.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_table2_blocking(benchmark):
    rows = benchmark.pedantic(
        E.table2_blocking, kwargs=dict(n=40_000, eb=1e-3), rounds=1, iterations=1
    )
    _save("table2.txt", E.format_rows(rows, "Table 2 - blocking"))
    for r in rows:
        assert r["entropy_bs8"] < r["entropy_bs64"] < r["entropy_noblock"]
