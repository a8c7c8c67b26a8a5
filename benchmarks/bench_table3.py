"""Benchmark reproducing paper Table 3 (Huffman vs fixed-length coding).

Run: pytest benchmarks/bench_table3.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_table3_coding(benchmark):
    rows = benchmark.pedantic(
        E.table3_coding, kwargs=dict(n=40_000), rounds=1, iterations=1
    )
    _save("table3.txt", E.format_rows(rows, "Table 3 - coding method sizes"))
    winners = {r["id_winner"] for r in rows} | {r["rel_winner"] for r in rows}
    assert winners == {"huffman", "fixed"}  # data-dependent, as in the paper
