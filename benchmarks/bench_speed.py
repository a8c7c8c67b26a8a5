"""Benchmark reproducing paper Figs. 16/17/18 (speed).

Run: pytest benchmarks/bench_speed.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_speed_single_frame(benchmark):
    rows = benchmark.pedantic(
        E.speed, kwargs=dict(n=40_000), rounds=1, iterations=1
    )
    _save("speed_single.txt", E.format_rows(rows, "Figs. 16/17 - speed MB/s"))


def test_speed_batch(benchmark):
    rows = benchmark.pedantic(
        E.speed_batch, kwargs=dict(n=20_000, frames=16, batch_size=16),
        rounds=1, iterations=1,
    )
    _save("speed_batch.txt", E.format_rows(rows, "Fig. 18 - batch speed MB/s"))
