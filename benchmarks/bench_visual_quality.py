"""Benchmark reproducing paper Figs. 14/15 (PSNR at matched size).

Run: pytest benchmarks/bench_visual_quality.py --benchmark-only -q
Prints the reproduced table and saves it to benchmarks/results/.
"""
import pathlib

from repro.analysis import experiments as E

RESULTS = pathlib.Path(__file__).parent / "results"


def _save(name: str, text: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / name).write_text(text)
    print("\n" + text)


def test_visual_quality(benchmark):
    rows = benchmark.pedantic(
        E.visual_quality, kwargs=dict(n=20_000, target_cr=12.0),
        rounds=1, iterations=1,
    )
    _save("visual_quality.txt",
          E.format_rows(rows, "Figs. 14/15 - PSNR at matched CR (~12)"))
