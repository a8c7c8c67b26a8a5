"""Reproduce paper Fig. 10: mean compression-ratio rank (CD diagram
numbers)."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.ranking(n=10_000, frames=16, ebs=(1e-1, 1e-2, 1e-3), batch_sizes=(8, 16))
    print(E.format_rows(rows, "Fig. 10 — mean CR rank (lower is better)"))
