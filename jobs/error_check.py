"""Reproduce paper Fig. 9: LCP error distribution vs the bound
(Helium, eb = 0.1)."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.error_distribution(n=40_000, frames=8, eb=0.1)
    print(E.format_rows(rows, "Fig. 9 — error distribution (Helium, eb=0.1)"))
