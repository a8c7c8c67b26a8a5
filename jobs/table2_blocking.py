"""Reproduce paper Table 2: effect of spatial blocking on entropy and
autocorrelation of quantized particle data.

Usage: spark-submit jobs/table2_blocking.py  (or python jobs/table2_blocking.py)
"""
import _session  # noqa: F401  (path + Spark bootstrap)
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.table2_blocking(n=40_000, eb=1e-3)
    print(E.format_rows(rows, "Table 2 — blocking vs entropy/autocorrelation"))
