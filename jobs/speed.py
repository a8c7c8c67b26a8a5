"""Reproduce paper Figs. 16/17/18: compression and decompression speed."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.speed(n=40_000)
    print(E.format_rows(rows, "Figs. 16/17 — single-frame speed (MB/s)"))
    rows = E.speed_batch(n=20_000, frames=16, batch_size=16)
    print(E.format_rows(rows, "Fig. 18 — batch-mode speed (MB/s, batch=16)"))
