"""Reproduce paper Figs. 14/15 numeric annotations: PSNR at matched
compressed size on Copper and Bun Zipper."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.visual_quality(n=20_000, target_cr=12.0)
    print(E.format_rows(rows, "Figs. 14/15 — PSNR at matched CR (~12)"))
