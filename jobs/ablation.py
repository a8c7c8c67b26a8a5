"""Reproduce paper Fig. 8 (ablation): LCP-S -> +BLK -> +LCP-T -> +EB."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.ablation(n=20_000, frames=32, ebs=(1e-1, 1e-2, 1e-3), batch_size=16)
    print(E.format_rows(rows, "Fig. 8 — ablation (CR per variant)"))
