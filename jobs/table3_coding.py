"""Reproduce paper Table 3: Huffman vs fixed-length coding of the
block-id and relative-position streams."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    rows = E.table3_coding(n=40_000)
    print(E.format_rows(rows, "Table 3 — Huffman vs fixed-length coding"))
