"""Error-bound aware quantization (paper §6.1, Eq. 5).

``q = floor((x - min) / (2*eb))``; reconstruction ``(2q+1)*eb + min``
lands in the centre of the quantization bin, so ``|x - x'| <= eb``
pointwise — the absolute error bound of Eq. 2, guaranteed by
construction for any user-chosen ``eb``.

Both a numpy kernel (used inside codecs) and a Spark SQL expression
builder (used for Catalyst-level twins checked against DuckDB) live
here so the two can be diffed in tests.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F


def quantize(coords: np.ndarray, eb: float, mins: np.ndarray | None = None):
    """Quantize ``coords`` (N, d) to int64 bins. Returns ``(q, mins)``."""
    coords = np.asarray(coords, dtype=np.float64)
    if mins is None:
        mins = coords.min(axis=0)
    q = np.floor((coords - mins) / (2.0 * eb)).astype(np.int64)
    return q, np.asarray(mins, dtype=np.float64)


def dequantize(q: np.ndarray, eb: float, mins: np.ndarray) -> np.ndarray:
    """Reverse quantization (Eq. 5, second line): bin centres."""
    return (2.0 * np.asarray(q, dtype=np.float64) + 1.0) * eb + mins


def quantize_expr(col: Column, eb: float, minimum: float) -> Column:
    """Spark SQL twin of :func:`quantize` for one coordinate column."""
    return F.floor((col - F.lit(minimum)) / F.lit(2.0 * eb)).cast("long")


def dequantize_expr(qcol: Column, eb: float, minimum: float) -> Column:
    """Spark SQL twin of :func:`dequantize`."""
    return (F.lit(2.0) * qcol + F.lit(1.0)) * F.lit(eb) + F.lit(minimum)
