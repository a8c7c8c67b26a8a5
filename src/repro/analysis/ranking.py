"""Critical-difference-style ranking (paper Fig. 10).

The paper summarizes compression-ratio results across datasets x
settings with a CD diagram: per test case, compressors are ranked
1..k by CR; mean ranks are compared with the Friedman/Nemenyi
critical difference. We reproduce the numbers behind the diagram —
mean rank per compressor and the Nemenyi CD interval — as a table
(figures are out of scope).
"""
from __future__ import annotations

import numpy as np

# Upper-tail studentized-range q_{0.05, k} / sqrt(2) for the Nemenyi
# test, k = number of algorithms (2..10) — standard table.
_Q_ALPHA_05 = {
    2: 1.960, 3: 2.344, 4: 2.569, 5: 2.728, 6: 2.850,
    7: 2.949, 8: 3.031, 9: 3.102, 10: 3.164,
}


def rank_table(results: dict[str, list[float]]) -> dict[str, float]:
    """Mean rank per algorithm; ``results[name]`` = metric per test
    case (higher is better, e.g. compression ratio). Ties share the
    average rank."""
    names = sorted(results)
    mat = np.array([results[n] for n in names], dtype=np.float64)
    k, cases = mat.shape
    ranks = np.zeros_like(mat)
    for j in range(cases):
        col = -mat[:, j]  # higher metric -> better -> rank 1
        order = np.argsort(col, kind="stable")
        r = np.empty(k)
        r[order] = np.arange(1, k + 1)
        # average ties
        for v in np.unique(col):
            tie = col == v
            if tie.sum() > 1:
                r[tie] = r[tie].mean()
        ranks[:, j] = r
    return {n: float(ranks[i].mean()) for i, n in enumerate(names)}


def nemenyi_cd(k: int, n_cases: int, alpha: float = 0.05) -> float:
    """Critical difference between mean ranks at alpha=0.05."""
    if alpha != 0.05:
        raise ValueError("only alpha=0.05 tabulated")
    q = _Q_ALPHA_05[k]
    return float(q * np.sqrt(k * (k + 1) / (6.0 * n_cases)))
