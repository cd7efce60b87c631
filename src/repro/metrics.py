"""Accuracy metrics used throughout the evaluation.

The paper reports L1 norm error against the exact RWR vector (Fig. 1c) and
Spearman rank correlation between the approximate and exact vectors (Fig. 4),
because most RWR applications consume the *ranking*.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

__all__ = ["l1_error", "spearman"]


def l1_error(approx: np.ndarray, exact: np.ndarray) -> float:
    """‖approx − exact‖₁."""
    approx = np.asarray(approx, dtype=np.float64)
    exact = np.asarray(exact, dtype=np.float64)
    if approx.shape != exact.shape:
        raise ValueError(f"shape mismatch: {approx.shape} vs {exact.shape}")
    return float(np.abs(approx - exact).sum())


def spearman(approx: np.ndarray, exact: np.ndarray) -> float:
    """Spearman rank correlation (ties get average ranks, as in [2]).

    Computed via pandas rank + Pearson on ranks; returns a value in [-1, 1].
    A constant vector has undefined correlation — returns 0.0 for it.
    """
    a = pd.Series(np.asarray(approx, dtype=np.float64))
    e = pd.Series(np.asarray(exact, dtype=np.float64))
    if len(a) != len(e):
        raise ValueError("length mismatch")
    ra, re = a.rank(), e.rank()
    sa, se = ra.std(), re.std()
    if sa == 0 or se == 0 or np.isnan(sa) or np.isnan(se):
        return 0.0
    return float(np.corrcoef(ra, re)[0, 1])
