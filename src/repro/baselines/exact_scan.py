"""Brute-force joinability: the naive method of §III and the test oracle.

Computes every query-target distance (``|Q| · |S_V|`` evaluations) and
the exact per-column match counts. All other methods must agree with
this on joinable sets (PEXESO, CTREE, EPT exactly; PQ approximately).
"""
from __future__ import annotations

import numpy as np

__all__ = ["match_counts", "joinable_columns"]


def match_counts(
    Q: np.ndarray, X: np.ndarray, col_of_vector: np.ndarray, n_cols: int, tau: float
) -> np.ndarray:
    """Exact per-column count of query vectors with ≥1 match in the column."""
    counts = np.zeros(n_cols, dtype=np.int64)
    tau2 = tau * tau
    x2 = np.einsum("ij,ij->i", X, X)
    for q in Q:
        d2 = x2 + q @ q - 2.0 * (X @ q)
        hit_cols = np.unique(col_of_vector[d2 <= tau2])
        counts[hit_cols] += 1
    return counts


def joinable_columns(
    Q: np.ndarray,
    X: np.ndarray,
    col_of_vector: np.ndarray,
    n_cols: int,
    tau: float,
    T_abs: int,
) -> set[int]:
    """Exact joinable column set at absolute threshold ``T_abs``."""
    counts = match_counts(Q, X, col_of_vector, n_cols, tau)
    return set(np.flatnonzero(counts >= T_abs).tolist())
