"""EPT baseline: pivot-table scan (§VI-A, [27]).

A pivot table stores the pre-computed distances from every target
vector to a pivot set. A range query scans the vectors, skipping the
exact distance computation for any vector Lemma-1-filtered in the
pivot space (∃ pivot j: |d(x,p_j) - d(q,p_j)| > τ).

The scan is organized per column, like the paper's setup: every method
is "equipped with the early termination technique" that skips all the
vectors of a column once its joinability counter reaches T — which
requires column-granular processing. All competitors in this repo use
the same loop granularity (Python per (query vector, column), numpy
inside), mirroring the paper's all-Python implementations, so wall
times are comparable across methods.
"""
from __future__ import annotations

import numpy as np

from repro.core.pivots import pivot_map, select_pivots

__all__ = ["PivotTable", "ept_search"]


class PivotTable:
    """Pre-computed pivot distances for all target vectors."""

    def __init__(self, X: np.ndarray, *, n_pivots: int = 5, seed: int = 0) -> None:
        self.X = X
        self.pivots = select_pivots(X, n_pivots, seed=seed)
        self.Xp = pivot_map(X, self.pivots)

    def range_query(self, q: np.ndarray, tau: float, counter: list[int]) -> np.ndarray:
        """Column-agnostic range query (used by unit tests)."""
        qp = pivot_map(q[None, :], self.pivots)[0]
        rows = np.flatnonzero(np.all(np.abs(self.Xp - qp) <= tau, axis=1))
        if len(rows) == 0:
            return rows
        d = np.linalg.norm(self.X[rows] - q, axis=1)
        counter[0] += len(rows)
        return rows[d <= tau]


def ept_search(
    table: PivotTable,
    col_of_vector: np.ndarray,
    n_cols: int,
    Q: np.ndarray,
    tau: float,
    T_abs: int,
) -> tuple[set[int], int]:
    """EPT workflow; returns (joinable set, distance computations).

    For each query vector and each column: pivot-filter the column's
    vectors, exact-distance the survivors, count one match per
    (q, column); columns that reach T are skipped thereafter.
    """
    counts = np.zeros(n_cols, dtype=np.int64)
    joinable: set[int] = set()
    n_dist = 0
    col_rows = {
        int(c): np.flatnonzero(col_of_vector == c) for c in np.unique(col_of_vector)
    }
    Qp = pivot_map(Q, table.pivots)
    for qi in range(len(Q)):
        q, qp = Q[qi], Qp[qi]
        for col, rows in col_rows.items():
            if col in joinable:
                continue  # early termination
            sub = rows[np.all(np.abs(table.Xp[rows] - qp) <= tau, axis=1)]
            if len(sub) == 0:
                continue
            d = np.linalg.norm(table.X[sub] - q, axis=1)
            n_dist += len(sub)
            if np.any(d <= tau):
                counts[col] += 1
                if counts[col] >= T_abs:
                    joinable.add(col)
    return joinable, n_dist
