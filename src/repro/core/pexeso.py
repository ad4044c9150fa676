"""PEXESO index construction and search (Algorithm 3, §III-E).

``PexesoIndex.build`` runs the offline pipeline: PCA pivot selection →
pivot mapping → hierarchical grid over the mapped target vectors →
inverted index. ``PexesoIndex.search`` runs the online pipeline for a
query column: map the query, build ``HG_Q`` with the same ``m``, block
(Algorithm 1 + quick browsing), verify (Algorithm 2).

``use_inverted=False`` at search time turns the verifier into the
naive cell-scan of the PEXESO-H baseline (§VI-A) — identical blocking,
no inverted-index / per-vector pivot pruning.
"""
from __future__ import annotations

from dataclasses import dataclass
import math

import numpy as np

from repro.core import block as blockmod
from repro.core import verify as verifymod
from repro.core.grid import HierarchicalGrid
from repro.core.inverted import InvertedIndex
from repro.core.pivots import pivot_map, select_pivots

__all__ = ["SearchResult", "PexesoIndex", "t_abs"]


def t_abs(T: float, n_query: int) -> int:
    """Absolute joinability threshold: T is a fraction of |Q| (§V)."""
    return max(1, math.ceil(T * n_query))


@dataclass
class SearchResult:
    """Joinable columns plus the counters behind Tables VI/VII & Fig. 7a."""

    joinable: set[int]
    match_counts: np.ndarray
    n_distance: int
    n_candidates: int
    n_match_pairs: int
    block_seconds: float = 0.0
    verify_seconds: float = 0.0


class PexesoIndex:
    """A single in-memory PEXESO over one repository (or one partition)."""

    def __init__(
        self,
        X: np.ndarray,
        col_of_vector: np.ndarray,
        n_cols: int,
        *,
        n_pivots: int = 5,
        m: int = 4,
        seed: int = 0,
    ) -> None:
        """Build the index over target vectors ``X`` (rows unit-norm).

        ``col_of_vector`` maps each row of ``X`` to its column index in
        ``[0, n_cols)``.
        """
        if len(X) != len(col_of_vector):
            raise ValueError("X and col_of_vector must align")
        self.X = X
        self.col_of_vector = np.asarray(col_of_vector, dtype=np.int64)
        self.n_cols = n_cols
        self.m = m
        self.pivots = select_pivots(X, n_pivots, seed=seed)
        self.Xp = pivot_map(X, self.pivots)
        self.grid = HierarchicalGrid(self.Xp, m)
        self.index = InvertedIndex(self.grid, self.col_of_vector)

    # -- online ----------------------------------------------------------
    def search(
        self,
        Q: np.ndarray,
        tau: float,
        T: float,
        *,
        use_inverted: bool = True,
        use_quick_browsing: bool = True,
        early_terminate: bool = True,
    ) -> SearchResult:
        """Find all columns joinable to the query column ``Q`` (Alg. 3)."""
        import time

        t0 = time.perf_counter()
        Qp = pivot_map(Q, self.pivots)
        hg_q = HierarchicalGrid(Qp, self.m)
        blocks = blockmod.block(
            hg_q, self.grid, Qp, tau, use_quick_browsing=use_quick_browsing
        )
        t1 = time.perf_counter()
        T_abs = t_abs(T, len(Q))
        if use_inverted:
            res = verifymod.verify(
                blocks, self.index, self.X, self.Xp, Q, Qp, tau, T_abs,
                self.n_cols, early_terminate=early_terminate,
            )
        else:
            res = verifymod.verify_naive(
                blocks, self.grid, self.col_of_vector, self.X, Q, tau,
                T_abs, self.n_cols,
            )
        t2 = time.perf_counter()
        return SearchResult(
            joinable=res.joinable_columns(),
            match_counts=res.match,
            n_distance=res.n_distance,
            n_candidates=blocks.n_candidates(),
            n_match_pairs=blocks.n_matches(),
            block_seconds=t1 - t0,
            verify_seconds=t2 - t1,
        )
