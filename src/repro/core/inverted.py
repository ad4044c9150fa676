"""Inverted index over the leaf cells of ``HG_SV`` (§III-C).

Keys are leaf-cell coordinates; each postings list holds, per column
having at least one vector in the cell, the indices of those vectors in
the global target matrix. Postings are sorted by column id so that
verification can proceed document-at-a-time (DaaT), with one column
(= document) fully resolved before the next — the layout that enables
the early-termination rules (joinability reached / Lemma 7).
"""
from __future__ import annotations

import numpy as np

from repro.core.grid import Coords, HierarchicalGrid

__all__ = ["InvertedIndex"]


class InvertedIndex:
    """leaf cell → [(col_idx, vector row indices)] sorted by column."""

    def __init__(self, hg: HierarchicalGrid, col_of_vector: np.ndarray) -> None:
        """``col_of_vector[i]`` is the integer column index of vector i."""
        self.postings: dict[Coords, list[tuple[int, np.ndarray]]] = {}
        for coords, idx in hg.leaves.items():
            cols = col_of_vector[idx]
            order = np.argsort(cols, kind="stable")
            idx_sorted, cols_sorted = idx[order], cols[order]
            cuts = np.flatnonzero(np.diff(cols_sorted)) + 1
            groups = np.split(idx_sorted, cuts)
            starts = np.concatenate(([0], cuts))
            self.postings[coords] = [
                (int(cols_sorted[s]), grp) for s, grp in zip(starts, groups)
            ]

    def lookup(self, coords: Coords) -> list[tuple[int, np.ndarray]]:
        return self.postings.get(coords, [])

    def n_postings(self) -> int:
        return sum(len(v) for v in self.postings.values())
