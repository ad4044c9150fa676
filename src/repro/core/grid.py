"""Hierarchical grids over the pivot space (§III-B).

The pivot space is the hyper-cube ``[0, DOMAIN]^{|P|}`` (DOMAIN = 2 for
unit-normalized vectors under Euclidean distance). Level ``i`` of an
``m``-level grid splits each dimension into ``2^i`` equal parts, giving
``2^{|P|·i}`` cells; only non-empty cells are materialized. A cell is
identified by ``(level, coords)`` where ``coords`` is the integer tuple
of per-dimension indices; the parent of a cell halves each coordinate.

``HierarchicalGrid`` stores, per leaf cell, the indices of the vectors
it contains, and the child links needed by the dual descent of
Algorithm 1.
"""
from __future__ import annotations

import numpy as np

__all__ = ["DOMAIN", "HierarchicalGrid"]

#: Extent of the pivot space per dimension (max pairwise distance, §V).
DOMAIN = 2.0

Coords = tuple[int, ...]


class HierarchicalGrid:
    """An m-level grid over mapped vectors ``Xp`` (shape (n, |P|))."""

    def __init__(self, Xp: np.ndarray, m: int) -> None:
        if m < 1:
            raise ValueError("grid needs at least one level")
        self.m = m
        self.dims = Xp.shape[1]
        self.n = Xp.shape[0]
        side = DOMAIN / (1 << m)
        # Leaf coordinates per vector; clip handles x == DOMAIN exactly.
        coords = np.floor(Xp / side).astype(np.int64)
        np.clip(coords, 0, (1 << m) - 1, out=coords)
        self.leaf_of_vector = coords  # (n, dims) int

        # leaf cell -> np.ndarray of vector indices
        leaves: dict[Coords, list[int]] = {}
        for i, c in enumerate(map(tuple, coords.tolist())):
            leaves.setdefault(c, []).append(i)
        self.leaves: dict[Coords, np.ndarray] = {
            c: np.asarray(v, dtype=np.int64) for c, v in leaves.items()
        }

        # children[(level, coords)] -> sorted list of child coords at level+1.
        # Level 0 is the root cell with coords (0,)*dims.
        self.children: dict[tuple[int, Coords], list[Coords]] = {}
        current = set(self.leaves.keys())
        for level in range(m, 0, -1):
            parents: dict[Coords, set[Coords]] = {}
            for c in current:
                parents.setdefault(tuple(x >> 1 for x in c), set()).add(c)
            for p, kids in parents.items():
                self.children[(level - 1, p)] = sorted(kids)
            current = set(parents.keys())

    # -- geometry --------------------------------------------------------
    def side(self, level: int) -> float:
        """Edge length of a cell at ``level``."""
        return DOMAIN / (1 << level)

    def bounds(self, level: int, coords: Coords) -> tuple[np.ndarray, np.ndarray]:
        """(lower, upper) corner arrays of the cell."""
        s = self.side(level)
        lo = np.asarray(coords, dtype=np.float64) * s
        return lo, lo + s

    def root(self) -> Coords:
        return (0,) * self.dims

    def child_cells(self, level: int, coords: Coords) -> list[Coords]:
        """Non-empty children of ``(level, coords)`` (empty list at m)."""
        return self.children.get((level, coords), [])

    def vectors_in_leaf(self, coords: Coords) -> np.ndarray:
        return self.leaves.get(coords, np.empty(0, dtype=np.int64))

    def descendant_leaves(self, level: int, coords: Coords) -> list[Coords]:
        """All non-empty leaf cells under ``(level, coords)``."""
        if level == self.m:
            return [coords] if coords in self.leaves else []
        out: list[Coords] = []
        stack = [(level, coords)]
        while stack:
            lvl, c = stack.pop()
            if lvl == self.m:
                out.append(c)
            else:
                stack.extend((lvl + 1, k) for k in self.child_cells(lvl, c))
        return out

    def n_cells(self) -> int:
        """Total number of materialized cells across all levels."""
        return len(self.leaves) + len(self.children)
