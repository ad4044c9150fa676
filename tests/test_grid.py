"""Tests for the hierarchical grid."""
import numpy as np
import pytest

from repro.core.grid import DOMAIN, HierarchicalGrid
from repro.core.pivots import pivot_map, select_pivots
from tests.conftest import unit_rows


def _mapped(n=200, dim=12, n_pivots=3, seed=0):
    X = unit_rows(n, dim, seed)
    P = select_pivots(X, n_pivots, seed=seed)
    return pivot_map(X, P)


@pytest.mark.parametrize("m", [1, 2, 3, 5])
def test_every_vector_in_exactly_one_leaf(m):
    Xp = _mapped()
    hg = HierarchicalGrid(Xp, m)
    counts = np.zeros(len(Xp), dtype=int)
    for idx in hg.leaves.values():
        counts[idx] += 1
    assert np.all(counts == 1)


@pytest.mark.parametrize("m", [1, 2, 4])
def test_leaf_bounds_contain_vectors(m):
    Xp = _mapped()
    hg = HierarchicalGrid(Xp, m)
    for coords, idx in hg.leaves.items():
        lo, up = hg.bounds(m, coords)
        pts = Xp[idx]
        assert np.all(pts >= lo - 1e-12) and np.all(pts <= up + 1e-12)


def test_side_lengths_halve():
    hg = HierarchicalGrid(_mapped(), 3)
    assert hg.side(1) == DOMAIN / 2
    assert hg.side(2) == DOMAIN / 4
    assert hg.side(3) == DOMAIN / 8


def test_children_partition_parents():
    Xp = _mapped()
    hg = HierarchicalGrid(Xp, 3)
    # Walking root→leaves reaches every occupied leaf exactly once.
    reached = hg.descendant_leaves(0, hg.root())
    assert sorted(reached) == sorted(hg.leaves.keys())


def test_child_coords_are_children():
    hg = HierarchicalGrid(_mapped(), 3)
    for (level, parent), kids in hg.children.items():
        for kid in kids:
            assert tuple(x >> 1 for x in kid) == parent


def test_boundary_value_clipped():
    """A coordinate exactly at DOMAIN lands in the last cell, not out of range."""
    Xp = np.array([[DOMAIN, 0.0], [0.0, DOMAIN]])
    hg = HierarchicalGrid(Xp, 2)
    for coords in hg.leaves:
        assert all(0 <= c < 4 for c in coords)


def test_m_zero_rejected():
    with pytest.raises(ValueError):
        HierarchicalGrid(_mapped(), 0)


def test_n_cells_counts_all_levels():
    hg = HierarchicalGrid(_mapped(), 2)
    assert hg.n_cells() == len(hg.leaves) + len(hg.children)


def test_empty_leaf_lookup():
    hg = HierarchicalGrid(_mapped(), 2)
    assert hg.vectors_in_leaf((999, 999, 999)).size == 0
