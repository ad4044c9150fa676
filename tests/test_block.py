"""Tests for Algorithm 1 (blocking) and quick browsing."""
import numpy as np
import pytest

from repro.core.block import BlockResult, block, quick_browse
from repro.core.grid import HierarchicalGrid
from repro.core.pivots import pivot_map, select_pivots
from tests.conftest import planted_repo


def _setup(tau_seed=0, n_pivots=3, m=3):
    Q, X, col, n_cols = planted_repo(seed=tau_seed)
    P = select_pivots(X, n_pivots, seed=tau_seed)
    Xp, Qp = pivot_map(X, P), pivot_map(Q, P)
    return Q, X, Qp, Xp


@pytest.mark.parametrize("m", [1, 2, 3, 4])
@pytest.mark.parametrize("tau", [0.1, 0.4, 0.8])
def test_blocking_complete(m, tau):
    """Completeness: every true match (q, x) appears in mpair or cpair."""
    Q, X, Qp, Xp = _setup(m=m)
    hg_q, hg_s = HierarchicalGrid(Qp, m), HierarchicalGrid(Xp, m)
    res = block(hg_q, hg_s, Qp, tau)
    leaf_of = {i: tuple(c) for i, c in enumerate(hg_s.leaf_of_vector.tolist())}
    d = np.linalg.norm(Q[:, None, :] - X[None, :, :], axis=2)
    for qi, xi in zip(*np.where(d <= tau)):
        cells = set(res.mpair.get(qi, [])) | set(res.cpair.get(qi, []))
        assert leaf_of[xi] in cells, (qi, xi)


@pytest.mark.parametrize("tau", [0.1, 0.4])
def test_matching_pairs_sound(tau):
    """Every vector in an mpair cell really matches the query vector."""
    Q, X, Qp, Xp = _setup()
    m = 3
    hg_q, hg_s = HierarchicalGrid(Qp, m), HierarchicalGrid(Xp, m)
    res = block(hg_q, hg_s, Qp, tau)
    for qi, cells in res.mpair.items():
        for c in cells:
            rows = hg_s.vectors_in_leaf(c)
            d = np.linalg.norm(X[rows] - Q[qi], axis=1)
            assert np.all(d <= tau + 1e-9)


def test_quick_browsing_equivalent():
    """Same pair *sets* with and without quick browsing."""
    Q, X, Qp, Xp = _setup()
    m, tau = 3, 0.4
    hg_q, hg_s = HierarchicalGrid(Qp, m), HierarchicalGrid(Xp, m)
    with_qb = block(hg_q, hg_s, Qp, tau, use_quick_browsing=True)
    without = block(hg_q, hg_s, Qp, tau, use_quick_browsing=False)

    def norm(r: BlockResult):
        return (
            {q: frozenset(c) for q, c in r.mpair.items() if c},
            {q: frozenset(c) for q, c in r.cpair.items() if c},
        )

    assert norm(with_qb) == norm(without)


def test_quick_browse_emits_shared_leaves():
    Q, X, Qp, Xp = _setup()
    hg_q, hg_s = HierarchicalGrid(Qp, 3), HierarchicalGrid(Xp, 3)
    out = BlockResult()
    shared = quick_browse(hg_q, hg_s, out)
    assert shared == (hg_q.leaves.keys() & hg_s.leaves.keys())
    emitted = {c for cells in out.cpair.values() for c in cells}
    assert emitted == shared


def test_mismatched_levels_rejected():
    Q, X, Qp, Xp = _setup()
    with pytest.raises(ValueError):
        block(HierarchicalGrid(Qp, 2), HierarchicalGrid(Xp, 3), Qp, 0.3)


def test_larger_tau_more_candidates():
    Q, X, Qp, Xp = _setup()
    hg_q, hg_s = HierarchicalGrid(Qp, 3), HierarchicalGrid(Xp, 3)
    small = block(hg_q, hg_s, Qp, 0.05)
    large = block(hg_q, hg_s, Qp, 0.8)
    total_small = small.n_candidates() + small.n_matches()
    total_large = large.n_candidates() + large.n_matches()
    assert total_large >= total_small


def test_blocking_prunes_at_small_tau():
    """At tiny τ most (q, leaf) pairs must be pruned."""
    Q, X, Qp, Xp = _setup()
    hg_q, hg_s = HierarchicalGrid(Qp, 3), HierarchicalGrid(Xp, 3)
    res = block(hg_q, hg_s, Qp, 0.05)
    exhaustive = len(Q) * len(hg_s.leaves)
    assert res.n_candidates() + res.n_matches() < exhaustive * 0.5
