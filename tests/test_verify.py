"""Exactness of the full PEXESO search (Algorithms 1+2+3) vs brute force."""
import numpy as np
import pytest

from repro.baselines import exact_scan
from repro.core.pexeso import PexesoIndex, t_abs
from tests.conftest import planted_repo


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("tau", [0.15, 0.4, 0.7])
@pytest.mark.parametrize("n_pivots,m", [(3, 2), (3, 4), (5, 3)])
@pytest.mark.parametrize("T", [0.2, 0.5, 0.8])
def test_pexeso_exact(seed, tau, n_pivots, m, T):
    Q, X, col, n_cols = planted_repo(seed=seed)
    idx = PexesoIndex(X, col, n_cols, n_pivots=n_pivots, m=m, seed=seed)
    Ta = t_abs(T, len(Q))
    truth = exact_scan.joinable_columns(Q, X, col, n_cols, tau, Ta)
    assert idx.search(Q, tau, T).joinable == truth


@pytest.mark.parametrize("tau", [0.2, 0.5])
@pytest.mark.parametrize("T", [0.3, 0.6])
def test_pexeso_h_exact(tau, T):
    """PEXESO-H (naive verification) must also be exact."""
    Q, X, col, n_cols = planted_repo(seed=4)
    idx = PexesoIndex(X, col, n_cols, n_pivots=3, m=3, seed=4)
    Ta = t_abs(T, len(Q))
    truth = exact_scan.joinable_columns(Q, X, col, n_cols, tau, Ta)
    assert idx.search(Q, tau, T, use_inverted=False).joinable == truth


@pytest.mark.parametrize("tau", [0.2, 0.6])
def test_full_match_counts_exact(tau):
    """Without early termination the per-column counts are exact."""
    Q, X, col, n_cols = planted_repo(seed=5)
    idx = PexesoIndex(X, col, n_cols, n_pivots=4, m=3, seed=5)
    res = idx.search(Q, tau, 0.5, early_terminate=False)
    counts = exact_scan.match_counts(Q, X, col, n_cols, tau)
    assert np.array_equal(res.match_counts, counts)


def test_no_quick_browsing_same_answer():
    Q, X, col, n_cols = planted_repo(seed=6)
    idx = PexesoIndex(X, col, n_cols, n_pivots=3, m=3, seed=6)
    a = idx.search(Q, 0.4, 0.4)
    b = idx.search(Q, 0.4, 0.4, use_quick_browsing=False)
    assert a.joinable == b.joinable


def test_inverted_reduces_distance_computations():
    """The Fig. 7a claim: PEXESO computes far fewer distances than PEXESO-H."""
    Q, X, col, n_cols = planted_repo(seed=7, n_cols=40)
    idx = PexesoIndex(X, col, n_cols, n_pivots=5, m=4, seed=7)
    with_inv = idx.search(Q, 0.3, 0.5)
    naive = idx.search(Q, 0.3, 0.5, use_inverted=False)
    assert with_inv.n_distance < naive.n_distance


def test_early_termination_never_changes_answer():
    Q, X, col, n_cols = planted_repo(seed=8)
    idx = PexesoIndex(X, col, n_cols, n_pivots=3, m=3, seed=8)
    for T in (0.1, 0.4, 0.9):
        et = idx.search(Q, 0.5, T).joinable
        full = idx.search(Q, 0.5, T, early_terminate=False).joinable
        assert et == full


def test_t_abs():
    assert t_abs(0.5, 10) == 5
    assert t_abs(0.51, 10) == 6
    assert t_abs(0.0, 10) == 1  # at least one match required
    assert t_abs(1.0, 7) == 7


def test_empty_query_region_no_results():
    """A query far from everything yields no joinable columns at tiny τ."""
    Q, X, col, n_cols = planted_repo(seed=9, noise=0.0)
    g = np.random.default_rng(123)
    far = g.standard_normal((4, X.shape[1]))
    far /= np.linalg.norm(far, axis=1, keepdims=True)
    idx = PexesoIndex(X, col, n_cols, n_pivots=3, m=3)
    assert idx.search(far, 0.01, 0.25).joinable == set()


def test_search_counters_populated():
    Q, X, col, n_cols = planted_repo(seed=10)
    idx = PexesoIndex(X, col, n_cols, n_pivots=3, m=3)
    res = idx.search(Q, 0.4, 0.3)
    assert res.block_seconds >= 0 and res.verify_seconds >= 0
    assert res.n_candidates >= 0 and res.n_distance >= 0
