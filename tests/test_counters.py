"""Counter-level claims behind Fig. 7a and Fig. 9 (figures are out of
scope, but the quantities fall out of our modules and pin the paper's
mechanisms)."""
import numpy as np
import pytest

from repro.core.pexeso import PexesoIndex
from repro.partition.cluster import jsd_kmeans, random_partition
from tests.conftest import planted_repo


@pytest.fixture(scope="module")
def repo():
    return planted_repo(seed=20, n_cols=36, col_size=24, n_query=16, dim=16)


def test_fig7a_distance_computation_ordering(repo):
    """Fig. 7a: naive scan > PEXESO-H > PEXESO in distance computations."""
    Q, X, col, n_cols = repo
    engine = PexesoIndex(X, col, n_cols, n_pivots=5, m=4)
    tau, T = 0.3, 0.4
    px = engine.search(Q, tau, T)
    h = engine.search(Q, tau, T, use_inverted=False)
    scan = len(Q) * len(X)
    assert px.n_distance <= h.n_distance <= scan
    assert px.n_distance < scan  # blocking must actually prune


def _partitioned_distance_total(Q, col_vectors, assign, k, tau, T):
    total = 0
    for part in range(k):
        cols = [c for c, p in assign.items() if p == part]
        if not cols:
            continue
        X = np.vstack([col_vectors[c] for c in cols])
        col_of = np.concatenate(
            [np.full(len(col_vectors[c]), i) for i, c in enumerate(cols)]
        )
        engine = PexesoIndex(X, col_of, len(cols), n_pivots=3, m=3)
        total += engine.search(Q, tau, T).n_distance
    return total


def test_fig9_jsd_partitioning_not_worse_than_random(repo):
    """Fig. 9's mechanism: clustering similar columns together gives the
    per-partition pivots more filtering power, so the total verification
    work under JSD partitioning should not exceed random partitioning."""
    Q, X, col, n_cols = repo
    col_vectors = {f"c{c}": X[col == c] for c in range(n_cols)}
    k = 4
    jsd_total = _partitioned_distance_total(
        Q, col_vectors, jsd_kmeans(col_vectors, k, seed=1), k, 0.3, 0.4
    )
    rnd_total = _partitioned_distance_total(
        Q, col_vectors, random_partition(col_vectors, k, seed=1), k, 0.3, 0.4
    )
    # Allow slack: at test scale the effect is noisy, but JSD must not
    # be catastrophically worse.
    assert jsd_total <= rnd_total * 1.25


def test_partitioned_union_equals_single_index(repo):
    """Searching partitions independently and unioning loses nothing."""
    Q, X, col, n_cols = repo
    tau, T = 0.3, 0.4
    single = PexesoIndex(X, col, n_cols, n_pivots=3, m=3).search(Q, tau, T)
    col_vectors = {c: X[col == c] for c in range(n_cols)}
    assign = jsd_kmeans({str(c): v for c, v in col_vectors.items()}, 3, seed=0)
    got = set()
    for part in range(3):
        cols = sorted(int(c) for c, p in assign.items() if p == part)
        if not cols:
            continue
        Xp_ = np.vstack([col_vectors[c] for c in cols])
        col_of = np.concatenate(
            [np.full(len(col_vectors[c]), i) for i, c in enumerate(cols)]
        )
        eng = PexesoIndex(Xp_, col_of, len(cols), n_pivots=3, m=3)
        got |= {cols[i] for i in eng.search(Q, tau, T).joinable}
    assert got == single.joinable
