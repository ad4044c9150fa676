"""Pivot selection and pivot mapping (§III-A, §III-D).

Pivot mapping sends a vector ``x`` to ``x' = [d(p_1,x), …, d(p_n,x)]``
for a pivot set ``P``. Lemmas 1 and 2 (triangle inequality) then filter
and match vectors using only pivot-space coordinates.

Pivot selection follows the PCA-based method of Mao et al. [20] the
paper adopts for its O(|S_V|) cost: good pivots are outliers, and the
points with extreme projections along the top principal components are
exactly the outliers that spread the mapped vectors.
"""
from __future__ import annotations

import numpy as np

__all__ = ["select_pivots", "pivot_map", "lemma1_filter_mask", "lemma2_match_mask"]


def select_pivots(
    X: np.ndarray, n_pivots: int, *, seed: int = 0, sample: int = 4096
) -> np.ndarray:
    """PCA-based pivot selection: (n_pivots, dim) rows drawn from ``X``.

    For each of the top principal components (cycled if ``n_pivots``
    exceeds the rank), the not-yet-chosen sample point with the largest
    absolute projection is picked — an outlier along that axis.
    """
    if len(X) == 0:
        raise ValueError("cannot select pivots from an empty dataset")
    g = np.random.default_rng(seed)
    idx = np.arange(len(X)) if len(X) <= sample else g.choice(len(X), sample, False)
    S = X[idx]
    centered = S - S.mean(axis=0)
    # Top components via SVD of the (sample, dim) matrix.
    _, _, vt = np.linalg.svd(centered, full_matrices=False)
    chosen: list[int] = []
    comp = 0
    n_comp = vt.shape[0]
    while len(chosen) < n_pivots:
        proj = np.abs(centered @ vt[comp % n_comp])
        order = np.argsort(-proj)
        for j in order:
            if j not in chosen:
                chosen.append(int(j))
                break
        comp += 1
    return S[chosen].copy()


def pivot_map(X: np.ndarray, pivots: np.ndarray) -> np.ndarray:
    """Map vectors to the pivot space: (n, |P|) matrix of distances."""
    # ||x - p||^2 = ||x||^2 + ||p||^2 - 2 x·p, computed blockwise.
    x2 = np.einsum("ij,ij->i", X, X)[:, None]
    p2 = np.einsum("ij,ij->i", pivots, pivots)[None, :]
    d2 = x2 + p2 - 2.0 * (X @ pivots.T)
    np.maximum(d2, 0.0, out=d2)
    return np.sqrt(d2)


def lemma1_filter_mask(Xp: np.ndarray, qp: np.ndarray, tau: float) -> np.ndarray:
    """Boolean mask of rows of ``Xp`` that *survive* Lemma 1.

    Row x' survives iff |x'[j] - q'[j]| <= τ for every pivot j; rows
    outside the square query region SQR(q', τ) provably do not match.
    """
    return np.all(np.abs(Xp - qp) <= tau, axis=1)


def lemma2_match_mask(Xp: np.ndarray, qp: np.ndarray, tau: float) -> np.ndarray:
    """Boolean mask of rows guaranteed to match by Lemma 2.

    Row x' matches for sure iff x'[j] + q'[j] <= τ for some pivot j
    (i.e. x' lies in a rectangle query region RQR(q', p_j, τ)).
    """
    return np.any(Xp + qp <= tau, axis=1)
