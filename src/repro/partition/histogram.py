"""Column distribution histograms for JSD clustering (§IV).

JSD compares probability distributions, so each column of vectors is
summarized as a probability histogram: counts of its vectors over a
fixed grid of space regions, normalized to sum 1. To keep the histogram
length independent of dimensionality, the bins are the product of
per-dimension quantile cuts of a *reference projection* — we project
vectors onto a small number of random directions (deterministic seed)
and histogram each projection, concatenating the per-direction
histograms. Columns with similar vector distributions produce similar
histograms, which is all §IV's clustering needs.
"""
from __future__ import annotations

import numpy as np

__all__ = ["column_histogram", "histograms"]

_EPS = 1e-9


def _directions(dim: int, k: int, seed: int = 123) -> np.ndarray:
    g = np.random.default_rng(seed)
    D = g.standard_normal((k, dim))
    return D / np.linalg.norm(D, axis=1, keepdims=True)


def column_histogram(
    vectors: np.ndarray, *, n_dirs: int = 4, n_bins: int = 8, seed: int = 123
) -> np.ndarray:
    """Probability histogram (length n_dirs·n_bins, sums to 1) of a column."""
    D = _directions(vectors.shape[1], n_dirs, seed)
    proj = vectors @ D.T  # (n, n_dirs); unit vectors → proj in [-1, 1]
    hist = []
    for j in range(proj.shape[1]):
        h, _ = np.histogram(proj[:, j], bins=n_bins, range=(-1.0, 1.0))
        hist.append(h)
    h = np.concatenate(hist).astype(np.float64)
    h += _EPS  # avoid zero bins (KLD needs full support)
    return h / h.sum()


def histograms(
    column_vectors: dict[str, np.ndarray], **kw
) -> tuple[list[str], np.ndarray]:
    """Histogram matrix for a set of columns: (ids, (n_cols, bins))."""
    ids = sorted(column_vectors)
    H = np.vstack([column_histogram(column_vectors[c], **kw) for c in ids])
    return ids, H
