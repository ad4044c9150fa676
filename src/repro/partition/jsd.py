"""KL and Jensen–Shannon divergence between probability histograms (§IV)."""
from __future__ import annotations

import numpy as np

__all__ = ["kld", "jsd", "jsd_matrix"]


def kld(a: np.ndarray, b: np.ndarray) -> float:
    """Kullback–Leibler divergence KLD(a ‖ b); inputs sum to 1, positive."""
    return float(np.sum(a * np.log(a / b)))


def jsd(a: np.ndarray, b: np.ndarray) -> float:
    """Symmetric Jensen–Shannon divergence as defined in §IV:

    JSD(A ‖ B) = (KLD(A ‖ B) + KLD(B ‖ A)) / 2.
    """
    return (kld(a, b) + kld(b, a)) / 2.0


def jsd_matrix(H: np.ndarray, centers: np.ndarray) -> np.ndarray:
    """(n_hist, n_centers) JSD distances, vectorized over both axes."""
    # sum_x h log(h/c) + c log(c/h), broadcast (n, 1, bins) vs (1, k, bins)
    h = H[:, None, :]
    c = centers[None, :, :]
    return 0.5 * (np.sum(h * np.log(h / c), axis=2) + np.sum(c * np.log(c / h), axis=2))
