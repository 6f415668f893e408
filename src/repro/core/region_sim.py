"""Region similarity: normalized cross-correlation of color histograms.

Sec. 4.2: each region's 192-bin color histogram acts as a fingerprint;
similarity of two regions is the cross-correlation of their histograms
(OpenCV ``HISTCMP_CORREL`` convention, as in the original Mondrian code),
clamped to [0, 1]. Two regions over threshold ``TAU_R = 0.75`` are
considered equivalent and make their files template candidates.
"""
from __future__ import annotations

import numpy as np

__all__ = ["TAU_R", "histogram_correlation", "correlation_matrix"]

#: Region-similarity threshold from Sec. 4.4.
TAU_R = 0.75


def histogram_correlation(h1: np.ndarray, h2: np.ndarray) -> float:
    """Pearson correlation of two histograms, clamped to [0, 1].

    Scale-invariant: a region with the same type mix at k-times the area
    has correlation 1. Two zero-variance histograms (identical constant
    bins) compare as 1 if proportional, else 0.
    """
    a = h1 - h1.mean()
    b = h2 - h2.mean()
    denom = np.sqrt((a @ a) * (b @ b))
    if denom == 0:
        # Zero variance on either side: equal up to scale -> 1, else 0.
        n1, n2 = np.linalg.norm(h1), np.linalg.norm(h2)
        if n1 == 0 or n2 == 0:
            return float(n1 == n2)
        return float(np.allclose(h1 / n1, h2 / n2))
    return float(np.clip((a @ b) / denom, 0.0, 1.0))


def correlation_matrix(H1: np.ndarray, H2: np.ndarray) -> np.ndarray:
    """Pairwise clamped correlations of histogram row-matrices.

    ``H1`` is (m, 192), ``H2`` is (n, 192); result is (m, n). Vectorized
    equivalent of :func:`histogram_correlation` for the non-degenerate case
    (zero-variance rows yield 0 against everything, 1 on exact proportional
    match handled by the scalar path in tests).
    """
    A = H1 - H1.mean(axis=1, keepdims=True)
    B = H2 - H2.mean(axis=1, keepdims=True)
    na = np.linalg.norm(A, axis=1)
    nb = np.linalg.norm(B, axis=1)
    denom = np.outer(na, nb)
    with np.errstate(divide="ignore", invalid="ignore"):
        corr = (A @ B.T) / denom
    corr = np.nan_to_num(corr, nan=0.0, posinf=0.0, neginf=0.0)
    return np.clip(corr, 0.0, 1.0)
