"""External clustering metrics: homogeneity, completeness, V-measure.

Rosenberg & Hirschberg (EMNLP 2007) definitions, computed from the
contingency table of (true template, predicted template) label pairs --
sklearn is unavailable offline. Conventions match sklearn: when the
relevant entropy is zero (e.g. a single true class), the score is 1.0.
"""
from __future__ import annotations

from collections import Counter
from collections.abc import Hashable, Sequence

import numpy as np

__all__ = ["homogeneity_completeness_v", "v_measure"]


def _entropy(counts: np.ndarray) -> float:
    n = counts.sum()
    p = counts[counts > 0] / n
    return float(-(p * np.log(p)).sum())


def homogeneity_completeness_v(
    true: Sequence[Hashable], pred: Sequence[Hashable]
) -> tuple[float, float, float]:
    """(homogeneity, completeness, V-measure) of a predicted clustering."""
    if len(true) != len(pred):
        raise ValueError("label sequences must have equal length")
    n = len(true)
    if n == 0:
        return 1.0, 1.0, 1.0
    joint = Counter(zip(true, pred))
    n_c = Counter(true)
    n_k = Counter(pred)
    h_c = _entropy(np.array(list(n_c.values()), dtype=np.float64))
    h_k = _entropy(np.array(list(n_k.values()), dtype=np.float64))
    # Conditional entropies H(C|K) and H(K|C).
    h_c_given_k = 0.0
    h_k_given_c = 0.0
    for (c, k), n_ck in joint.items():
        h_c_given_k -= (n_ck / n) * np.log(n_ck / n_k[k])
        h_k_given_c -= (n_ck / n) * np.log(n_ck / n_c[c])
    hom = 1.0 if h_c == 0 else 1.0 - h_c_given_k / h_c
    com = 1.0 if h_k == 0 else 1.0 - h_k_given_c / h_k
    v = 0.0 if hom + com == 0 else 2 * hom * com / (hom + com)
    return float(hom), float(com), float(v)


def v_measure(true: Sequence[Hashable], pred: Sequence[Hashable]) -> float:
    """V-measure only (harmonic mean of homogeneity and completeness)."""
    return homogeneity_completeness_v(true, pred)[2]
