"""Maximum-weight bipartite matching (Hungarian algorithm).

Sec. 4.3 computes the final layout similarity from a maximum weighted
matching on the bipartite graph weighted by the flooded similarity matrix.
scipy is unavailable offline, so this is a from-scratch O(n^3) Hungarian
implementation (shortest augmenting paths with potentials), padded to
square for rectangular inputs. With non-negative weights, the max-weight
*perfect* matching on the zero-padded square matrix coincides with the
max-weight matching of the original rectangle.
"""
from __future__ import annotations

import numpy as np

__all__ = ["min_cost_assignment", "max_weight_matching"]


def min_cost_assignment(cost: np.ndarray) -> list[int]:
    """Minimum-cost perfect assignment on a square matrix.

    Returns ``assign`` with ``assign[i] = j`` meaning row ``i`` -> column
    ``j``. Classic potentials formulation; O(n^3).
    """
    a = np.asarray(cost, dtype=np.float64)
    n = a.shape[0]
    if a.shape != (n, n):
        raise ValueError("cost matrix must be square")
    if n == 0:
        return []
    INF = np.inf
    u = np.zeros(n + 1)
    v = np.zeros(n + 1)
    p = np.zeros(n + 1, dtype=np.int64)  # p[j] = row matched to column j (1-based)
    way = np.zeros(n + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(n + 1, INF)
        used = np.zeros(n + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta = INF
            j1 = -1
            for j in range(1, n + 1):
                if not used[j]:
                    cur = a[i0 - 1, j - 1] - u[i0] - v[j]
                    if cur < minv[j]:
                        minv[j] = cur
                        way[j] = j0
                    if minv[j] < delta:
                        delta = minv[j]
                        j1 = j
            for j in range(n + 1):
                if used[j]:
                    u[p[j]] += delta
                    v[j] -= delta
                else:
                    minv[j] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    assign = [0] * n
    for j in range(1, n + 1):
        assign[p[j] - 1] = j - 1
    return assign


def max_weight_matching(weights: np.ndarray) -> list[tuple[int, int, float]]:
    """Maximum-weight matching of a rectangular non-negative weight matrix.

    Returns ``(row, col, weight)`` triples for the matched *real* pairs
    (pairs assigned to zero-padding are dropped; zero-weight real pairs are
    kept, matching the paper's "including zero values" averaging).
    """
    w = np.asarray(weights, dtype=np.float64)
    if w.size == 0:
        return []
    if (w < 0).any():
        raise ValueError("weights must be non-negative")
    m, n = w.shape
    k = max(m, n)
    padded = np.zeros((k, k))
    padded[:m, :n] = w
    assign = min_cost_assignment(-padded)
    return [
        (i, assign[i], float(w[i, assign[i]]))
        for i in range(m)
        if assign[i] < n
    ]
