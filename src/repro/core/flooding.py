"""Layout similarity via similarity flooding (Sec. 4.3).

Pipeline per pair of layouts (Ga with U nodes, Gb with V nodes):

1. ``sigma0``: U x V initial node similarities = region histogram
   correlations.
2. ``Phi``: edge similarity between ``edge(u_i, u_m)`` and
   ``edge(v_j, v_n)`` -- 0 when either "edge" is a self-loop or the
   alignment directions differ, else ``1 - d/d_max`` where ``d`` is the
   Euclidean distance of the (magnitude, distance) feature vectors and
   ``d_max`` the maximum such distance over all same-direction edge pairs
   of the two graphs.
3. Flooding: ``sigma_k(i,j) = sigma0(i,j) + (1/2^{|degI - degJ|}) *
   sum_m sigma_{k-1}(m, n*) * Phi((i,m),(j,n*))`` where for each neighbor
   ``m`` of ``i`` only the neighbor ``n*`` of ``j`` with maximum edge
   similarity is used (the paper's 1:1 selection). For complete graphs the
   degree normalization is the uniform ``2^{|U - V|}`` (the paper writes
   ``2^{n-m}``, which amplifies rather than dampens when ``n < m``; we use
   the absolute difference -- see DESIGN.md). Each entry is then divided
   by its *maximum attainable* value ``1 + sum_m Phi_best(i,m,j) /
   2^{|U-V|}`` rather than by the global matrix maximum: with global
   max-normalization two *identical* layouts would score visibly below 1
   (only the argmax entry survives normalization), which contradicts the
   paper's operating point (tau_f = 0.99 groups near-identical files,
   Fig. 8 / Table 3). Per-entry normalization keeps the fixpoint of two
   isomorphic graphs with perfect region similarity at exactly 1.
   Iteration stops when the Frobenius distance between consecutive sigmas
   falls below 0.1 or after 10 iterations (the paper's recommended
   setting).
4. Maximum-weight bipartite matching on the final sigma;
   ``sim = sum(matched weights) / max(U, V)`` (unmatched nodes count as 0).

The 1:1 neighbor selection makes the directed score asymmetric, so
``layout_similarity`` averages both directions as the paper prescribes.

The similarity is bounded by ``min(U,V)/max(U,V)``, which the template
pipeline uses to prune pairs before flooding (Sec. 5.4).
"""
from __future__ import annotations

import numpy as np

from repro.core.layout import Layout
from repro.core.matching import max_weight_matching
from repro.core.region_sim import correlation_matrix

__all__ = [
    "TAU_F_DEFAULT",
    "EPS_CONVERGENCE",
    "MAX_ITERATIONS",
    "similarity_bound",
    "edge_feature_arrays",
    "flood",
    "sim_directed",
    "layout_similarity",
]

#: Layout-similarity threshold used for the paper's headline results (Table 3).
TAU_F_DEFAULT = 0.99
#: Convergence threshold / iteration cap recommended in Sec. 4.3.
EPS_CONVERGENCE = 0.1
MAX_ITERATIONS = 10

_DIR_CODE = {"V": 0, "H": 1, "N": 2, "O": 3}


def similarity_bound(u: int, v: int) -> float:
    """Upper bound ``min(u,v)/max(u,v)`` on the layout similarity."""
    if u == 0 or v == 0:
        return 1.0 if u == v else 0.0
    return min(u, v) / max(u, v)


def edge_feature_arrays(g: Layout) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Dense (dir_code, magnitude, distance) matrices for a layout.

    Self-loops get direction code ``-1`` so they never match anything.
    """
    n = len(g)
    dirs = np.full((n, n), -1, dtype=np.int8)
    mags = np.zeros((n, n))
    dists = np.zeros((n, n))
    for (i, j), e in g.edges.items():
        dirs[i, j] = _DIR_CODE[e.direction]
        mags[i, j] = e.magnitude
        dists[i, j] = e.distance
    return dirs, mags, dists


def _max_feature_distance(
    fa: tuple[np.ndarray, np.ndarray, np.ndarray],
    fb: tuple[np.ndarray, np.ndarray, np.ndarray],
) -> float:
    """Maximum Euclidean (magnitude, distance) gap over same-direction edge pairs.

    Chunked so U^2 x V^2 pair spaces never materialize at once.
    """
    da, ma, sa = fa
    db, mb, sb = fb
    best = 0.0
    for code in range(4):
        a_sel = da == code
        b_sel = db == code
        if not a_sel.any() or not b_sel.any():
            continue
        pa = np.stack([ma[a_sel], sa[a_sel]], axis=1)
        pb = np.stack([mb[b_sel], sb[b_sel]], axis=1)
        for start in range(0, pa.shape[0], 4096):
            blk = pa[start : start + 4096]
            d2 = ((blk[:, None, :] - pb[None, :, :]) ** 2).sum(axis=2)
            best = max(best, float(np.sqrt(d2.max())))
    return best


def flood(ga: Layout, gb: Layout) -> np.ndarray:
    """Run similarity flooding; returns the final U x V similarity matrix."""
    u, v = len(ga), len(gb)
    if u == 0 or v == 0:
        return np.zeros((u, v))
    sigma0 = correlation_matrix(ga.hists, gb.hists)
    if u == 1 or v == 1:
        # A single-node side has no edges: flooding adds nothing (Sec 5.4.2
        # notes these layouts are judged by region similarity alone).
        return sigma0
    fa = edge_feature_arrays(ga)
    fb = edge_feature_arrays(gb)
    d_max = _max_feature_distance(fa, fb)
    dirs_a, mags_a, dists_a = fa
    dirs_b, mags_b, dists_b = fb
    norm = 2.0 ** abs(u - v)

    sigma = sigma0.copy()
    for _ in range(MAX_ITERATIONS):
        contrib = np.zeros((u, v))
        cap = np.zeros((u, v))  # maximum attainable contribution per entry
        for i in range(u):
            # phi[m, j, n] = edge similarity of (i,m) vs (j,n).
            same_dir = dirs_a[i][:, None, None] == dirs_b[None, :, :]
            valid = same_dir & (dirs_a[i][:, None, None] >= 0)
            if d_max > 0:
                dm = mags_a[i][:, None, None] - mags_b[None, :, :]
                dd = dists_a[i][:, None, None] - dists_b[None, :, :]
                phi = 1.0 - np.sqrt(dm**2 + dd**2) / d_max
            else:
                phi = np.ones((u, v, v))
            phi = np.where(valid, phi, 0.0)
            # 1:1 selection: per neighbor m and target j, use only the n
            # maximizing the *propagated* similarity sigma(m,n) * phi --
            # selecting on phi alone picks arbitrary near-tie edges in
            # uniform layouts (stacked regions with near-equal spacing) and
            # collapses the similarity of identical layouts (DESIGN.md).
            prod = sigma[:, None, :] * phi  # [m, j, n] = sigma(m,n)*phi
            n_star = prod.argmax(axis=2)  # (u, v)
            phi_best = np.take_along_axis(phi, n_star[:, :, None], axis=2)[:, :, 0]
            sig_best = np.take_along_axis(
                np.broadcast_to(sigma[:, None, :], phi.shape), n_star[:, :, None], axis=2
            )[:, :, 0]
            contrib[i] = (sig_best * phi_best).sum(axis=0)
            cap[i] = phi_best.sum(axis=0)
        # Per-entry normalization: each entry's attainable maximum is
        # sigma0 <= 1 plus a full-strength (sigma = 1) neighbor sum.
        new = (sigma0 + contrib / norm) / (1.0 + cap / norm)
        if np.linalg.norm(new - sigma) < EPS_CONVERGENCE:
            sigma = new
            break
        sigma = new
    return sigma


def sim_directed(ga: Layout, gb: Layout) -> float:
    """Directed layout similarity: flooding + matching, normalized by max size."""
    u, v = len(ga), len(gb)
    if u == 0 or v == 0:
        return 1.0 if u == v else 0.0
    sigma = flood(ga, gb)
    matched = max_weight_matching(sigma)
    return sum(w for _, _, w in matched) / max(u, v)


def layout_similarity(ga: Layout, gb: Layout) -> float:
    """Symmetric layout similarity: average of the two directed scores."""
    return 0.5 * (sim_directed(ga, gb) + sim_directed(gb, ga))
