"""Template inference (Algorithm 1), driver-side reference implementation.

The paper's inductive procedure is order-independent (Sec. 4.4), so we
implement the equivalent batch dataflow, which is also what the Spark
pipeline in :mod:`repro.dist.pipeline` distributes:

1. **Region index / pruning**: pairwise histogram correlation across all
   regions of different files; any pair >= ``tau_r`` makes the two files a
   *candidate pair* (files sharing no similar region are never compared).
2. **Bound pruning**: a candidate pair whose node-count bound
   ``min(|Ga|,|Gb|)/max(|Ga|,|Gb|)`` is below the pruning threshold skips
   similarity flooding entirely (Sec. 5.4).
3. **Layout similarity** for surviving pairs; edges where >= ``tau_f``.
4. **Templates** = connected components of the file-similarity graph
   (transitive closure); files with no edge are singleton templates.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.flooding import layout_similarity, similarity_bound
from repro.core.layout import Layout
from repro.core.region_sim import TAU_R, correlation_matrix
from repro.core.segmentation import _UnionFind

__all__ = ["TemplateResult", "candidate_pairs", "pair_similarities", "group_templates", "infer_templates"]


@dataclass
class TemplateResult:
    """Template labels plus the intermediate products (for tests/harnesses)."""

    labels: dict[str, int]
    candidates: list[tuple[str, str]]
    similarities: dict[tuple[str, str], float]


def candidate_pairs(
    layouts: dict[str, Layout], *, tau_r: float = TAU_R, block: int = 2048
) -> list[tuple[str, str]]:
    """File pairs sharing at least one region pair with correlation >= tau_r.

    The all-regions correlation matrix is evaluated in row blocks so large
    corpora never materialize an M x M float matrix at once.
    """
    file_ids: list[str] = []
    rows: list[np.ndarray] = []
    owners: list[int] = []
    for idx, (fid, layout) in enumerate(sorted(layouts.items())):
        file_ids.append(fid)
        for h in layout.hists:
            rows.append(h)
            owners.append(idx)
    if not rows:
        return []
    H = np.stack(rows)
    owner = np.array(owners)
    pairs: set[tuple[int, int]] = set()
    for start in range(0, H.shape[0], block):
        corr = correlation_matrix(H[start : start + block], H)
        ra, rb = np.nonzero(corr >= tau_r)
        fa = owner[ra + start]
        fb = owner[rb]
        keep = fa < fb
        pairs.update(zip(fa[keep].tolist(), fb[keep].tolist()))
    return sorted((file_ids[a], file_ids[b]) for a, b in pairs)


def pair_similarities(
    layouts: dict[str, Layout],
    candidates: list[tuple[str, str]],
    *,
    prune_below: float = 0.7,
) -> dict[tuple[str, str], float]:
    """Layout similarity per candidate pair, with node-count bound pruning.

    Pairs whose similarity bound is under ``prune_below`` are recorded at
    their (sub-threshold) bound without running flooding -- exactly the
    time-saving rule of Sec. 5.4.
    """
    sims: dict[tuple[str, str], float] = {}
    for fa, fb in candidates:
        ga, gb = layouts[fa], layouts[fb]
        bound = similarity_bound(len(ga), len(gb))
        if bound < prune_below:
            sims[(fa, fb)] = bound
        else:
            sims[(fa, fb)] = layout_similarity(ga, gb)
    return sims


def group_templates(
    file_ids: list[str],
    sims: dict[tuple[str, str], float],
    *,
    tau_f: float,
) -> dict[str, int]:
    """Transitive closure: connected components of the >=tau_f similarity graph.

    Labels are dense ints, deterministic in sorted file order.
    """
    order = sorted(file_ids)
    index = {f: i for i, f in enumerate(order)}
    uf = _UnionFind(len(order))
    for (fa, fb), s in sims.items():
        if s >= tau_f:
            uf.union(index[fa], index[fb])
    root_to_label: dict[int, int] = {}
    labels: dict[str, int] = {}
    for f in order:
        r = uf.find(index[f])
        if r not in root_to_label:
            root_to_label[r] = len(root_to_label)
        labels[f] = root_to_label[r]
    return labels


def infer_templates(
    layouts: dict[str, Layout],
    *,
    tau_r: float = TAU_R,
    tau_f: float = 0.99,
    prune_below: float = 0.7,
) -> TemplateResult:
    """Full Algorithm-1 pipeline: candidates -> similarities -> templates."""
    cands = candidate_pairs(layouts, tau_r=tau_r)
    sims = pair_similarities(layouts, cands, prune_below=min(prune_below, tau_f))
    labels = group_templates(list(layouts), sims, tau_f=tau_f)
    return TemplateResult(labels, cands, sims)
