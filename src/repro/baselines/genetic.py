"""Genetic-based table recognition (Koci et al.) -- reimplementation.

The original is a two-step supervised pipeline: a cell classifier labels
every cell with a role (header / data / metadata), neighboring same-role
cells are grouped, and a genetic algorithm partitions the resulting graph
into tables. We rebuild the same mechanism without sklearn:

1. **Cell-role classification** (:func:`classify_cells`) -- rule-based on
   content type and spatial context, with a per-variant error rate:
   the *XLS* variant additionally consumes the corpus' style channel
   (emphasized title/header/footnote cells, standing in for Excel rich
   formatting) and therefore makes far fewer role mistakes than the
   *CSV* variant, which must infer roles from content alone. This
   reproduces the paper's key finding: classification errors fragment
   regions and cascade into poor table boundaries, and the XLS/CSV gap
   is the value of style features.
2. **Genetic partition search** (:func:`genetic_tables`) -- a real GA
   over row cut points (candidate cuts at header rows and post-gap rows)
   with a table-coherence fitness: segments should start with a header
   band and contain data below it.
3. **Region extraction** -- each segment yields its table box(es) (split
   at wide empty column gaps so side-by-side tables separate); metadata
   cell groups are emitted as their own regions.

Deterministic given ``seed`` (the paper reports averages over 3 runs; the
harness varies the seed).
"""
from __future__ import annotations

import numpy as np

from repro.core.cells import CellType
from repro.core.elements import Box

__all__ = ["classify_cells", "genetic_tables", "detect"]

_STRING_TYPES = {int(CellType.UPPER), int(CellType.LOWER), int(CellType.TITLE), int(CellType.GENERIC)}

# Role codes.
_NONE, _DATA, _HEADER, _META = 0, 1, 2, 3


def classify_cells(
    tgrid: np.ndarray,
    style_boxes: list[tuple[str, Box]] | None,
    *,
    rng: np.random.Generator,
    error_rate: float,
) -> np.ndarray:
    """Per-cell role grid (0 none, 1 data, 2 header, 3 metadata).

    With ``style_boxes`` (XLS variant) roles inside emphasized boxes come
    from the style channel; elsewhere (and for the CSV variant
    everywhere) content/context heuristics apply. Each labeled cell's
    role is flipped to a random other role with prob ``error_rate`` --
    the supervised classifier's residual error.
    """
    h, w = tgrid.shape
    roles = np.zeros((h, w), dtype=np.int8)
    nonempty = tgrid != 0
    is_string = np.isin(tgrid, list(_STRING_TYPES))
    row_nonempty = nonempty.sum(axis=1)
    row_string = (is_string & nonempty).sum(axis=1)
    numeric_row = (row_nonempty > 0) & (row_string < np.maximum(1, row_nonempty) * 0.5)

    for y in range(h):
        if row_nonempty[y] == 0:
            continue
        stringy = row_string[y] >= row_nonempty[y] * 0.6
        below_numeric = any(
            numeric_row[yy] for yy in range(y + 1, min(h, y + 4))
        )
        for x in range(w):
            if not nonempty[y, x]:
                continue
            if stringy and below_numeric and row_nonempty[y] >= 2:
                roles[y, x] = _HEADER
            elif stringy and row_nonempty[y] <= 2 and not below_numeric:
                roles[y, x] = _META
            else:
                roles[y, x] = _DATA

    if style_boxes is not None:
        for kind, b in style_boxes:
            role = _HEADER if kind == "header" else _META
            y1 = min(b.y1 + 1, h)
            x1 = min(b.x1 + 1, w)
            sub = roles[b.y0 : y1, b.x0 : x1]
            sub[nonempty[b.y0 : y1, b.x0 : x1]] = role

    # Residual classification noise.
    ys, xs = np.nonzero(roles)
    flip = rng.random(len(ys)) < error_rate
    for y, x in zip(ys[flip], xs[flip]):
        others = [r for r in (_DATA, _HEADER, _META) if r != roles[y, x]]
        roles[y, x] = others[int(rng.integers(len(others)))]
    return roles


def _header_band(roles: np.ndarray) -> np.ndarray:
    """Rows whose non-empty cells are majority header-role.

    Row-level aggregation means isolated cell-classification errors do
    not create table starts, but errors on narrow rows (2-3 cells) and on
    single-cell note rows do -- the realistic cascade path.
    """
    nonempty = (roles != _NONE).sum(axis=1)
    headers = (roles == _HEADER).sum(axis=1)
    return (nonempty > 0) & (headers * 2 >= nonempty)


def _candidate_cuts(roles: np.ndarray) -> list[int]:
    """Rows where a region may start: header bands and rows after empty rows."""
    h = roles.shape[0]
    any_cell = (roles != _NONE).any(axis=1)
    band = _header_band(roles)
    cuts = {0}
    for y in range(h):
        if band[y]:
            cuts.add(y)
        if y > 0 and not any_cell[y - 1] and any_cell[y]:
            cuts.add(y)
    return sorted(cuts)


def _fitness(roles: np.ndarray, cut_rows: list[int]) -> float:
    """Table-coherence score of a row partition.

    Scored so that splitting one table into several data segments never
    pays: only header-topped tables and metadata-only segments earn
    rewards, mid-segment header bands signal a missed cut, and every cut
    costs a constant. Without this balance the GA shreds files into
    per-fragment segments (and template inference on the resulting
    graphs explodes).
    """
    h = roles.shape[0]
    bounds = cut_rows + [h]
    band = _header_band(roles)
    score = 0.0
    for s, e in zip(bounds, bounds[1:]):
        seg = roles[s:e]
        seg_band = band[s:e]
        has_data = (seg == _DATA).any()
        band_rows = np.flatnonzero(seg_band)
        header_top = len(band_rows) > 0 and band_rows[0] <= 1
        if has_data and header_top:
            score += 1.5  # a proper table: header band on top, data below
        elif not has_data and (seg == _META).any():
            score += 0.5  # metadata-only region (title/notes/footnote)
        elif has_data:
            score += 0.2  # headerless data region
        else:
            score -= 0.3
        # Additional header bands inside the segment signal missed cuts.
        extra = len(band_rows) - (1 if header_top else 0)
        score -= 0.5 * max(0, extra)
    return score - 0.4 * len(cut_rows)


def genetic_tables(
    roles: np.ndarray,
    *,
    rng: np.random.Generator,
    population: int = 24,
    generations: int = 40,
    mutation: float = 0.05,
) -> list[int]:
    """GA over candidate cut rows; returns the best cut-row list."""
    cands = _candidate_cuts(roles)
    if len(cands) <= 1:
        return cands
    n = len(cands)
    pop = rng.random((population, n)) < 0.5
    pop[:, 0] = True  # the sheet always starts a segment
    fits = np.array(
        [_fitness(roles, [c for c, b in zip(cands, ind) if b]) for ind in pop]
    )
    for _ in range(generations):
        # Tournament selection + single-point crossover + mutation.
        idx = rng.integers(0, population, size=(population, 2))
        parents = np.where(
            (fits[idx[:, 0]] >= fits[idx[:, 1]])[:, None], pop[idx[:, 0]], pop[idx[:, 1]]
        )
        xp = rng.integers(1, n, size=population)
        children = parents.copy()
        for i in range(0, population - 1, 2):
            p = int(xp[i])
            children[i, p:], children[i + 1, p:] = (
                parents[i + 1, p:].copy(),
                parents[i, p:].copy(),
            )
        flips = rng.random((population, n)) < mutation
        children ^= flips
        children[:, 0] = True
        child_fits = np.array(
            [_fitness(roles, [c for c, b in zip(cands, ind) if b]) for ind in children]
        )
        # Elitist replacement.
        both = np.vstack([pop, children])
        both_fits = np.concatenate([fits, child_fits])
        order = np.argsort(-both_fits, kind="stable")[:population]
        pop, fits = both[order], both_fits[order]
    best = pop[0]
    return [c for c, b in zip(cands, best) if b]


def _split_columns(mask: np.ndarray, y0: int, y1: int, min_gap: int = 2) -> list[tuple[int, int]]:
    """Column ranges of a row band, split at empty column gaps >= min_gap."""
    cols = mask[y0 : y1 + 1].any(axis=0)
    ranges: list[tuple[int, int]] = []
    x = 0
    w = len(cols)
    while x < w:
        if not cols[x]:
            x += 1
            continue
        start = x
        gap = 0
        while x < w and gap < min_gap:
            if cols[x]:
                gap = 0
                end = x
            else:
                gap += 1
            x += 1
        ranges.append((start, end))
    return ranges


def detect(
    tgrid: np.ndarray,
    style_boxes: list[tuple[str, Box]] | None,
    *,
    seed: int = 0,
    error_rate: float | None = None,
) -> list[Box]:
    """Full genetic-based region detection; XLS variant iff style given."""
    if tgrid.size == 0 or not (tgrid != 0).any():
        return []
    rng = np.random.default_rng(seed)
    if error_rate is None:
        error_rate = 0.03 if style_boxes is not None else 0.12
    roles = classify_cells(tgrid, style_boxes, rng=rng, error_rate=error_rate)
    cuts = genetic_tables(roles, rng=rng)
    h = roles.shape[0]
    mask = roles != _NONE
    boxes: list[Box] = []
    bounds = cuts + [h]
    for s, e in zip(bounds, bounds[1:]):
        band = mask[s:e]
        if not band.any():
            continue
        rows = np.flatnonzero(band.any(axis=1))
        y0, y1 = s + int(rows.min()), s + int(rows.max())
        for x0, x1 in _split_columns(mask, y0, y1):
            sub = mask[y0 : y1 + 1, x0 : x1 + 1]
            rr = np.flatnonzero(sub.any(axis=1))
            boxes.append(Box(x0, y0 + int(rr.min()), x1, y0 + int(rr.max())))
    boxes.sort(key=lambda b: (b.y0, b.x0, b.y1, b.x1))
    return boxes
