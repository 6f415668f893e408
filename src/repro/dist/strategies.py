"""Region-detection strategy dispatch for the Spark pipeline.

Every strategy maps one file's CSV content (plus, where the strategy is
defined to use them, gold or style annotations) to a list of
``(boundary_box, histogram, n_elements)`` triples -- the uniform region
representation the downstream matching/flooding stages consume. The
names match Table 4's rows:

- ``gold``          paper's "Gold Standard" (annotated regions)
- ``static``        Mondrian, one radius for the whole dataset
- ``dynamic``       Mondrian, per-file optimal radius (uses gold IoU)
- ``cc``            connected components (Coletta et al.)
- ``genetic_xls``   Koci et al. with style features
- ``genetic_csv``   Koci et al., content+position only
- ``tablesense``    TableSense surrogate
"""
from __future__ import annotations

import json

import numpy as np

from repro.baselines import connected_components as cc_baseline
from repro.baselines import genetic as genetic_baseline
from repro.baselines import tablesense as tablesense_baseline
from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.core.mondrian import best_dynamic_radius, detect_regions
from repro.core.regions import color_histogram

__all__ = ["STRATEGIES", "boxes_for_strategy", "detect_regions_for_strategy"]

STRATEGIES = (
    "gold",
    "static",
    "dynamic",
    "cc",
    "genetic_xls",
    "genetic_csv",
    "tablesense",
)


def _parse_gold(gold_json: str | None) -> list[Box]:
    if not gold_json:
        return []
    return [Box(*map(int, coords)) for coords in json.loads(gold_json)]


def _parse_style(style_json: str | None) -> list[tuple[str, Box]]:
    if not style_json:
        return []
    return [(k, Box(int(a), int(b), int(c), int(d))) for k, a, b, c, d in json.loads(style_json)]


def boxes_for_strategy(
    strategy: str,
    tgrid: np.ndarray,
    *,
    gold: list[Box],
    style: list[tuple[str, Box]],
    eps: float = 1.5,
    alpha: float = 1.0,
    beta: float = 0.5,
    gamma: float = 1.0,
    seed: int = 0,
) -> tuple[list[Box], list[int]]:
    """Region boxes plus per-region element counts for one strategy."""
    if strategy == "gold":
        return list(gold), [1] * len(gold)
    if strategy in ("static", "dynamic"):
        if strategy == "dynamic":
            eps = best_dynamic_radius(tgrid, gold, alpha=alpha, beta=beta, gamma=gamma)
        regions = detect_regions(tgrid, eps=eps, alpha=alpha, beta=beta, gamma=gamma)
        return [r.box for r in regions], [r.n_elements for r in regions]
    if strategy == "cc":
        boxes = cc_baseline.detect(tgrid)
    elif strategy == "genetic_xls":
        boxes = genetic_baseline.detect(tgrid, style, seed=seed)
    elif strategy == "genetic_csv":
        boxes = genetic_baseline.detect(tgrid, None, seed=seed)
    elif strategy == "tablesense":
        boxes = tablesense_baseline.detect(tgrid, seed=seed)
    else:
        raise ValueError(f"unknown strategy {strategy!r}")
    return boxes, [1] * len(boxes)


def detect_regions_for_strategy(
    strategy: str,
    *,
    content: str,
    gold_json: str | None = None,
    style_json: str | None = None,
    file_id: str = "",
    seed: int = 0,
    **params,
) -> list[tuple[Box, np.ndarray, int]]:
    """Uniform per-file entry point used by ``detect_regions_df``.

    The stochastic strategies derive their per-file RNG seed from the run
    seed and the file id so repeated runs differ only via ``seed``.
    """
    tgrid = csv_to_type_grid(content)
    if tgrid.size == 0:
        return []
    file_seed = (seed * 1_000_003 + hash(file_id)) % (2**32)
    boxes, n_els = boxes_for_strategy(
        strategy,
        tgrid,
        gold=_parse_gold(gold_json),
        style=_parse_style(style_json),
        seed=file_seed,
        **params,
    )
    return [
        (box, color_histogram(tgrid, box), n_el) for box, n_el in zip(boxes, n_els)
    ]
