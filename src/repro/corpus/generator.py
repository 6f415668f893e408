"""Deterministic synthetic multiregion-spreadsheet generator.

Substitutes the DECO/FUSTE corpora (see DESIGN.md). A corpus is a set of
*templates*; each template is a layout spec (bands of regions: titles,
tables -- possibly side by side --, notes, footnotes) plus content
parameters (column types, header case, density). Every file instantiates
its template with realistic jitter:

- data values, header years and table numbers change per file;
- table row counts vary; empty rows appear inside tables (missing data);
- region positions shift (gap rows jitter); some templates use 1-row gaps
  or directly adjacent side-by-side tables (the hard cases of Sec. 5.3);
- table column counts change by +-1 for some templates.

Each file ships gold region bounding boxes (of its non-empty cells), its
template label, and "style" boxes marking emphasized cells (title, header,
footnote) -- the Excel-style channel consumed only by the Genetic-XLS
baseline. Outlier files (many tiny scattered regions) exercise the
99.9-percentile region-count filter of Sec. 5.1.

Everything is seeded: ``generate_corpus(config, sf)`` is a pure function.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.elements import Box
from repro.core.grid import to_csv
from repro.corpus.configs import CorpusConfig

__all__ = ["RegionGold", "GeneratedFile", "generate_corpus"]

_WORDS = (
    "Projected Infant Mortality Population Sales Revenue Energy Demand "
    "Supply Index Quarterly Annual Regional Customer Product Origin Race "
    "Forecast Capacity Volume Margin Price Summary Report Division Total"
).split()
_LOWER_NOTES = (
    "infant deaths per thousand live birth",
    "hispanics may be of any race",
    "values in thousands unless noted",
    "abbreviations follow the standard usage",
    "preliminary figures subject to revision",
    "totals may not add due to rounding",
    "see methodology notes for details",
)
_SOURCES = (
    "source: population division census bureau",
    "source: enterprise reporting system",
    "source: regional sales database",
    "source: internal forecast model",
)
_MONTHS = ("January", "March", "June", "September", "December")


@dataclass(frozen=True)
class RegionGold:
    """Gold annotation for one region of one file."""

    region_id: int
    kind: str  # title | table | notes | footnote | cell
    box: Box


@dataclass
class GeneratedFile:
    """One synthetic spreadsheet with its annotations."""

    dataset: str
    file_id: str
    template_id: str
    content: str
    gold: list[RegionGold]
    style_boxes: list[tuple[str, Box]]
    is_outlier: bool = False

    @property
    def n_regions(self) -> int:
        return len(self.gold)


# --------------------------------------------------------------------------
# Template specs
# --------------------------------------------------------------------------


@dataclass(frozen=True)
class _TableSpec:
    n_cols: int
    col_types: tuple[str, ...]  # 'str' | 'int' | 'float' | 'date'
    header_case: str  # 'title' | 'upper'
    label_case: str  # 'title' | 'lower'
    base_rows: int
    int_scale: int  # magnitude of integer values (content realism only)
    header_words: tuple[str, ...]
    #: template-fixed structure: which data rows are followed by an empty
    #: (missing-data) row, and which interior cells are missing. Real
    #: same-template files share these patterns (e.g. the same race
    #: categories are empty every census year), which is what makes
    #: same-template region detection consistent across files.
    gap_pattern: tuple[bool, ...] = ()
    missing_pattern: frozenset = frozenset()


@dataclass(frozen=True)
class _RegionSpec:
    kind: str
    table: _TableSpec | None = None
    n_rows: int = 0  # for notes/footnote
    note_style: str = "lower"  # 'lower' | 'numbered'


@dataclass(frozen=True)
class _TemplateSpec:
    template_id: str
    bands: tuple[tuple[_RegionSpec, ...], ...]
    gap_rows: int  # empty rows between bands (>=1; 1 = hard template)
    col_gap: int  # empty cols between side-by-side regions (0 = adjacent)
    col_jitter: bool  # tables may gain/lose one column per file
    jitter: float = 1.0  # corpus-level intra-template noise multiplier


_PATTERN_ROWS = 32  # length of the template-fixed row structure patterns


def _make_table(rng: np.random.Generator) -> _TableSpec:
    n_cols = int(rng.integers(3, 10))
    col_types = ["str" if rng.random() < 0.8 else "int"]
    for _ in range(n_cols - 1):
        r = rng.random()
        if r < 0.55:
            col_types.append("int")
        elif r < 0.85:
            col_types.append("float")
        elif r < 0.95:
            col_types.append("date")
        else:
            col_types.append("str")
    gap_p = float(rng.uniform(0.0, 0.25))
    missing_p = float(rng.uniform(0.02, 0.15))
    gap_pattern = tuple(bool(rng.random() < gap_p) for _ in range(_PATTERN_ROWS))
    missing_pattern = frozenset(
        (i, j)
        for i in range(_PATTERN_ROWS)
        for j in range(1, n_cols - 1)
        if rng.random() < missing_p
    )
    return _TableSpec(
        n_cols=n_cols,
        col_types=tuple(col_types),
        header_case="upper" if rng.random() < 0.3 else "title",
        label_case="lower" if rng.random() < 0.3 else "title",
        base_rows=int(rng.integers(4, 17)),
        int_scale=int(10 ** rng.integers(2, 5)),
        header_words=tuple(rng.choice(_WORDS, size=12, replace=True)),
        gap_pattern=gap_pattern,
        missing_pattern=missing_pattern,
    )


def _build_template(
    template_id: str, n_regions: int, rng: np.random.Generator, jitter: float = 1.0
) -> _TemplateSpec:
    """Synthesize a layout spec with exactly ``n_regions`` regions."""
    regions: list[_RegionSpec] = []
    if n_regions == 1:
        if rng.random() < 0.85:
            regions.append(_RegionSpec("table", table=_make_table(rng)))
        else:
            regions.append(
                _RegionSpec("notes", n_rows=int(rng.integers(2, 6)))
            )
    else:
        budget = n_regions
        has_title = rng.random() < 0.75
        if has_title:
            budget -= 1
        has_foot = budget >= 2 and rng.random() < 0.7
        if has_foot:
            budget -= 1
        core = [
            _RegionSpec("table", table=_make_table(rng))
            if rng.random() < 0.8
            else _RegionSpec(
                "notes",
                n_rows=int(rng.integers(1, 4)),
                note_style="numbered" if rng.random() < 0.4 else "lower",
            )
            for _ in range(budget)
        ]
        if has_title:
            regions.append(_RegionSpec("title"))
        regions.extend(core)
        if has_foot:
            regions.append(_RegionSpec("footnote", n_rows=int(rng.integers(2, 5))))

    # Band layout: pair consecutive tables side by side with prob 0.25.
    bands: list[tuple[_RegionSpec, ...]] = []
    i = 0
    while i < len(regions):
        r = regions[i]
        if (
            r.kind == "table"
            and i + 1 < len(regions)
            and regions[i + 1].kind == "table"
            and rng.random() < 0.25
        ):
            bands.append((r, regions[i + 1]))
            i += 2
        else:
            bands.append((r,))
            i += 1
    gap = 1 if rng.random() < 0.12 else int(rng.integers(2, 5))
    col_gap = 0 if rng.random() < 0.1 else int(rng.integers(1, 3))
    return _TemplateSpec(
        template_id=template_id,
        bands=tuple(bands),
        gap_rows=gap,
        col_gap=col_gap,
        col_jitter=rng.random() < min(0.8, 0.3 * jitter),
        jitter=jitter,
    )


# --------------------------------------------------------------------------
# File rendering
# --------------------------------------------------------------------------


class _Canvas:
    """Sparse cell canvas tracking per-region non-empty cells."""

    def __init__(self) -> None:
        self.cells: dict[tuple[int, int], str] = {}
        self.region_cells: dict[int, list[tuple[int, int]]] = {}

    def put(self, region_id: int, row: int, col: int, value: str) -> None:
        if value == "":
            return
        self.cells[(row, col)] = value
        self.region_cells.setdefault(region_id, []).append((row, col))

    def to_rows(self) -> list[list[str]]:
        if not self.cells:
            return [[""]]
        n_rows = max(r for r, _ in self.cells) + 1
        n_cols = max(c for _, c in self.cells) + 1
        rows = [[""] * n_cols for _ in range(n_rows)]
        for (r, c), v in self.cells.items():
            rows[r][c] = v
        return rows

    def gold_box(self, region_id: int) -> Box:
        cells = self.region_cells[region_id]
        return Box(
            min(c for _, c in cells),
            min(r for r, _ in cells),
            max(c for _, c in cells),
            max(r for r, _ in cells),
        )


def _value(kind: str, table: _TableSpec, rng: np.random.Generator) -> str:
    if kind == "int":
        return str(int(rng.integers(1, table.int_scale)))
    if kind == "float":
        return f"{rng.uniform(0, table.int_scale):.2f}"
    if kind == "date":
        return f"{rng.integers(1, 29)}/{rng.integers(1, 13)}/{rng.integers(0, 100):02d}"
    word = str(rng.choice(table.header_words))
    return word.lower() if table.label_case == "lower" else word


def _render_table(
    canvas: _Canvas,
    region_id: int,
    spec: _TableSpec,
    row0: int,
    col0: int,
    rng: np.random.Generator,
    d_cols: int,
    style: list[tuple[str, Box]],
    noise: float = 1.0,
) -> int:
    """Render one table; returns rows consumed (including internal gaps)."""
    n_cols = max(2, spec.n_cols + d_cols)
    # Header row: never missing, so the region always has cells.
    for j in range(n_cols):
        word = spec.header_words[j % len(spec.header_words)]
        if spec.col_types[min(j, len(spec.col_types) - 1)] != "str" and rng.random() < 0.5:
            text = str(int(rng.integers(1990, 2061)))  # year-style header
        else:
            text = word.upper() if spec.header_case == "upper" else word
        canvas.put(region_id, row0, col0 + j, text)
    style.append(("header", Box(col0, row0, col0 + n_cols - 1, row0)))
    r = row0 + 1
    # Row-count jitter proportional to table size: +-2 rows on a 4-row
    # table would shift its type proportions (and thus its histogram
    # fingerprint) far more than real same-template files do.
    j = max(1, int(round(spec.base_rows // 5 * noise)))
    n_rows = max(2, spec.base_rows + int(rng.integers(-j, j + 1)))
    for i in range(n_rows):
        for j in range(n_cols):
            # Missing values follow the template-fixed pattern (plus a tiny
            # per-file noise term) and hit interior columns only: the label
            # column and last column stay populated, so table fragments keep
            # equal column extents and Mondrian's alignment term can
            # re-merge them across missing-data empty rows (Fig. 1).
            if 0 < j < n_cols - 1 and (
                (i % _PATTERN_ROWS, j) in spec.missing_pattern
                or rng.random() < 0.02 * noise
            ):
                continue
            ct = spec.col_types[min(j, len(spec.col_types) - 1)]
            canvas.put(region_id, r, col0 + j, _value(ct, spec, rng))
        r += 1
        if spec.gap_pattern and spec.gap_pattern[i % _PATTERN_ROWS]:
            r += 1  # missing-data empty row inside the table (template-fixed)
    return r - row0


def _render_region(
    canvas: _Canvas,
    region_id: int,
    spec: _RegionSpec,
    row0: int,
    col0: int,
    rng: np.random.Generator,
    d_cols: int,
    style: list[tuple[str, Box]],
    noise: float = 1.0,
) -> int:
    if spec.kind == "table":
        assert spec.table is not None
        return _render_table(
            canvas, region_id, spec.table, row0, col0, rng, d_cols, style, noise
        )
    if spec.kind == "title":
        n = int(rng.integers(1, 30))
        words = " ".join(str(w) for w in rng.choice(_WORDS, size=3, replace=False))
        canvas.put(region_id, row0, col0, f"Table {n}. {words}")
        style.append(("title", Box(col0, row0, col0, row0)))
        return 1
    # notes / footnote
    rows = max(1, spec.n_rows)
    for i in range(rows):
        if spec.kind == "footnote" and i == rows - 1:
            month = str(rng.choice(_MONTHS))
            canvas.put(region_id, row0 + i, col0, f"Release Date: {month} {rng.integers(2000, 2025)}")
        elif spec.kind == "footnote" and i == rows - 2:
            canvas.put(region_id, row0 + i, col0, str(rng.choice(_SOURCES)))
        else:
            text = str(rng.choice(_LOWER_NOTES))
            if spec.note_style == "numbered":
                text = f"{i + 1} {text}"
            canvas.put(region_id, row0 + i, col0, text)
    if spec.kind == "footnote":
        style.append(("footnote", Box(col0, row0, col0, row0 + rows - 1)))
    return rows


def _render_file(
    dataset: str,
    file_id: str,
    spec: _TemplateSpec,
    rng: np.random.Generator,
) -> GeneratedFile:
    canvas = _Canvas()
    style: list[tuple[str, Box]] = []
    kinds: dict[int, str] = {}
    d_cols = 0
    if spec.col_jitter and rng.random() < 0.5:
        d_cols = int(rng.choice([-1, 1]))
    row = 0
    region_id = 0
    for band in spec.bands:
        col = 0
        band_height = 0
        for r_spec in band:
            kinds[region_id] = r_spec.kind
            h = _render_region(
                canvas, region_id, r_spec, row, col, rng, d_cols, style, spec.jitter
            )
            band_height = max(band_height, h)
            box = canvas.gold_box(region_id)
            col = box.x1 + 1 + spec.col_gap
            region_id += 1
        gap = max(1, spec.gap_rows + int(rng.integers(-1, 2)))
        row += band_height + gap
    gold = [
        RegionGold(rid, kinds[rid], canvas.gold_box(rid))
        for rid in sorted(canvas.region_cells)
    ]
    return GeneratedFile(
        dataset=dataset,
        file_id=file_id,
        template_id=spec.template_id,
        content=to_csv(canvas.to_rows()),
        gold=gold,
        style_boxes=style,
    )


def _render_outlier(
    dataset: str, file_id: str, template_id: str, n_regions: int, rng: np.random.Generator
) -> GeneratedFile:
    """A file with many tiny scattered regions (Sec. 5.1 outliers)."""
    canvas = _Canvas()
    per_row = 20
    for i in range(n_regions):
        r, c = 3 * (i // per_row), 3 * (i % per_row)
        canvas.put(i, r, c, str(int(rng.integers(1, 1000))))
    gold = [RegionGold(i, "cell", canvas.gold_box(i)) for i in range(n_regions)]
    return GeneratedFile(
        dataset=dataset,
        file_id=file_id,
        template_id=template_id,
        content=to_csv(canvas.to_rows()),
        gold=gold,
        style_boxes=[],
        is_outlier=True,
    )


# --------------------------------------------------------------------------
# Corpus assembly
# --------------------------------------------------------------------------


def _scaled_quotas(cfg: CorpusConfig, sf: float, n_non_outlier: int) -> dict[int, int]:
    quotas = {b: int(round(q * sf)) for b, q in cfg.bucket_quotas.items()}
    # Repair rounding drift onto the largest bucket so quotas sum exactly.
    drift = n_non_outlier - sum(quotas.values())
    largest = max(quotas, key=lambda b: quotas[b])
    quotas[largest] += drift
    if any(q < 0 for q in quotas.values()):
        raise ValueError(f"unsatisfiable scaled quotas {quotas}")
    return quotas


def _allocate(
    cfg: CorpusConfig, sf: float
) -> tuple[list[tuple[int, int]], dict[int, int]]:
    """Scale the config and assign every template a (file_count, bucket).

    Returns the multi-template assignments and, for singletons, how many
    singleton templates land in each bucket. Exact at sf=1.0 by
    construction; at other scales the quotas are hit up to rounding.
    """
    n_multi = max(1, int(round(len(cfg.multi_sizes) * sf)))
    multi_sizes = [max(2, int(round(s * sf))) for s in cfg.multi_sizes[:n_multi]]
    n_singletons = max(1, int(round(cfg.n_singletons * sf)))
    n_outliers = len(cfg.outlier_region_counts)
    n_non_outlier = sum(multi_sizes) + n_singletons - n_outliers
    quotas = _scaled_quotas(cfg, sf, n_non_outlier)

    remaining = dict(quotas)
    assignments: list[tuple[int, int]] = []
    pool = sorted(multi_sizes, reverse=True)
    # Forced assignments first (matched by scaled size, best effort).
    for size, bucket in cfg.forced_buckets:
        scaled = max(2, int(round(size * sf)))
        if scaled in pool and remaining.get(bucket, 0) >= scaled:
            pool.remove(scaled)
            assignments.append((scaled, bucket))
            remaining[bucket] -= scaled
    for size in pool:
        fitting = [b for b, q in remaining.items() if q >= size]
        bucket = (
            max(fitting, key=lambda b: remaining[b])
            if fitting
            else max(remaining, key=lambda b: remaining[b])
        )
        assignments.append((size, bucket))
        remaining[bucket] -= size

    singles = {b: max(0, q) for b, q in remaining.items()}
    n_single_no = n_singletons - n_outliers
    drift = n_single_no - sum(singles.values())
    order = sorted(singles, key=lambda b: -singles[b])
    i = 0
    while drift != 0 and order:
        b = order[i % len(order)]
        step = 1 if drift > 0 else -1
        if singles[b] + step >= 0:
            singles[b] += step
            drift -= step
        i += 1
    return assignments, singles


def generate_corpus(cfg: CorpusConfig, *, sf: float = 1.0) -> list[GeneratedFile]:
    """Generate the full corpus at scale factor ``sf`` (1.0 = paper scale).

    Deterministic in ``(cfg.seed, sf)``. File ids are
    ``{name}_{index:04d}``; template ids ``{name}_t{index:04d}``.
    """
    assignments, singles = _allocate(cfg, sf)
    master = np.random.default_rng(cfg.seed)
    files: list[GeneratedFile] = []
    t_idx = 0
    f_idx = 0

    def region_count(bucket: int, rng: np.random.Generator) -> int:
        if bucket == 1:
            return 1
        if bucket == 25:
            return int(rng.integers(2, 6))
        lo, hi = cfg.many_region_range
        return int(rng.integers(lo, hi + 1))

    for size, bucket in assignments:
        rng_t = np.random.default_rng((cfg.seed, t_idx))
        tid = f"{cfg.name}_t{t_idx:04d}"
        spec = _build_template(tid, region_count(bucket, rng_t), rng_t, cfg.jitter)
        for _ in range(size):
            rng_f = np.random.default_rng((cfg.seed, t_idx, f_idx))
            files.append(_render_file(cfg.name, f"{cfg.name}_{f_idx:04d}", spec, rng_f))
            f_idx += 1
        t_idx += 1
    for bucket, count in sorted(singles.items()):
        for _ in range(count):
            rng_t = np.random.default_rng((cfg.seed, t_idx))
            tid = f"{cfg.name}_t{t_idx:04d}"
            spec = _build_template(tid, region_count(bucket, rng_t), rng_t, cfg.jitter)
            rng_f = np.random.default_rng((cfg.seed, t_idx, f_idx))
            files.append(_render_file(cfg.name, f"{cfg.name}_{f_idx:04d}", spec, rng_f))
            f_idx += 1
            t_idx += 1
    for n_regions in cfg.outlier_region_counts:
        n = max(30, int(round(n_regions * sf))) if sf < 1.0 else n_regions
        rng_f = np.random.default_rng((cfg.seed, t_idx, f_idx))
        files.append(
            _render_outlier(
                cfg.name, f"{cfg.name}_{f_idx:04d}", f"{cfg.name}_t{t_idx:04d}", n, rng_f
            )
        )
        f_idx += 1
        t_idx += 1
    assert len(files) == len({f.file_id for f in files})
    return files
