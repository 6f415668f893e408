"""Harnesses that reproduce the paper's evaluation tables.

Each ``tableN_*`` function computes the rows the paper reports; the
``jobs/tableN_*.py`` entrypoints print them side by side with the
published numbers (also recorded in EXPERIMENTS.md).

The evaluation protocol (Sec. 5.1) is applied here: files whose *gold*
region count exceeds the 99.9th percentile of the dataset are outliers
and excluded from all experiments.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core.cells import COLORS, CellType, cell_type
from repro.corpus.generator import GeneratedFile
from repro.dist.pipeline import corpus_df, run_pipeline
from repro.eval.clustering_metrics import homogeneity_completeness_v

__all__ = [
    "filter_outliers",
    "table1_rows",
    "DATASET_OVERVIEW_SQL",
    "table2_overview",
    "table3_rows",
    "table4_rows",
    "STATIC_EPS",
]

#: Best static radii reported in Sec. 5.2 (DECO 1.5, FUSTE 1.4).
STATIC_EPS = {"deco": 1.5, "fuste": 1.4}


def filter_outliers(files: list[GeneratedFile]) -> list[GeneratedFile]:
    """Drop files with an unusually large number of regions (Sec. 5.1).

    The paper excludes files "with more regions than the 99.9% of the
    remaining files" -- 2 DECO and 1 FUSTE files. A literal interpolated
    99.9th percentile over ~850 files lands *between* the two DECO
    outliers, so we operationalize the rule with the non-interpolated
    99.7th percentile, which excludes exactly the intended sparse
    outlier files in both corpora (and nothing else).
    """
    counts = np.array([f.n_regions for f in files], dtype=np.float64)
    thr = np.quantile(counts, 0.997, method="lower")
    return [f for f in files if f.n_regions <= thr]


# ---------------------------------------------------------------- Table 1 --

#: The paper's sample cells per sub-type (Table 1). "17/9/20" parses as a
#: date, "MWH" as uppercase, etc.; the harness re-classifies each sample
#: to prove the implemented typing matches the published table.
_TABLE1_SAMPLES = {
    CellType.EMPTY: " ",
    CellType.INTEGER: "14",
    CellType.FLOAT: "47.74",
    CellType.TIME: "17:00",
    CellType.DATE: "17/9/20",
    CellType.UPPER: "MWH",
    CellType.LOWER: "real/time",
    CellType.TITLE: "Firm Sales",
    CellType.GENERIC: "System avg. =",
}


def table1_rows() -> list[dict]:
    """Type -> sample cell -> classified type -> color rows (Table 1)."""
    return [
        {
            "sub_type": t.name,
            "sample": sample,
            "classified_as": cell_type(sample).name,
            "color_rgb": COLORS[t],
            "matches": cell_type(sample) == t,
        }
        for t, sample in _TABLE1_SAMPLES.items()
    ]


# ---------------------------------------------------------------- Table 2 --

#: Portable SQL (runs on both Spark and DuckDB over the corpus metadata
#: table ``corpus``) computing the Table 2 overview per dataset.
DATASET_OVERVIEW_SQL = """
WITH template_sizes AS (
    SELECT dataset, template_id, count(*) AS n_files
    FROM corpus
    GROUP BY dataset, template_id
)
SELECT
    c.dataset AS dataset,
    count(*) AS total_files,
    sum(CASE WHEN c.n_gold_regions = 1 THEN 1 ELSE 0 END) AS single_region_files,
    sum(CASE WHEN c.n_gold_regions > 1 THEN 1 ELSE 0 END) AS multi_region_files,
    count(DISTINCT c.template_id) AS templates,
    count(DISTINCT CASE WHEN t.n_files = 1 THEN c.template_id END) AS singleton_templates,
    count(DISTINCT CASE WHEN t.n_files > 1 THEN c.template_id END) AS multi_templates
FROM corpus c
JOIN template_sizes t
  ON c.dataset = t.dataset AND c.template_id = t.template_id
GROUP BY c.dataset
ORDER BY c.dataset
"""


def table2_overview(spark: SparkSession, files: list[GeneratedFile]) -> DataFrame:
    """Table 2 dataset overview as a Spark DataFrame (oracle-checkable)."""
    corpus = corpus_df(spark, files)
    corpus.createOrReplaceTempView("corpus")
    return spark.sql(DATASET_OVERVIEW_SQL)


# ---------------------------------------------------------------- Table 3 --

_BUCKETS = (
    ("1", lambda n: n == 1),
    ("[2,5]", lambda n: 2 <= n <= 5),
    (">=6", lambda n: n >= 6),
)


@dataclass
class Table3Row:
    dataset: str
    bucket: str
    n_files: int
    homogeneity: float
    completeness: float
    v_measure: float


def table3_rows(
    spark: SparkSession,
    files: list[GeneratedFile],
    *,
    dataset: str,
    tau_f: float = 0.99,
    strategy: str = "static",
    **params,
) -> tuple[list[Table3Row], dict[str, float]]:
    """Template inference at tau_f, scored per region-count bucket.

    Buckets use *gold* region counts (the paper partitions the evaluation
    datasets by their annotated layouts). Returns the rows plus the
    pipeline stage timings.
    """
    kept = filter_outliers(files)
    if strategy == "static":
        params.setdefault("eps", STATIC_EPS.get(dataset, 1.5))
    res = run_pipeline(spark, kept, strategy=strategy, tau_f=tau_f, **params)
    true = [f.template_id for f in kept]
    pred = [res.labels[f.file_id] for f in kept]
    rows = []
    for name, sel in _BUCKETS:
        idx = [i for i, f in enumerate(kept) if sel(f.n_regions)]
        if not idx:
            continue
        h, c, v = homogeneity_completeness_v(
            [true[i] for i in idx], [pred[i] for i in idx]
        )
        rows.append(Table3Row(dataset, name, len(idx), h, c, v))
    return rows, res.timings


# ---------------------------------------------------------------- Table 4 --


@dataclass
class Table4Row:
    dataset: str
    strategy: str
    mean_seconds: float
    std_seconds: float
    n_regions: int
    n_candidate_pairs: int
    v_measure: float


#: Strategies in the order of the paper's Table 4 rows.
TABLE4_STRATEGIES = (
    "gold",
    "dynamic",
    "static",
    "cc",
    "genetic_xls",
    "genetic_csv",
    "tablesense",
)


def table4_rows(
    spark: SparkSession,
    files: list[GeneratedFile],
    *,
    dataset: str,
    strategies: tuple[str, ...] = TABLE4_STRATEGIES,
    n_runs: int = 3,
    tau_f: float = 0.99,
) -> list[Table4Row]:
    """Template-inference wall time per region-detection strategy.

    Follows Table 4's protocol: the reported time is the template
    inference given detected regions (matching + flooding + grouping);
    the stochastic ML strategies vary their seed across the ``n_runs``
    repetitions and deterministic ones run once (their std is ~0 anyway,
    matching the paper's sub-1% deviations).
    """
    kept = filter_outliers(files)
    rows: list[Table4Row] = []
    for strategy in strategies:
        params: dict = {}
        if strategy == "static":
            params["eps"] = STATIC_EPS.get(dataset, 1.5)
        runs = n_runs if strategy in ("genetic_xls", "genetic_csv", "tablesense") else 1
        times, last = [], None
        for run in range(runs):
            if strategy in ("genetic_xls", "genetic_csv", "tablesense"):
                params["seed"] = run
            t0 = time.perf_counter()
            last = run_pipeline(spark, kept, strategy=strategy, tau_f=tau_f, **params)
            times.append(last.timings["inference"])
            _ = time.perf_counter() - t0
        true = [f.template_id for f in kept]
        pred = [last.labels[f.file_id] for f in kept]
        _, _, v = homogeneity_completeness_v(true, pred)
        rows.append(
            Table4Row(
                dataset,
                strategy,
                float(np.mean(times)),
                float(np.std(times)),
                last.n_regions,
                last.n_candidate_pairs,
                v,
            )
        )
    return rows
