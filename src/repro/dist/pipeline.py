"""Distributed Mondrian: the paper's dataflow as Spark DataFrame stages.

Stages (all DataFrame API; per-file and per-pair compute runs inside
``mapInPandas`` with explicit result schemas):

1. :func:`corpus_df` / :func:`gold_df` -- the generated corpus as tables.
2. :func:`detect_regions_df` -- one row per detected region
   ``(file_id, region_id, x0, y0, x1, y1, n_elements, hist)``, computed
   per file with the chosen strategy (mondrian static/dynamic, connected
   components, genetic XLS/CSV, tablesense surrogate, or gold).
3. :func:`candidate_pairs_df` -- Algorithm 1's region-index pruning:
   every region block is correlated against the broadcast histogram
   matrix of all regions; file pairs sharing a region pair with
   correlation >= tau_r survive.
4. :func:`layout_similarity_df` -- per-pair similarity flooding, after
   the node-count bound prune (Sec. 5.4).
5. :func:`template_labels_df` -- connected components of the >= tau_f
   similarity graph (label propagation; see :mod:`repro.dist.ccomp`).

``run_pipeline`` chains the stages and returns labels plus stage timings
(consumed by the Table 4 harness).
"""
from __future__ import annotations

import json
import time
from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    IntegerType,
    StringType,
    StructField,
    StructType,
)

from repro.corpus.generator import GeneratedFile
from repro.core.elements import Box
from repro.core.flooding import layout_similarity, similarity_bound
from repro.core.layout import Layout
from repro.core.region_sim import TAU_R
from repro.dist.ccomp import components_spark, components_unionfind

__all__ = [
    "REGION_SCHEMA",
    "corpus_df",
    "gold_df",
    "detect_regions_df",
    "candidate_pairs_df",
    "layout_similarity_df",
    "template_labels_df",
    "PipelineResult",
    "run_pipeline",
]

REGION_SCHEMA = StructType(
    [
        StructField("file_id", StringType(), False),
        StructField("region_id", IntegerType(), False),
        StructField("x0", IntegerType(), False),
        StructField("y0", IntegerType(), False),
        StructField("x1", IntegerType(), False),
        StructField("y1", IntegerType(), False),
        StructField("n_elements", IntegerType(), False),
        StructField("hist", ArrayType(DoubleType(), False), False),
    ]
)

_PAIR_SCHEMA = StructType(
    [
        StructField("file_a", StringType(), False),
        StructField("file_b", StringType(), False),
    ]
)

_SIM_SCHEMA = StructType(
    [
        StructField("file_a", StringType(), False),
        StructField("file_b", StringType(), False),
        StructField("similarity", DoubleType(), False),
    ]
)


def corpus_df(spark: SparkSession, files: list[GeneratedFile]) -> DataFrame:
    """Corpus table: one row per file, gold boxes/styles as JSON payloads.

    The JSON payloads ride along so per-file strategies that need them
    (dynamic radius, genetic-XLS) stay a single ``mapInPandas`` pass.
    """
    rows = [
        {
            "dataset": f.dataset,
            "file_id": f.file_id,
            "template_id": f.template_id,
            "content": f.content,
            "is_outlier": f.is_outlier,
            "n_gold_regions": f.n_regions,
            "gold_json": json.dumps(
                [[g.box.x0, g.box.y0, g.box.x1, g.box.y1] for g in f.gold]
            ),
            "style_json": json.dumps(
                [[k, b.x0, b.y0, b.x1, b.y1] for k, b in f.style_boxes]
            ),
        }
        for f in files
    ]
    return spark.createDataFrame(pd.DataFrame(rows))


def gold_df(spark: SparkSession, files: list[GeneratedFile]) -> DataFrame:
    """Gold region table: one row per annotated region."""
    rows = [
        {
            "file_id": f.file_id,
            "region_id": g.region_id,
            "kind": g.kind,
            "x0": g.box.x0,
            "y0": g.box.y0,
            "x1": g.box.x1,
            "y1": g.box.y1,
        }
        for f in files
        for g in f.gold
    ]
    return spark.createDataFrame(pd.DataFrame(rows))


def detect_regions_df(
    corpus: DataFrame, strategy: str, **params
) -> DataFrame:
    """Per-file region detection, parallelized with ``mapInPandas``.

    ``strategy`` is a name resolved by
    :func:`repro.dist.strategies.detect_regions_for_strategy` on the
    executors. ``params`` must be plain serializable values.
    """

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from repro.dist.strategies import detect_regions_for_strategy

        for pdf in batches:
            out: list[dict] = []
            for row in pdf.itertuples(index=False):
                regions = detect_regions_for_strategy(
                    strategy,
                    content=row.content,
                    gold_json=row.gold_json,
                    style_json=row.style_json,
                    file_id=row.file_id,
                    **params,
                )
                for rid, (box, hist, n_el) in enumerate(regions):
                    out.append(
                        {
                            "file_id": row.file_id,
                            "region_id": rid,
                            "x0": box.x0,
                            "y0": box.y0,
                            "x1": box.x1,
                            "y1": box.y1,
                            "n_elements": n_el,
                            "hist": hist.tolist(),
                        }
                    )
            yield pd.DataFrame(
                out,
                columns=[f.name for f in REGION_SCHEMA.fields],
            )

    # Spread files evenly: region detection cost varies per file.
    n = corpus.rdd.getNumPartitions()
    src = corpus.repartition(max(n, 32), "file_id")
    return src.mapInPandas(run, schema=REGION_SCHEMA)


def candidate_pairs_df(
    spark: SparkSession, regions: DataFrame, *, tau_r: float = TAU_R
) -> DataFrame:
    """Distinct file pairs sharing >= tau_r-similar regions (blocked corr).

    The full histogram matrix is broadcast (M x 192 doubles; ~6 MB at
    paper scale) and every partition correlates its region block against
    it -- the Spark version of the blocked loop in
    :func:`repro.core.templates.candidate_pairs`.
    """
    pdf = regions.select("file_id", "hist").toPandas()
    if pdf.empty:
        return spark.createDataFrame([], schema=_PAIR_SCHEMA)
    H = np.stack(pdf["hist"].to_numpy())
    owners = pdf["file_id"].to_numpy()
    bc = spark.sparkContext.broadcast((H, owners))

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from repro.core.region_sim import correlation_matrix

        H_all, owner_all = bc.value
        for block in batches:
            if block.empty:
                yield pd.DataFrame(columns=["file_a", "file_b"])
                continue
            Hb = np.stack(block["hist"].to_numpy())
            owner_b = block["file_id"].to_numpy()
            corr = correlation_matrix(Hb, H_all)
            ra, rb = np.nonzero(corr >= tau_r)
            fa, fb = owner_b[ra], owner_all[rb]
            keep = fa < fb
            out = pd.DataFrame({"file_a": fa[keep], "file_b": fb[keep]})
            yield out.drop_duplicates()

    pairs = regions.select("file_id", "hist").mapInPandas(run, schema=_PAIR_SCHEMA)
    return pairs.distinct()


def _layout_payload(regions: DataFrame) -> DataFrame:
    """Per-file packed layout: boxes and histograms as nested arrays.

    ``collect_list`` gives no ordering guarantee, so regions are packed as
    structs keyed by ``region_id`` and sorted with ``sort_array`` --
    the node order of the reconstructed Layout is then deterministic.
    """
    packed = regions.groupBy("file_id").agg(
        F.sort_array(
            F.collect_list(
                F.struct(
                    F.col("region_id"),
                    F.array("x0", "y0", "x1", "y1").alias("box"),
                    F.col("hist"),
                )
            )
        ).alias("rs"),
        F.count("*").alias("n_regions"),
    )
    return packed.select(
        "file_id",
        F.col("rs.box").alias("boxes"),
        F.col("rs.hist").alias("hists"),
        "n_regions",
    )


def layout_similarity_df(
    spark: SparkSession,
    regions: DataFrame,
    pairs: DataFrame,
    *,
    prune_below: float = 0.7,
) -> DataFrame:
    """Similarity flooding per candidate pair (bound-pruned), distributed.

    Pairs failing the ``min/max`` node-count bound are emitted at their
    bound value without flooding (Sec. 5.4 pruning); the rest compute the
    full symmetric flooding score inside ``mapInPandas``.
    """
    payload = _layout_payload(regions)
    a = payload.select(
        F.col("file_id").alias("file_a"),
        F.col("boxes").alias("boxes_a"),
        F.col("hists").alias("hists_a"),
        F.col("n_regions").alias("n_a"),
    )
    b = payload.select(
        F.col("file_id").alias("file_b"),
        F.col("boxes").alias("boxes_b"),
        F.col("hists").alias("hists_b"),
        F.col("n_regions").alias("n_b"),
    )
    joined = pairs.join(a, "file_a").join(b, "file_b")

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = []
            for row in pdf.itertuples(index=False):
                bound = similarity_bound(int(row.n_a), int(row.n_b))
                if bound < prune_below:
                    sim = bound
                else:
                    ga = Layout(
                        [Box(*map(int, bx)) for bx in row.boxes_a],
                        np.array([np.asarray(h) for h in row.hists_a]),
                    )
                    gb = Layout(
                        [Box(*map(int, bx)) for bx in row.boxes_b],
                        np.array([np.asarray(h) for h in row.hists_b]),
                    )
                    sim = layout_similarity(ga, gb)
                out.append(
                    {"file_a": row.file_a, "file_b": row.file_b, "similarity": sim}
                )
            yield pd.DataFrame(out, columns=["file_a", "file_b", "similarity"])

    n = max(joined.rdd.getNumPartitions(), 64)
    return joined.repartition(n).mapInPandas(run, schema=_SIM_SCHEMA)


def template_labels_df(
    spark: SparkSession,
    corpus: DataFrame,
    sims: DataFrame,
    *,
    tau_f: float,
    distributed: bool = True,
) -> DataFrame:
    """Template labels: connected components of the thresholded graph.

    Returns ``(file_id, template_label)`` where the label is the smallest
    file_id in the component (stringly-typed, deterministic).
    """
    edges = sims.where(F.col("similarity") >= tau_f).select(
        F.col("file_a").alias("src"), F.col("file_b").alias("dst")
    )
    nodes = corpus.select(F.col("file_id").alias("node"))
    if distributed:
        labels = components_spark(spark, nodes, edges)
        return labels.select(
            F.col("node").alias("file_id"), F.col("component").alias("template_label")
        )
    node_list = [r.node for r in nodes.collect()]
    edge_list = [(r.src, r.dst) for r in edges.collect()]
    comp = components_unionfind(node_list, edge_list)
    pdf = pd.DataFrame(
        {"file_id": list(comp), "template_label": [str(v) for v in comp.values()]}
    )
    return spark.createDataFrame(pdf)


@dataclass
class PipelineResult:
    """Labels plus stage artifacts and wall-clock timings."""

    labels: dict[str, str]
    n_regions: int
    n_candidate_pairs: int
    timings: dict[str, float]


def run_pipeline(
    spark: SparkSession,
    files: list[GeneratedFile],
    *,
    strategy: str = "static",
    tau_r: float = TAU_R,
    tau_f: float = 0.99,
    prune_below: float = 0.7,
    distributed_components: bool = False,
    **params,
) -> PipelineResult:
    """End-to-end distributed Mondrian with per-stage timings.

    ``timings['inference']`` covers matching + flooding + grouping -- the
    quantity reported in the paper's Table 4 (region detection excluded,
    as the paper times template inference given detected regions).
    """
    timings: dict[str, float] = {}
    corpus = corpus_df(spark, files).cache()
    corpus.count()

    t0 = time.perf_counter()
    regions = detect_regions_df(corpus, strategy, **params).cache()
    n_regions = regions.count()
    timings["detection"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    pairs = candidate_pairs_df(spark, regions, tau_r=tau_r).cache()
    n_pairs = pairs.count()
    timings["matching"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    sims = layout_similarity_df(
        spark, regions, pairs, prune_below=min(prune_below, tau_f)
    ).cache()
    sims.count()
    timings["flooding"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    labels_df = template_labels_df(
        spark, corpus, sims, tau_f=tau_f, distributed=distributed_components
    )
    labels = {r.file_id: str(r.template_label) for r in labels_df.collect()}
    timings["grouping"] = time.perf_counter() - t0
    timings["inference"] = (
        timings["matching"] + timings["flooding"] + timings["grouping"]
    )

    regions.unpersist()
    pairs.unpersist()
    sims.unpersist()
    corpus.unpersist()
    return PipelineResult(labels, n_regions, n_pairs, timings)
