"""Region/table detection accuracy per strategy (context for Fig. 6).

Figures are out of scope for this reproduction, but Tables 3-4 depend on
the relative detection quality of the strategies, so this job prints the
Fig.-6 operating points: the share of gold regions detected perfectly
(IoU = 1.0) and above 0.7 / 0.9, plus mean IoU and mean EoB, per
strategy and dataset -- parallelized per file with Spark.

Usage: spark-submit jobs/region_detection.py [--sf 1.0]
"""
from __future__ import annotations

import sys
from pathlib import Path
from typing import Iterator

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import build_session, sf_parser  # noqa: E402

import pandas as pd  # noqa: E402
from pyspark.sql import SparkSession  # noqa: E402
from pyspark.sql import functions as F  # noqa: E402
from pyspark.sql.types import (  # noqa: E402
    DoubleType,
    StringType,
    StructField,
    StructType,
)

from repro.corpus import deco_config, fuste_config, generate_corpus  # noqa: E402
from repro.dist.pipeline import corpus_df  # noqa: E402
from repro.eval.tables import STATIC_EPS, filter_outliers  # noqa: E402

_SCORE_SCHEMA = StructType(
    [
        StructField("dataset", StringType(), False),
        StructField("strategy", StringType(), False),
        StructField("iou", DoubleType(), False),
        StructField("eob", DoubleType(), False),
    ]
)

STRATEGIES = ("static", "dynamic", "cc", "genetic_xls", "genetic_csv", "tablesense")


def _score_factory(strategies: tuple[str, ...], eps_static: float):
    def score(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        import json

        from repro.core.elements import Box
        from repro.core.grid import csv_to_type_grid
        from repro.dist.strategies import boxes_for_strategy
        from repro.eval.detection import file_scores

        for pdf in batches:
            out = []
            for row in pdf.itertuples(index=False):
                tgrid = csv_to_type_grid(row.content)
                gold = [Box(*map(int, c)) for c in json.loads(row.gold_json)]
                style = [
                    (k, Box(int(a), int(b), int(c), int(d)))
                    for k, a, b, c, d in json.loads(row.style_json)
                ]
                mask = tgrid != 0
                for strat in strategies:
                    boxes, _ = boxes_for_strategy(
                        strat, tgrid, gold=gold, style=style, eps=eps_static, seed=1
                    )
                    for iou, eob in file_scores(mask, boxes, gold):
                        out.append(
                            {
                                "dataset": row.dataset,
                                "strategy": strat,
                                "iou": iou,
                                "eob": eob,
                            }
                        )
            yield pd.DataFrame(out, columns=["dataset", "strategy", "iou", "eob"])

    return score


def run(spark: SparkSession, sf: float = 1.0, strategies=STRATEGIES) -> list[dict]:
    rows = []
    for cfg in (deco_config(), fuste_config()):
        files = filter_outliers(generate_corpus(cfg, sf=sf))
        corpus = corpus_df(spark, files).repartition(64, "file_id")
        scores = corpus.mapInPandas(
            _score_factory(tuple(strategies), STATIC_EPS[cfg.name]), _SCORE_SCHEMA
        )
        agg = (
            scores.groupBy("dataset", "strategy")
            .agg(
                F.avg("iou").alias("mean_iou"),
                F.avg((F.col("iou") == 1.0).cast("double")).alias("perfect"),
                F.avg((F.col("iou") >= 0.9).cast("double")).alias("at_90"),
                F.avg((F.col("iou") >= 0.7).cast("double")).alias("at_70"),
                F.avg("eob").alias("mean_eob"),
                F.count("*").alias("n_regions"),
            )
            .orderBy("dataset", "strategy")
        )
        rows.extend(r.asDict() for r in agg.collect())
    print(f"\nRegion detection accuracy (sf={sf})")
    for r in rows:
        print(
            f"  {r['dataset']:<6} {r['strategy']:<12} meanIoU={r['mean_iou']:.3f} "
            f"perfect={r['perfect']:.1%} >=0.9={r['at_90']:.1%} >=0.7={r['at_70']:.1%} "
            f"meanEoB={r['mean_eob']:.2f} (n={r['n_regions']})"
        )
    return rows


if __name__ == "__main__":
    args = sf_parser(__doc__).parse_args()
    session = build_session("region_detection")
    try:
        run(session, args.sf)
    finally:
        session.stop()
