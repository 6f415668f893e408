"""Table 2: synthetic overview of the evaluation datasets.

Generates both corpora at the requested scale factor, computes the
overview with Spark SQL, cross-checks it against DuckDB via the oracle,
and prints measured vs paper numbers.

Usage: spark-submit jobs/table2_datasets.py [--sf 1.0]
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import build_session, sf_parser  # noqa: E402

from pyspark.sql import SparkSession  # noqa: E402

from repro.corpus import deco_config, fuste_config, generate_corpus  # noqa: E402
from repro.eval.tables import DATASET_OVERVIEW_SQL, table2_overview  # noqa: E402

#: Paper Table 2 (files / single / multi / templates / singleton / multi-t).
PAPER = {
    "deco": (854, 233, 621, 750, 679, 71),
    "fuste": (886, 495, 391, 136, 105, 31),
}


def run(spark: SparkSession, sf: float = 1.0, *, oracle: bool = True) -> list[dict]:
    files = [
        f
        for cfg in (deco_config(), fuste_config())
        for f in generate_corpus(cfg, sf=sf)
    ]
    df = table2_overview(spark, files)
    if oracle:
        import pandas as pd

        from repro.oracle import assert_equivalent

        meta = pd.DataFrame(
            {
                "dataset": [f.dataset for f in files],
                "template_id": [f.template_id for f in files],
                "n_gold_regions": [f.n_regions for f in files],
            }
        )
        assert_equivalent(df, DATASET_OVERVIEW_SQL, corpus=meta)
    rows = [r.asDict() for r in df.collect()]
    print(f"\nTable 2 (sf={sf}) -- measured | paper (at sf=1.0)")
    for r in rows:
        paper = PAPER[r["dataset"]]
        print(
            f"  {r['dataset']}: files={r['total_files']}|{paper[0]} "
            f"single/multi={r['single_region_files']}/{r['multi_region_files']}|{paper[1]}/{paper[2]} "
            f"templates={r['templates']}|{paper[3]} "
            f"singleton/multi-t={r['singleton_templates']}/{r['multi_templates']}|{paper[4]}/{paper[5]}"
        )
    return rows


if __name__ == "__main__":
    args = sf_parser(__doc__).parse_args()
    session = build_session("table2")
    try:
        run(session, args.sf)
    finally:
        session.stop()
