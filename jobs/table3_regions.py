"""Table 3: template inference at varying numbers of regions.

Runs the full Mondrian pipeline (static radius, tau_f = 0.99) on both
corpora and reports homogeneity / completeness / V-measure per
region-count bucket (1, [2,5], >=6), next to the paper's numbers.

Usage: spark-submit jobs/table3_regions.py [--sf 1.0]
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import build_session, sf_parser  # noqa: E402

from pyspark.sql import SparkSession  # noqa: E402

from repro.corpus import deco_config, fuste_config, generate_corpus  # noqa: E402
from repro.eval.tables import table3_rows  # noqa: E402

#: Paper Table 3 at tau_f = 0.99: bucket -> (#files, H, C, V).
PAPER = {
    "deco": {"1": (232, 0.92, 0.97, 0.94), "[2,5]": (470, 0.97, 0.98, 0.98), ">=6": (150, 0.99, 0.98, 0.99)},
    "fuste": {"1": (495, 0.98, 0.68, 0.80), "[2,5]": (372, 0.98, 0.76, 0.86), ">=6": (18, 1.00, 0.95, 0.97)},
}


def run(spark: SparkSession, sf: float = 1.0, tau_f: float = 0.99) -> list:
    all_rows = []
    for cfg in (deco_config(), fuste_config()):
        files = generate_corpus(cfg, sf=sf)
        rows, timings = table3_rows(spark, files, dataset=cfg.name, tau_f=tau_f)
        all_rows.extend(rows)
        print(f"\nTable 3 -- {cfg.name} (sf={sf}, tau_f={tau_f}) "
              f"[inference {timings['inference']:.1f}s] -- measured | paper")
        for r in rows:
            p = PAPER[cfg.name].get(r.bucket)
            ps = f"{p[0]} H={p[1]:.2f} C={p[2]:.2f} V={p[3]:.2f}" if p else "-"
            print(
                f"  {r.bucket:>5}: files={r.n_files} H={r.homogeneity:.2f} "
                f"C={r.completeness:.2f} V={r.v_measure:.2f}  |  {ps}"
            )
    return all_rows


if __name__ == "__main__":
    args = sf_parser(__doc__).parse_args()
    session = build_session("table3")
    try:
        run(session, args.sf)
    finally:
        session.stop()
