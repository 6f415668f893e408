"""Table 4: time performance of template inference.

Times the template-inference stage (region matching + similarity
flooding + transitive grouping, as the paper measures) for every
region-detection strategy on both corpora, with 3 seeded repetitions for
the stochastic ML strategies. Prints measured seconds next to the
paper's (their hardware: single-threaded Python on an Epyc 7702P; ours:
Spark local[*] -- absolute values differ, the ordering is the target).

Usage: spark-submit jobs/table4_timing.py [--sf 1.0] [--strategies a,b]
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import build_session, sf_parser  # noqa: E402

from pyspark.sql import SparkSession  # noqa: E402

from repro.corpus import deco_config, fuste_config, generate_corpus  # noqa: E402
from repro.eval.tables import TABLE4_STRATEGIES, table4_rows  # noqa: E402

#: Paper Table 4 (seconds, mean +- std).
PAPER = {
    ("deco", "gold"): (93.39, 0.26),
    ("deco", "dynamic"): (1563.51, 2.91),
    ("deco", "static"): (343.13, 3.81),
    ("deco", "cc"): (15887.50, 127.12),
    ("deco", "genetic_xls"): (102.32, 0.51),
    ("deco", "genetic_csv"): (114.76, 1.58),
    ("deco", "tablesense"): (361.46, 47.47),
    ("fuste", "gold"): (78.87, 0.77),
    ("fuste", "dynamic"): (8515.46, 194.55),
    ("fuste", "static"): (2749.20, 13.04),
    ("fuste", "cc"): (3529.21, 76.67),
    ("fuste", "genetic_xls"): (75.12, 0.96),
    ("fuste", "genetic_csv"): (75.13, 0.34),
    ("fuste", "tablesense"): (51.54, 9.37),
}


def run(
    spark: SparkSession,
    sf: float = 1.0,
    strategies: tuple[str, ...] = TABLE4_STRATEGIES,
    n_runs: int = 3,
) -> list:
    all_rows = []
    for cfg in (deco_config(), fuste_config()):
        files = generate_corpus(cfg, sf=sf)
        rows = table4_rows(
            spark, files, dataset=cfg.name, strategies=strategies, n_runs=n_runs
        )
        all_rows.extend(rows)
        print(f"\nTable 4 -- {cfg.name} (sf={sf}) -- measured s | paper s")
        for r in rows:
            p = PAPER.get((r.dataset, r.strategy))
            ps = f"{p[0]:.0f} +- {p[1]:.0f}" if p else "-"
            print(
                f"  {r.strategy:<12}: {r.mean_seconds:8.2f} +- {r.std_seconds:5.2f}  "
                f"(regions={r.n_regions}, pairs={r.n_candidate_pairs}, V={r.v_measure:.2f})  |  {ps}"
            )
    return all_rows


if __name__ == "__main__":
    parser = sf_parser(__doc__)
    parser.add_argument(
        "--strategies",
        type=str,
        default=",".join(TABLE4_STRATEGIES),
        help="comma-separated strategy subset",
    )
    parser.add_argument("--runs", type=int, default=3)
    args = parser.parse_args()
    session = build_session("table4")
    try:
        run(session, args.sf, tuple(args.strategies.split(",")), args.runs)
    finally:
        session.stop()
