"""Table 1: data types, sample cells, and their colors.

Prints the implemented type -> color mapping next to the paper's sample
cells and verifies each sample classifies to its published sub-type.
No Spark needed (the mapping is a pure function); kept as a job for
uniformity.

Usage: python jobs/table1_colors.py
"""
from __future__ import annotations

from repro.eval.tables import table1_rows


def run() -> list[dict]:
    rows = table1_rows()
    print(f"{'Sub-type':<10} {'Sample':<15} {'Classified':<10} {'RGB':<16} ok")
    for r in rows:
        print(
            f"{r['sub_type']:<10} {r['sample']!r:<15} {r['classified_as']:<10} "
            f"{str(r['color_rgb']):<16} {'OK' if r['matches'] else 'MISMATCH'}"
        )
    return rows


if __name__ == "__main__":
    bad = [r for r in run() if not r["matches"]]
    raise SystemExit(1 if bad else 0)
