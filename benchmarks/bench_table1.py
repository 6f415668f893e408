"""Benchmark for Table 1's substrate: image parsing throughput.

Table 1 itself is a static mapping; the measurable quantity is the
cell-typing / image-parsing stage it defines, benchmarked here over a
DECO-scale file sample (SF=0.1).
"""
from __future__ import annotations

import pytest

from repro.core.grid import csv_to_type_grid, render_image
from repro.corpus import deco_config, generate_corpus


@pytest.fixture(scope="module")
def contents():
    return [f.content for f in generate_corpus(deco_config(), sf=0.1)]


def test_bench_type_parsing(benchmark, contents):
    def parse_all():
        return sum(csv_to_type_grid(c).size for c in contents)

    total = benchmark(parse_all)
    assert total > 0


def test_bench_image_rendering(benchmark, contents):
    grids = [csv_to_type_grid(c) for c in contents]

    def render_all():
        return sum(render_image(g).nbytes for g in grids)

    total = benchmark(render_all)
    assert total > 0
