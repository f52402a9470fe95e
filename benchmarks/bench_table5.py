"""Benchmark behind Table V: pattern-count mining per dataset.

One benchmark per dataset mines the loosest grid cell (σ=δ=20%); the
full grid is derived by post-filtering (see ``repro.tables.table5``),
so this run is the entire mining cost of the table.  Extracted counts
are attached as ``extra_info`` for comparison with the paper's Table V.
"""
import pytest

from repro.core.htpgm import mine
from repro.paper_numbers import TABLE5

from ._bench_util import cfg, dataset, once


@pytest.mark.parametrize(
    "name", ["nist", "ukdale", "dataport", "smartcity"]
)
def test_table5_pattern_counts(benchmark, spark, name):
    ds = dataset(spark, name)
    result = once(benchmark, lambda: mine(ds.db, cfg(20, 20)))
    grid = {}
    for s in (20, 40, 60, 80):
        for c in (20, 40, 60, 80):
            grid[f"s{s}_c{c}"] = len(result.filtered(s / 100, c / 100))
    benchmark.extra_info.update(grid)
    benchmark.extra_info["paper_s20_c20"] = TABLE5[name][20][20]
    # grid monotonicity, the paper's qualitative shape
    assert grid["s20_c20"] >= grid["s80_c80"]
    assert grid["s20_c20"] > 0
