"""Benchmark behind Figs. 6-7 data: E-HTPGM pruning-variant runtimes."""
import pytest

from repro.core.htpgm import mine_variant

from ._bench_util import cfg, dataset, once


@pytest.mark.parametrize("variant", ["noprune", "apriori", "trans", "all"])
@pytest.mark.parametrize("name", ["nist"])
def test_ablation_variants(benchmark, spark, name, variant):
    ds = dataset(spark, name)
    c = cfg(50, 50)
    result = once(benchmark, lambda: mine_variant(ds.db, c, variant))
    benchmark.extra_info["patterns"] = len(result.patterns)
    assert len(result.patterns) > 0
