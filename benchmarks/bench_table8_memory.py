"""Benchmark behind Table VIII: per-method peak memory (σ=δ=50% cell).

The benchmark timer measures the tracemalloc-instrumented run; the
figure of merit is ``extra_info["peak_mib"]``.  The paper's ordering —
H-DFS most memory (materialized embeddings), then IEMiner/TPMiner,
then E-HTPGM (bitmaps), then A-HTPGM (pruned series) — is asserted in
``tests/test_tables.py`` at a smaller scale.
"""
import pytest

from repro.baselines import mine_hdfs, mine_ieminer, mine_tpminer
from repro.core.ahtpgm import mine_approx
from repro.core.htpgm import mine
from repro.metrics import peak_memory_call

from ._bench_util import cfg, dataset, graphs, once

METHODS = ["H-DFS", "IEMiner", "TPMiner", "E-HTPGM", "A-HTPGM (60%)"]


def _runner(spark, name, method):
    ds = dataset(spark, name)
    table = {
        "H-DFS": lambda c: mine_hdfs(ds.db, c),
        "IEMiner": lambda c: mine_ieminer(ds.db, c),
        "TPMiner": lambda c: mine_tpminer(ds.db, c),
        "E-HTPGM": lambda c: mine(ds.db, c),
    }
    if method in table:
        return table[method]
    g = graphs(spark, name)[60]
    return lambda c: mine_approx(ds.db, g, c)


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("name", ["nist", "smartcity"])
def test_table8_memory(benchmark, spark, name, method):
    run = _runner(spark, name, method)
    c = cfg(50, 50)
    result, peak = once(benchmark, lambda: peak_memory_call(lambda: run(c)))
    benchmark.extra_info["peak_mib"] = round(peak, 2)
    assert peak > 0
    assert result.n_sequences > 0
