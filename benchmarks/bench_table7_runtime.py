"""Benchmark behind Table VII: per-method runtimes (σ=δ=50% cell).

One benchmark per (dataset, method); the table job
(``jobs/table7_runtime.py``) sweeps the full σ×δ grid, the benchmark
pins the representative middle cell so the relative ordering —
H-DFS > IEMiner > TPMiner > E-HTPGM > A-HTPGM — is regenerated on
every benchmark run.
"""
import pytest

from repro.baselines import mine_hdfs, mine_ieminer, mine_tpminer
from repro.core.ahtpgm import mine_approx
from repro.core.htpgm import mine

from ._bench_util import cfg, dataset, graphs, once

METHODS = [
    "H-DFS",
    "IEMiner",
    "TPMiner",
    "E-HTPGM",
    "A-HTPGM (80%)",
    "A-HTPGM (60%)",
    "A-HTPGM (40%)",
    "A-HTPGM (20%)",
]


def _runner(spark, name, method):
    ds = dataset(spark, name)
    if method == "H-DFS":
        return lambda c: mine_hdfs(ds.db, c)
    if method == "IEMiner":
        return lambda c: mine_ieminer(ds.db, c)
    if method == "TPMiner":
        return lambda c: mine_tpminer(ds.db, c)
    if method == "E-HTPGM":
        return lambda c: mine(ds.db, c)
    density = int(method.split("(")[1].rstrip("%)"))
    g = graphs(spark, name)[density]
    return lambda c: mine_approx(ds.db, g, c)


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("name", ["nist", "smartcity"])
def test_table7_runtime(benchmark, spark, name, method):
    run = _runner(spark, name, method)
    c = cfg(50, 50)
    result = once(benchmark, lambda: run(c))
    benchmark.extra_info["patterns"] = len(result.patterns)
    assert result.n_sequences > 0
