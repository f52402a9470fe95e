"""Benchmark behind Table IX: A-HTPGM runtime & accuracy per μ density.

Each benchmark mines A-HTPGM at one correlation-graph density and
reports its accuracy against E-HTPGM in ``extra_info`` (the paper's
trade-off: lower μ → faster & less accurate).
"""
import pytest

from repro.core.ahtpgm import accuracy, mine_approx
from repro.core.htpgm import mine

from ._bench_util import cfg, dataset, graphs, once

_EXACT = {}


def _exact(spark, name, c):
    key = (name, c.sigma, c.delta)
    if key not in _EXACT:
        _EXACT[key] = mine(dataset(spark, name).db, c)
    return _EXACT[key]


@pytest.mark.parametrize("density", [40, 60, 80, 90])
@pytest.mark.parametrize("name", ["nist", "smartcity"])
def test_table9_accuracy(benchmark, spark, name, density):
    ds = dataset(spark, name)
    g = graphs(spark, name)[density]
    c = cfg(20, 20)
    exact = _exact(spark, name, c)
    approx = once(benchmark, lambda: mine_approx(ds.db, g, c))
    acc = accuracy(approx, exact)
    benchmark.extra_info["accuracy_pct"] = round(100 * acc, 1)
    benchmark.extra_info["mu"] = round(g.mu, 4)
    assert 0.0 <= acc <= 1.0
    assert set(approx.patterns) <= set(exact.patterns)
