"""Shared benchmark helpers: small-scale datasets, loaded once.

Benchmarks use ``benchmark.pedantic(..., rounds=1)``: each mining run is
a multi-second deterministic CPU workload, so one round measures it
adequately and keeps the whole suite under a few minutes.
"""
import functools

from repro.core import mi as mi_mod
from repro.core.ahtpgm import CorrelationGraph
from repro.core.htpgm import MiningConfig
from repro.core.pipeline import load_dataset

#: Benchmark scale: smaller than the table jobs, same structure.
N_SEQ = 24


@functools.lru_cache(maxsize=None)
def _cache_key(name):  # pragma: no cover - trivial
    return name


_DATASETS = {}
_GRAPHS = {}


def dataset(spark, name):
    if name not in _DATASETS:
        _DATASETS[name] = load_dataset(spark, name, n_seq=N_SEQ)
    return _DATASETS[name]


def graphs(spark, name):
    if name not in _GRAPHS:
        ds = dataset(spark, name)
        nmi = mi_mod.nmi_matrix(ds.symbols)
        _GRAPHS[name] = {
            d: CorrelationGraph.from_nmi(nmi, density=d / 100)
            for d in (20, 40, 60, 80, 90)
        }
    return _GRAPHS[name]


def cfg(supp_pct, conf_pct, **kw):
    kw.setdefault("max_k", 3)
    return MiningConfig(sigma=supp_pct / 100, delta=conf_pct / 100, **kw)


def once(benchmark, fn):
    """Run ``fn`` exactly once under the benchmark timer."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)
