"""Runtime and peak-memory measurement for the quantitative tables.

Runtime is wall-clock via ``time.perf_counter``; memory is the Python
peak allocation during the call via ``tracemalloc`` (the miners are
pure Python + numpy, so tracemalloc captures the dominant allocations —
bitmaps, embedding lists, pattern dictionaries).  Runtime and memory
are measured in *separate* passes, since tracemalloc instrumentation
slows execution by an order of magnitude.
"""
from __future__ import annotations

import time
import tracemalloc
from typing import Any, Callable


def time_call(fn: Callable[[], Any]) -> tuple[Any, float]:
    """(result, wall-clock seconds) of ``fn()``."""
    t0 = time.perf_counter()
    result = fn()
    return result, time.perf_counter() - t0


def peak_memory_call(fn: Callable[[], Any]) -> tuple[Any, float]:
    """(result, peak allocated MiB during ``fn()``) via tracemalloc."""
    tracemalloc.start()
    try:
        result = fn()
        _, peak = tracemalloc.get_traced_memory()
    finally:
        tracemalloc.stop()
    return result, peak / (1 << 20)
