"""Tests for the runtime/memory measurement harness."""
import time

from repro.metrics import peak_memory_call, time_call


def test_time_call_returns_result_and_duration():
    result, secs = time_call(lambda: sum(range(1000)))
    assert result == 499500
    assert secs >= 0


def test_time_call_measures_sleep():
    _, secs = time_call(lambda: time.sleep(0.05))
    assert secs >= 0.045


def test_peak_memory_call_returns_result():
    result, mib = peak_memory_call(lambda: [0] * 1000)
    assert len(result) == 1000
    assert mib > 0


def test_peak_memory_tracks_large_allocation():
    def big():
        return bytearray(32 * 1024 * 1024)

    _, mib_big = peak_memory_call(big)
    _, mib_small = peak_memory_call(lambda: bytearray(1024))
    assert mib_big > 30
    assert mib_small < 1


def test_peak_memory_stops_tracing_on_error():
    import tracemalloc

    try:
        peak_memory_call(lambda: 1 / 0)
    except ZeroDivisionError:
        pass
    assert not tracemalloc.is_tracing()
