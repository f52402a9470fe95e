"""Tests for the pattern model encoding and MiningResult helpers."""
import pytest

from repro.core.model import (
    MiningResult,
    format_pattern,
    min_support,
    pattern_pairs,
    pattern_size,
)


def test_pattern_pairs_column_major_order():
    assert list(pattern_pairs(2)) == [(0, 1)]
    assert list(pattern_pairs(3)) == [(0, 1), (0, 2), (1, 2)]
    assert list(pattern_pairs(4)) == [
        (0, 1), (0, 2), (1, 2), (0, 3), (1, 3), (2, 3),
    ]


@pytest.mark.parametrize("k", [2, 3, 4, 5, 6])
def test_pattern_pairs_count(k):
    pairs = list(pattern_pairs(k))
    assert len(pairs) == k * (k - 1) // 2
    assert len(set(pairs)) == len(pairs)
    # appending event j contributes the contiguous block (0,j)..(j-1,j)
    tail = pairs[-(k - 1):]
    assert tail == [(i, k - 1) for i in range(k - 1)]


def test_pattern_size_and_format():
    key = (("K:On", "T:On"), ("C",))
    assert pattern_size(key) == 2
    assert format_pattern(key) == "(K:On >= T:On)"
    key3 = (("K:On", "T:On", "M:On"), ("C", "F", "F"))
    assert format_pattern(key3) == (
        "(K:On >= T:On), (K:On -> M:On), (T:On -> M:On)"
    )


@pytest.mark.parametrize(
    "sigma, n, expected",
    [(0.2, 10, 2), (0.25, 10, 3), (0.7, 4, 3), (0.0, 10, 1), (1.0, 7, 7)],
)
def test_min_support(sigma, n, expected):
    assert min_support(sigma, n) == expected


def _result():
    return MiningResult(
        n_sequences=10,
        frequent_events={"A": 10, "B": 5},
        patterns={
            (("A", "B"), ("F",)): 5,
            (("A", "B"), ("C",)): 3,
            (("A", "A"), ("F",)): 8,
        },
    )


def test_confidence_uses_max_event_support():
    r = _result()
    assert r.confidence((("A", "B"), ("F",))) == 0.5
    assert r.confidence((("A", "A"), ("F",))) == 0.8


def test_filtered_grid_is_monotone():
    r = _result()
    loose = r.filtered(0.2, 0.2)
    tight = r.filtered(0.5, 0.5)
    assert set(tight) <= set(loose)
    assert (("A", "B"), ("F",)) in tight
    assert (("A", "B"), ("C",)) not in tight  # supp 3 < 5


def test_filtered_respects_confidence():
    r = _result()
    # supp 5 passes sigma=0.5 but conf 0.5 fails delta=0.6
    assert (("A", "B"), ("F",)) not in r.filtered(0.5, 0.6)
