"""Tests for the SequenceDatabase bitmap substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.core.seqdb import SequenceDatabase

from .util import kitchen_db, random_db


def test_from_rows_basic():
    db = kitchen_db()
    assert db.n_seq == 5
    assert db.events == ["K", "M", "T"]
    assert db.support("K") == 5
    assert db.support("M") == 4
    assert list(db.bitmaps["M"]) == [True, True, True, True, False]


def test_instances_sorted_by_start_then_longest_first():
    db = SequenceDatabase.from_rows(
        [(0, "A", 5, 8), (0, "A", 0, 3), (0, "A", 5, 12)], n_seq=1
    )
    assert db.sequences[0]["A"] == [(0, 3), (5, 12), (5, 8)]


def test_group_bitmap_and_support():
    db = kitchen_db()
    assert db.group_support(("K", "T")) == 5
    assert db.group_support(("K", "T", "M")) == 4
    np.testing.assert_array_equal(
        db.group_bitmap(("K", "M")), np.array([1, 1, 1, 1, 0], dtype=bool)
    )


def test_explicit_n_seq_pads_empty_sequences():
    db = SequenceDatabase.from_rows([(0, "A", 0, 1)], n_seq=3)
    assert db.n_seq == 3
    assert db.support("A") == 1
    assert db.sequences[2] == {}


def test_empty_database():
    db = SequenceDatabase.from_rows([], n_seq=0)
    assert db.n_seq == 0
    assert db.events == []


def test_pandas_round_trip():
    db = random_db(seed=7)
    pdf = db.to_pandas()
    db2 = SequenceDatabase.from_pandas(pdf, n_seq=db.n_seq)
    assert db2.n_seq == db.n_seq
    assert db2.events == db.events
    for a, b in zip(db.sequences, db2.sequences):
        assert a == b


def test_event_supports_matches_pandas_groupby():
    db = random_db(seed=3)
    pdf = db.to_pandas()
    expected = pdf.groupby("event")["seq_id"].nunique().to_dict()
    assert db.event_supports() == expected


def test_avg_instances_per_sequence():
    db = kitchen_db()
    # 4*3 + 2 = 14 instances over 5 sequences
    assert db.avg_instances_per_sequence() == pytest.approx(14 / 5)


def test_from_pandas_requires_columns():
    pdf = pd.DataFrame({"seq_id": [0], "event": ["A"], "start": [0], "end": [2]})
    db = SequenceDatabase.from_pandas(pdf)
    assert db.support("A") == 1
