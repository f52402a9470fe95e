"""Distributed miner == driver miner, and Catalyst support primitives
== DuckDB oracle."""
import pandas as pd
import pytest

from repro.core.distributed import (
    event_supports_df,
    mine_distributed,
    pair_supports_df,
    two_event_pattern_supports_df,
)
from repro.core.htpgm import MiningConfig, mine
from repro.core.relations import relation_sql
from repro.oracle import assert_equivalent

from .util import kitchen_db, random_db


def _spark_dseq(spark, db):
    return spark.createDataFrame(db.to_pandas())


def test_event_supports_matches_oracle(spark):
    db = random_db(seed=0)
    dseq = _spark_dseq(spark, db)
    assert_equivalent(
        event_supports_df(dseq),
        "SELECT event, count(DISTINCT seq_id) AS supp FROM dseq "
        "GROUP BY event",
        dseq=db.to_pandas(),
    )


def test_event_supports_match_bitmaps(spark):
    db = random_db(seed=1)
    got = {
        r["event"]: r["supp"]
        for r in event_supports_df(_spark_dseq(spark, db)).collect()
    }
    assert got == db.event_supports()


def test_pair_supports_matches_oracle(spark):
    db = random_db(seed=2, n_seq=10)
    dseq = _spark_dseq(spark, db)
    assert_equivalent(
        pair_supports_df(dseq),
        "WITH pres AS (SELECT DISTINCT seq_id, event FROM dseq) "
        "SELECT a.event AS event_i, b.event AS event_j, "
        "count(DISTINCT a.seq_id) AS supp "
        "FROM pres a JOIN pres b USING (seq_id) "
        "GROUP BY a.event, b.event",
        dseq=db.to_pandas(),
    )


def test_pair_supports_match_bitmap_and(spark):
    db = random_db(seed=3)
    got = {
        (r["event_i"], r["event_j"]): r["supp"]
        for r in pair_supports_df(_spark_dseq(spark, db)).collect()
    }
    for (ei, ej), supp in got.items():
        assert supp == db.group_support((ei, ej))


@pytest.mark.parametrize("eps,d_o,t_max", [(0, 1, None), (1, 3, 20)])
def test_two_event_supports_match_oracle(spark, eps, d_o, t_max):
    db = random_db(seed=4, n_seq=10)
    dseq = _spark_dseq(spark, db)
    rel = relation_sql("a.start", 'a."end"', "b.start", 'b."end"', eps, d_o)
    tmax_cond = (
        f'AND b."end" - a.start <= {t_max} ' if t_max is not None else ""
    )
    sql = (
        "SELECT event_i, event_j, rel, count(DISTINCT seq_id) AS supp "
        "FROM ("
        "  SELECT a.seq_id, a.event AS event_i, b.event AS event_j, "
        f"  {rel} AS rel "
        "  FROM dseq a JOIN dseq b ON a.seq_id = b.seq_id "
        "  WHERE (a.start < b.start "
        '     OR (a.start = b.start AND a."end" > b."end") '
        '     OR (a.start = b.start AND a."end" = b."end" '
        "         AND a.event < b.event)) "
        f"  {tmax_cond}"
        ") WHERE rel IS NOT NULL "
        "GROUP BY event_i, event_j, rel"
    )
    got = two_event_pattern_supports_df(
        dseq, epsilon=eps, d_o=d_o, t_max=t_max
    )
    assert_equivalent(got, sql, dseq=db.to_pandas())


def test_two_event_supports_match_driver_enumeration(spark):
    db = random_db(seed=5, n_seq=12)
    r = mine(db, MiningConfig(sigma=0.0, delta=0.0, max_k=2))
    got = {
        (r2["event_i"], r2["event_j"], r2["rel"]): r2["supp"]
        for r2 in two_event_pattern_supports_df(
            _spark_dseq(spark, db)
        ).collect()
    }
    for ((e1, e2), (rel,)), supp in r.patterns.items():
        assert got[(e1, e2, rel)] == supp


@pytest.mark.parametrize("seed,sigma,delta", [(0, 0.3, 0.3), (1, 0.2, 0.5)])
def test_mine_distributed_equals_driver(spark, seed, sigma, delta):
    db = random_db(seed=seed, n_seq=14, n_vars=4)
    cfg = MiningConfig(sigma=sigma, delta=delta, max_k=3)
    expected = mine(db, cfg)
    got = mine_distributed(spark, _spark_dseq(spark, db), cfg)
    assert got.patterns == expected.patterns
    assert got.frequent_events == expected.frequent_events
    assert got.n_sequences == expected.n_sequences


def test_mine_distributed_kitchen(spark):
    db = kitchen_db()
    cfg = MiningConfig(sigma=0.8, delta=0.8, max_k=3)
    got = mine_distributed(spark, _spark_dseq(spark, db), cfg)
    assert got.patterns[(("K", "T", "M"), ("C", "F", "F"))] == 4


def test_mine_distributed_with_relation_params(spark):
    db = random_db(seed=7, n_seq=10)
    cfg = MiningConfig(
        sigma=0.25, delta=0.25, max_k=3, epsilon=1, d_o=3, t_max=25
    )
    expected = mine(db, cfg)
    got = mine_distributed(spark, _spark_dseq(spark, db), cfg)
    assert got.patterns == expected.patterns


def test_mine_distributed_empty(spark):
    pdf = pd.DataFrame(
        {"seq_id": [0], "event": ["A"], "start": [0], "end": [1]}
    )
    cfg = MiningConfig(sigma=1.0, delta=1.0, max_k=3)
    got = mine_distributed(spark, spark.createDataFrame(pdf), cfg)
    assert got.frequent_events == {"A": 1}
    assert got.patterns == {}
