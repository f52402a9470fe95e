"""Tests for the E-HTPGM miner and its pruning variants."""
import math

import pytest

from repro.core.htpgm import MiningConfig, mine, mine_variant
from repro.core.model import min_support
from repro.core.seqdb import SequenceDatabase

from .util import kitchen_db, random_db

VARIANTS = ["noprune", "apriori", "trans", "all"]


def cfg(sigma=0.5, delta=0.5, **kw):
    return MiningConfig(sigma=sigma, delta=delta, **kw)


def test_frequent_single_events():
    db = kitchen_db()
    r = mine(db, cfg(sigma=0.9, delta=0.5))
    # M has supp 4/5 = 0.8 < 0.9 -> only K and T remain
    assert set(r.frequent_events) == {"K", "T"}
    assert r.frequent_events["K"] == 5


def test_planted_two_event_patterns():
    db = kitchen_db()
    r = mine(db, cfg(sigma=0.8, delta=0.8, max_k=2))
    # (K contains T) holds in sequences 0-3 => supp 4, conf 4/5
    assert r.patterns[(("K", "T"), ("C",))] == 4
    assert r.confidence((("K", "T"), ("C",))) == pytest.approx(0.8)
    # (T follows K) holds only in sequence 4 => infrequent
    assert (("T", "K"), ("F",)) not in r.patterns


def test_planted_three_event_pattern():
    db = kitchen_db()
    r = mine(db, cfg(sigma=0.8, delta=0.8, max_k=3))
    key = (("K", "T", "M"), ("C", "F", "F"))
    assert r.patterns[key] == 4
    assert r.node_counts[3] >= 1


def test_sigma_prunes_patterns():
    db = kitchen_db()
    r = mine(db, cfg(sigma=1.0, delta=0.5, max_k=3))
    # nothing with M survives supp=5
    assert all("M" not in key[0] for key in r.patterns)


def test_delta_prunes_patterns():
    db = kitchen_db()
    loose = mine(db, cfg(sigma=0.6, delta=0.2, max_k=2))
    tight = mine(db, cfg(sigma=0.6, delta=0.9, max_k=2))
    assert set(tight.patterns) <= set(loose.patterns)
    # (K,T,'C') has conf 0.8 < 0.9
    assert (("K", "T"), ("C",)) not in tight.patterns


def test_max_k_caps_levels():
    db = kitchen_db()
    r = mine(db, cfg(sigma=0.6, delta=0.6, max_k=2))
    assert all(len(key[0]) <= 2 for key in r.patterns)


def test_self_relation_pattern():
    rows = [(s, "A", 0, 2) for s in range(4)] + [
        (s, "A", 5, 7) for s in range(4)
    ]
    db = SequenceDatabase.from_rows(rows, n_seq=4)
    r = mine(db, cfg(sigma=0.9, delta=0.9, max_k=2))
    assert r.patterns[(("A", "A"), ("F",))] == 4


def test_t_max_constraint_drops_distant_pattern():
    rows = [(s, "A", 0, 2) for s in range(4)] + [
        (s, "B", 50, 55) for s in range(4)
    ]
    db = SequenceDatabase.from_rows(rows, n_seq=4)
    free = mine(db, cfg(sigma=0.9, delta=0.9, max_k=2))
    bounded = mine(db, cfg(sigma=0.9, delta=0.9, max_k=2, t_max=20))
    assert (("A", "B"), ("F",)) in free.patterns
    assert (("A", "B"), ("F",)) not in bounded.patterns


def test_sub_pattern_apriori_holds():
    """Every 2-event projection of a frequent 3-event pattern is frequent."""
    db = random_db(seed=11, n_seq=16, n_vars=4)
    r = mine(db, cfg(sigma=0.3, delta=0.3, max_k=3))
    two = {k for k in r.patterns if len(k[0]) == 2}
    for key in [k for k in r.patterns if len(k[0]) == 3]:
        (e1, e2, e3), (r12, r13, r23) = key
        assert ((e1, e2), (r12,)) in two
        assert ((e1, e3), (r13,)) in two
        assert ((e2, e3), (r23,)) in two


def test_supports_within_bounds():
    db = random_db(seed=5)
    r = mine(db, cfg(sigma=0.25, delta=0.25, max_k=3))
    ms = min_support(0.25, db.n_seq)
    for key, supp in r.patterns.items():
        assert ms <= supp <= db.n_seq
        assert supp <= min(r.frequent_events[e] for e in key[0])
        assert r.confidence(key) >= 0.25


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_variants_agree_on_random_data(variant, seed):
    db = random_db(seed=seed, n_seq=14, n_vars=4)
    base = mine_variant(db, cfg(sigma=0.3, delta=0.3, max_k=3), "all")
    other = mine_variant(db, cfg(sigma=0.3, delta=0.3, max_k=3), variant)
    assert other.patterns == base.patterns
    assert other.frequent_events == base.frequent_events


@pytest.mark.parametrize("sigma,delta", [(0.2, 0.2), (0.5, 0.5), (0.8, 0.4)])
def test_variants_agree_on_kitchen(sigma, delta):
    db = kitchen_db()
    results = [
        mine_variant(db, cfg(sigma=sigma, delta=delta, max_k=3), v)
        for v in VARIANTS
    ]
    for r in results[1:]:
        assert r.patterns == results[0].patterns


def test_pruning_reduces_work():
    db = random_db(seed=4, n_seq=20, n_vars=5)
    c = cfg(sigma=0.4, delta=0.4, max_k=3)
    pruned = mine_variant(db, c, "all")
    unpruned = mine_variant(db, c, "noprune")
    assert pruned.stats["sequence_scans"] < unpruned.stats["sequence_scans"]


def test_filtered_equals_remining():
    """Mining loose then post-filtering == mining at tight thresholds."""
    db = random_db(seed=9, n_seq=16, n_vars=4)
    loose = mine(db, cfg(sigma=0.2, delta=0.2, max_k=3))
    for sigma, delta in [(0.4, 0.4), (0.6, 0.2), (0.2, 0.6)]:
        tight = mine(db, cfg(sigma=sigma, delta=delta, max_k=3))
        assert loose.filtered(sigma, delta) == tight.patterns


def test_edge_filter_restricts_pairs():
    db = kitchen_db()
    r = mine(
        db,
        cfg(sigma=0.6, delta=0.6, max_k=3),
        edge_filter=lambda a, b: {a, b} <= {"K", "T"},
    )
    assert all(set(k[0]) <= {"K", "T"} for k in r.patterns)


def test_empty_result_when_sigma_impossible():
    db = SequenceDatabase.from_rows([(0, "A", 0, 1)], n_seq=10)
    r = mine(db, cfg(sigma=0.5, delta=0.5))
    assert r.frequent_events == {}
    assert r.patterns == {}


def test_level_counts_populated():
    db = kitchen_db()
    r = mine(db, cfg(sigma=0.8, delta=0.8, max_k=3))
    assert r.node_counts[1] == 3
    assert r.node_counts[2] >= 2
    assert r.pattern_counts[2] >= 2


def test_math_ceil_min_support_boundary():
    # sigma exactly on a sequence-count boundary
    assert min_support(0.75, 4) == 3
    assert min_support(0.7, 4) == math.ceil(2.8)
