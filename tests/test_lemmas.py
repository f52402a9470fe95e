"""Property tests for the paper's lemmas and Theorem 1 on random data."""
import math

import numpy as np
import pytest

from repro.core import mi as mi_mod
from repro.core.htpgm import MiningConfig, mine
from repro.core.model import min_support, pattern_pairs

from .util import random_db

SEEDS = [0, 1, 2]


@pytest.fixture(scope="module", params=SEEDS)
def mined(request):
    db = random_db(seed=request.param, n_seq=16, n_vars=4)
    r = mine(db, MiningConfig(sigma=0.2, delta=0.1, max_k=3))
    return db, r


def test_lemma2_pattern_support_bounded_by_group_support(mined):
    """supp(P) <= supp(E_i, E_j) for every event pair in P (Lemma 2)."""
    db, r = mined
    for key, supp in r.patterns.items():
        events = key[0]
        for i, j in pattern_pairs(len(events)):
            assert supp <= db.group_support((events[i], events[j]))


def test_lemma3_pattern_conf_bounded_by_pair_conf(mined):
    """conf(P) <= conf(E_i, E_j) for pairs of P's events (Lemma 3)."""
    db, r = mined
    for key in r.patterns:
        events = key[0]
        conf_p = r.confidence(key)
        for i, j in pattern_pairs(len(events)):
            pair = (events[i], events[j])
            pair_conf = db.group_support(pair) / max(
                db.support(pair[0]), db.support(pair[1])
            )
            assert conf_p <= pair_conf + 1e-12


def test_lemma6_subpattern_confidence_monotone(mined):
    """P' subset of P implies conf(P') >= conf(P) (Lemma 6)."""
    db, r = mined
    for key, supp in r.patterns.items():
        events, rels = key
        if len(events) != 3:
            continue
        rel_list = list(rels)
        projections = [
            ((events[0], events[1]), (rel_list[0],)),
            ((events[0], events[2]), (rel_list[1],)),
            ((events[1], events[2]), (rel_list[2],)),
        ]
        for sub in projections:
            assert sub in r.patterns  # pattern-level Apriori
            assert r.confidence(sub) >= r.confidence(key) - 1e-12
            assert r.patterns[sub] >= supp  # support monotone too


def test_lemma7_low_conf_subpattern_bounds_superpattern(mined):
    """supp(P') / max_supp(P) <= delta implies conf(P) <= delta."""
    db, r = mined
    for key in r.patterns:
        events, rels = key
        if len(events) != 3:
            continue
        max_supp = max(r.frequent_events[e] for e in events)
        sub = ((events[0], events[1]), (rels[0],))
        bound = r.patterns[sub] / max_supp
        assert r.confidence(key) <= bound + 1e-12


@pytest.mark.parametrize("seed", SEEDS)
def test_lemma8_syb_support_bounded_by_seq_support(seed):
    """supp(X1,Y1)_DSYB <= supp(X1,Y1)_DSEQ (Lemma 8).

    D_SYB support = fraction of slots where both symbols co-occur;
    D_SEQ support = fraction of sequences containing both events.
    """
    rng = np.random.default_rng(seed)
    n_seq, seq_len = 12, 16
    x = rng.random(n_seq * seq_len) < 0.3
    y = rng.random(n_seq * seq_len) < 0.4
    syb_supp = np.mean(x & y)
    seq_supp = np.mean(
        [
            (x[i * seq_len : (i + 1) * seq_len]
             & y[i * seq_len : (i + 1) * seq_len]).any()
            for i in range(n_seq)
        ]
    )
    assert syb_supp <= seq_supp + 1e-12


@pytest.mark.parametrize("seed", range(6))
def test_theorem1_bound_on_random_correlated_series(seed):
    """conf(X1,Y1)_DSEQ >= LB when the pair is frequent and NMI >= mu."""
    rng = np.random.default_rng(seed)
    n_seq, seq_len = 10, 12
    total = n_seq * seq_len
    x = rng.random(total) < 0.35
    noise = rng.random(total) < 0.15
    y = x ^ noise  # correlated with x
    # NMI from the joint distribution over slots
    joint = np.array(
        [
            [np.sum(x & y), np.sum(x & ~y)],
            [np.sum(~x & y), np.sum(~x & ~y)],
        ],
        dtype=float,
    )
    import pandas as pd

    nmi_xy, nmi_yx = mi_mod.nmi_from_joint(pd.DataFrame(joint))
    mu = min(nmi_xy, nmi_yx)
    if mu <= 0:
        pytest.skip("degenerate draw")
    # supports
    seqs = np.arange(total) // seq_len
    supp_pair_syb = np.mean(x & y)
    supp_x_seq = len(np.unique(seqs[x])) / n_seq
    supp_y_seq = len(np.unique(seqs[y])) / n_seq
    supp_pair_seq = (
        len(np.unique(seqs[x]).tolist() and
            np.intersect1d(np.unique(seqs[x]), np.unique(seqs[y])))
        / n_seq
    )
    conf_seq = supp_pair_seq / max(supp_x_seq, supp_y_seq)
    sigma = supp_pair_syb  # pair frequent at exactly its own support
    sigma_m = max(supp_x_seq, supp_y_seq, np.mean(x), np.mean(y))
    if not 0 < sigma <= sigma_m <= 1:
        pytest.skip("degenerate draw")
    lb = mi_mod.confidence_lower_bound(sigma, sigma_m, mu, n_x=2)
    assert conf_seq >= lb - 1e-9


def test_lemma1_search_space_formula():
    """Sanity on the O(m^h 3^{h^2}) count: the enumerated node counts
    of a real HPG stay under the closed-form bound."""
    db = random_db(seed=3, n_seq=12, n_vars=3)
    r = mine(db, MiningConfig(sigma=0.0, delta=0.0, max_k=3))
    m = len(r.frequent_events)
    for level, count in r.pattern_counts.items():
        if level == 1:
            continue
        bound = m**level * 3 ** (level * (level - 1) // 2)
        assert count <= bound


def test_min_support_matches_relative_definition():
    for sigma in (0.2, 0.5, 0.77):
        for n in (4, 48, 97):
            ms = min_support(sigma, n)
            assert ms / n >= sigma - 1e-9 or ms == math.ceil(sigma * n)
