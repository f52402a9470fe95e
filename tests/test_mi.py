"""Unit tests for entropy / MI / NMI and the correlation graph (§V)."""
import math

import numpy as np
import pandas as pd
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core import mi as mi_mod


def joint(d):
    """Contingency table from {(x_sym, y_sym): count}."""
    xs = sorted({k[0] for k in d})
    ys = sorted({k[1] for k in d})
    return pd.DataFrame(
        [[d.get((x, y), 0) for y in ys] for x in xs], index=xs, columns=ys
    )


def test_entropy_uniform_and_degenerate():
    assert mi_mod.entropy(np.array([0.5, 0.5])) == pytest.approx(math.log(2))
    assert mi_mod.entropy(np.array([1.0, 0.0])) == 0.0
    assert mi_mod.entropy(np.array([0.25] * 4)) == pytest.approx(math.log(4))


def test_mi_independent_is_zero():
    t = joint({("a", "c"): 25, ("a", "d"): 25, ("b", "c"): 25, ("b", "d"): 25})
    assert mi_mod.mutual_information(t) == pytest.approx(0.0, abs=1e-12)


def test_mi_identical_equals_entropy():
    t = joint({("a", "a"): 30, ("b", "b"): 70})
    h = mi_mod.entropy(np.array([0.3, 0.7]))
    assert mi_mod.mutual_information(t) == pytest.approx(h)
    n_xy, n_yx = mi_mod.nmi_from_joint(t)
    assert n_xy == pytest.approx(1.0)
    assert n_yx == pytest.approx(1.0)


def test_mi_paper_worked_example():
    t = joint(
        {
            ("On", "On"): 15,
            ("On", "Off"): 2,
            ("Off", "On"): 3,
            ("Off", "Off"): 16,
        }
    )
    assert mi_mod.mutual_information(t) == pytest.approx(0.2921, abs=0.001)
    n_xy, n_yx = mi_mod.nmi_from_joint(t)
    assert n_xy == pytest.approx(0.4223, abs=0.002)  # I/H(K)
    assert n_yx == pytest.approx(0.4214, abs=0.002)  # I/H(T)


@given(
    counts=st.lists(
        st.tuples(st.integers(0, 2), st.integers(0, 2), st.integers(1, 30)),
        min_size=1,
        max_size=9,
    )
)
def test_mi_nonnegative_and_bounded(counts):
    d = {}
    for x, y, c in counts:
        d[(f"x{x}", f"y{y}")] = d.get((f"x{x}", f"y{y}"), 0) + c
    t = joint(d)
    i = mi_mod.mutual_information(t)
    c = t.to_numpy(dtype=float)
    hx = mi_mod.entropy(c.sum(axis=1) / c.sum())
    hy = mi_mod.entropy(c.sum(axis=0) / c.sum())
    assert i >= -1e-12
    assert i <= min(hx, hy) + 1e-9
    n_xy, n_yx = mi_mod.nmi_from_joint(t)
    assert -1e-9 <= n_xy <= 1 + 1e-9
    assert -1e-9 <= n_yx <= 1 + 1e-9


def _nmi_frame(scores):
    """Directed NMI frame from {(x, y): (nmi_xy, nmi_yx)}."""
    rows = []
    for (x, y), (a, b) in scores.items():
        rows.append((x, y, a))
        rows.append((y, x, b))
    return pd.DataFrame(rows, columns=["var_x", "var_y", "nmi"]).set_index(
        ["var_x", "var_y"]
    )


def test_pair_scores_take_min_of_directions():
    nmi = _nmi_frame({("a", "b"): (0.9, 0.4), ("a", "c"): (0.2, 0.3)})
    scores = mi_mod.pair_scores(nmi)
    assert scores[frozenset(("a", "b"))] == pytest.approx(0.4)
    assert scores[frozenset(("a", "c"))] == pytest.approx(0.2)


def test_mu_for_density_keeps_top_fraction():
    nmi = _nmi_frame(
        {
            ("a", "b"): (0.9, 0.9),
            ("a", "c"): (0.5, 0.5),
            ("b", "c"): (0.3, 0.3),
            ("a", "d"): (0.1, 0.1),
        }
    )
    mu = mi_mod.mu_for_density(nmi, 0.5)
    edges = mi_mod.correlation_edges(nmi, mu)
    assert edges == {frozenset(("a", "b")), frozenset(("a", "c"))}
    assert mi_mod.graph_density(nmi, mu) == pytest.approx(0.5)


def test_mu_for_density_extremes():
    nmi = _nmi_frame({("a", "b"): (0.9, 0.8), ("a", "c"): (0.5, 0.4)})
    assert mi_mod.correlation_edges(nmi, mi_mod.mu_for_density(nmi, 1.0)) == {
        frozenset(("a", "b")),
        frozenset(("a", "c")),
    }
    assert mi_mod.correlation_edges(nmi, mi_mod.mu_for_density(nmi, 0.0)) == set()


def test_density_monotone_edge_nesting():
    rng = np.random.default_rng(0)
    pairs = {}
    for i in range(6):
        for j in range(i + 1, 6):
            pairs[(f"v{i}", f"v{j}")] = tuple(rng.random(2))
    nmi = _nmi_frame(pairs)
    prev = set()
    for d in [0.0, 0.2, 0.4, 0.6, 0.8, 1.0]:
        edges = mi_mod.correlation_edges(nmi, mi_mod.mu_for_density(nmi, d))
        assert prev <= edges
        prev = edges
    assert len(prev) == 15


def test_confidence_lower_bound_values():
    # mu = 1 and sigma_m = sigma collapse the bound to 1
    assert mi_mod.confidence_lower_bound(0.5, 0.5, 1.0, 2) == pytest.approx(1.0)
    lb = mi_mod.confidence_lower_bound(0.2, 0.5, 0.6, 2)
    assert 0 < lb < 1


def test_confidence_lower_bound_monotone_in_mu():
    lbs = [
        mi_mod.confidence_lower_bound(0.3, 0.6, mu, 2)
        for mu in (0.2, 0.4, 0.6, 0.8, 0.99)
    ]
    assert lbs == sorted(lbs)


def test_confidence_lower_bound_validates():
    with pytest.raises(ValueError):
        mi_mod.confidence_lower_bound(0.0, 0.5, 0.5, 2)
    with pytest.raises(ValueError):
        mi_mod.confidence_lower_bound(0.6, 0.5, 0.5, 2)  # sigma > sigma_m
    with pytest.raises(ValueError):
        mi_mod.confidence_lower_bound(0.2, 0.5, 0.5, 1)


def test_all_pairs():
    assert len(mi_mod.all_pairs(["a", "b", "c", "d"])) == 6
