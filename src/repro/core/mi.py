"""Mutual information over the symbolic database (paper §V).

Entropy, conditional entropy, MI and *normalized* MI (NMI, Eq. 10 —
asymmetric: ``NMI(X;Y) = I(X;Y) / H(X)``) between symbolic time
series, computed from slot-aligned joint symbol counts.  The joint
counts are produced with a Spark self-join on the slot index — one
shuffle, all pairs at once — and the small per-pair contingency tables
are reduced in pandas.

Also here: the correlation graph (Def. 5.5), the density-driven choice
of the μ threshold (Def. 5.6), and the Theorem 1 confidence lower
bound.

All logarithms are natural: that reproduces the paper's worked example
``I(K;T) = 0.29`` from Table I.
"""
from __future__ import annotations

import itertools
import math

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def entropy(p: np.ndarray) -> float:
    """Shannon entropy (nats) of a probability vector; 0·log0 := 0."""
    p = np.asarray(p, dtype=float)
    p = p[p > 0]
    return float(-(p * np.log(p)).sum())


def mutual_information(joint: pd.DataFrame) -> float:
    """MI (nats) from a contingency table of counts (rows: X, cols: Y)."""
    c = joint.to_numpy(dtype=float)
    total = c.sum()
    if total == 0:
        return 0.0
    pxy = c / total
    px = pxy.sum(axis=1, keepdims=True)
    py = pxy.sum(axis=0, keepdims=True)
    mask = pxy > 0
    ratio = np.where(mask, pxy / (px @ py), 1.0)
    return float((pxy[mask] * np.log(ratio[mask])).sum())


def nmi_from_joint(joint: pd.DataFrame) -> tuple[float, float]:
    """(NMI(X;Y), NMI(Y;X)) from a contingency table (rows X, cols Y).

    NMI(X;Y) = I(X;Y) / H(X); degenerate zero-entropy series get NMI 0.
    """
    mi = mutual_information(joint)
    c = joint.to_numpy(dtype=float)
    total = c.sum()
    hx = entropy(c.sum(axis=1) / total)
    hy = entropy(c.sum(axis=0) / total)
    return (mi / hx if hx > 0 else 0.0, mi / hy if hy > 0 else 0.0)


def joint_symbol_counts(symbols: DataFrame) -> pd.DataFrame:
    """Slot-aligned joint symbol counts for every ordered variable pair.

    Input ``(var, t, symbol)``; output pandas frame
    ``(var_x, var_y, sym_x, sym_y, cnt)`` for ``var_x < var_y`` — one
    Spark self-join on ``t`` plus a groupBy, the D_SYB single scan of
    the paper's complexity analysis.
    """
    a = symbols.select(
        F.col("var").alias("var_x"), "t", F.col("symbol").alias("sym_x")
    )
    b = symbols.select(
        F.col("var").alias("var_y"), "t", F.col("symbol").alias("sym_y")
    )
    joined = a.join(b, on="t").where(F.col("var_x") < F.col("var_y"))
    return (
        joined.groupBy("var_x", "var_y", "sym_x", "sym_y")
        .agg(F.count(F.lit(1)).alias("cnt"))
        .toPandas()
    )


def nmi_matrix(symbols: DataFrame) -> pd.DataFrame:
    """Directed NMI for every variable pair.

    Returns a pandas frame indexed by ``(var_x, var_y)`` for
    ``var_x != var_y`` with column ``nmi`` = NMI(X;Y) = I/H(X).
    """
    counts = joint_symbol_counts(symbols)
    rows = []
    for (vx, vy), grp in counts.groupby(["var_x", "var_y"]):
        table = grp.pivot_table(
            index="sym_x", columns="sym_y", values="cnt", fill_value=0
        )
        n_xy, n_yx = nmi_from_joint(table)
        rows.append((vx, vy, n_xy))
        rows.append((vy, vx, n_yx))
    return pd.DataFrame(rows, columns=["var_x", "var_y", "nmi"]).set_index(
        ["var_x", "var_y"]
    )


def pair_scores(nmi: pd.DataFrame) -> dict[frozenset, float]:
    """Undirected pair score = min(NMI(X;Y), NMI(Y;X)).

    A correlation-graph edge requires both directions ≥ μ (Def. 5.5),
    so the undirected score is the min of the two directed NMIs.
    """
    scores: dict[frozenset, float] = {}
    for (vx, vy), row in nmi.iterrows():
        key = frozenset((vx, vy))
        v = float(row["nmi"])
        scores[key] = min(scores.get(key, v), v)
    return scores


def mu_for_density(nmi: pd.DataFrame, density: float) -> float:
    """μ achieving a target correlation-graph density (Def. 5.6).

    Keeps the top ``density`` fraction of the complete graph's edges
    ranked by undirected pair score: μ is the score of the last edge
    kept.  ``density=1`` keeps everything (μ = min score); ``density=0``
    prunes all edges.
    """
    scores = sorted(pair_scores(nmi).values(), reverse=True)
    if not scores:
        return 1.0
    n_keep = int(round(density * len(scores)))
    if n_keep <= 0:
        return math.nextafter(scores[0], math.inf) if density <= 0 else scores[0]
    n_keep = min(n_keep, len(scores))
    return scores[n_keep - 1]


def correlation_edges(nmi: pd.DataFrame, mu: float) -> set[frozenset]:
    """Edges of the correlation graph G_C at threshold μ."""
    return {pair for pair, s in pair_scores(nmi).items() if s >= mu}


def graph_density(nmi: pd.DataFrame, mu: float) -> float:
    """Achieved density of G_C at μ w.r.t. the complete graph."""
    scores = pair_scores(nmi)
    if not scores:
        return 0.0
    return sum(1 for s in scores.values() if s >= mu) / len(scores)


def confidence_lower_bound(
    sigma: float, sigma_m: float, mu: float, n_x: int
) -> float:
    """Theorem 1's LB on conf(X1, Y1) in D_SEQ (Eq. 11).

    ``sigma``: support threshold; ``sigma_m``: max support of the pair
    in D_SYB; ``mu``: MI threshold; ``n_x``: alphabet size of X.
    """
    if not 0 < sigma <= sigma_m <= 1 or n_x < 2:
        raise ValueError("need 0 < sigma <= sigma_m <= 1 and n_x >= 2")
    base = sigma**sigma_m * ((1 - sigma_m) / (n_x - 1)) ** (1 - sigma)
    return base ** ((1 - mu) / sigma) * sigma / (2 * sigma_m - sigma)


def all_pairs(variables: list[str]) -> list[frozenset]:
    """All undirected variable pairs (complete-graph edge set)."""
    return [frozenset(p) for p in itertools.combinations(sorted(variables), 2)]
