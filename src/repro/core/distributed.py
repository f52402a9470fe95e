"""Distributed HTPGM over time series partitions.

The paper's miner is single-machine; the reproduction's distributed
variant keeps the Hierarchical Pattern Graph logic on the driver but
pushes all support counting into Spark, partitioned by sequence:

* **L1** — ``groupBy(event).agg(countDistinct(seq_id))``.
* **L2** — a sequence-local self-join of ``D_SEQ`` with the relation
  decision tree rendered as a SQL CASE expression
  (:func:`repro.core.relations.relation_sql`), aggregated with
  ``countDistinct(seq_id)`` per (event pair, relation).  Pure Catalyst;
  oracle-checked against DuckDB running the identical SQL.
* **Lk (k >= 3)** — level-wise candidate broadcast: the driver derives
  candidate nodes exactly as E-HTPGM does (green-node extension +
  transitivity filtering), ships them to the executors, and
  ``applyInPandas`` over ``groupBy(seq_id)`` enumerates each candidate's
  relation tuples per sequence with the shared
  :func:`repro.core.enumerate.enumerate_pattern_tuples`.  Supports come
  back via ``groupBy(node, rels).agg(countDistinct(seq_id))``.

Support of a pattern is additive over sequences, which makes the
counting embarrassingly parallel; the level barrier is the Apriori
dependency.  Results are identical to the driver miner (tested).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .enumerate import enumerate_pattern_tuples
from .htpgm import MiningConfig
from .model import MiningResult, min_support
from .relations import relation_sql


def event_supports_df(dseq: DataFrame) -> DataFrame:
    """Support of every event: (event, supp)."""
    return dseq.groupBy("event").agg(
        F.countDistinct("seq_id").alias("supp")
    )


def pair_supports_df(dseq: DataFrame) -> DataFrame:
    """Support of every ordered event pair: (event_i, event_j, supp)."""
    pres = dseq.select("seq_id", "event").distinct()
    a = pres.select("seq_id", F.col("event").alias("event_i"))
    b = pres.select("seq_id", F.col("event").alias("event_j"))
    return a.join(b, on="seq_id").groupBy("event_i", "event_j").agg(
        F.countDistinct("seq_id").alias("supp")
    )


def _ordered_pair_join(dseq: DataFrame) -> DataFrame:
    """Sequence-local self-join producing chronologically ordered pairs.

    Ordering key is ``(start, -end, event)``; the first instance of a
    pair must strictly precede the second, mirroring the driver-side
    embedding order.
    """
    a = dseq.select(
        "seq_id",
        F.col("event").alias("e1"),
        F.col("start").alias("s1"),
        F.col("end").alias("t1"),
    )
    b = dseq.select(
        "seq_id",
        F.col("event").alias("e2"),
        F.col("start").alias("s2"),
        F.col("end").alias("t2"),
    )
    order = (
        (F.col("s1") < F.col("s2"))
        | ((F.col("s1") == F.col("s2")) & (F.col("t1") > F.col("t2")))
        | (
            (F.col("s1") == F.col("s2"))
            & (F.col("t1") == F.col("t2"))
            & (F.col("e1") < F.col("e2"))
        )
    )
    return a.join(b, on="seq_id").where(order)


def two_event_pattern_supports_df(
    dseq: DataFrame,
    *,
    epsilon: int = 0,
    d_o: int = 1,
    t_max: int | None = None,
) -> DataFrame:
    """Support of every 2-event pattern: (event_i, event_j, rel, supp).

    The L2 mining step (paper step 2.1+2.2) as one Catalyst dataflow.
    """
    pairs = _ordered_pair_join(dseq)
    if t_max is not None:
        pairs = pairs.where(F.col("t2") - F.col("s1") <= F.lit(t_max))
    rel = F.expr(relation_sql("s1", "t1", "s2", "t2", epsilon, d_o))
    return (
        pairs.select(
            "seq_id",
            F.col("e1").alias("event_i"),
            F.col("e2").alias("event_j"),
            rel.alias("rel"),
        )
        .where(F.col("rel").isNotNull())
        .groupBy("event_i", "event_j", "rel")
        .agg(F.countDistinct("seq_id").alias("supp"))
    )


def _count_candidates(
    dseq: DataFrame, candidates: list[tuple[str, ...]], cfg: MiningConfig
) -> pd.DataFrame:
    """Per-sequence enumeration of candidate nodes via applyInPandas.

    Returns a pandas frame (node_id, rels, supp) where ``rels`` is the
    comma-joined relation tuple.
    """
    cand = list(candidates)
    epsilon, d_o, t_max = cfg.epsilon, cfg.d_o, cfg.t_max
    # Per-candidate event sets for the cheap presence prefilter.
    cand_events = [set(c) for c in cand]

    def per_sequence(pdf: pd.DataFrame) -> pd.DataFrame:
        seq_id = int(pdf["seq_id"].iloc[0])
        instances: dict[str, list[tuple[int, int]]] = {}
        for ev, s, e in zip(pdf["event"], pdf["start"], pdf["end"]):
            instances.setdefault(ev, []).append((int(s), int(e)))
        present = set(instances)
        out_nodes, out_rels = [], []
        for node_id, node in enumerate(cand):
            if not cand_events[node_id] <= present:
                continue
            for t in enumerate_pattern_tuples(
                instances, node, epsilon=epsilon, d_o=d_o, t_max=t_max
            ):
                out_nodes.append(node_id)
                out_rels.append(",".join(t))
        return pd.DataFrame(
            {
                "node_id": pd.Series(out_nodes, dtype="int64"),
                "rels": pd.Series(out_rels, dtype="object"),
                "seq_id": pd.Series(
                    [seq_id] * len(out_nodes), dtype="int64"
                ),
            }
        )

    hits = dseq.groupBy("seq_id").applyInPandas(
        per_sequence, schema="node_id long, rels string, seq_id long"
    )
    return (
        hits.groupBy("node_id", "rels")
        .agg(F.countDistinct("seq_id").alias("supp"))
        .toPandas()
    )


def mine_distributed(
    spark: SparkSession, dseq: DataFrame, cfg: MiningConfig
) -> MiningResult:
    """Level-wise distributed HTPGM; same output as :func:`htpgm.mine`."""
    dseq = dseq.select("seq_id", "event", "start", "end").cache()
    try:
        n = dseq.select("seq_id").distinct().count()
        ms = min_support(cfg.sigma, n)

        supports = {
            r["event"]: r["supp"] for r in event_supports_df(dseq).collect()
        }
        one_freq = {e: s for e, s in supports.items() if s >= ms}
        result = MiningResult(
            n_sequences=n, frequent_events=dict(one_freq), patterns={}
        )
        result.node_counts[1] = len(one_freq)
        result.pattern_counts[1] = len(one_freq)
        if not one_freq or cfg.max_k < 2:
            return result
        events1 = sorted(one_freq)

        def keep(node: tuple[str, ...], tuples: dict[tuple[str, ...], int]):
            max_ev = max(supports[e] for e in node)
            return {
                t: s
                for t, s in tuples.items()
                if s >= ms and s / max_ev >= cfg.delta
            }

        # ---- L2 via the Catalyst self-join ------------------------
        l2_pdf = two_event_pattern_supports_df(
            dseq, epsilon=cfg.epsilon, d_o=cfg.d_o, t_max=cfg.t_max
        ).toPandas()
        level2: dict[tuple[str, str], dict[tuple[str, ...], int]] = {}
        grouped: dict[tuple[str, str], dict[tuple[str, ...], int]] = {}
        for r in l2_pdf.itertuples():
            if r.event_i in one_freq and r.event_j in one_freq:
                grouped.setdefault((r.event_i, r.event_j), {})[(r.rel,)] = (
                    r.supp
                )
        for pair, tuples in grouped.items():
            pats = keep(pair, tuples)
            if pats:
                level2[pair] = pats
        result.node_counts[2] = len(level2)
        result.pattern_counts[2] = sum(len(p) for p in level2.values())
        for pair, pats in level2.items():
            for t, s in pats.items():
                result.patterns[(pair, t)] = s

        # ---- Lk via candidate broadcast + applyInPandas -----------
        prev = level2
        k = 3
        while prev and k <= cfg.max_k:
            filtered1 = sorted({e for node in prev for e in node})
            green2 = set(level2)
            candidates = []
            for node_prev in prev:
                for ek in filtered1:
                    # transitivity admission: every pair with the new
                    # event must be a green L2 node
                    if all((ei, ek) in green2 for ei in node_prev):
                        candidates.append(node_prev + (ek,))
            if not candidates:
                break
            counts = _count_candidates(dseq, candidates, cfg)
            level_k: dict[tuple[str, ...], dict[tuple[str, ...], int]] = {}
            by_node: dict[int, dict[tuple[str, ...], int]] = {}
            for r in counts.itertuples():
                rels = tuple(r.rels.split(","))
                by_node.setdefault(int(r.node_id), {})[rels] = int(r.supp)
            for node_id, tuples in by_node.items():
                node = candidates[node_id]
                pats = keep(node, tuples)
                if pats:
                    level_k[node] = pats
            result.node_counts[k] = len(level_k)
            result.pattern_counts[k] = sum(
                len(p) for p in level_k.values()
            )
            for node, pats in level_k.items():
                for t, s in pats.items():
                    result.patterns[(node, t)] = s
            prev = level_k
            k += 1
        return result
    finally:
        dseq.unpersist()
