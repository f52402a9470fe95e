"""TPMiner-style baseline: endpoint representation + support prefilters.

Models TPMiner [1]: each sequence is viewed through its *endpoint*
representation (every instance contributes a start and an end point;
per-event sequence occurrence sets are derived from it), which lets the
miner prefilter candidate event combinations by their co-occurrence
support before any relation checking — the optimization that makes
TPMiner the fastest of the three baselines.  It still lacks E-HTPGM's
bitmap indexes, combination-level confidence prefilter and transitivity
pruning: the prefilter uses Python set intersections and candidates are
generated from all frequent events.  Pattern-level sigma/delta gating
(Lemma 6) keeps the result set equal to E-HTPGM's.
"""
from __future__ import annotations

from ..core.enumerate import enumerate_pattern_tuples
from ..core.htpgm import MiningConfig
from ..core.model import MiningResult, min_support
from ..core.seqdb import SequenceDatabase


def endpoint_representation(
    db: SequenceDatabase,
) -> list[list[tuple[int, int, str, int]]]:
    """Per sequence, the sorted endpoint list (time, kind, event, idx).

    ``kind`` is +1 for a start point and -1 for an end point.  Exposed
    for tests; the miner derives its occurrence sets from it.
    """
    out = []
    for seq in db.sequences:
        pts: list[tuple[int, int, str, int]] = []
        for ev, insts in seq.items():
            for idx, (s, e) in enumerate(insts):
                pts.append((s, 1, ev, idx))
                pts.append((e, -1, ev, idx))
        pts.sort()
        out.append(pts)
    return out


def mine_tpminer(db: SequenceDatabase, cfg: MiningConfig) -> MiningResult:
    n = db.n_seq
    ms = min_support(cfg.sigma, n)
    stats = {"sequence_scans": 0, "candidates": 0, "prefiltered": 0}

    # Occurrence sets from the endpoint representation (one pass).
    endpoints = endpoint_representation(db)
    occ: dict[str, set[int]] = {}
    for sid, pts in enumerate(endpoints):
        stats["sequence_scans"] += 1
        for _, kind, ev, _ in pts:
            if kind == 1:
                occ.setdefault(ev, set()).add(sid)
    one_freq = {e: len(s) for e, s in occ.items() if len(s) >= ms}
    result = MiningResult(
        n_sequences=n, frequent_events=dict(one_freq), patterns={}
    )
    if not one_freq or cfg.max_k < 2:
        result.stats = stats
        return result
    events1 = sorted(one_freq)
    raw_patterns: dict = {}

    def count_node(
        node: tuple[str, ...], seq_ids: set[int]
    ) -> dict[tuple[str, ...], int]:
        stats["candidates"] += 1
        pats: dict[tuple[str, ...], set[int]] = {}
        for sid in sorted(seq_ids):
            stats["sequence_scans"] += 1
            for t in enumerate_pattern_tuples(
                db.sequences[sid],
                node,
                epsilon=cfg.epsilon,
                d_o=cfg.d_o,
                t_max=cfg.t_max,
            ):
                pats.setdefault(t, set()).add(sid)
        # Pattern-level sigma/delta gate (sound by Lemma 6).
        max_ev = max(one_freq[e] for e in node)
        return {
            t: len(s)
            for t, s in pats.items()
            if len(s) >= ms and len(s) / max_ev >= cfg.delta
        }

    # Level 2 with co-occurrence prefilter.
    prev_green: list[tuple[tuple[str, ...], set[int]]] = []
    for ei in events1:
        for ej in events1:
            ids = occ[ei] & occ[ej]
            if len(ids) < ms:
                stats["prefiltered"] += 1
                continue
            node = (ei, ej)
            pats = count_node(node, ids)
            if pats:
                prev_green.append((node, ids))
                for t, supp in pats.items():
                    raw_patterns[(node, t)] = supp

    k = 3
    while prev_green and k <= cfg.max_k:
        green: list[tuple[tuple[str, ...], set[int]]] = []
        for node_prev, ids_prev in prev_green:
            for ek in events1:
                ids = ids_prev & occ[ek]
                if len(ids) < ms:
                    stats["prefiltered"] += 1
                    continue
                node = node_prev + (ek,)
                pats = count_node(node, ids)
                if pats:
                    green.append((node, ids))
                    for t, supp in pats.items():
                        raw_patterns[(node, t)] = supp
        prev_green = green
        k += 1

    result.patterns = raw_patterns
    result.stats = stats
    return result
