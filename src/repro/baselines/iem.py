"""IEMiner-style baseline: level-wise Apriori with database rescans.

Models IEMiner's behaviour [2]: candidates at level k are generated
Apriori-style from the pattern-bearing nodes of level k-1, but support
counting re-scans the *entire* sequence database for every candidate —
no bitmap indexes, no combination-level (node) support/confidence
prefilter, no transitivity filtering.  Like every exact miner here it
gates deeper levels on the existence of a frequent & confident pattern
(sound by Lemma 6), so its result set equals E-HTPGM's while its
runtime retains the characteristic full-scan cost.
"""
from __future__ import annotations

from ..core.enumerate import enumerate_pattern_tuples
from ..core.htpgm import MiningConfig
from ..core.model import MiningResult, min_support
from ..core.seqdb import SequenceDatabase


def mine_ieminer(db: SequenceDatabase, cfg: MiningConfig) -> MiningResult:
    n = db.n_seq
    ms = min_support(cfg.sigma, n)
    stats = {"sequence_scans": 0, "candidates": 0}

    # Frequent single events by scanning (no bitmaps).
    counts: dict[str, int] = {}
    for seq in db.sequences:
        stats["sequence_scans"] += 1
        for ev in seq:
            counts[ev] = counts.get(ev, 0) + 1
    one_freq = {e: c for e, c in counts.items() if c >= ms}
    result = MiningResult(
        n_sequences=n, frequent_events=dict(one_freq), patterns={}
    )
    if not one_freq or cfg.max_k < 2:
        result.stats = stats
        return result
    events1 = sorted(one_freq)

    def count_node(node: tuple[str, ...]) -> dict[tuple[str, ...], set[int]]:
        """Full database rescan: relation tuple -> supporting seq ids."""
        stats["candidates"] += 1
        pats: dict[tuple[str, ...], set[int]] = {}
        for sid, seq in enumerate(db.sequences):
            stats["sequence_scans"] += 1
            for t in enumerate_pattern_tuples(
                seq, node, epsilon=cfg.epsilon, d_o=cfg.d_o, t_max=cfg.t_max
            ):
                pats.setdefault(t, set()).add(sid)
        # Pattern-level sigma/delta gate (sound by Lemma 6: a prefix of a
        # frequent, confident pattern is itself frequent and confident).
        max_ev = max(one_freq[e] for e in node)
        return {
            t: s
            for t, s in pats.items()
            if len(s) >= ms and len(s) / max_ev >= cfg.delta
        }

    raw_patterns: dict = {}
    prev_green: list[tuple[str, ...]] = []
    for ei in events1:
        for ej in events1:
            node = (ei, ej)
            pats = count_node(node)
            if pats:
                prev_green.append(node)
                for t, s in pats.items():
                    raw_patterns[(node, t)] = len(s)

    k = 3
    while prev_green and k <= cfg.max_k:
        green: list[tuple[str, ...]] = []
        for node_prev in prev_green:
            for ek in events1:
                node = node_prev + (ek,)
                pats = count_node(node)
                if pats:
                    green.append(node)
                    for t, s in pats.items():
                        raw_patterns[(node, t)] = len(s)
        prev_green = green
        k += 1

    result.patterns = raw_patterns
    result.stats = stats
    return result
