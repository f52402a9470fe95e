"""H-DFS-style baseline: hybrid BFS/DFS over ID-lists.

Models H-DFS [3]: events are held in vertical *ID-lists* (per event, the
list of (sequence, instance) occurrences).  A breadth-first phase merges
the ID-lists of every ordered pair of frequent events into resident
2-event embedding lists; a depth-first phase then extends each
pattern-bearing pair by further ID-list merges, keeping each prefix's
full embedding list.  Pruning happens only at the pattern-support level
(a branch is abandoned when no relation tuple of the node is frequent —
H-DFS mines frequent *arrangements* and has no confidence notion, so
delta is a pure output filter); there is no combination-level
bitmap/confidence/transitivity pruning, and the resident merged
ID-lists dominate memory — the profile Table VIII reports for H-DFS.

Relation semantics (ordering key, relation test, t_max) are identical
to the core's enumeration, so the output equals E-HTPGM's.
"""
from __future__ import annotations

from ..core.htpgm import MiningConfig
from ..core.model import MiningResult, min_support
from ..core.relations import relation
from ..core.seqdb import SequenceDatabase

# An embedding: (seq_id, chosen instances, order key of last instance,
# relation tuple accumulated so far).
_Embedding = tuple[int, tuple, tuple, tuple]


def mine_hdfs(db: SequenceDatabase, cfg: MiningConfig) -> MiningResult:
    n = db.n_seq
    ms = min_support(cfg.sigma, n)
    stats = {"sequence_scans": 0, "embeddings": 0, "candidates": 0}

    # Vertical ID-lists: event -> [(seq, (s, e)), ...]
    id_lists: dict[str, list[tuple[int, tuple[int, int]]]] = {}
    for sid, seq in enumerate(db.sequences):
        stats["sequence_scans"] += 1
        for ev, insts in seq.items():
            id_lists.setdefault(ev, []).extend((sid, it) for it in insts)
    # Sequence-indexed view of the ID-lists (the merge join of the
    # original algorithm walks both lists sequence by sequence).
    id_by_seq: dict[str, dict[int, list[tuple[int, int]]]] = {}
    for ev, lst in id_lists.items():
        d = id_by_seq[ev] = {}
        for sid, inst in lst:
            d.setdefault(sid, []).append(inst)
    supports = {e: len({s for s, _ in lst}) for e, lst in id_lists.items()}
    one_freq = {e: c for e, c in supports.items() if c >= ms}
    result = MiningResult(
        n_sequences=n, frequent_events=dict(one_freq), patterns={}
    )
    if not one_freq or cfg.max_k < 2:
        result.stats = stats
        return result
    events1 = sorted(one_freq)
    raw_patterns: dict = {}

    def extend(
        node: tuple[str, ...], embeddings: list[_Embedding]
    ) -> None:
        """DFS step: merge the node's embeddings with each event ID-list."""
        if len(node) >= cfg.max_k:
            return
        for ek in events1:
            stats["candidates"] += 1
            new_node = node + (ek,)
            new_embs: list[_Embedding] = []
            by_tuple: dict[tuple, set[int]] = {}
            per_seq = id_by_seq.get(ek, {})
            for sid, insts, last_key, rels in embeddings:
                first_start = insts[0][0]
                for inst in per_seq.get(sid, ()):
                    key = (inst[0], -inst[1], ek)
                    if key <= last_key:
                        continue
                    if (
                        cfg.t_max is not None
                        and inst[1] - first_start > cfg.t_max
                    ):
                        continue
                    ext = []
                    ok = True
                    for prev in insts:
                        r = relation(
                            prev[0], prev[1], inst[0], inst[1],
                            cfg.epsilon, cfg.d_o,
                        )
                        if r is None:
                            ok = False
                            break
                        ext.append(r)
                    if not ok:
                        continue
                    new_rels = rels + tuple(ext)
                    emb = (sid, insts + (inst,), key, new_rels)
                    new_embs.append(emb)
                    by_tuple.setdefault(new_rels, set()).add(sid)
            stats["embeddings"] += len(new_embs)
            # The original H-DFS mines frequent *arrangements*: its only
            # pruning is pattern-level support.  Confidence exists only
            # as an output filter, so low-delta runs cost as much as
            # high-delta ones — one reason it trails the other methods.
            freq_tuples = {
                t: len(s) for t, s in by_tuple.items() if len(s) >= ms
            }
            if not freq_tuples:
                continue
            max_ev = max(one_freq[e] for e in new_node)
            for t, supp in freq_tuples.items():
                if supp / max_ev >= cfg.delta:
                    raw_patterns[(new_node, t)] = supp
            extend(new_node, new_embs)

    # Hybrid search (the "H" of H-DFS): a breadth-first phase first
    # materializes the merged 2-event ID-lists for *every* ordered pair
    # of frequent events, and keeps them resident while the depth-first
    # phase extends the pattern-bearing pairs.  The resident per-pair
    # embedding lists are exactly why H-DFS's memory footprint is the
    # largest of the compared methods (paper Table VIII) and why it
    # "does not scale well when the data size increases" (paper §II).
    pair_store: dict[tuple[str, str], list[_Embedding]] = {}
    dfs_seeds: list[tuple[str, str]] = []
    for ei in events1:
        base: list[_Embedding] = [
            (sid, (inst,), (inst[0], -inst[1], ei), ())
            for sid, inst in id_lists[ei]
        ]
        stats["embeddings"] += len(base)
        for ej in events1:
            stats["candidates"] += 1
            new_node = (ei, ej)
            new_embs: list[_Embedding] = []
            by_tuple: dict[tuple, set[int]] = {}
            per_seq = id_by_seq.get(ej, {})
            for sid, insts, last_key, rels in base:
                inst1 = insts[0]
                for inst in per_seq.get(sid, ()):
                    key = (inst[0], -inst[1], ej)
                    if key <= last_key:
                        continue
                    if (
                        cfg.t_max is not None
                        and inst[1] - inst1[0] > cfg.t_max
                    ):
                        continue
                    r = relation(
                        inst1[0], inst1[1], inst[0], inst[1],
                        cfg.epsilon, cfg.d_o,
                    )
                    if r is None:
                        continue
                    emb = (sid, (inst1, inst), key, (r,))
                    new_embs.append(emb)
                    by_tuple.setdefault((r,), set()).add(sid)
            stats["embeddings"] += len(new_embs)
            pair_store[new_node] = new_embs  # resident for the whole run
            freq_tuples = {
                t: len(s) for t, s in by_tuple.items() if len(s) >= ms
            }
            if not freq_tuples:
                continue
            max_ev = max(one_freq[e] for e in new_node)
            for t, supp in freq_tuples.items():
                if supp / max_ev >= cfg.delta:
                    raw_patterns[(new_node, t)] = supp
            dfs_seeds.append(new_node)

    for pair in dfs_seeds:
        extend(pair, pair_store[pair])

    result.patterns = raw_patterns
    result.stats = stats
    return result
