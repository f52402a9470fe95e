"""Baseline temporal pattern miners (paper §II / §VI-A3).

All three baselines are *exact*: they return the same frequent temporal
patterns as E-HTPGM (regression-tested), but use the data structures and
search strategies of the original papers — which is precisely what the
runtime/memory comparison of Tables VII-VIII measures:

* :mod:`repro.baselines.hdfs` — H-DFS [Papapetrou et al., KAIS'09]:
  DFS over event prefixes with materialized per-pattern embedding
  ID-lists; no combination-level pruning; memory-heavy.
* :mod:`repro.baselines.iem` — IEMiner [Patel et al., SIGMOD'08]:
  level-wise Apriori candidate generation with full database rescans
  per candidate; no bitmaps, confidence or transitivity pruning.
* :mod:`repro.baselines.tpminer` — TPMiner [Chen et al., TKDE'15]:
  endpoint-representation miner with upfront single-event and
  combination support prefilters over per-event sequence sets.

The pattern semantics (chronological ordering, relation definitions,
t_max) are shared with the core via :mod:`repro.core.enumerate`.
"""
from .hdfs import mine_hdfs
from .iem import mine_ieminer
from .tpminer import mine_tpminer

__all__ = ["mine_hdfs", "mine_ieminer", "mine_tpminer"]
