"""Reproduction of "Efficient Temporal Pattern Mining in Big Time Series
Using Mutual Information" (Ho, Ho & Pedersen, VLDB 2021).

Package layout:

* :mod:`repro.synth_data` — synthetic dataset generators (TPC-H-lite as
  provided, plus smart-energy / smart-city time series for this paper).
* :mod:`repro.core` — the paper's contribution: the FTPMfTS pipeline,
  E-HTPGM, A-HTPGM, mutual information, distributed + streaming variants.
* :mod:`repro.baselines` — H-DFS, IEMiner and TPMiner comparators.
* :mod:`repro.tables` — harnesses reproducing Tables IV–IX.
"""
