"""End-to-end FTPMfTS data transformation for the named datasets.

Glues the generators in :mod:`repro.synth_data` to the transformation
phase: readings → symbolic database (threshold for energy, percentile
bins for smart-city) → event instances → overlapping-window sequence
database, returning both the Spark ``D_SEQ`` DataFrame / collected
:class:`SequenceDatabase` and the symbolic DataFrame that A-HTPGM's
NMI computation consumes.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from .. import synth_data
from .events import to_instances
from .sequences import split_sequences
from .seqdb import SequenceDatabase
from .symbolize import percentile_symbolize, threshold_symbolize

#: On/Off threshold for energy datasets (paper §VI-A2).
ENERGY_THRESHOLD = 0.05

#: Skewed percentile boundaries for the smart-city states (§VI-A2 uses
#: e.g. 10/25/50/75/95th percentiles: extreme states are *rare*).  With
#: 4 states: none (50%), low (25%), medium (20%), high (5%) — so
#: high-severity events have low support and meaningful correlation
#: (the paper's "rare but highly confident" weather patterns).
CITY_PERCENTILES = (0.50, 0.75, 0.95)


@dataclass
class Dataset:
    """A fully transformed dataset ready for mining."""

    name: str
    symbols: DataFrame  # (var, t, symbol) — D_SYB in long format
    dseq_df: DataFrame  # (seq_id, event, start, end) — D_SEQ
    db: SequenceDatabase
    seq_len: int


def symbolizer_for(name: str):
    """The paper's symbolization for a named dataset."""
    if synth_data.is_energy(name):
        return lambda df: threshold_symbolize(df, threshold=ENERGY_THRESHOLD)
    labels = synth_data.city_state_labels()
    return lambda df: percentile_symbolize(df, labels, list(CITY_PERCENTILES))


def load_dataset(
    spark: SparkSession,
    name: str,
    *,
    n_seq: int | None = None,
    overlap: int = 0,
    variables: list[str] | None = None,
) -> Dataset:
    """Generate, symbolize, split and collect one named dataset.

    ``variables`` restricts to a subset of series (the
    varying-#attributes scalability experiment).
    """
    readings = synth_data.readings(spark, name, n_seq=n_seq)
    if variables is not None:
        readings = readings.where(readings["var"].isin(variables))
    seq_len = synth_data.slots_per_seq(name)
    symbols = symbolizer_for(name)(readings)
    instances = to_instances(symbols)
    dseq_df = split_sequences(instances, seq_len=seq_len, overlap=overlap)
    db = SequenceDatabase.from_spark(dseq_df)
    return Dataset(
        name=name, symbols=symbols, dseq_df=dseq_df, db=db, seq_len=seq_len
    )
