"""Integration tests for the end-to-end dataset pipeline."""
import pytest

from repro import synth_data
from repro.core.pipeline import Dataset, load_dataset, symbolizer_for


@pytest.fixture(scope="module")
def nist(spark):
    return load_dataset(spark, "nist", n_seq=6)


def test_load_dataset_returns_dataset(nist):
    assert isinstance(nist, Dataset)
    assert nist.name == "nist"
    assert nist.db.n_seq == 6
    assert nist.seq_len == synth_data.slots_per_seq("nist")


def test_energy_dataset_binary_alphabet(nist):
    symbols = {e.rsplit(":", 1)[1] for e in nist.db.events}
    assert symbols <= {"On", "Off"}


def test_city_dataset_multistate_alphabet(spark):
    ds = load_dataset(spark, "smartcity", n_seq=4)
    symbols = {e.rsplit(":", 1)[1] for e in ds.db.events}
    assert symbols <= set(synth_data.city_state_labels())
    assert len(symbols) >= 3


def test_instances_within_sequence_bounds(nist):
    for seq in nist.db.sequences:
        for insts in seq.values():
            for s, e in insts:
                assert 0 <= s < e <= nist.seq_len


def test_every_sequence_covered(nist):
    # Off events blanket the timeline, so no sequence is empty.
    assert all(len(seq) > 0 for seq in nist.db.sequences)


def test_variable_subset(spark):
    ds = load_dataset(spark, "nist", n_seq=4, variables=["kitchen", "tv"])
    vars_seen = {e.rsplit(":", 1)[0] for e in ds.db.events}
    assert vars_seen <= {"kitchen", "tv"}


def test_overlap_creates_more_sequences(spark):
    flat = load_dataset(spark, "dataport", n_seq=4, overlap=0)
    lap = load_dataset(spark, "dataport", n_seq=4, overlap=24)
    assert lap.db.n_seq > flat.db.n_seq


def test_symbolizer_for_dispatch():
    assert symbolizer_for("nist") is not None
    assert symbolizer_for("smartcity") is not None


def test_dseq_df_matches_db(nist):
    pdf = nist.dseq_df.toPandas()
    assert len(pdf) == sum(
        len(v) for seq in nist.db.sequences for v in seq.values()
    )
