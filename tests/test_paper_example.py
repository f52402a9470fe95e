"""The paper's running example, end to end.

Table I (the 6-appliance symbolic database) is transcribed in
``paper_data.py``; the paper derives from it the sequence database of
Table III, the HPG of Fig. 4 (σ = δ = 0.7), the MI worked example
I(K;T) = 0.29 with NMI ≈ 0.42, and the 6-edge correlation graph of
Fig. 5 at 40% density.  These tests reproduce each derivation.

Note on NMI rounding: the paper prints NMI(K;T) = 0.43, but its own
counts (p(KOn) = 17/36 etc.) give I/H(K) = 0.2921/0.6917 = 0.4223; we
assert the recomputed value.
"""
import numpy as np
import pytest

from repro.core import mi as mi_mod
from repro.core.ahtpgm import CorrelationGraph
from repro.core.events import to_instances
from repro.core.htpgm import MiningConfig, mine
from repro.core.sequences import split_sequences
from repro.core.seqdb import SequenceDatabase
from repro.core.symbolize import threshold_symbolize

from .paper_data import SEQ_LEN, TABLE_I, readings_pandas, symbols_pandas


@pytest.fixture(scope="module")
def symbols_df(spark):
    return spark.createDataFrame(symbols_pandas())


@pytest.fixture(scope="module")
def dseq(spark):
    readings = spark.createDataFrame(readings_pandas())
    syms = threshold_symbolize(readings, threshold=0.5)
    inst = to_instances(syms)
    return split_sequences(inst, seq_len=SEQ_LEN, overlap=0)


@pytest.fixture(scope="module")
def db(dseq):
    return SequenceDatabase.from_spark(dseq)


# ---- Data transformation (Tables I & III) --------------------------------

def test_four_sequences(db):
    assert db.n_seq == 4


def test_twelve_distinct_events(db):
    assert len(db.events) == 12
    assert set(db.events) == {
        f"{v}:{s}" for v in TABLE_I for s in ("On", "Off")
    }


def test_kon_instances_sequence_one(db):
    # Table III row 1: K On during [10:00,10:15] and [10:35,10:40]
    # -> slots [0,4) and [7,9) at 5-minute resolution.
    assert db.sequences[0]["K:On"] == [(0, 4), (7, 9)]


def test_ioff_spans_whole_first_sequence(db):
    # Table III row 1: (IOff,[10:00,10:40]) -> slots [0, 9)
    assert db.sequences[0]["I:Off"] == [(0, 9)]


def test_ion_present_only_in_sequences_2_and_4(db):
    # Paper §IV-D: "IOn ... only appears in sequences 2 and 4"
    np.testing.assert_array_equal(
        db.bitmaps["I:On"], np.array([0, 1, 0, 1], dtype=bool)
    )


def test_bon_missing_from_sequence_2(db):
    # Table III row 2 lists only BOff for B.
    assert "B:On" not in db.sequences[1]
    assert db.sequences[1]["B:Off"] == [(0, 9)]


def test_kon_bitmap_all_ones(db):
    # Fig. 4, L1: b_KOn = [1,1,1,1]
    np.testing.assert_array_equal(
        db.bitmaps["K:On"], np.ones(4, dtype=bool)
    )


# ---- HPG L1 (Fig. 4, sigma = delta = 0.7) --------------------------------

@pytest.fixture(scope="module")
def mined(db):
    return mine(db, MiningConfig(sigma=0.7, delta=0.7, max_k=3))


def test_eleven_frequent_single_events(mined):
    # Paper §IV-D: 1Freq contains 11 events; IOn is pruned.
    assert len(mined.frequent_events) == 11
    assert "I:On" not in mined.frequent_events


def test_kon_ton_contain_is_frequent(mined):
    # Fig. 4, L2 node (KOn, TOn): K On contains T On in every sequence.
    key = (("K:On", "T:On"), ("C",))
    assert mined.patterns[key] == 4
    assert mined.confidence(key) == 1.0


def test_bon_in_no_frequent_two_event_pattern(mined):
    # §IV-F: "BOn is not present in any frequent 2-event patterns in L2"
    # (supp(BOn) = 3 >= 0.7*4, but every pattern through BOn is rarer).
    assert "B:On" in mined.frequent_events
    assert all(
        "B:On" not in key[0]
        for key in mined.patterns
    )


def test_frequent_three_event_pattern_exists(mined):
    assert any(len(key[0]) == 3 for key in mined.patterns)


# ---- Mutual information (§V-A worked example) ----------------------------

@pytest.fixture(scope="module")
def nmi(symbols_df):
    return mi_mod.nmi_matrix(symbols_df)


def test_symbol_probabilities_match_paper():
    pdf = symbols_pandas()
    counts = pdf.groupby(["var", "symbol"]).size()
    assert counts[("K", "On")] == 17
    assert counts[("K", "Off")] == 19
    assert counts[("T", "On")] == 18
    assert counts[("T", "Off")] == 18


def test_joint_counts_match_paper(symbols_df):
    joint = mi_mod.joint_symbol_counts(symbols_df)
    kt = joint[(joint.var_x == "K") & (joint.var_y == "T")]
    got = {
        (r.sym_x, r.sym_y): r.cnt for r in kt.itertuples()
    }
    assert got == {
        ("On", "On"): 15,
        ("Off", "Off"): 16,
        ("On", "Off"): 2,
        ("Off", "On"): 3,
    }


def test_mutual_information_value(nmi):
    # I(K;T) = 0.29 nats (paper §V-A)
    h_k = mi_mod.entropy(np.array([17 / 36, 19 / 36]))
    i_kt = float(nmi.loc[("K", "T"), "nmi"]) * h_k
    assert i_kt == pytest.approx(0.2921, abs=0.002)


def test_nmi_values_and_asymmetry(nmi):
    n_kt = float(nmi.loc[("K", "T"), "nmi"])
    n_tk = float(nmi.loc[("T", "K"), "nmi"])
    assert n_kt == pytest.approx(0.4223, abs=0.005)
    assert n_tk == pytest.approx(0.4214, abs=0.005)
    assert n_kt != n_tk  # Eq. 10: NMI is asymmetric


def test_correlation_graph_density_40_percent(nmi):
    # §V-C example: 6 series -> complete graph has 15 edges; density
    # 40% keeps 15 * 0.4 = 6 edges.
    graph = CorrelationGraph.from_nmi(nmi, density=0.4)
    assert len(graph.edges) == 6
    assert graph.has_edge("K", "T")
    assert graph.has_edge("M", "C")


def test_correlation_graph_full_density_is_complete(nmi):
    graph = CorrelationGraph.from_nmi(nmi, density=1.0)
    assert len(graph.edges) == 15
