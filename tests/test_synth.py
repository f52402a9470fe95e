"""Tests for the synthetic dataset generators (Table IV substrate)."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data


@pytest.mark.parametrize("name", synth_data.dataset_names())
def test_readings_shape_and_schema(name):
    pdf = synth_data.readings_pandas(name, n_seq=4)
    assert list(pdf.columns) == ["var", "t", "value"]
    slots = synth_data.slots_per_seq(name)
    n_vars = pdf["var"].nunique()
    assert len(pdf) == 4 * slots * n_vars
    # every var covers every slot exactly once
    per_var = pdf.groupby("var")["t"].agg(["count", "min", "max"])
    assert (per_var["count"] == 4 * slots).all()
    assert (per_var["min"] == 0).all()
    assert (per_var["max"] == 4 * slots - 1).all()


@pytest.mark.parametrize("name", synth_data.dataset_names())
def test_readings_deterministic(name):
    a = synth_data.readings_pandas(name, n_seq=3)
    b = synth_data.readings_pandas(name, n_seq=3)
    pd.testing.assert_frame_equal(a, b)


def test_energy_values_threshold_separable():
    pdf = synth_data.readings_pandas("nist", n_seq=6)
    # On values ~N(1, .2) clipped at 0.1; Off ~|N(0, .01)|: the 0.05
    # threshold of §VI-A2 cleanly separates the two populations.
    on = pdf[pdf.value >= 0.05]
    off = pdf[pdf.value < 0.05]
    assert len(on) > 0 and len(off) > 0
    assert on["value"].min() >= 0.05
    assert off["value"].max() < 0.05
    assert len(off) > len(on)  # appliances are mostly off


def test_energy_group_cooccurrence():
    """Vars of one group co-activate far more than across groups."""
    pdf = synth_data.readings_pandas("ukdale", n_seq=24)
    on = (
        pdf.assign(on=pdf.value >= 0.05)
        .pivot_table(index="t", columns="var", values="on")
        .astype(bool)
    )
    def jaccard(a, b):
        return (on[a] & on[b]).sum() / max(1, (on[a] | on[b]).sum())

    within = jaccard("kitchen", "kettle")
    across = jaccard("kitchen", "washer")
    noise = jaccard("kitchen", "tv")
    assert within > across
    assert within > noise


def test_city_weather_drives_collisions():
    pdf = synth_data.readings_pandas("smartcity", n_seq=24)
    wide = pdf.pivot_table(index="t", columns="var", values="value")
    corr_weather = wide["rain"].corr(wide["wind"])
    corr_lagged = wide["rain"].corr(wide["motorist_injury"])
    corr_noise = wide["rain"].corr(wide["temperature"])
    assert corr_weather > 0.6
    assert corr_lagged > 0.4
    assert abs(corr_noise) < 0.25


def test_city_values_continuous_multistate():
    pdf = synth_data.readings_pandas("smartcity", n_seq=4)
    # values vary enough for 4 percentile bins per variable
    spread = pdf.groupby("var")["value"].agg(lambda v: v.nunique())
    assert (spread > 50).all()


def test_n_seq_override():
    small = synth_data.readings_pandas("dataport", n_seq=2)
    big = synth_data.readings_pandas("dataport", n_seq=5)
    slots = synth_data.slots_per_seq("dataport")
    n_vars = small["var"].nunique()
    assert len(small) == 2 * slots * n_vars
    assert len(big) == 5 * slots * n_vars


def test_unknown_dataset_raises():
    with pytest.raises(KeyError):
        synth_data.readings_pandas("nope")
    with pytest.raises(KeyError):
        synth_data.slots_per_seq("nope")


def test_dataset_names_and_kinds():
    names = synth_data.dataset_names()
    assert set(names) == {"nist", "ukdale", "dataport", "smartcity"}
    assert synth_data.is_energy("nist")
    assert not synth_data.is_energy("smartcity")


def test_city_state_labels():
    assert synth_data.city_state_labels(4) == ["none", "low", "medium", "high"]
    assert len(synth_data.city_state_labels(5)) == 5


def test_spark_readings(spark):
    df = synth_data.readings(spark, "dataport", n_seq=2)
    assert df.columns == ["var", "t", "value"]
    assert df.count() == len(synth_data.readings_pandas("dataport", n_seq=2))


def test_provided_tpch_generators_still_work(spark):
    li = synth_data.lineitem(spark, sf=0.0005)
    assert li.count() > 0
    assert "l_orderkey" in li.columns
