"""Tests for the 11 synthetic dataset equivalents (Table 4)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import DATASETS, dataset_columns


@pytest.mark.parametrize("name", list(DATASETS))
def test_shape_matches_registry(name):
    spec = DATASETS[name]
    pdf = spec.generate(3000)
    assert pdf.shape == (3000, spec.paper_cols)


@pytest.mark.parametrize("name", list(DATASETS))
def test_deterministic(name):
    spec = DATASETS[name]
    a = spec.generate(500)
    b = spec.generate(500)
    pd.testing.assert_frame_equal(a, b)


@pytest.mark.parametrize("name", ["aqua", "build", "flights", "taxis"])
def test_null_bearing_datasets_have_nulls(name):
    pdf = DATASETS[name].generate(4000)
    assert pdf.isna().any().any(), f"{name} should contain nulls (Table 4 notes)"


@pytest.mark.parametrize("name", ["basement", "current", "furnace", "gas", "light", "power", "temp"])
def test_sensor_datasets_complete(name):
    pdf = DATASETS[name].generate(2000)
    assert not pdf.isna().any().any()


@pytest.mark.parametrize("name", list(DATASETS))
def test_column_roles(name):
    pdf = DATASETS[name].generate(1500)
    numeric, preds, cats = dataset_columns(pdf)
    assert numeric, "every dataset needs aggregatable columns"
    assert set(preds) == set(pdf.columns)
    for c in cats:
        assert pdf[c].dtype == object
    for c in numeric:
        assert np.issubdtype(pdf[c].dropna().infer_objects().dtype, np.number)


def test_registry_paper_numbers():
    # spot-check the registry against Table 4
    assert DATASETS["flights"].paper_rows == 5_819_079
    assert DATASETS["flights"].paper_cols == 32
    assert DATASETS["power"].paper_cols == 10
    assert DATASETS["temp"].paper_cols == 5
    assert len(DATASETS) == 11


def test_default_rows_scaling():
    assert DATASETS["power"].default_rows(1 / 50) == pytest.approx(2_049_280 / 50, rel=0.01)
    assert DATASETS["light"].default_rows(1e-9) == 2000  # floor


def test_sensor_autocorrelation():
    """IoT series must be smooth (AR(1)) — the property GD exploits."""
    pdf = DATASETS["power"].generate(4000)
    v = pdf["voltage"].to_numpy()
    r = np.corrcoef(v[:-1], v[1:])[0, 1]
    assert r > 0.8


def test_flights_cancellation_reason_only_when_cancelled():
    pdf = DATASETS["flights"].generate(6000)
    ok = pdf.loc[pdf["cancelled"] == 0, "cancellation_reason"].isna().all()
    assert ok
    if (pdf["cancelled"] == 1).any():
        assert pdf.loc[pdf["cancelled"] == 1, "cancellation_reason"].notna().all()


def test_taxis_totals_consistent():
    pdf = DATASETS["taxis"].generate(3000)
    total = pdf["fare"] + pdf["tips"] + pdf["tolls"] + pdf["extras"]
    np.testing.assert_allclose(pdf["trip_total"], np.round(total, 2), atol=0.02)


def test_zipf_skew_in_categoricals():
    pdf = DATASETS["taxis"].generate(8000)
    vc = pdf["payment_type"].value_counts(normalize=True)
    assert vc.iloc[0] > 2 * vc.iloc[-1]
