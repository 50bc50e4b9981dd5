"""Tests for the synthetic airlines generator (repro.datasets.airlines)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datasets.airlines import (
    DELAY_PER_GAP_MIN,
    FEATURE_COLS,
    GAP_STD,
    TARGET,
    airlines_pdf,
    splits_pdf,
)


def test_deterministic():
    pd.testing.assert_frame_equal(airlines_pdf(500, seed=1), airlines_pdf(500, seed=1))


def test_schema_is_14_attributes():
    pdf = airlines_pdf(100)
    attrs = [c for c in pdf.columns if c != "is_overnight"]
    assert len(attrs) == 14  # 11 numeric features + carrier + 2 more = paper's 14
    assert set(FEATURE_COLS + ["carrier", TARGET]).issubset(attrs)


@pytest.mark.parametrize("frac", [0.0, 0.5, 1.0])
def test_overnight_fraction(frac):
    pdf = airlines_pdf(1000, overnight_frac=frac, seed=2)
    assert pdf["is_overnight"].mean() == pytest.approx(frac, abs=0.001)


def test_daytime_flights_satisfy_example1_invariant():
    """arr - dep - duration ~ N(GAP_MEAN, ~GAP_STD) for daytime flights."""
    pdf = airlines_pdf(5000, overnight_frac=0.0, seed=3)
    gap = pdf["arr_time"] - pdf["dep_time"] - pdf["duration"]
    assert abs(gap.mean()) < 3 * GAP_STD / np.sqrt(len(pdf)) + 6
    assert gap.std() == pytest.approx(GAP_STD, rel=0.15)
    assert (pdf["arr_time"] > pdf["dep_time"]).all()


def test_overnight_flights_wrap_midnight():
    """Overnight flights: arrival earlier than departure; the linear gap
    expression is off by one day (-1440)."""
    pdf = airlines_pdf(5000, overnight_frac=1.0, seed=4)
    assert (pdf["arr_time"] < pdf["dep_time"]).all()
    gap = pdf["arr_time"] - pdf["dep_time"] - pdf["duration"]
    assert gap.mean() == pytest.approx(-1440, abs=3 * GAP_STD)


def test_duration_distance_invariant():
    pdf = airlines_pdf(5000, seed=5)
    resid = pdf["duration"] - pdf["distance"] / 8.0 - 25.0
    assert abs(resid.mean()) < 2
    assert resid.std() < 10


def test_delay_is_linear_in_gap():
    # the Laplace noise (MAE 19) dominates the signal, so the slope's
    # standard error is ~0.007 even at n=100k — tolerance is 3 s.e.
    pdf = airlines_pdf(100_000, overnight_frac=0.0, seed=6)
    gap = (pdf["arr_time"] - pdf["dep_time"] - pdf["duration"]).to_numpy()
    beta = np.polyfit(gap, pdf[TARGET].to_numpy(), 1)[0]
    assert beta == pytest.approx(DELAY_PER_GAP_MIN, abs=0.022)


def test_splits():
    s = splits_pdf(n_train=2000, n_test=400, seed=7)
    assert set(s) == {"train", "daytime", "overnight", "mixed"}
    assert len(s["train"]) == 2000 and len(s["mixed"]) == 400
    assert s["train"]["is_overnight"].mean() == 0.0
    assert s["overnight"]["is_overnight"].mean() == 1.0
    assert 0.25 < s["mixed"]["is_overnight"].mean() < 0.40


def test_carrier_low_cardinality():
    pdf = airlines_pdf(2000, seed=8)
    assert 2 <= pdf["carrier"].nunique() <= 50
