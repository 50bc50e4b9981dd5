"""Tests for the synthetic HAR generator (repro.datasets.har)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datasets.har import (
    ACTIVITIES,
    ACTIVITY_PROFILE,
    MOBILE,
    PERSON_META,
    PERSONS,
    SEDENTARY,
    SENSOR_COLS,
    har_cell_pdf,
    har_pdf,
    person_scale,
)


def test_deterministic():
    pd.testing.assert_frame_equal(
        har_cell_pdf("p01", "lying", 50), har_cell_pdf("p01", "lying", 50)
    )


def test_shape_and_schema():
    pdf = har_pdf(n_per_cell=10)
    assert len(pdf) == 10 * len(PERSONS) * len(ACTIVITIES)
    assert len(SENSOR_COLS) == 36  # 2 sensors x 6 locations x 3 axes
    assert list(pdf.columns) == ["person", "activity"] + SENSOR_COLS


def test_metadata_matches_paper_figure6():
    assert len(PERSON_META) == 15
    assert PERSON_META["p08"] == ("Low", "Obese", "Female")
    assert PERSON_META["p01"] == ("Moderate", "Underweight", "Female")
    assert PERSON_META["p14"] == ("High", "Normal", "Male")


@pytest.mark.parametrize("activity", SEDENTARY)
def test_sedentary_cells_are_tight(activity):
    pdf = har_cell_pdf("p02", activity, 500)
    stds = pdf[SENSOR_COLS].std()
    assert stds.max() < 0.15


@pytest.mark.parametrize("activity", MOBILE)
def test_mobile_cells_are_wide(activity):
    pdf = har_cell_pdf("p02", activity, 500)
    stds = pdf[SENSOR_COLS].std()
    assert stds.mean() > 0.25


def test_mobile_envelope_covers_sedentary_means():
    """'While a person walks, she also stands' — sedentary means fall within
    the mobile activities' 4-sigma envelope far more than the reverse."""
    for person in ["p01", "p05", "p09"]:
        walk = har_cell_pdf(person, "walking", 800)[SENSOR_COLS]
        stand = har_cell_pdf(person, "standing", 800)[SENSOR_COLS]
        w_mu, w_sd = walk.mean(), walk.std()
        s_mu, s_sd = stand.mean(), stand.std()
        stand_in_walk = (abs(s_mu - w_mu) <= 4 * w_sd).mean()
        walk_in_stand = (abs(w_mu - s_mu) <= 4 * s_sd).mean()
        assert stand_in_walk > walk_in_stand


def test_person_scale_extremes():
    """p08 (obese, low fitness) has the most extreme scale; normal-moderate
    persons sit near 1.0 — the Figure 6 structure."""
    scales = {p: person_scale(p) for p in PERSONS}
    assert max(scales, key=lambda p: abs(scales[p] - 1.0)) == "p08"
    assert abs(scales["p04"] - 1.0) < 0.1


def test_persons_distinct_within_activity():
    a = har_cell_pdf("p02", "standing", 300)[SENSOR_COLS].mean()
    b = har_cell_pdf("p08", "standing", 300)[SENSOR_COLS].mean()
    assert np.linalg.norm(a - b) > 0.5


def test_cell_seed_changes_sample_not_structure():
    a = har_cell_pdf("p03", "sitting", 400, seed=0)[SENSOR_COLS]
    b = har_cell_pdf("p03", "sitting", 400, seed=1)[SENSOR_COLS]
    assert not np.allclose(a.to_numpy(), b.to_numpy())
    np.testing.assert_allclose(a.mean(), b.mean(), atol=0.05)


def test_filtered_generation():
    pdf = har_pdf(n_per_cell=5, persons=["p01", "p02"], activities=["lying"])
    assert set(pdf["person"]) == {"p01", "p02"}
    assert set(pdf["activity"]) == {"lying"}


def test_activity_profiles_sane():
    assert set(ACTIVITY_PROFILE) == set(ACTIVITIES)
    assert ACTIVITY_PROFILE["running"][0] > ACTIVITY_PROFILE["walking"][0] > ACTIVITY_PROFILE["standing"][0]
