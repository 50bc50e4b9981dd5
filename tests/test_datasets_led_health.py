"""Tests for the LED and cardio/mobile/house generators."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datasets.health import (
    CARDIO_COLS,
    HOUSE_COLS,
    MOBILE_COLS,
    cardio_pdf,
    house_pdf,
    mobile_pdf,
)
from repro.datasets.led import (
    IRRELEVANT_COLS,
    LED_COLS,
    MALFUNCTION_PHASES,
    SEGMENTS,
    led_window_pdf,
    led_windows_pdf,
    malfunctioning_leds,
)

# ---------------------------------------------------------------------------
# LED
# ---------------------------------------------------------------------------


def test_led_deterministic():
    pd.testing.assert_frame_equal(led_window_pdf(3, n=200), led_window_pdf(3, n=200))


def test_led_schema():
    pdf = led_window_pdf(0, n=100)
    assert list(pdf.columns) == ["digit"] + LED_COLS + IRRELEVANT_COLS
    assert len(LED_COLS) == 7 and len(IRRELEVANT_COLS) == 17
    assert pdf["digit"].between(0, 9).all()
    assert pdf[LED_COLS + IRRELEVANT_COLS].isin([0.0, 1.0]).all().all()


def test_led_segments_encode_digits():
    """Clean window: each digit's segment bits match the 7-segment encoding
    up to the planted noise rate."""
    pdf = led_window_pdf(0, n=5000, noise=0.05)
    err = 0.0
    for d, grp in pdf.groupby("digit"):
        expected = np.array(SEGMENTS[d], dtype=float)
        err += np.abs(grp[LED_COLS].to_numpy() - expected).mean() * len(grp)
    assert err / len(pdf) == pytest.approx(0.05, abs=0.01)


@pytest.mark.parametrize("window,leds", [(0, ()), (4, ()), (5, (4, 5)), (12, (1, 3)), (19, (2, 7))])
def test_led_malfunction_schedule(window, leds):
    assert malfunctioning_leds(window) == leds


def test_led_malfunction_inverts_bits():
    clean = led_window_pdf(0, n=8000, noise=0.0)
    broken = led_window_pdf(5, n=8000, noise=0.0)  # phase {4,5}
    for d in range(10):
        exp = np.array(SEGMENTS[d], dtype=float)
        got = broken[broken.digit == d][LED_COLS].mean().to_numpy()
        flipped = exp.copy()
        for led in MALFUNCTION_PHASES[1]:
            flipped[led - 1] = 1 - flipped[led - 1]
        np.testing.assert_allclose(got, flipped, atol=1e-9)
    # non-malfunctioning windows equal the clean encoding
    for d in range(10):
        got = clean[clean.digit == d][LED_COLS].mean().to_numpy()
        np.testing.assert_allclose(got, SEGMENTS[d], atol=1e-9)


def test_led_windows_list():
    ws = led_windows_pdf(n_windows=4, n=50)
    assert len(ws) == 4 and all(len(w) == 50 for w in ws)


# ---------------------------------------------------------------------------
# cardio / mobile / house
# ---------------------------------------------------------------------------


@pytest.mark.parametrize("gen,cols", [(cardio_pdf, CARDIO_COLS), (mobile_pdf, MOBILE_COLS), (house_pdf, HOUSE_COLS)])
def test_case_study_schema(gen, cols):
    train, test = gen(n_train=300, n_test=100)
    assert list(train.columns) == cols
    assert list(test.columns) == cols
    assert len(train) == 300 and len(test) == 100


@pytest.mark.parametrize("gen", [cardio_pdf, mobile_pdf, house_pdf])
def test_case_study_deterministic(gen):
    a = gen(n_train=100, n_test=50)
    b = gen(n_train=100, n_test=50)
    pd.testing.assert_frame_equal(a[0], b[0])
    pd.testing.assert_frame_equal(a[1], b[1])


def test_cardio_signal_in_blood_pressure():
    train, test = cardio_pdf(n_train=3000, n_test=1000)
    # z-shift of the test set vs train, per attribute
    z = ((test.mean() - train.mean()) / train.std()).abs().sort_values(ascending=False)
    assert set(z.index[:2]) == {"ap_hi", "ap_lo"}


def test_mobile_signal_in_ram():
    train, test = mobile_pdf(n_train=3000, n_test=1000)
    z = ((test.mean() - train.mean()) / train.std()).abs()
    assert z.idxmax() == "ram"
    assert z["ram"] > 3 * z.drop("ram").max()


def test_house_signal_is_holistic():
    train, test = house_pdf(n_train=3000, n_test=1000)
    z = ((test.mean() - train.mean()) / train.std()).abs()
    # many attributes shifted, none towering over the rest
    assert (z > 1.0).sum() >= 5
    assert z.max() < 3 * np.median(z)
