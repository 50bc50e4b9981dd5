"""Tests for the logistic-regression substrate (repro.ml.classify)."""
from __future__ import annotations

import pytest

from repro.datasets.har import SEDENTARY, SENSOR_COLS, har_pdf
from repro.ml.classify import accuracy, fit_logreg


@pytest.fixture(scope="module")
def har_small(spark):
    train = har_pdf(60, persons=["p01", "p05", "p08"], activities=SEDENTARY, seed=0)
    held = har_pdf(40, persons=["p01", "p05", "p08"], activities=SEDENTARY, seed=1)
    return spark.createDataFrame(train), spark.createDataFrame(held)


def test_classifier_learns_persons(spark, har_small):
    train, held = har_small
    clf = fit_logreg(train, SENSOR_COLS, "person")
    assert accuracy(clf, held) > 0.9


def test_classifier_beats_chance_on_hard_labels(spark, har_small):
    train, held = har_small
    clf = fit_logreg(train, SENSOR_COLS, "person", max_iter=5)
    acc = accuracy(clf, held)
    assert acc > 1.0 / 3.0  # 3 classes


def test_classifier_degrades_on_mobile_data(spark, har_small):
    """The Figure 5(a) mechanism: a model trained on sedentary data loses
    accuracy on mobile-activity data."""
    train, held = har_small
    clf = fit_logreg(train, SENSOR_COLS, "person")
    mobile = spark.createDataFrame(
        har_pdf(40, persons=["p01", "p05", "p08"], activities=["running"], seed=1)
    )
    assert accuracy(clf, mobile) < accuracy(clf, held)


def test_accuracy_bounds(spark, har_small):
    train, held = har_small
    clf = fit_logreg(train, SENSOR_COLS, "person")
    a = accuracy(clf, held)
    assert 0.0 <= a <= 1.0
