"""Tests for the synthetic EVL benchmark (repro.datasets.evl)."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.datasets.evl import (
    EVL_DATASETS,
    EVL_SPECS,
    evl_window_pdf,
    evl_windows_pdf,
    ground_truth_drift,
)


def test_sixteen_datasets():
    assert len(EVL_DATASETS) == 16
    for expected in ["1CDT", "2CHT", "4CR", "4CRE-V2", "5CVT", "1CSurr",
                     "4CE1CF", "UG-2C-2D", "MG-2C-2D", "FG-2C-2D",
                     "UG-2C-3D", "UG-2C-5D", "GEARS-2C-2D"]:
        assert expected in EVL_DATASETS


@pytest.mark.parametrize("name", EVL_DATASETS)
def test_window_schema(name):
    pdf = evl_window_pdf(name, 0.0, n_per_class=50, seed=0)
    dim = EVL_SPECS[name]["dim"]
    assert list(pdf.columns) == ["label"] + [f"d{i}" for i in range(dim)]
    counts = pdf["label"].value_counts()
    assert len(counts) == len(EVL_SPECS[name]["classes"])
    assert (counts == 50).all()


@pytest.mark.parametrize("name", EVL_DATASETS)
def test_window_deterministic(name):
    pd.testing.assert_frame_equal(
        evl_window_pdf(name, 0.5, 40, seed=1), evl_window_pdf(name, 0.5, 40, seed=1)
    )


@pytest.mark.parametrize("name", EVL_DATASETS)
def test_ground_truth_curve(name):
    gt = ground_truth_drift(name, n_windows=20)
    assert len(gt) == 20
    assert gt[0] == 0.0
    assert gt.max() == pytest.approx(1.0)
    assert (gt >= 0).all() and (gt <= 1).all()


def test_4cr_returns_to_origin():
    """Figure 9: 4CR's rotation peaks mid-timeline and returns to start."""
    gt = ground_truth_drift("4CR", n_windows=21)
    assert gt[10] == pytest.approx(1.0)
    assert gt[-1] == pytest.approx(0.0, abs=1e-9)


def test_class_centers_move_as_specified():
    pdf0 = evl_window_pdf("1CDT", 0.0, 2000, seed=2)
    pdf1 = evl_window_pdf("1CDT", 1.0, 2000, seed=3)
    # fixed class stays put
    c0_0 = pdf0[pdf0.label == "c0"][["d0", "d1"]].mean().to_numpy()
    c0_1 = pdf1[pdf1.label == "c0"][["d0", "d1"]].mean().to_numpy()
    np.testing.assert_allclose(c0_0, c0_1, atol=0.1)
    # drifting class moved from (4,4) towards (-2,1)
    c1_0 = pdf0[pdf0.label == "c1"][["d0", "d1"]].mean().to_numpy()
    c1_1 = pdf1[pdf1.label == "c1"][["d0", "d1"]].mean().to_numpy()
    np.testing.assert_allclose(c1_0, [4, 4], atol=0.1)
    np.testing.assert_allclose(c1_1, [-2, 1], atol=0.1)


@pytest.mark.parametrize("name", ["4CR", "4CRE-V2", "FG-2C-2D"])
def test_rotation_symmetric_reference_is_isotropic(name):
    """The datasets PCA-SPLL fails on: the reference window's global
    covariance is near-isotropic, so its lowest-variance PC already explains
    ~half the variance (>= the 25% retention threshold)."""
    pdf = evl_window_pdf(name, 0.0, 3000, seed=4)
    cov = np.cov(pdf[["d0", "d1"]].to_numpy().T)
    eigs = np.sort(np.linalg.eigvalsh(cov))
    assert eigs[0] / eigs.sum() > 0.25


@pytest.mark.parametrize("name", ["1CDT", "2CDT", "UG-2C-2D"])
def test_translation_reference_is_anisotropic(name):
    """Translation datasets have a low-variance direction PCA-SPLL retains."""
    pdf = evl_window_pdf(name, 0.0, 3000, seed=5)
    cov = np.cov(pdf[["d0", "d1"]].to_numpy().T)
    eigs = np.sort(np.linalg.eigvalsh(cov))
    assert eigs[0] / eigs.sum() < 0.25


def test_windows_list():
    ws = evl_windows_pdf("2CDT", n_windows=5, n_per_class=30)
    assert len(ws) == 5
    assert all(len(w) == 60 for w in ws)


def test_fg_global_distribution_static():
    """FG-2C-2D swaps class positions: t=0 and t=1 unions match in mean/cov."""
    a = evl_window_pdf("FG-2C-2D", 0.0, 4000, seed=6)[["d0", "d1"]]
    b = evl_window_pdf("FG-2C-2D", 1.0, 4000, seed=7)[["d0", "d1"]]
    np.testing.assert_allclose(a.mean(), b.mean(), atol=0.1)
    np.testing.assert_allclose(np.cov(a.T), np.cov(b.T), atol=0.2)
    # ...but the ground-truth (local, per-class) drift is maximal at t=1
    gt = ground_truth_drift("FG-2C-2D", n_windows=2)
    assert gt[-1] == 1.0
