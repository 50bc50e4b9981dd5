"""Synthetic cardiovascular / mobile-price / house-price datasets
(substitutes for the Kaggle datasets [1, 2, 3] of the ExTuNe case studies).

Each generator produces a (train, test) pair split by the class the paper
splits on, planting the responsibility profile Figure 10 reports:

* **cardio** — train: no disease (normal blood pressure); test: disease
  (hypertensive).  The non-conformance signal is concentrated in
  ``ap_hi``/``ap_lo``.
* **mobile** — train: cheap phones; test: expensive.  ``ram`` is the
  dominant distinguishing attribute.
* **house** — train: price <= 100K; test: price >= 300K.  The signal is
  spread *holistically* across many attributes (area, bathrooms, year
  built, garage, basement), none dominant.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

CARDIO_COLS = [
    "age", "height", "weight", "ap_hi", "ap_lo",
    "cholesterol", "gluc", "smoke", "alco", "active",
]
MOBILE_COLS = [
    "battery_power", "ram", "px_height", "px_width",
    "int_memory", "n_cores", "clock_speed", "talk_time",
]
HOUSE_COLS = [
    "living_area", "basement_area", "n_bathrooms", "n_bedrooms",
    "year_built", "garage_cars", "lot_area", "overall_quality",
]


def _cardio(g: np.random.Generator, n: int, diseased: bool) -> pd.DataFrame:
    height = g.normal(168, 8, n)
    weight = 0.9 * (height - 100) + g.normal(0, 6, n) + (6 if diseased else 0)
    if diseased:
        ap_hi = g.normal(162, 14, n)
        ap_lo = 0.55 * ap_hi + g.normal(0, 6, n)  # ~ N(89, ..) hypertensive
    else:
        ap_hi = g.normal(120, 7, n)
        ap_lo = 0.55 * ap_hi + g.normal(0, 4, n)  # ~ N(66, ..)
    return pd.DataFrame(
        {
            "age": g.normal(52 if diseased else 48, 7, n).round(),
            "height": height.round(1),
            "weight": weight.round(1),
            "ap_hi": ap_hi.round(),
            "ap_lo": ap_lo.round(),
            "cholesterol": g.choice([1.0, 2.0, 3.0], n, p=[0.5, 0.3, 0.2] if diseased else [0.75, 0.15, 0.1]),
            "gluc": g.choice([1.0, 2.0, 3.0], n, p=[0.6, 0.25, 0.15] if diseased else [0.85, 0.1, 0.05]),
            "smoke": (g.random(n) < 0.1).astype(float),
            "alco": (g.random(n) < 0.06).astype(float),
            "active": (g.random(n) < 0.78).astype(float),
        }
    )


def cardio_pdf(n_train: int = 4000, n_test: int = 1000, seed: int = 0):
    g = np.random.default_rng(seed)
    return _cardio(g, n_train, diseased=False), _cardio(g, n_test, diseased=True)


def _mobile(g: np.random.Generator, n: int, expensive: bool) -> pd.DataFrame:
    ram = g.normal(3300 if expensive else 850, 350 if expensive else 220, n)
    return pd.DataFrame(
        {
            "battery_power": g.normal(1400 if expensive else 1150, 300, n).round(),
            "ram": np.maximum(ram, 256).round(),
            "px_height": g.normal(900 if expensive else 700, 250, n).round(),
            "px_width": g.normal(1400 if expensive else 1150, 300, n).round(),
            "int_memory": g.normal(40 if expensive else 30, 12, n).round(),
            "n_cores": g.integers(1, 9, n).astype(float),
            "clock_speed": g.uniform(0.5, 3.0, n).round(2),
            "talk_time": g.integers(2, 21, n).astype(float),
        }
    )


def mobile_pdf(n_train: int = 4000, n_test: int = 1000, seed: int = 1):
    g = np.random.default_rng(seed)
    return _mobile(g, n_train, expensive=False), _mobile(g, n_test, expensive=True)


def _house(g: np.random.Generator, n: int, expensive: bool) -> pd.DataFrame:
    """Expensive houses differ *moderately on many* attributes (holistic)."""
    shift = 1.0 if expensive else 0.0
    living = g.normal(1100 + 900 * shift, 250, n)
    return pd.DataFrame(
        {
            "living_area": living.round(),
            "basement_area": (0.55 * living + g.normal(0, 140, n) + 250 * shift).round(),
            "n_bathrooms": np.clip(g.normal(1.4 + 1.1 * shift, 0.5, n).round(), 1, 5),
            "n_bedrooms": np.clip(g.normal(2.6 + 0.9 * shift, 0.8, n).round(), 1, 6),
            "year_built": np.clip(g.normal(1955 + 40 * shift, 18, n).round(), 1900, 2020),
            "garage_cars": np.clip(g.normal(1.0 + 1.2 * shift, 0.6, n).round(), 0, 4),
            "lot_area": g.normal(8000 + 4500 * shift, 2200, n).round(),
            "overall_quality": np.clip(g.normal(5.0 + 2.5 * shift, 1.0, n).round(), 1, 10),
        }
    )


def house_pdf(n_train: int = 4000, n_test: int = 1000, seed: int = 2):
    g = np.random.default_rng(seed)
    return _house(g, n_train, expensive=False), _house(g, n_test, expensive=True)


CASE_STUDIES = {"cardio": cardio_pdf, "mobile": mobile_pdf, "house": house_pdf}
