"""Figure 5(a): HAR TML — accuracy drop vs violation as mobile data mixes in.

Train: sedentary activities (lying/standing/sitting) for all 15 persons;
classifier predicts the person from the 36 sensor attributes; constraints are
learned on the same training features (disjunctive over person and activity).
Test sets mix held-out sedentary data with mobile (walking/running) data at
increasing fractions; the paper reports a 0.99 Pearson correlation between
average violation and mean accuracy drop.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.discovery import discover
from repro.core.scoring import average_violation
from repro.datasets.har import MOBILE, SEDENTARY, SENSOR_COLS, har_pdf
from repro.ml.classify import accuracy, fit_logreg

PAPER_PCC = 0.99


def run(
    spark: SparkSession,
    n_per_cell: int = 300,
    fractions: tuple[float, ...] = (0.0, 0.125, 0.25, 0.375, 0.5, 0.625, 0.75, 0.875, 1.0),
    seed: int = 0,
) -> pd.DataFrame:
    train_pdf = har_pdf(n_per_cell, activities=SEDENTARY, seed=seed)
    held_sed = har_pdf(n_per_cell, activities=SEDENTARY, seed=seed + 1)
    mobile = har_pdf(n_per_cell, activities=MOBILE, seed=seed + 1)

    train = spark.createDataFrame(train_pdf)
    constraint = discover(train, cols=SENSOR_COLS)
    clf = fit_logreg(train, SENSOR_COLS, "person")

    base_acc = accuracy(clf, spark.createDataFrame(held_sed))

    rows = []
    g = np.random.default_rng(seed + 7)
    n_test = min(len(held_sed), len(mobile))
    for f in fractions:
        n_mob = int(round(f * n_test))
        mix = pd.concat(
            [
                held_sed.sample(n=n_test - n_mob, random_state=int(g.integers(1 << 31))),
                mobile.sample(n=n_mob, random_state=int(g.integers(1 << 31))),
            ],
            ignore_index=True,
        )
        mix_df = spark.createDataFrame(mix)
        rows.append(
            {
                "mobile_fraction": f,
                "avg_violation": average_violation(mix_df, constraint),
                "accuracy": accuracy(clf, mix_df),
            }
        )
    out = pd.DataFrame(rows)
    out["accuracy_drop"] = base_acc - out["accuracy"]
    pcc = float(np.corrcoef(out["avg_violation"], out["accuracy_drop"])[0, 1])
    out["pcc_violation_accdrop"] = pcc
    out["paper_pcc"] = PAPER_PCC
    return out
