"""Figure 3: airlines TML — average violation and regression MAE per split.

Constraints are learned on the daytime-only training split with the target
attribute (``arr_delay``) excluded, exactly as in the paper; the linear
regressor predicts ``arr_delay`` from the same features.  The Overnight split
breaks the planted Example-1 invariant, so both the violation and the MAE
must jump there, with Mixed interpolating.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.discovery import discover
from repro.core.scoring import average_violation
from repro.datasets.airlines import FEATURE_COLS, TARGET, splits_pdf
from repro.ml.linreg import fit_ols, mae

#: the paper's Figure 3 numbers, for side-by-side reporting
PAPER = {
    "train": {"violation": 0.0002, "mae": 18.95},
    "daytime": {"violation": 0.0002, "mae": 18.89},
    "overnight": {"violation": 0.2768, "mae": 80.54},
    "mixed": {"violation": 0.0887, "mae": 38.60},
}


def _to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    return spark.createDataFrame(pdf.drop(columns=["is_overnight"]))


def run(
    spark: SparkSession,
    n_train: int = 50_000,
    n_test: int = 8_000,
    seed: int = 0,
) -> pd.DataFrame:
    splits = splits_pdf(n_train=n_train, n_test=n_test, seed=seed)
    dfs = {name: _to_spark(spark, pdf) for name, pdf in splits.items()}

    train = dfs["train"]
    constraint = discover(train, cols=FEATURE_COLS)  # target excluded
    model = fit_ols(train, FEATURE_COLS, TARGET)

    rows = []
    for name in ["train", "daytime", "overnight", "mixed"]:
        rows.append(
            {
                "split": name,
                "avg_violation": average_violation(dfs[name], constraint),
                "mae": mae(dfs[name], model, TARGET),
                "paper_violation": PAPER[name]["violation"],
                "paper_mae": PAPER[name]["mae"],
            }
        )
    return pd.DataFrame(rows)
