"""spark-submit entrypoint for the fig5b_gradual_drift experiment (see repro.experiments.fig5b_gradual_drift)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig5b_gradual_drift


def main() -> None:
    spark = get_spark()
    emit("fig5b_gradual_drift", fig5b_gradual_drift.run(spark))


if __name__ == "__main__":
    main()
