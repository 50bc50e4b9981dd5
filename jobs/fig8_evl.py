"""spark-submit entrypoint for the fig8_evl experiment (see repro.experiments.fig8_evl)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig8_evl


def main() -> None:
    spark = get_spark()
    emit("fig8_evl", fig8_evl.run(spark))


if __name__ == "__main__":
    main()
