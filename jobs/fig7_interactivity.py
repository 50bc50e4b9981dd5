"""spark-submit entrypoint for the fig7_interactivity experiment (see repro.experiments.fig7_interactivity)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig7_interactivity


def main() -> None:
    spark = get_spark()
    emit("fig7_interactivity", fig7_interactivity.run(spark))


if __name__ == "__main__":
    main()
