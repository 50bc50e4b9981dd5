"""spark-submit entrypoint for the fig3_airlines experiment (see repro.experiments.fig3_airlines)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig3_airlines


def main() -> None:
    spark = get_spark()
    emit("fig3_airlines", fig3_airlines.run(spark))


if __name__ == "__main__":
    main()
