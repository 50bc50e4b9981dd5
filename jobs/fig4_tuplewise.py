"""spark-submit entrypoint for the fig4_tuplewise experiment (see repro.experiments.fig4_tuplewise)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig4_tuplewise


def main() -> None:
    spark = get_spark()
    emit("fig4_tuplewise", fig4_tuplewise.run(spark))


if __name__ == "__main__":
    main()
