"""spark-submit entrypoint for the fig6_interperson experiment (see repro.experiments.fig6_interperson)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig6_interperson


def main() -> None:
    spark = get_spark()
    emit("fig6_interperson", fig6_interperson.run(spark))


if __name__ == "__main__":
    main()
