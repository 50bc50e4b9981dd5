"""spark-submit entrypoint for the fig10_explain experiment (see repro.experiments.fig10_explain)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig10_explain


def main() -> None:
    spark = get_spark()
    emit("fig10_explain", fig10_explain.run(spark))


if __name__ == "__main__":
    main()
