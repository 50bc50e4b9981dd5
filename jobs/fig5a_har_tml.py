"""spark-submit entrypoint for the fig5a_har_tml experiment (see repro.experiments.fig5a_har_tml)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import get_spark, emit

from repro.experiments import fig5a_har_tml


def main() -> None:
    spark = get_spark()
    emit("fig5a_har_tml", fig5a_har_tml.run(spark))


if __name__ == "__main__":
    main()
