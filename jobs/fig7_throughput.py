"""T-7: query throughput vs CPU budget, six strategies (paper Fig. 7)."""
from repro.experiments.fig7 import run
from repro.experiments.report import fig7_section
from repro.session import get_session


def main() -> None:
    spark = get_session("fig7")
    spark.sparkContext.setLogLevel("ERROR")
    print(fig7_section(run(spark)))
    spark.stop()


if __name__ == "__main__":
    main()
