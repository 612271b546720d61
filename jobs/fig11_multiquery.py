"""T-11: multiple queries per data source node (paper Fig. 11)."""
from repro.experiments.fig11 import run
from repro.experiments.report import fig11_section
from repro.session import get_session


def main() -> None:
    spark = get_session("fig11")
    spark.sparkContext.setLogLevel("ERROR")
    print(fig11_section(run(spark)))
    spark.stop()


if __name__ == "__main__":
    main()
