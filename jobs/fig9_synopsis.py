"""T-9: WSP sampling accuracy/bandwidth vs Jarvis (paper Fig. 9)."""
from repro.experiments.fig9 import run
from repro.experiments.report import fig9_section
from repro.session import get_session


def main() -> None:
    spark = get_session("fig9")
    spark.sparkContext.setLogLevel("ERROR")
    print(fig9_section(run(spark)))
    spark.stop()


if __name__ == "__main__":
    main()
