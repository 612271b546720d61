"""T-10: multi-source scaling over a shared SP link (paper Fig. 10)."""
from repro.experiments.fig10 import run
from repro.experiments.report import fig10_section
from repro.session import get_session


def main() -> None:
    spark = get_session("fig10")
    spark.sparkContext.setLogLevel("ERROR")
    print(fig10_section(run(spark)))
    spark.stop()


if __name__ == "__main__":
    main()
