"""T-3: operator-level vs data-level network traffic (paper Fig. 3).

Usage: spark-submit jobs/fig3_datalevel.py   (or python jobs/fig3_datalevel.py)
"""
from repro.experiments.fig3 import run
from repro.experiments.report import fig3_section
from repro.session import get_session


def main() -> None:
    spark = get_session("fig3")
    spark.sparkContext.setLogLevel("ERROR")
    print(fig3_section(run(spark)))
    spark.stop()


if __name__ == "__main__":
    main()
