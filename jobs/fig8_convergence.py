"""T-8: convergence epochs after resource changes (paper Fig. 8).

Pure control-plane experiment (simulated epoch executor); no Spark
session needed.
"""
from repro.experiments.fig8 import run
from repro.experiments.report import fig8_section


def main() -> None:
    print(fig8_section(run()))


if __name__ == "__main__":
    main()
