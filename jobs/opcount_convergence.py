"""T-8d: exhaustive convergence-cost sweep vs operator count."""
from repro.experiments.opcount import run
from repro.experiments.report import opcount_section


def main() -> None:
    print(opcount_section(run()))


if __name__ == "__main__":
    main()
