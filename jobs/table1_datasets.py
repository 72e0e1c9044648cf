"""Table I — overview of the (synthetic) evaluation data sets.

Usage: spark-submit jobs/table1_datasets.py [sf]
"""
import sys

from repro.experiments import run_table1

PAPER = """Paper Table I:   ACS NY 2 MB / 3 dims / 6 targets;
  Stack Overflow 197 MB / 7 dims / 6 targets; Flights 565 MB / 6 dims /
  1 target (delay; cancellation also evaluated); Primaries 6 MB / 5 dims
  / 1 target."""


def main(sf: float = 0.01) -> None:
    print(PAPER)
    print(run_table1(sf=sf).to_string(index=False))


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.01)
