"""Figure 4 — scaling in speech length and dimensions per fact
(G-B vs G-P vs G-O).

Usage: spark-submit jobs/fig4_scaling.py [sf]
"""
import sys

from repro.experiments import run_fig4
from repro.session import get_session


def main(sf: float = 0.002) -> None:
    spark = get_session("fig4-scaling")
    df = run_fig4(spark, sf=sf)
    print(
        "Paper Fig. 4: graceful scaling in speech length, steep in"
        " dimensions per fact; G-O below G-P/G-B throughout."
    )
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.002)
