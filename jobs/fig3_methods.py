"""Figure 3 — pre-processing method comparison (E, G-B, G-P, G-O):
total computation time and average utility over all queries of each
scenario-target case.

Usage: spark-submit jobs/fig3_methods.py [exact_timeout_seconds]
"""
import sys

from repro.experiments import run_fig3
from repro.session import get_session


def main(exact_timeout: float = 10.0) -> None:
    spark = get_session("fig3-methods")
    df = run_fig3(spark, exact_timeout=exact_timeout)
    print(
        "Paper Fig. 3: greedy is orders of magnitude faster than exact;"
        " greedy utility >= 98% of optimal; G-O total 1456 s vs G-B"
        " 3107 s vs G-P 3088 s (2.1x from cost-based pruning)."
    )
    print(df.to_string(index=False))
    agg = df.groupby("method")[["wall_s", "solver_s"]].sum()
    print("\nTotals across cases:\n" + agg.to_string())
    spark.stop()


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 10.0)
