"""Figure 10 — run-time latency and processing time: pre-processed
lookup (ours) vs the sampling baseline, plus per-query pre-processing
overhead.

Usage: spark-submit jobs/fig10_runtime.py
"""
from repro.experiments import run_fig10
from repro.session import get_session


def main() -> None:
    spark = get_session("fig10-runtime")
    df = run_fig10(spark)
    print(
        "Paper Fig. 10: lookup latency ~0 vs baseline latency of"
        " seconds; 25 min pre-processing amortized over 28,720 queries"
        " (~52 ms per query)."
    )
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
