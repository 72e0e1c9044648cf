"""Table II — best vs worst ranked speech among 100 random speeches for
ACS visual impairment, plus the Fig. 5-style simulated worker ratings.

Usage: spark-submit jobs/table2_speeches.py [sf]
"""
import sys

from repro import datasets as ds
from repro.core.model import Problem
from repro.studies.simulate import simulate_ratings, table2_study


def main(sf: float = 0.02) -> None:
    df = ds.acs_pandas(sf=sf)
    problem = Problem.from_pandas(df, list(ds.ACS_SPEC.dims), "visual_impairment")
    bmw = table2_study(problem, n_speeches=100, m=3, seed=0)
    print("Paper Table II — worst: boroughs only; best: age groups (steep")
    print("age gradient dominates the ACS data). Ours below:\n")
    for name in ("best", "median", "worst"):
        s = bmw[name]
        print(f"[{name}] normalized utility {s.normalized:.3f}")
        print(f"  {s.text}\n")
    ratings = simulate_ratings(bmw, n_workers=50, seed=0)
    print("Fig. 5 (simulated workers): avg rating / comparison wins")
    for name, r in ratings.items():
        print(f"  {name:>6}: {r['avg_rating']:.2f} / {r['wins']}")


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.02)
