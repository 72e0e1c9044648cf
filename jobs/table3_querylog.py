"""Table III + Fig. 9(a) — classification of 50 voice requests per
public deployment (synthetic logs calibrated to the paper's mix).

Usage: spark-submit jobs/table3_querylog.py [seed]
"""
import sys

from repro import datasets as ds
from repro.studies.querylog import (
    PAPER_TABLE3,
    Vocabulary,
    classify_log,
    classify_request,
    generate_log,
    predicate_count,
)

_VOCABS = {
    "primaries": Vocabulary(
        targets=("support",),
        dim_values={
            "candidate": ("CandidateA", "CandidateB", "CandidateC"),
            "region": ("Northeast", "South", "Midwest", "West"),
            "urbanity": ("urban", "suburban", "rural"),
        },
    ),
    "flights": Vocabulary(
        targets=("cancellation", "delay"),
        dim_values={
            "season": ("Winter", "Summer", "Spring", "Fall"),
            "airline": tuple(f"Airline{c}" for c in "ABCD"),
            "daytime": ("morning", "evening"),
        },
    ),
    "developers": Vocabulary(
        targets=("job satisfaction", "optimism", "competence"),
        dim_values={
            "dev_type": ("backend", "frontend", "mobile"),
            "education": ("bachelor", "master", "self-taught"),
            "age_group": ("under 25", "25-34"),
        },
    ),
}


def main(seed: int = 0) -> None:
    cats = ("Help", "Repeat", "S-Query", "U-Query", "Other")
    print(f"{'deployment':<12}" + "".join(f"{c:>10}" for c in cats) + "   (paper)")
    pred_hist = {0: 0, 1: 0, 2: 0}
    for dep, vocab in _VOCABS.items():
        log = generate_log(vocab, dep, n=50, seed=seed)
        counts = classify_log(log, vocab)
        paper = PAPER_TABLE3[dep]
        ours = "".join(f"{counts[c]:>10}" for c in cats)
        ref = "/".join(str(paper[c]) for c in cats)
        print(f"{dep:<12}{ours}   ({ref})")
        for q in log:
            if classify_request(q, vocab) == "S-Query":
                pred_hist[min(predicate_count(q, vocab), 2)] += 1
    print("\nFig. 9(a) — predicates per supported query (paper: 0-2, mode 1):")
    for k in sorted(pred_hist):
        print(f"  {k} predicates: {pred_hist[k]}")


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 0)
