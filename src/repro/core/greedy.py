"""Algorithm 2 — greedy speech construction (G-B).

Iteratively adds the fact with maximal utility gain; by monotonicity and
submodularity of utility (Theorem 1) this is (1 - 1/e)-approximate
(Theorem 3). Optional *fact pruning* (Algorithm 3) skips utility
computation for fact groups whose upper bound is dominated; the pruning
plan is supplied by the caller (naive plan → G-P, cost-optimized plan →
G-O), so this one function backs all three greedy variants in the
paper's evaluation.
"""
from __future__ import annotations

import numpy as np

from .facts import FactSet
from .model import Problem, SpeechResult
from .pruning import PruningPlan, pruned_gains
from . import utility as U


def greedy_summary(
    problem: Problem,
    factset: FactSet,
    m: int,
    plan: PruningPlan | None = None,
) -> SpeechResult:
    """Select up to ``m`` facts greedily; returns the speech plus cost
    counters. With ``plan=None`` every fact's gain is computed each
    iteration (G-B); otherwise Algorithm 3 prunes fact groups first."""
    dev = problem.prior_deviation()
    prior_total = float(dev.sum())
    chosen: list[int] = []
    rows_processed = 0
    facts_evaluated = 0
    n = problem.n_rows
    for _ in range(m):
        if plan is None:
            gains = np.empty(factset.n_facts, dtype=np.float64)
            for g, grp in enumerate(factset.groups):
                lo, hi = int(factset.offsets[g]), int(factset.offsets[g + 1])
                gains[lo:hi] = U.group_gains(dev, problem.target, grp)
                rows_processed += n
                facts_evaluated += grp.n_facts
        else:
            gains, stats = pruned_gains(dev, problem.target, factset, plan)
            rows_processed += stats.rows_processed
            facts_evaluated += stats.facts_evaluated
        best = int(np.argmax(gains))
        if gains[best] <= 0:
            break  # no fact improves the approximation further
        chosen.append(best)
        dev = U.apply_fact(dev, problem.target, factset, best)
        rows_processed += n
    util = prior_total - float(dev.sum())
    return SpeechResult(
        facts=[factset.fact(f) for f in chosen],
        utility=util,
        normalized=U.normalized(problem, util),
        rows_processed=rows_processed,
        facts_evaluated=facts_evaluated,
        extra={"fact_ids": chosen},
    )
