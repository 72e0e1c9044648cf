"""Algorithm 3 — fact-group pruning for greedy iterations (Section VI-B).

Facts are pruned at the granularity of *fact groups* (all facts
restricting the same subset of dimension columns). A pruning plan is a
pair ``<S, T>``: utilities of all facts in the *source* groups ``S`` are
computed first; the best realized gain ``m`` then prunes each *target*
group ``t ∈ T`` whose upper gain bound (summed current deviation per
value combination, a cheap group-by without the fact join) is below
``m``. A pruned target drags down all its *specializations* — groups
restricting a strict superset of its dimension columns — because a
specialized fact's scope is contained in some target fact's scope.

Soundness: the returned argmax over computed gains equals the true
argmax over *all* facts, so greedy keeps its (1 - 1/e) guarantee.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from .facts import FactSet
from . import utility as U


@dataclass(frozen=True)
class PruningPlan:
    """Pruning strategy ``<S, T>`` over fact-group indices.

    ``sources``: groups whose fact utilities are always computed.
    ``targets``: groups to try to prune, in order. Groups in neither
    list are computed unless eliminated as a specialization of a pruned
    target.
    """

    sources: tuple[int, ...]
    targets: tuple[int, ...]


@dataclass
class PruneStats:
    rows_processed: int = 0
    facts_evaluated: int = 0
    groups_pruned: int = 0
    bounds_computed: int = 0
    extra: dict = field(default_factory=dict)


def naive_plan(factset: FactSet) -> PruningPlan:
    """The simple strategy behind algorithm G-P in the evaluation: the
    group with fewest facts (highest expected per-fact utility) is the
    single source; every other group is a pruning target, in the same
    order Algorithm 4 considers them (ascending fact count)."""
    order = sorted(
        range(len(factset.groups)),
        key=lambda g: (factset.groups[g].n_facts, factset.groups[g].dims),
    )
    return PruningPlan(sources=(order[0],), targets=tuple(order[1:]))


def pruned_gains(
    dev: np.ndarray,
    target: np.ndarray,
    factset: FactSet,
    plan: PruningPlan,
) -> tuple[np.ndarray, PruneStats]:
    """One greedy iteration's gain computation under a pruning plan
    (replaces Line 7 of Algorithm 2, per Algorithm 3). Returns a global
    gain array where facts in pruned groups are ``-inf``."""
    stats = PruneStats()
    n = dev.shape[0]
    groups = factset.groups
    dimsets = [frozenset(g.dims) for g in groups]
    gains = np.full(factset.n_facts, -np.inf, dtype=np.float64)

    def compute(g: int) -> float:
        lo, hi = int(factset.offsets[g]), int(factset.offsets[g + 1])
        gains[lo:hi] = U.group_gains(dev, target, groups[g])
        stats.rows_processed += n
        stats.facts_evaluated += groups[g].n_facts
        return float(gains[lo:hi].max())

    best_so_far = -np.inf
    for s in plan.sources:
        best_so_far = max(best_so_far, compute(s))

    alive = set(range(len(groups))) - set(plan.sources)
    for t in plan.targets:
        if t not in alive:
            continue  # already pruned as a specialization
        bound = float(U.group_deviation_bounds(dev, groups[t]).max())
        stats.rows_processed += n
        stats.bounds_computed += 1
        if best_so_far > bound:
            victims = {g for g in alive if dimsets[t] <= dimsets[g]}
            alive -= victims
            stats.groups_pruned += len(victims)

    for g in sorted(alive):
        best_so_far = max(best_so_far, compute(g))
    return gains, stats
