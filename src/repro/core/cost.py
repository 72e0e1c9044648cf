"""Cost model for pruning plans (Section VI-C).

Estimated cost of Algorithm 3 under plan ``<S, T>``:

    Σ_{s∈S} C_U(s)  +  Σ_{t∈T} C_D(t)  +  Σ_{g∉S} Pr(¬P_g)·C_U(g)

``C_U(g)`` — cost of the fact-join + aggregation computing utilities for
group ``g``; ``C_D(g)`` — cost of the join-free group-by computing gain
bounds. The paper reads both from the Postgres optimizer where a join
is far more expensive than a scan; our substrate is NumPy kernels where
the gain kernel does ~3x the per-row work of the bound kernel, so we
use ``C_U(g) = n + M(g)`` and ``C_D(g) = BOUND_COST_RATIO·n`` in the
same units.

``Pr(P_{s→t})`` — probability that source ``s`` prunes target ``t`` —
follows the paper's normal approximation: per-fact utility is a sum of
i.i.d. per-row contributions, rows are assumed uniform over dimension
values, so a group's per-fact mean scales as ``1/M(g)`` with fixed
variance ``σ²``. The paper further assumes the *bound* of a target
group follows the same distribution as a *gain*; in reality the bound
(total deviation in scope) upper-bounds the gain, so we scale the
target mean by ``bound_scale ≥ 1`` (``bound_scale = 1`` recovers the
paper's formula exactly):

    Pr(P_{s→t}) = Φ( (1/M(s) - bound_scale/M(t)) / (σ·√2) )
"""
from __future__ import annotations

import math

import numpy as np

from .facts import FactSet
from .pruning import PruningPlan

#: Per-row cost of a bound scan relative to a gain (utility) scan.
BOUND_COST_RATIO = 0.35


def _phi(x: float) -> float:
    """Standard normal CDF."""
    return 0.5 * (1.0 + math.erf(x / math.sqrt(2.0)))


def prune_probability(
    m_source: int, m_target: int, sigma: float, bound_scale: float = 1.0
) -> float:
    """``Pr(P_{s→t})`` for source/target groups with ``M(s)``/``M(t)``
    facts (Section VI-C's two-normal comparison)."""
    return _phi(
        (1.0 / m_source - bound_scale / m_target) / (sigma * math.sqrt(2.0))
    )


class CostModel:
    """Plan-cost estimator bound to one problem's fact set.

    Precomputes the pairwise prune-probability matrix and the
    specialization (dimension-subset containment) matrix so that
    :meth:`plan_cost` is a handful of vectorized operations — the plan
    optimizer evaluates hundreds of candidate plans per problem and
    must not dominate solve time.
    """

    def __init__(
        self, factset: FactSet, sigma: float = 0.5, bound_scale: float = 3.0
    ):
        self.factset = factset
        self.sigma = sigma
        self.bound_scale = bound_scale
        self.n = factset.problem.n_rows
        self.M = np.array([g.n_facts for g in factset.groups], dtype=np.float64)
        self._dimsets = [frozenset(g.dims) for g in factset.groups]
        k = len(self.M)
        # P[s, t] = Pr(P_{s→t}); log1mP for products over pairs
        inv = 1.0 / self.M
        z = (inv[:, None] - bound_scale * inv[None, :]) / (sigma * math.sqrt(2.0))
        # Φ(z) elementwise: Φ(x) = (1 + erf(x/√2)) / 2
        self.P = 0.5 * (1.0 + np.vectorize(math.erf)(z / math.sqrt(2.0)))
        with np.errstate(divide="ignore"):
            self._log1mP = np.log(np.clip(1.0 - self.P, 1e-300, 1.0))
        # contains[t, g] = dims(t) ⊆ dims(g) (t prunes g as specialization)
        self.contains = np.zeros((k, k), dtype=bool)
        for t in range(k):
            for g in range(k):
                self.contains[t, g] = self._dimsets[t] <= self._dimsets[g]
        self._cu = self.n + self.M
        self._cd = np.full(k, BOUND_COST_RATIO * self.n)

    def c_utility(self, g: int) -> float:
        """Cost of computing utility for every fact of group ``g``."""
        return float(self._cu[g])

    def c_deviation(self, g: int) -> float:
        """Cost of computing the gain bound for group ``g``."""
        return float(self._cd[g])

    def survival_probability(self, g: int, plan: PruningPlan) -> float:
        """``Pr(¬P_g)`` — group ``g`` survives all pruning attempts:
        product over sources and over targets generalizing ``g`` of the
        per-pair non-pruning probability (independence assumption)."""
        return float(self._survival(plan)[g])

    def _survival(self, plan: PruningPlan) -> np.ndarray:
        if not plan.sources or not plan.targets:
            return np.ones(len(self.M))
        S = np.fromiter(plan.sources, dtype=int)
        T = np.fromiter(plan.targets, dtype=int)
        # w[t] = Σ_{s∈S} log(1 - P[s, t])
        w = self._log1mP[S][:, T].sum(axis=0)
        log_surv = self.contains[T].T.astype(float) @ w
        return np.exp(log_surv)

    def prune_probability_any_source(self, t: int, sources: tuple[int, ...]) -> float:
        """``Pr(P_t)`` — some source prunes target ``t`` (used by the
        plan enumerator's heuristic H)."""
        if not sources:
            return 0.0
        S = np.fromiter(sources, dtype=int)
        return float(1.0 - np.exp(self._log1mP[S, t].sum()))

    def plan_cost(self, plan: PruningPlan) -> float:
        """Estimated total processing cost of one greedy iteration
        under ``plan`` (Section VI-C formula)."""
        cost = float(self._cu[list(plan.sources)].sum()) if plan.sources else 0.0
        if plan.targets:
            cost += float(self._cd[list(plan.targets)].sum())
        surv = self._survival(plan)
        mask = np.ones(len(self.M), dtype=bool)
        mask[list(plan.sources)] = False
        cost += float((surv[mask] * self._cu[mask]).sum())
        return cost
