"""Tests for the Section VI-C cost model and Algorithm 4 / OPTPRUNE."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.cost import CostModel, prune_probability
from repro.core.facts import enumerate_facts
from repro.core.greedy import greedy_summary
from repro.core.model import Problem
from repro.core.planner import candidate_plans, opt_prune
from repro.core.pruning import PruningPlan


def rand_problem(seed, n=60, dims=("a", "b", "c")):
    rng = np.random.default_rng(seed)
    df = pd.DataFrame(
        {
            "a": rng.choice(list("xy"), n),
            "b": rng.choice([f"v{i}" for i in range(8)], n),
            "c": rng.choice([f"w{i}" for i in range(15)], n),
        }
    )
    df["t"] = np.round(rng.random(n) * 100, 1)
    return Problem.from_pandas(df, list(dims), "t")


class TestPruneProbability:
    def test_small_source_beats_large_target(self):
        # fewer facts in source -> larger per-fact mean -> likely prune
        assert prune_probability(1, 100, sigma=0.1) > 0.99

    def test_symmetric_at_equal_sizes(self):
        assert prune_probability(10, 10, sigma=0.5) == pytest.approx(0.5)

    def test_monotone_in_target_size(self):
        ps = [prune_probability(2, mt, 0.2) for mt in (2, 5, 20, 100)]
        assert ps == sorted(ps)

    def test_sigma_flattens(self):
        sharp = prune_probability(1, 50, sigma=0.05)
        flat = prune_probability(1, 50, sigma=5.0)
        assert sharp > flat > 0.5


class TestCostModel:
    def test_no_prune_plan_cost_is_all_utilities(self):
        p = rand_problem(0)
        fs = enumerate_facts(p)
        cm = CostModel(fs)
        all_groups = tuple(range(len(fs.groups)))
        cost = cm.plan_cost(PruningPlan(sources=all_groups, targets=()))
        assert cost == pytest.approx(sum(cm.c_utility(g) for g in all_groups))

    def test_survival_probability_in_unit_interval(self):
        p = rand_problem(1)
        fs = enumerate_facts(p)
        cm = CostModel(fs)
        plan = PruningPlan(sources=(0,), targets=(1, 2))
        for g in range(len(fs.groups)):
            assert 0.0 <= cm.survival_probability(g, plan) <= 1.0

    def test_survival_lower_with_more_sources(self):
        p = rand_problem(2)
        fs = enumerate_facts(p)
        cm = CostModel(fs)
        g = len(fs.groups) - 1  # most specialized group
        p1 = cm.survival_probability(g, PruningPlan(sources=(0,), targets=(1,)))
        p2 = cm.survival_probability(
            g, PruningPlan(sources=(0, 2), targets=(1,))
        )
        assert p2 <= p1 + 1e-12

    def test_target_only_affects_specializations(self):
        p = rand_problem(3)
        fs = enumerate_facts(p)
        cm = CostModel(fs)
        # target = group {a,b}; group {c} is not a specialization
        dimsets = [set(g.dims) for g in fs.groups]
        t = dimsets.index({0, 1})
        c_only = dimsets.index({2})
        plan = PruningPlan(sources=(0,), targets=(t,))
        assert cm.survival_probability(c_only, plan) == pytest.approx(1.0)


class TestPlanner:
    def test_trivial_plan_always_candidate(self):
        p = rand_problem(4)
        fs = enumerate_facts(p)
        plans = candidate_plans(fs, CostModel(fs))
        assert any(pl.targets == () for pl in plans)

    def test_sources_are_prefixes_by_size(self):
        p = rand_problem(5)
        fs = enumerate_facts(p)
        for pl in candidate_plans(fs, CostModel(fs)):
            if not pl.targets:
                continue
            max_src = max(fs.groups[s].n_facts for s in pl.sources)
            outside = set(range(len(fs.groups))) - set(pl.sources)
            # Algorithm 4's source condition: no outside group strictly
            # smaller than an inside group
            assert all(fs.groups[g].n_facts >= max_src for g in outside) or all(
                fs.groups[g].n_facts >= min(fs.groups[s].n_facts for s in pl.sources)
                for g in outside
            )

    def test_targets_disjoint_from_sources(self):
        p = rand_problem(6)
        fs = enumerate_facts(p)
        for pl in candidate_plans(fs, CostModel(fs)):
            assert not (set(pl.sources) & set(pl.targets))

    def test_opt_prune_returns_min_cost_candidate(self):
        p = rand_problem(7)
        fs = enumerate_facts(p)
        cm = CostModel(fs, sigma=0.1)
        # planning_threshold=0 forces a full plan search even on this
        # small fixture (the default short-circuits tiny problems)
        best = opt_prune(fs, sigma=0.1, planning_threshold=0.0)
        costs = [cm.plan_cost(pl) for pl in candidate_plans(fs, cm)]
        assert cm.plan_cost(best) == pytest.approx(min(costs))

    def test_opt_prune_short_circuits_tiny_problems(self):
        p = rand_problem(8)
        fs = enumerate_facts(p)
        plan = opt_prune(fs)  # default threshold ≫ this problem's work
        assert plan.targets == ()
        assert sorted(plan.sources) == list(range(len(fs.groups)))

    @given(st.integers(0, 50))
    @settings(max_examples=15, deadline=None)
    def test_go_equals_gb_utility(self, seed):
        """G-O (cost-optimized pruning) must not change speech quality."""
        p = rand_problem(seed)
        fs = enumerate_facts(p)
        gb = greedy_summary(p, fs, 3)
        go = greedy_summary(p, fs, 3, plan=opt_prune(fs))
        assert go.utility == pytest.approx(gb.utility)

    def test_go_skips_work_on_prunable_data(self):
        """On data where one coarse dim explains the target and another
        dim has many noise values, the chosen plan should avoid
        computing utilities for every noise fact."""
        rng = np.random.default_rng(0)
        n = 500
        a = rng.choice(["lo", "hi"], n)
        df = pd.DataFrame(
            {
                "a": a,
                "b": rng.choice([f"v{i}" for i in range(80)], n),
                "c": rng.choice([f"w{i}" for i in range(60)], n),
                "t": np.where(a == "lo", 0.0, 100.0) + rng.normal(0, 1, n),
            }
        )
        p = Problem.from_pandas(df, ["a", "b", "c"], "t")
        fs = enumerate_facts(p)
        gb = greedy_summary(p, fs, 3)
        go = greedy_summary(p, fs, 3, plan=opt_prune(fs))
        assert go.utility == pytest.approx(gb.utility)
        assert go.facts_evaluated <= gb.facts_evaluated
