"""Unit tests for candidate-fact enumeration (Section III fact model)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.facts import enumerate_facts
from repro.core.model import Problem


@pytest.fixture()
def grid_problem():
    # 4 regions x 2 seasons, one row per cell, delays chosen so facts differ.
    df = pd.DataFrame(
        {
            "region": ["North", "South", "East", "West"] * 2,
            "season": ["Summer"] * 4 + ["Winter"] * 4,
            "delay": [10.0, 20.0, 20.0, 10.0, 20.0, 10.0, 20.0, 10.0],
        }
    )
    return Problem.from_pandas(df, ["region", "season"], "delay", prior=0.0)


class TestEnumeration:
    def test_group_count_two_dims(self, grid_problem):
        fs = enumerate_facts(grid_problem, max_extra_dims=2)
        # {}, {region}, {season}, {region,season}
        assert [g.dims for g in fs.groups] == [(), (0,), (1,), (0, 1)]

    def test_group_count_limited_to_one_dim(self, grid_problem):
        fs = enumerate_facts(grid_problem, max_extra_dims=1)
        assert [g.dims for g in fs.groups] == [(), (0,), (1,)]

    def test_total_fact_count(self, grid_problem):
        fs = enumerate_facts(grid_problem, max_extra_dims=2)
        # 1 overall + 4 regions + 2 seasons + 8 cells
        assert fs.n_facts == 1 + 4 + 2 + 8

    def test_overall_fact_value_is_mean(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        assert fs.groups[0].fact_values[0] == pytest.approx(15.0)

    def test_single_dim_fact_values(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        season_group = fs.groups[2]
        vals = dict(
            zip(
                (grid_problem.dim_labels[1][c[0]] for c in season_group.fact_codes),
                season_group.fact_values,
            )
        )
        assert vals["Summer"] == pytest.approx(15.0)
        assert vals["Winter"] == pytest.approx(15.0)

    def test_fact_counts_sum_to_rows(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        for g in fs.groups:
            assert g.fact_counts.sum() == grid_problem.n_rows

    def test_rows_of_fact_partition(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        for g in fs.groups:
            seen = np.concatenate([g.rows_of_fact(i) for i in range(g.n_facts)])
            assert sorted(seen) == list(range(grid_problem.n_rows))

    def test_row_to_fact_consistent_with_rows_of_fact(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        g = fs.groups[3]
        for i in range(g.n_facts):
            for r in g.rows_of_fact(i):
                assert g.row_to_fact[r] == i

    def test_global_id_roundtrip(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        for fid in range(fs.n_facts):
            g, local = fs.group_of(fid)
            assert fs.offsets[g] + local == fid
            assert 0 <= local < fs.groups[g].n_facts

    def test_fact_materialization_labels(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        f = fs.fact(0)
        assert f.scope == ()
        # some two-dim fact carries both dim names
        f2 = fs.fact(fs.n_facts - 1)
        assert {d for d, _ in f2.scope} == {"region", "season"}

    def test_fact_value_matches_subset_mean(self, grid_problem):
        fs = enumerate_facts(grid_problem)
        for fid in range(fs.n_facts):
            rows = fs.fact_scope_rows(fid)
            assert fs.fact_value(fid) == pytest.approx(
                grid_problem.target[rows].mean()
            )

    def test_only_observed_combinations_enumerated(self):
        # sparse data: only 3 of 4 possible (a, b) combos appear
        df = pd.DataFrame(
            {"a": ["x", "x", "y"], "b": ["1", "2", "1"], "t": [1.0, 2.0, 3.0]}
        )
        p = Problem.from_pandas(df, ["a", "b"], "t")
        fs = enumerate_facts(p)
        pair_group = [g for g in fs.groups if g.dims == (0, 1)][0]
        assert pair_group.n_facts == 3

    def test_zero_extra_dims(self, grid_problem):
        fs = enumerate_facts(grid_problem, max_extra_dims=0)
        assert fs.n_facts == 1 and fs.groups[0].dims == ()

    def test_three_dims_group_count(self):
        rng = np.random.default_rng(0)
        df = pd.DataFrame(
            {
                "a": rng.choice(list("pq"), 30),
                "b": rng.choice(list("rs"), 30),
                "c": rng.choice(list("tu"), 30),
                "t": rng.random(30),
            }
        )
        p = Problem.from_pandas(df, ["a", "b", "c"], "t")
        fs = enumerate_facts(p, max_extra_dims=2)
        # C(3,0)+C(3,1)+C(3,2) = 1+3+3 groups
        assert len(fs.groups) == 7
