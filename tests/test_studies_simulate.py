"""Tests for the simulated AMT study pipelines (Figs. 5-7, Table II)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.facts import enumerate_facts
from repro.core.model import Problem
from repro.studies.simulate import (
    best_median_worst,
    conflicting_facts_study,
    rank_random_speeches,
    simulate_ratings,
    simulate_worker_estimates,
    table2_study,
)
from repro import datasets as ds


def acs_problem():
    df = ds.acs_pandas(sf=0.005)
    return Problem.from_pandas(
        df, list(ds.ACS_SPEC.dims), "visual_impairment"
    )


@pytest.fixture(scope="module")
def ranked():
    p = acs_problem()
    return rank_random_speeches(p, enumerate_facts(p), n_speeches=40, m=3, seed=0)


class TestRanking:
    def test_sorted_best_first(self, ranked):
        utils = [s.utility for s in ranked]
        assert utils == sorted(utils, reverse=True)

    def test_speech_texts_rendered(self, ranked):
        assert all(s.text for s in ranked)

    def test_three_facts_each(self, ranked):
        assert all(len(s.facts) == 3 for s in ranked)

    def test_best_median_worst_ordering(self, ranked):
        bmw = best_median_worst(ranked)
        assert bmw["best"].utility >= bmw["median"].utility >= bmw["worst"].utility

    def test_table2_study_end_to_end(self):
        out = table2_study(acs_problem(), n_speeches=30, seed=1)
        assert set(out) == {"best", "median", "worst"}
        assert "visual_impairment" in out["best"].text


class TestRatings:
    def test_fig5_shape_best_rated_highest(self, ranked):
        """Ratings must correlate with the quality model (Fig. 5)."""
        bmw = best_median_worst(ranked)
        res = simulate_ratings(bmw, n_workers=50, seed=0)
        assert res["best"]["avg_rating"] > res["worst"]["avg_rating"]
        assert res["best"]["wins"] > res["worst"]["wins"]

    def test_wins_sum_to_workers(self, ranked):
        bmw = best_median_worst(ranked)
        res = simulate_ratings(bmw, n_workers=50, seed=1)
        assert sum(v["wins"] for v in res.values()) == 50

    def test_ratings_bounded(self, ranked):
        bmw = best_median_worst(ranked)
        res = simulate_ratings(bmw, n_workers=30, seed=2)
        for v in res.values():
            assert 1.0 <= v["avg_rating"] <= 10.0


class TestWorkerEstimates:
    def test_fig6_shape_best_speech_tracks_truth(self, ranked):
        """Estimates from the best speech must deviate less from the
        truth than estimates from the worst speech (Fig. 6)."""
        p = acs_problem()
        bmw = best_median_worst(ranked)
        rng = np.random.default_rng(0)
        idx = rng.choice(p.n_rows, 15, replace=False)
        points = [
            {d: str(p.dim_labels[j][p.dim_matrix[i, j]]) for j, d in enumerate(p.dim_names)}
            for i in idx
        ]
        truths = [float(p.target[i]) for i in idx]
        err = {}
        for name in ("best", "worst"):
            est = simulate_worker_estimates(
                bmw[name].facts, points, truths, p.prior, n_workers=20, seed=3
            )
            err[name] = float(np.mean([abs(e - t) for e, t in zip(est, truths)]))
        assert err["best"] <= err["worst"] + 1e-9

    def test_estimate_count(self):
        p = acs_problem()
        est = simulate_worker_estimates([], [{}], [5.0], p.prior, n_workers=5)
        assert len(est) == 1


class TestConflictingFacts:
    def _study(self, seed=0):
        return conflicting_facts_study(
            dim_a="borough",
            values_a=("Staten Island", "Bronx"),
            facts_a=(20.0, 40.0),
            dim_b="age_group",
            values_b=("children", "elder"),
            facts_b=(5.0, 80.0),
            truths={
                ("Staten Island", "children"): 6.0,
                ("Staten Island", "elder"): 70.0,
                ("Bronx", "children"): 8.0,
                ("Bronx", "elder"): 90.0,
            },
            prior=30.0,
            n_workers=20,
            seed=seed,
        )

    def test_fig7_closest_model_wins(self):
        """The paper's key finding: the closest-relevant-value model
        predicts worker estimates best."""
        errors = self._study()
        assert errors["closest"] == min(errors.values())

    def test_all_models_reported(self):
        errors = self._study(seed=1)
        assert set(errors) == {"closest", "farthest", "mean_relevant", "mean_all"}

    def test_errors_nonnegative(self):
        assert all(v >= 0 for v in self._study(seed=2).values())
