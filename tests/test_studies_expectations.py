"""Tests for the four Figure-7 user-expectation models."""
import pytest

from repro.core.model import Fact
from repro.studies.expectations import (
    MODELS,
    predict_closest,
    predict_farthest,
    predict_mean_all,
    predict_mean_relevant,
    relevant_values,
)

F_WINTER = Fact(scope=(("season", "Winter"),), value=15.0)
F_SUMMER = Fact(scope=(("season", "Summer"),), value=5.0)
F_NORTH = Fact(scope=(("region", "North"),), value=12.0)
FACTS = [F_WINTER, F_SUMMER, F_NORTH]
POINT = {"season": "Winter", "region": "North"}  # relevant: 15, 12


class TestRelevance:
    def test_relevant_values(self):
        assert relevant_values(FACTS, POINT) == [15.0, 12.0]

    def test_no_relevant(self):
        assert relevant_values(FACTS, {"season": "Fall", "region": "East"}) == []

    def test_partial_point_not_in_scope(self):
        # a point missing the restricted dim is not covered
        assert relevant_values([F_NORTH], {"season": "Winter"}) == []


class TestModels:
    def test_closest(self):
        # truth 14 -> among {15, 12, prior 0}: 15
        assert predict_closest(FACTS, POINT, truth=14.0, prior=0.0) == 15.0

    def test_closest_can_pick_prior(self):
        assert predict_closest(FACTS, POINT, truth=1.0, prior=0.0) == 0.0

    def test_farthest(self):
        assert predict_farthest(FACTS, POINT, truth=14.0, prior=0.0) == 0.0

    def test_mean_relevant(self):
        assert predict_mean_relevant(FACTS, POINT, 14.0, 0.0) == pytest.approx(13.5)

    def test_mean_relevant_falls_back_to_prior(self):
        assert predict_mean_relevant(FACTS, {"season": "Fall"}, 1.0, 7.0) == 7.0

    def test_mean_all_ignores_relevance(self):
        assert predict_mean_all(FACTS, POINT, 14.0, 0.0) == pytest.approx(
            (15.0 + 5.0 + 12.0) / 3
        )

    def test_registry(self):
        assert set(MODELS) == {"closest", "farthest", "mean_relevant", "mean_all"}

    def test_closest_dominates_farthest_error(self):
        truth = 14.0
        c = abs(predict_closest(FACTS, POINT, truth, 0.0) - truth)
        f = abs(predict_farthest(FACTS, POINT, truth, 0.0) - truth)
        assert c <= f
