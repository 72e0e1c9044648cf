"""Tests for the run-time most-specific-subset speech lookup."""
import pandas as pd
import pytest

from repro.pipeline.config import encode_key
from repro.pipeline.lookup import SpeechIndex


def make_table():
    rows = []
    for preds, speech in [
        ({}, "overall"),
        ({"season": "Winter"}, "winter"),
        ({"airline": "AirA"}, "aira"),
        ({"airline": "AirA", "season": "Winter"}, "aira-winter"),
    ]:
        rows.append(
            {
                "query_key": encode_key(preds),
                "target": "delay",
                "speech": speech,
                "utility": 1.0,
                "normalized": 0.9,
            }
        )
    rows.append(
        {
            "query_key": "",
            "target": "cancelled",
            "speech": "cancel-overall",
            "utility": 2.0,
            "normalized": 0.8,
        }
    )
    return pd.DataFrame(rows)


@pytest.fixture()
def index():
    return SpeechIndex(make_table())


class TestExactLookup:
    def test_exact_match(self, index):
        ans = index.query("delay", {"season": "Winter"})
        assert ans.speech == "winter" and ans.exact

    def test_exact_two_predicates(self, index):
        ans = index.query("delay", {"airline": "AirA", "season": "Winter"})
        assert ans.speech == "aira-winter" and ans.exact

    def test_whole_table_query(self, index):
        ans = index.query("delay", {})
        assert ans.speech == "overall" and ans.exact


class TestFallback:
    def test_most_specific_containing_subset(self, index):
        """Query {airline: AirA, season: Summer}: no exact speech; the
        most specific stored S ⊆ Q is {airline: AirA}."""
        ans = index.query("delay", {"airline": "AirA", "season": "Summer"})
        assert ans.speech == "aira" and not ans.exact
        assert ans.matched_predicates == {"airline": "AirA"}

    def test_falls_back_to_overall(self, index):
        ans = index.query("delay", {"airline": "AirZ"})
        assert ans.speech == "overall" and not ans.exact

    def test_unseen_values_three_predicates(self, index):
        ans = index.query(
            "delay", {"airline": "AirZ", "season": "Fall", "daytime": "am"}
        )
        assert ans.speech == "overall"

    def test_prefers_larger_intersection(self, index):
        ans = index.query(
            "delay", {"airline": "AirA", "season": "Winter", "daytime": "am"}
        )
        assert ans.speech == "aira-winter"


class TestEdgeCases:
    def test_unknown_target(self, index):
        assert index.query("nope", {}) is None

    def test_per_target_separation(self, index):
        assert index.query("cancelled", {}).speech == "cancel-overall"

    def test_len_and_targets(self, index):
        assert len(index) == 5
        assert index.targets == ["cancelled", "delay"]

    def test_numeric_predicate_values_coerced(self, index):
        tbl = make_table()
        tbl.loc[len(tbl)] = {
            "query_key": encode_key({"month": "2"}),
            "target": "delay",
            "speech": "feb",
            "utility": 1.0,
            "normalized": 0.5,
        }
        idx = SpeechIndex(tbl)
        assert idx.query("delay", {"month": 2}).speech == "feb"

    def test_missing_columns_rejected(self):
        with pytest.raises(ValueError):
            SpeechIndex(pd.DataFrame({"query_key": [""]}))
