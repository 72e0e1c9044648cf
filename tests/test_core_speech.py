"""Tests for speech templating (Section III / Table II style)."""
from repro.core.model import Fact
from repro.core.speech import render_fact, render_speech


class TestRenderFact:
    def test_first_overall(self):
        f = Fact(scope=(), value=0.06)
        assert render_fact(f, "cancellation probability", first=True) == (
            "The average cancellation probability is 0.06 overall."
        )

    def test_first_with_scope(self):
        f = Fact(scope=(("season", "Winter"),), value=15.0)
        s = render_fact(f, "delay", first=True)
        assert s == "The average delay is 15 for season Winter."

    def test_followup_elliptic_style(self):
        f = Fact(scope=(("borough", "Brooklyn"),), value=35.0)
        assert render_fact(f, "delay") == "It is 35 for borough Brooklyn."

    def test_followup_overall(self):
        f = Fact(scope=(), value=35.0)
        assert render_fact(f, "delay") == "It is 35 overall."

    def test_two_dim_scope(self):
        f = Fact(scope=(("region", "South"), ("season", "Summer")), value=20.0)
        s = render_fact(f, "delay", first=True)
        assert "region South" in s and "season Summer" in s

    def test_value_rounding(self):
        f = Fact(scope=(), value=0.123456)
        assert "0.123" in render_fact(f, "x", first=True)


class TestRenderSpeech:
    def _facts(self):
        return [
            Fact(scope=(), value=6.0),
            Fact(scope=(("month", "February"),), value=9.0),
            Fact(scope=(("region", "West"),), value=4.0),
        ]

    def test_full_speech_structure(self):
        s = render_speech(self._facts(), "cancellation", {"season": "Winter"})
        assert s.startswith("About cancellation for season Winter:")
        assert s.count(".") == 3

    def test_prefix_overall_query(self):
        s = render_speech(self._facts(), "cancellation", {})
        assert s.startswith("About cancellation overall:")

    def test_no_prefix_when_none(self):
        s = render_speech(self._facts(), "cancellation", None)
        assert s.startswith("The average cancellation")

    def test_empty_facts(self):
        s = render_speech([], "delay", {"a": "b"})
        assert "No summary available" in s

    def test_first_sentence_full_later_elliptic(self):
        s = render_speech(self._facts(), "cancellation", None)
        assert "The average" in s and "It is" in s
