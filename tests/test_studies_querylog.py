"""Tests for the synthetic deployment log and request classifier
(Table III, Figure 9a)."""
import numpy as np
import pytest

from repro.studies.querylog import (
    PAPER_TABLE3,
    Vocabulary,
    classify_log,
    classify_request,
    generate_log,
    predicate_count,
)

VOCAB = Vocabulary(
    targets=("cancellation", "delay"),
    dim_values={
        "season": ("Winter", "Summer", "Spring", "Fall"),
        "airline": ("AirlineA", "AirlineB"),
        "daytime": ("morning", "evening"),
    },
)


class TestClassifier:
    def test_help(self):
        assert classify_request("help", VOCAB) == "Help"
        assert classify_request("How does this work?", VOCAB) == "Help"

    def test_repeat(self):
        assert classify_request("repeat that", VOCAB) == "Repeat"
        assert classify_request("say that again", VOCAB) == "Repeat"

    def test_supported_query(self):
        assert classify_request("cancellations in Winter", VOCAB) == "S-Query"
        assert classify_request("what is the delay", VOCAB) == "S-Query"
        assert (
            classify_request("delay for AirlineA and morning", VOCAB) == "S-Query"
        )

    def test_unsupported_comparison(self):
        q = "make a comparison between delay for AirlineA and AirlineB"
        assert classify_request(q, VOCAB) == "U-Query"

    def test_unsupported_extremum(self):
        assert classify_request("which airline has the maximum delay", VOCAB) == "U-Query"

    def test_unsupported_unavailable_data(self):
        assert classify_request("what is the delay of flight 123", VOCAB) == "U-Query"

    def test_other(self):
        assert classify_request("play some music", VOCAB) == "Other"
        assert classify_request("thanks", VOCAB) == "Other"

    def test_case_insensitive(self):
        assert classify_request("CANCELLATION in WINTER", VOCAB) == "S-Query"


class TestPredicateCount:
    def test_zero(self):
        assert predicate_count("what is the delay", VOCAB) == 0

    def test_one(self):
        assert predicate_count("cancellations in Winter", VOCAB) == 1

    def test_two(self):
        assert predicate_count("delay for AirlineA in Winter", VOCAB) == 2

    def test_fig9a_range(self):
        """Generated S-Queries restrict between zero and two dims."""
        log = generate_log(VOCAB, "flights", n=200, seed=0)
        counts = [
            predicate_count(q, VOCAB)
            for q in log
            if classify_request(q, VOCAB) == "S-Query"
        ]
        assert counts and all(0 <= c <= 2 for c in counts)


class TestGenerator:
    @pytest.mark.parametrize("deployment", list(PAPER_TABLE3))
    def test_log_size(self, deployment):
        assert len(generate_log(VOCAB, deployment, n=50, seed=1)) == 50

    def test_deterministic(self):
        a = generate_log(VOCAB, "flights", n=50, seed=2)
        assert a == generate_log(VOCAB, "flights", n=50, seed=2)

    @pytest.mark.parametrize("deployment", list(PAPER_TABLE3))
    def test_classified_mix_tracks_paper(self, deployment):
        """End-to-end: classify a large generated log; the proportions
        must track the paper's Table III mix (within sampling noise)."""
        n = 2000
        log = generate_log(VOCAB, deployment, n=n, seed=3)
        counts = classify_log(log, VOCAB)
        paper = PAPER_TABLE3[deployment]
        for cat, c in paper.items():
            expected = n * c / 50
            # generous tolerance: classification and sampling both noisy
            assert abs(counts[cat] - expected) <= max(0.35 * n * 0.5, 0.06 * n + 60), (
                deployment,
                cat,
                counts,
            )

    def test_classify_log_total(self):
        log = generate_log(VOCAB, "primaries", n=50, seed=4)
        counts = classify_log(log, VOCAB)
        assert sum(counts.values()) == 50
