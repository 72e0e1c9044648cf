"""Benchmark: Figure 10 — run-time cost of answering one voice query:
pre-processed index lookup (ours) vs sampling-based selection (prior
work). The lookup must be orders of magnitude faster."""
import numpy as np
import pandas as pd
import pytest

from repro import datasets as ds
from repro.baseline.sampling import sampling_summary
from repro.core.facts import enumerate_facts
from repro.core.model import Problem
from repro.pipeline.config import encode_key
from repro.pipeline.lookup import SpeechIndex

SF = 0.001  # 5,800 flight rows
TARGET = "delay_minutes"
PREDS = {"season": "Winter"}


@pytest.fixture(scope="module")
def flights_pdf():
    return ds.flights_pandas(sf=SF)


@pytest.fixture(scope="module")
def index(flights_pdf):
    # a small speeches table covering the probe query and fallbacks
    rows = [
        {"query_key": "", "target": TARGET, "speech": "overall", "utility": 1.0, "normalized": 0.5},
        {
            "query_key": encode_key(PREDS),
            "target": TARGET,
            "speech": "winter speech",
            "utility": 2.0,
            "normalized": 0.8,
        },
    ]
    return SpeechIndex(pd.DataFrame(rows))


def test_bench_fig10_lookup(benchmark, index):
    ans = benchmark(index.query, TARGET, PREDS)
    assert ans.speech == "winter speech"


def test_bench_fig10_sampling_baseline(benchmark, flights_pdf):
    sub = flights_pdf[flights_pdf["season"] == "Winter"]
    dims = [d for d in ds.FLIGHTS_SPEC.dims if d != "season"]
    problem = Problem.from_pandas(sub, dims, TARGET)
    fs = enumerate_facts(problem, 2)
    res = benchmark.pedantic(
        sampling_summary, args=(problem, fs, 3), rounds=3, iterations=1
    )
    benchmark.extra_info["normalized_utility"] = res.normalized
    assert len(res.facts) == 3
