"""Benchmark: Figure 4 — scaling of greedy pre-processing in speech
length m and in dimensions-per-fact, on the flights workload."""
import pytest

from repro import datasets as ds
from repro.core.facts import enumerate_facts
from repro.core.greedy import greedy_summary
from repro.core.model import Problem
from repro.core.planner import opt_prune

SF = 0.002  # 11,600 rows — one whole-table problem, all facts


@pytest.fixture(scope="module")
def problem():
    pdf = ds.flights_pandas(sf=SF)
    return Problem.from_pandas(pdf, list(ds.FLIGHTS_SPEC.dims), "delay_minutes")


@pytest.mark.parametrize("m", [1, 3, 5])
def test_bench_fig4_speech_length(benchmark, problem, m):
    fs = enumerate_facts(problem, max_extra_dims=2)
    res = benchmark(greedy_summary, problem, fs, m)
    benchmark.extra_info["normalized_utility"] = res.normalized
    assert len(res.facts) <= m


@pytest.mark.parametrize("fact_dims", [1, 2, 3])
def test_bench_fig4_fact_dims(benchmark, problem, fact_dims):
    fs = enumerate_facts(problem, max_extra_dims=fact_dims)
    benchmark.extra_info["n_facts"] = fs.n_facts
    res = benchmark(greedy_summary, problem, fs, 3)
    assert res.utility >= 0


@pytest.mark.parametrize("fact_dims", [1, 2, 3])
def test_bench_fig4_fact_dims_go(benchmark, problem, fact_dims):
    """Same sweep for G-O: pruning should not cost more than it saves
    at large fact counts (the paper's Fig. 4 right panel)."""
    fs = enumerate_facts(problem, max_extra_dims=fact_dims)
    plan = opt_prune(fs)
    res = benchmark(greedy_summary, problem, fs, 3, plan)
    benchmark.extra_info["n_facts"] = fs.n_facts
    assert res.utility >= 0
