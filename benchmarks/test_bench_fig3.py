"""Benchmark: Figure 3 — per-method solver cost over a whole scenario's
query workload (local solve loop, no Spark scheduling noise).

One benchmark per method on the ACS visual-impairment case; the paper's
ordering must hold: E ≫ G-B ≳ G-P ≳ G-O in total time, with identical
greedy utilities and E at least as good.
"""
import pytest

from repro import datasets as ds
from repro.experiments import scenario_config, solve_problems_locally

SF = 0.01  # 300 rows, 71 queries — exact stays tractable
TARGET = "visual_impairment"


@pytest.fixture(scope="module")
def acs_pdf():
    return ds.acs_pandas(sf=SF)


@pytest.fixture(scope="module")
def config():
    return scenario_config("acs")


@pytest.fixture(scope="module")
def hard_problem():
    """One whole-table Stack Overflow problem (7 dims, thousands of
    facts) — the regime where exact blows up in the paper."""
    from repro.core.model import Problem

    pdf = ds.stackoverflow_pandas(sf=0.0006)
    return Problem.from_pandas(
        pdf, list(ds.STACKOVERFLOW_SPEC.dims), "competence"
    )


def test_bench_fig3_exact_vs_greedy_gap(benchmark, hard_problem):
    """E (capped at 5 s) vs the sub-10 ms greedy: the paper's orders-of-
    magnitude gap on fact-heavy scenarios."""
    from repro.core.exact import exact_summary
    from repro.core.facts import enumerate_facts
    from repro.core.greedy import greedy_summary
    import time

    fs = enumerate_facts(hard_problem, 2)
    t0 = time.perf_counter()
    g = greedy_summary(hard_problem, fs, 3)
    greedy_s = time.perf_counter() - t0
    res = benchmark.pedantic(
        exact_summary,
        args=(hard_problem, fs, 3),
        kwargs={"max_seconds": 5.0},
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["greedy_seconds"] = greedy_s
    benchmark.extra_info["n_facts"] = fs.n_facts
    benchmark.extra_info["exact_timed_out"] = res.extra["timed_out"]
    assert res.utility >= g.utility - 1e-9


@pytest.mark.parametrize("method", ["G-B", "G-P", "G-O", "E"])
def test_bench_fig3_acs_methods(benchmark, acs_pdf, config, method):
    out = benchmark.pedantic(
        solve_problems_locally,
        args=(acs_pdf, config, TARGET, method),
        kwargs={"exact_timeout": 10.0},
        rounds=2,
        iterations=1,
    )
    benchmark.extra_info["avg_normalized_utility"] = float(out["normalized"].mean())
    benchmark.extra_info["n_queries"] = len(out)
    assert (out["normalized"] <= 1.0 + 1e-9).all()
