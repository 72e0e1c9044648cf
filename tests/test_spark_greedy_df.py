"""The DataFrame-level Algorithm 2 must reproduce the NumPy greedy's
speech utility exactly — same model, two execution substrates."""
import numpy as np
import pandas as pd
import pytest

from repro.core.facts import enumerate_facts
from repro.core.greedy import greedy_summary
from repro.core.model import Problem
from repro.spark_ops.greedy_df import greedy_summary_df


def toy_pdf():
    return pd.DataFrame(
        {
            "region": ["North", "South", "East", "West"] * 2,
            "season": ["Summer"] * 4 + ["Winter"] * 4,
            "delay": [10.0, 20.0, 20.0, 10.0, 20.0, 10.0, 20.0, 10.0],
        }
    )


class TestGreedyDF:
    def test_matches_kernel_on_grid(self, spark):
        pdf = toy_pdf()
        sdf = spark.createDataFrame(pdf)
        res_df = greedy_summary_df(spark, sdf, ["region", "season"], "delay", m=2, prior=0.0)
        p = Problem.from_pandas(pdf, ["region", "season"], "delay", prior=0.0)
        res_np = greedy_summary(p, enumerate_facts(p), 2)
        assert res_df.utility == pytest.approx(res_np.utility)
        assert res_df.prior_error == pytest.approx(120.0)

    def test_matches_kernel_on_random(self, spark):
        rng = np.random.default_rng(3)
        pdf = pd.DataFrame(
            {
                "a": rng.choice(list("xyz"), 50),
                "b": rng.choice(list("uv"), 50),
                "t": np.round(rng.random(50) * 100, 1),
            }
        )
        sdf = spark.createDataFrame(pdf)
        res_df = greedy_summary_df(spark, sdf, ["a", "b"], "t", m=3)
        p = Problem.from_pandas(pdf, ["a", "b"], "t")
        res_np = greedy_summary(p, enumerate_facts(p), 3)
        assert res_df.utility == pytest.approx(res_np.utility, rel=1e-9)

    def test_default_prior_is_mean(self, spark):
        pdf = toy_pdf()
        sdf = spark.createDataFrame(pdf)
        res = greedy_summary_df(spark, sdf, ["region", "season"], "delay", m=1)
        # prior = mean(15): prior error = 8 * 5 = 40
        assert res.prior_error == pytest.approx(40.0)

    def test_selected_fact_scopes_are_dicts(self, spark):
        sdf = spark.createDataFrame(toy_pdf())
        res = greedy_summary_df(spark, sdf, ["region", "season"], "delay", m=2, prior=0.0)
        assert len(res.facts) >= 1
        first = res.facts[0]
        assert set(first) == {"scope", "value"}
        assert isinstance(first["scope"], dict)

    def test_normalized_in_unit_interval(self, spark):
        sdf = spark.createDataFrame(toy_pdf())
        res = greedy_summary_df(spark, sdf, ["region", "season"], "delay", m=3, prior=0.0)
        assert 0.0 <= res.normalized <= 1.0 + 1e-12
