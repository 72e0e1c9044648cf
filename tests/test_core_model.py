"""Unit tests for the problem model (Section II definitions)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import Fact, Problem


def _toy_df():
    return pd.DataFrame(
        {
            "region": ["North", "South", "East", "West"] * 2,
            "season": ["Summer"] * 4 + ["Winter"] * 4,
            "delay": [10.0, 20.0, 20.0, 10.0, 20.0, 10.0, 20.0, 10.0],
        }
    )


class TestProblemConstruction:
    def test_from_pandas_shapes(self):
        p = Problem.from_pandas(_toy_df(), ["region", "season"], "delay")
        assert p.n_rows == 8
        assert p.n_dims == 2
        assert p.dim_matrix.shape == (8, 2)

    def test_dim_labels_sorted_and_roundtrip(self):
        df = _toy_df()
        p = Problem.from_pandas(df, ["region", "season"], "delay")
        assert list(p.dim_labels[0]) == ["East", "North", "South", "West"]
        # codes decode back to the original values
        decoded = [p.dim_labels[0][c] for c in p.dim_matrix[:, 0]]
        assert decoded == list(df["region"])

    def test_default_prior_is_target_mean(self):
        p = Problem.from_pandas(_toy_df(), ["region"], "delay")
        assert p.prior == pytest.approx(_toy_df()["delay"].mean())

    def test_explicit_prior(self):
        p = Problem.from_pandas(_toy_df(), ["region"], "delay", prior=0.0)
        assert p.prior == 0.0

    def test_prior_deviation(self):
        p = Problem.from_pandas(_toy_df(), ["region"], "delay", prior=0.0)
        np.testing.assert_allclose(p.prior_deviation(), _toy_df()["delay"])

    def test_empty_relation_rejected(self):
        with pytest.raises(ValueError):
            Problem.from_pandas(_toy_df().iloc[:0], ["region"], "delay")

    def test_mismatched_shapes_rejected(self):
        with pytest.raises(ValueError):
            Problem(
                dim_names=["a"],
                dim_matrix=np.zeros((3, 1), dtype=np.int32),
                dim_labels=[np.array(["x"])],
                target=np.zeros(2),
                prior=0.0,
            )

    def test_dim_name_count_checked(self):
        with pytest.raises(ValueError):
            Problem(
                dim_names=["a", "b"],
                dim_matrix=np.zeros((3, 1), dtype=np.int32),
                dim_labels=[np.array(["x"])],
                target=np.zeros(3),
                prior=0.0,
            )

    def test_target_name_carried(self):
        p = Problem.from_pandas(_toy_df(), ["region"], "delay")
        assert p.target_name == "delay"

    def test_numeric_dimension_values_stringified(self):
        df = pd.DataFrame({"month": [1, 2, 1, 3], "y": [1.0, 2.0, 3.0, 4.0]})
        p = Problem.from_pandas(df, ["month"], "y")
        assert set(p.dim_labels[0]) == {"1", "2", "3"}


class TestFact:
    def test_scope_dict(self):
        f = Fact(scope=(("region", "North"), ("season", "Winter")), value=15.0)
        assert f.scope_dict == {"region": "North", "season": "Winter"}

    def test_str_overall(self):
        assert "overall" in str(Fact(scope=(), value=3.0))

    def test_str_with_scope(self):
        s = str(Fact(scope=(("season", "Winter"),), value=15.0))
        assert "season=Winter" in s

    def test_hashable(self):
        f1 = Fact(scope=(("a", "x"),), value=1.0)
        f2 = Fact(scope=(("a", "x"),), value=1.0)
        assert len({f1, f2}) == 1
