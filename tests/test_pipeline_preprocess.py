"""Integration tests for the Problem Generator and the batch
pre-processing job — the distributed heart of the reproduction."""
import json

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as sf

from repro.core.facts import enumerate_facts
from repro.core.greedy import greedy_summary
from repro.core.model import Problem
from repro.pipeline.config import Config, decode_key, encode_key
from repro.pipeline.preprocess import preprocess_all, preprocess_target, solve_query_group
from repro.pipeline.problems import count_queries, explode_queries


def toy_pdf():
    rng = np.random.default_rng(5)
    n = 60
    return pd.DataFrame(
        {
            "region": rng.choice(["North", "South", "East", "West"], n),
            "season": rng.choice(["Summer", "Winter"], n),
            "daytime": rng.choice(["am", "pm"], n),
            "delay": np.round(rng.random(n) * 60, 1),
        }
    )


CFG = Config(dims=("region", "season", "daytime"), targets=("delay",), speech_length=2)


@pytest.fixture(scope="module")
def toy_sdf(spark):
    return spark.createDataFrame(toy_pdf()).cache()


class TestProblemGenerator:
    def test_explosion_factor(self, toy_sdf):
        # subsets of <=2 of 3 dims: 1 + 3 + 3 = 7 replicas per row
        exploded = explode_queries(toy_sdf, CFG, "delay")
        assert exploded.count() == 60 * 7

    def test_empty_key_covers_all_rows(self, toy_sdf):
        exploded = explode_queries(toy_sdf, CFG, "delay")
        assert exploded.filter(sf.col("query_key") == "").count() == 60

    def test_group_sizes_match_filters(self, toy_sdf):
        exploded = explode_queries(toy_sdf, CFG, "delay")
        key = encode_key({"season": "Winter"})
        got = exploded.filter(sf.col("query_key") == key).count()
        want = toy_sdf.filter(sf.col("season") == "Winter").count()
        assert got == want

    def test_count_queries(self, toy_sdf):
        n_q = count_queries(toy_sdf, CFG)
        pdf = toy_pdf()
        expect = 1  # empty query
        from itertools import combinations

        for size in (1, 2):
            for sub in combinations(CFG.dims, size):
                expect += pdf[list(sub)].drop_duplicates().shape[0]
        assert n_q == expect

    def test_query_length_limit(self, toy_sdf):
        cfg1 = Config(dims=CFG.dims, targets=CFG.targets, max_query_len=1)
        exploded = explode_queries(toy_sdf, cfg1, "delay")
        assert exploded.count() == 60 * 4  # 1 + 3 subsets


class TestSolveQueryGroup:
    def test_matches_local_greedy(self):
        pdf = toy_pdf()
        sub = pdf[pdf["season"] == "Winter"].copy()
        sub["query_key"] = encode_key({"season": "Winter"})
        out = solve_query_group(sub, CFG, "delay", "G-B")
        assert len(out) == 1
        # reference: greedy over the same subset with season removed
        p = Problem.from_pandas(sub, ["region", "daytime"], "delay")
        ref = greedy_summary(p, enumerate_facts(p, 2), CFG.speech_length)
        assert out["utility"].iloc[0] == pytest.approx(ref.utility)

    def test_facts_exclude_query_dims(self):
        pdf = toy_pdf()
        sub = pdf[pdf["season"] == "Winter"].copy()
        sub["query_key"] = encode_key({"season": "Winter"})
        out = solve_query_group(sub, CFG, "delay", "G-B")
        facts = json.loads(out["facts_json"].iloc[0])
        for f in facts:
            assert "season" not in f["scope"]

    def test_speech_prefixed_with_subset(self):
        pdf = toy_pdf()
        sub = pdf[pdf["season"] == "Winter"].copy()
        sub["query_key"] = encode_key({"season": "Winter"})
        out = solve_query_group(sub, CFG, "delay", "G-O")
        assert out["speech"].iloc[0].startswith("About delay for season Winter:")

    def test_whole_table_query(self):
        pdf = toy_pdf().copy()
        pdf["query_key"] = ""
        out = solve_query_group(pdf, CFG, "delay", "G-B")
        assert out["n_rows"].iloc[0] == 60
        assert decode_key(out["query_key"].iloc[0]) == {}


class TestBatchJob:
    @pytest.fixture(scope="class")
    def speeches(self, spark, toy_sdf):
        return preprocess_target(spark, toy_sdf, CFG, "delay", method="G-B").cache()

    def test_one_speech_per_query(self, spark, toy_sdf, speeches):
        assert speeches.count() == count_queries(toy_sdf, CFG)

    def test_utilities_match_local_solver(self, speeches):
        """Every distributed solve must equal a local re-solve."""
        pdf = toy_pdf()
        for row in speeches.collect():
            preds = decode_key(row["query_key"])
            mask = pd.Series(True, index=pdf.index)
            for d, v in preds.items():
                mask &= pdf[d].astype(str) == v
            sub = pdf[mask]
            free = [d for d in CFG.dims if d not in preds] or [CFG.dims[0]]
            p = Problem.from_pandas(sub, free, "delay")
            ref = greedy_summary(
                p,
                enumerate_facts(p, min(2, len(free))),
                CFG.speech_length,
            )
            assert row["utility"] == pytest.approx(ref.utility), row["query_key"]

    def test_normalized_bounded(self, speeches):
        vals = [r["normalized"] for r in speeches.collect()]
        assert all(-1e-9 <= v <= 1.0 + 1e-9 for v in vals)

    def test_row_counts_sum(self, speeches):
        # across all 1-predicate queries per dim, row counts sum to n
        rows = speeches.collect()
        per_dim: dict[str, int] = {}
        for r in rows:
            preds = decode_key(r["query_key"])
            if len(preds) == 1:
                d = next(iter(preds))
                per_dim[d] = per_dim.get(d, 0) + r["n_rows"]
        assert set(per_dim.values()) == {60}

    def test_parquet_roundtrip(self, spark, toy_sdf, tmp_path_factory):
        out_dir = str(tmp_path_factory.mktemp("speeches"))
        df = preprocess_all(spark, toy_sdf, CFG, method="G-B", output_path=out_dir)
        assert df.count() == count_queries(spark.createDataFrame(toy_pdf()), CFG)
        assert set(df.select("target").distinct().toPandas()["target"]) == {"delay"}

    def test_methods_agree_on_utility(self, spark, toy_sdf):
        """G-B, G-P, G-O must produce equal-utility speeches; E at least
        as good (usually equal on this small data)."""
        utils = {}
        for method in ("G-B", "G-P", "G-O", "E"):
            df = preprocess_target(spark, toy_sdf, CFG, "delay", method=method)
            utils[method] = (
                df.select("query_key", "utility").toPandas().set_index("query_key")["utility"]
            )
        base = utils["G-B"].sort_index()
        for m in ("G-P", "G-O"):
            pd.testing.assert_series_equal(
                base, utils[m].sort_index(), check_exact=False, rtol=1e-9
            )
        assert (utils["E"].sort_index() >= base - 1e-6).all()
