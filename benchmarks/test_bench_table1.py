"""Benchmark: Table I dataset generation at benchmark scale (SF=0.1)."""
import pytest

from repro import datasets as ds


@pytest.mark.parametrize("name", ["acs", "primaries", "stackoverflow"])
def test_bench_dataset_generation(benchmark, name):
    df = benchmark(ds.load_pandas, name, sf=0.1)
    assert len(df) == max(8, int(ds.SPECS[name].rows_per_sf * 0.1))


def test_bench_flights_generation(benchmark):
    # flights at SF=0.02 (~116k rows) keeps the benchmark under control
    df = benchmark(ds.load_pandas, "flights", sf=0.02)
    assert len(df) == int(ds.FLIGHTS_SPEC.rows_per_sf * 0.02)
