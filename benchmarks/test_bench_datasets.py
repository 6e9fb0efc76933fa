"""Benchmark: Table 1 dataset-analog generation (the data substrate)."""
import pytest

from repro.graphs import datasets


@pytest.mark.parametrize("name", ["facebook", "yelp", "friendster"])
def test_bench_dataset_generation(benchmark, name):
    g = benchmark.pedantic(datasets.load, args=(name,), rounds=1, iterations=1)
    assert g.m > 300
