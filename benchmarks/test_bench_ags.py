"""Benchmark: AGS end-to-end on the star-dominated analog (§5.3)."""
import pytest

from repro.core import ags, buildup
from repro.graphs import generators as gen


@pytest.fixture(scope="module")
def star_tables(spark):
    g = gen.star_heavy_graph(8, 40, 80, seed=79)
    return buildup.build_tables(spark, g, 4, seed=80)


def test_bench_ags(benchmark, spark, star_tables):
    res = benchmark.pedantic(
        ags.ags,
        args=(spark, star_tables),
        kwargs={"cbar": 200, "batch_size": 1000, "max_samples": 4000, "seed": 81},
        rounds=1,
        iterations=1,
    )
    assert res.samples_used == 4000


def test_bench_naive_same_budget(benchmark, spark, star_tables):
    from repro.core import sampler

    batch = benchmark.pedantic(
        sampler.sample_graphlets,
        args=(spark, star_tables, 4000),
        kwargs={"seed": 82},
        rounds=1,
        iterations=1,
    )
    assert batch.n_samples == 4000
