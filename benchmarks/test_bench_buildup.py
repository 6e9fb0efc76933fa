"""Benchmark: build-up phase — Motivo vs the CC baseline (table 2's
measurement at pytest-benchmark scale; the full grid lives in
jobs/table2_buildup_speedup.py)."""
import pytest

from repro.core import baseline, buildup
from repro.graphs import generators as gen

K = 4


@pytest.fixture(scope="module")
def bench_graph():
    return gen.ba_graph(600, 6, seed=70)


def test_bench_buildup_motivo(benchmark, spark, bench_graph):
    def build():
        t = buildup.build_tables(spark, bench_graph, K, seed=71)
        for df in t.levels.values():
            df.unpersist()
        return t

    tables = benchmark.pedantic(build, rounds=1, iterations=1)
    assert tables.stats.total_rows > 0


def test_bench_buildup_cc_baseline(benchmark, spark, bench_graph):
    def build():
        levels, colors, stats = baseline.build_tables_cc(spark, bench_graph, K, seed=71)
        for df in levels.values():
            df.unpersist()
        return stats

    stats = benchmark.pedantic(build, rounds=1, iterations=1)
    assert stats.total_rows > 0


def test_bench_buildup_motivo_flushed(benchmark, spark, bench_graph, tmp_path):
    tables = benchmark.pedantic(
        buildup.build_tables,
        args=(spark, bench_graph, K),
        kwargs={"seed": 71, "flush_dir": str(tmp_path / "tables")},
        rounds=1,
        iterations=1,
    )
    assert tables.stats.total_bytes > 0
