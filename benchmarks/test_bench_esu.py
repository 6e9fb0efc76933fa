"""Benchmark: distributed exact ESU counting (the ESCAPE substitute)."""
import pytest

from repro.exactcount import esu
from repro.graphs import generators as gen


def test_bench_esu_distributed(benchmark, spark):
    g = gen.er_graph(800, 3200, seed=83)
    counts = benchmark.pedantic(
        esu.esu_counts, args=(spark, g, 4), rounds=1, iterations=1
    )
    assert sum(counts.values()) > 0


def test_bench_esu_local(benchmark):
    g = gen.er_graph(300, 1200, seed=84)
    counts = benchmark.pedantic(esu.esu_counts_local, args=(g.adj, 4), rounds=1, iterations=1)
    assert sum(counts.values()) > 0
