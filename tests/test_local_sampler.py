"""Tests for the CC-style per-sample sampler and neighbor buffering (§3.2)."""
import numpy as np
import pytest

from repro.core import buildup, estimators as est, local_sampler as ls
from repro.exactcount import esu
from repro.graphs import generators as gen


@pytest.fixture(scope="module")
def hub_tables(spark):
    # one hub of degree ~200 over a sparse background: the BerkStan regime
    g = gen.hub_graph(400, 900, 1, 200, seed=30)
    return buildup.build_tables(spark, g, 4, seed=31)


@pytest.fixture(scope="module")
def er_tables_local(spark):
    g = gen.er_graph(60, 180, seed=32)
    return buildup.build_tables(spark, g, 4, seed=33)


def test_local_sampler_produces_valid_colorful_treelets(er_tables_local):
    s = ls.LocalSampler(er_tables_local, seed=1)
    k = er_tables_local.k
    for _ in range(100):
        t0, nodes = s.sample_one()
        assert len(nodes) == k and len(set(nodes)) == k
        assert len({int(er_tables_local.colors[v]) for v in nodes}) == k


def test_local_estimates_match_exact(er_tables_local):
    s = ls.LocalSampler(er_tables_local, seed=2)
    hits = s.sample_graphlets(4000)
    estimates = est.naive_estimates(hits, 4000, er_tables_local)
    exact = esu.esu_counts_local(er_tables_local.graph.adj, er_tables_local.k)
    tot = sum(exact.values())
    for code, truth in exact.items():
        if truth / tot < 0.05:
            continue
        assert abs(est.err_h(estimates.get(code, 0.0), truth)) < 0.5


def test_local_matches_distributed_distribution(spark, er_tables_local):
    """The driver-side and Spark samplers draw from the same urn: their
    per-class hit frequencies agree within sampling noise."""
    from repro.core import sampler as dsampler

    n = 4000
    local_hits = ls.LocalSampler(er_tables_local, seed=3).sample_graphlets(n)
    dist_hits = dsampler.sample_graphlets(spark, er_tables_local, n, seed=4).hits
    keys = set(local_hits) | set(dist_hits)
    for code in keys:
        fl = local_hits.get(code, 0) / n
        fd = dist_hits.get(code, 0) / n
        if max(fl, fd) > 0.02:
            assert abs(fl - fd) < 0.3 * max(fl, fd) + 0.01


def test_buffering_preserves_distribution(hub_tables):
    n = 3000
    plain = ls.LocalSampler(hub_tables, seed=5).sample_graphlets(n)
    buffered = ls.LocalSampler(hub_tables, seed=5, buffer_threshold=100).sample_graphlets(n)
    keys = set(plain) | set(buffered)
    for code in keys:
        fp = plain.get(code, 0) / n
        fb = buffered.get(code, 0) / n
        if max(fp, fb) > 0.02:
            assert abs(fp - fb) < 0.3 * max(fp, fb) + 0.01


def test_buffering_reduces_hub_sweeps(hub_tables):
    """§3.2: buffering cuts neighbor sweeps dramatically on hub graphs."""
    n = 1500
    plain = ls.LocalSampler(hub_tables, seed=6)
    plain.sample_graphlets(n)
    buffered = ls.LocalSampler(hub_tables, seed=6, buffer_threshold=100)
    buffered.sample_graphlets(n)
    assert buffered.stats.buffer_hits > 0
    assert buffered.stats.swept_neighbors < 0.7 * plain.stats.swept_neighbors


def test_cc_mode_same_distribution_more_work(er_tables_local):
    n = 2000
    fast = ls.LocalSampler(er_tables_local, seed=7)
    cc = ls.LocalSampler(er_tables_local, seed=7, cc_mode=True, use_alias=False)
    hf, hc = fast.sample_graphlets(n), cc.sample_graphlets(n)
    for code in set(hf) | set(hc):
        a, b = hf.get(code, 0) / n, hc.get(code, 0) / n
        if max(a, b) > 0.02:
            assert abs(a - b) < 0.3 * max(a, b) + 0.01


def test_root_draw_without_alias_matches_with_alias(er_tables_local):
    n = 20_000
    with_alias = ls.LocalSampler(er_tables_local, seed=8, use_alias=True)
    without = ls.LocalSampler(er_tables_local, seed=8, use_alias=False)
    ra = [with_alias._draw_root() for _ in range(n)]
    rb = [without._draw_root() for _ in range(n)]
    fa = {}
    fb = {}
    for r in ra:
        fa[r] = fa.get(r, 0) + 1
    for r in rb:
        fb[r] = fb.get(r, 0) + 1
    common = [r for r in fa if fa[r] > n * 0.01]
    for r in common:
        assert abs(fa[r] - fb.get(r, 0)) < 0.25 * fa[r] + 20
