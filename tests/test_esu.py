"""Tests for the exact ESU counter (ESCAPE substitute)."""
import itertools

import numpy as np
import pytest

from repro.core import graphlet as gl
from repro.exactcount import esu
from repro.graphs import generators as gen


def brute_subset_counts(g: gen.Graph, k: int) -> dict[int, int]:
    """Independent oracle: test every k-subset for connectivity."""
    out: dict[int, int] = {}
    for nodes in itertools.combinations(range(g.n), k):
        code = esu.induced_code(g.adj, list(nodes))
        if gl.is_connected(code, k):
            canon = gl.canonical(code, k)
            out[canon] = out.get(canon, 0) + 1
    return out


@pytest.mark.parametrize("k", [2, 3, 4, 5])
def test_esu_on_clique(k):
    """K_n has C(n,k) induced k-subgraphs, all cliques."""
    n = 7
    g = gen.complete_graph(n)
    counts = esu.esu_counts_local(g.adj, k)
    import math

    assert counts == {gl.clique(k): math.comb(n, k)}


@pytest.mark.parametrize("k", [3, 4, 5])
def test_esu_on_path(k):
    """P_n has exactly n-k+1 induced k-subgraphs, all paths."""
    n = 12
    g = gen.path_graph(n)
    counts = esu.esu_counts_local(g.adj, k)
    assert counts == {gl.path_graphlet(k): n - k + 1}


@pytest.mark.parametrize("k", [3, 4, 5])
def test_esu_on_star(k):
    """The n-star has C(n-1, k-1) induced k-subgraphs, all stars."""
    import math

    n = 10
    g = gen.star_graph(n)
    counts = esu.esu_counts_local(g.adj, k)
    assert counts == {gl.star_graphlet(k): math.comb(n - 1, k - 1)}


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("k", [3, 4])
def test_esu_matches_subset_bruteforce(seed, k):
    g = gen.er_graph(18, 40, seed=seed)
    assert esu.esu_counts_local(g.adj, k) == brute_subset_counts(g, k)


def test_esu_triangle_count_known():
    # Cycle C_5: no triangles; five 3-paths.
    edges = np.array([(i, (i + 1) % 5) for i in range(5)])
    g = gen.Graph("c5", np.sort(edges, axis=1))
    counts = esu.esu_counts_local(g.adj, 3)
    assert counts == {gl.path_graphlet(3): 5}


@pytest.mark.parametrize("k", [3, 4])
def test_distributed_esu_matches_local(spark, k):
    g = gen.er_graph(120, 400, seed=5)
    assert esu.esu_counts(spark, g, k) == esu.esu_counts_local(g.adj, k)


def test_lollipop_induced_paths_are_rare():
    """Theorem 5's regime: the lollipop has Θ(n^k) treelet (non-induced
    path) copies but only Θ(n) induced k-path occurrences."""
    n, k = 24, 5
    g = gen.lollipop_graph(n, k)
    counts = esu.esu_counts_local(g.adj, k)
    # induced k-paths: the dangling path + clique-arc + one clique node
    cn = n - k + 2
    assert counts[gl.path_graphlet(k)] == cn - 1
    # the bulk of subgraphs are cliques from the clique part
    import math

    assert counts[gl.clique(k)] == math.comb(cn, k)
    assert counts[gl.clique(k)] > 50 * counts[gl.path_graphlet(k)]
