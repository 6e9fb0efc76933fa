"""Unit tests for the graphlet codes / canonical forms (Nauty substitute)."""
import itertools
import random

import pytest

from repro.core import graphlet as gl


@pytest.mark.parametrize("k,expected", [(2, 1), (3, 2), (4, 6), (5, 21)])
def test_number_of_connected_classes(k, expected):
    """Brute-force class enumeration matches the known graphlet counts."""
    assert len(gl.all_graphlets(k)) == expected
    assert gl.NUM_GRAPHLETS[k] == expected


@pytest.mark.parametrize("k", [3, 4, 5])
def test_encode_decode_roundtrip(k, seed=7):
    rng = random.Random(seed)
    pairs = list(itertools.combinations(range(k), 2))
    for _ in range(20):
        edges = [p for p in pairs if rng.random() < 0.5]
        assert sorted(gl.decode(gl.encode(edges, k), k)) == sorted(edges)


@pytest.mark.parametrize("k", [3, 4, 5, 6])
def test_canonical_invariant_under_permutation(k):
    """Relabeling a graph never changes its canonical form."""
    rng = random.Random(k)
    pairs = list(itertools.combinations(range(k), 2))
    for _ in range(10):
        edges = [p for p in pairs if rng.random() < 0.6]
        code = gl.encode(edges, k)
        perm = list(range(k))
        rng.shuffle(perm)
        pedges = [(perm[a], perm[b]) for a, b in edges]
        assert gl.canonical(code, k) == gl.canonical(gl.encode(pedges, k), k)


@pytest.mark.parametrize("k", [3, 4, 5])
def test_canonical_is_idempotent_and_minimal(k):
    for code in gl.all_graphlets(k):
        assert gl.canonical(code, k) == code


@pytest.mark.parametrize("k", [2, 3, 4, 5, 6])
def test_named_graphlets(k):
    assert gl.n_edges(gl.clique(k)) == k * (k - 1) // 2
    assert gl.n_edges(gl.path_graphlet(k)) == k - 1
    assert gl.n_edges(gl.star_graphlet(k)) == k - 1
    if k >= 3:
        assert gl.n_edges(gl.cycle_graphlet(k)) == k
    if k >= 4:
        assert gl.path_graphlet(k) != gl.star_graphlet(k)
    assert gl.degree_sequence(gl.star_graphlet(k), k)[-1] == k - 1


@pytest.mark.parametrize("k", [3, 4, 5])
def test_connectivity(k):
    assert gl.is_connected(gl.path_graphlet(k), k)
    assert gl.is_connected(gl.clique(k), k)
    # Empty graph and a single isolated edge are disconnected for k >= 3.
    assert not gl.is_connected(0, k)
    assert not gl.is_connected(gl.encode([(0, 1)], k), k)


def test_degree_sequence_is_iso_invariant():
    k = 5
    for code in gl.all_graphlets(k):
        for perm in itertools.islice(itertools.permutations(range(k)), 10):
            pedges = [(perm[a], perm[b]) for a, b in gl.decode(code, k)]
            assert gl.degree_sequence(gl.encode(pedges, k), k) == gl.degree_sequence(code, k)


def test_distinct_classes_have_distinct_canon():
    """All 21 5-graphlets are pairwise non-isomorphic by construction."""
    k = 5
    codes = gl.all_graphlets(k)
    assert len(set(codes)) == len(codes)
    # and they split by edge count the known way: 5-node connected graphs
    # have 4..10 edges
    by_edges = {}
    for c in codes:
        by_edges.setdefault(gl.n_edges(c), []).append(c)
    assert min(by_edges) == 4 and max(by_edges) == 10
    assert len(by_edges[4]) == 3  # the three 5-node trees
