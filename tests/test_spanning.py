"""Tests for spanning-tree counts σ_i and profiles σ_ij."""
import pytest

from repro.core import graphlet as gl
from repro.core import spanning as sp
from repro.core import treelet as tl


@pytest.mark.parametrize("k", [3, 4, 5, 6])
def test_known_spanning_tree_counts(k):
    # Cayley: clique has k^(k-2); cycle has k; trees have exactly 1.
    assert sp.num_spanning_trees(gl.clique(k), k) == k ** (k - 2)
    assert sp.num_spanning_trees(gl.cycle_graphlet(k), k) == k
    assert sp.num_spanning_trees(gl.path_graphlet(k), k) == 1
    assert sp.num_spanning_trees(gl.star_graphlet(k), k) == 1


@pytest.mark.parametrize("k", [3, 4, 5])
def test_profile_sums_to_kirchhoff(k):
    """Enumerated σ_ij must sum to the matrix-tree σ_i for every class."""
    for code in gl.all_graphlets(k):
        assert sp.sigma_total(code, k) == sp.num_spanning_trees(code, k)


@pytest.mark.parametrize("k", [3, 4, 5])
def test_profile_shapes_are_canonical_unrooted(k):
    shapes = set(tl.unrooted_shapes(k))
    for code in gl.all_graphlets(k):
        for shape, cnt in sp.spanning_profile(code, k).items():
            assert shape in shapes
            assert cnt > 0


@pytest.mark.parametrize("k", [4, 5, 6])
def test_tree_graphlets_have_singleton_profile(k):
    """A tree graphlet's only spanning tree is itself."""
    p = sp.spanning_profile(gl.path_graphlet(k), k)
    assert p == {tl.unroot(tl.path_rooted(k)): 1}
    s = sp.spanning_profile(gl.star_graphlet(k), k)
    assert s == {tl.unroot(tl.star_rooted(k)): 1}


def test_cycle_profile_is_all_paths():
    """Every spanning tree of the k-cycle is a k-path (k of them)."""
    for k in (3, 4, 5, 6):
        p = sp.spanning_profile(gl.cycle_graphlet(k), k)
        assert p == {tl.unroot(tl.path_rooted(k)): k}


def test_clique_profile_covers_all_tree_shapes():
    """K_k contains every k-node tree shape as a spanning tree."""
    for k in (4, 5):
        p = sp.spanning_profile(gl.clique(k), k)
        assert set(p) == set(tl.unrooted_shapes(k))
        assert sum(p.values()) == k ** (k - 2)
