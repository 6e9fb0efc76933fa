"""Unit tests for the succinct rooted-treelet encoding (paper §3.1)."""
import itertools

import pytest

from repro.core import treelet as tl

#: OEIS A000081 — rooted trees on n nodes.
ROOTED_COUNTS = {1: 1, 2: 1, 3: 2, 4: 4, 5: 9, 6: 20, 7: 48, 8: 115}
#: OEIS A000055 — unrooted (free) trees on n nodes.
UNROOTED_COUNTS = {1: 1, 2: 1, 3: 1, 4: 2, 5: 3, 6: 6, 7: 11, 8: 23}

MAXK = 8
SHAPES = tl.rooted_shapes(MAXK)
ALL = [t for h in range(1, MAXK + 1) for t in SHAPES[h]]


@pytest.mark.parametrize("h", range(1, MAXK + 1))
def test_rooted_shape_counts(h):
    """Enumeration produces exactly the A000081 number of rooted shapes."""
    assert len(SHAPES[h]) == ROOTED_COUNTS[h]
    assert len(set(SHAPES[h])) == len(SHAPES[h])


@pytest.mark.parametrize("h", range(1, MAXK + 1))
def test_unrooted_shape_counts(h):
    """Quotienting by re-rooting yields the A000055 free-tree counts."""
    assert len(set(tl.unroot(t) for t in SHAPES[h])) == UNROOTED_COUNTS[h]


@pytest.mark.parametrize("h", range(1, MAXK + 1))
def test_size_is_popcount_plus_one(h):
    for t in SHAPES[h]:
        assert tl.size(t) == h
        assert tl.nbits(t) == 2 * (h - 1)


@pytest.mark.parametrize("t", [t for t in ALL if t != tl.SINGLETON])
def test_merge_decomp_roundtrip(t):
    """decomp is the exact inverse of merge for every canonical shape."""
    tp, ts = tl.decomp(t)
    assert tl.merge(tp, ts) == t
    assert tl.size(tp) + tl.size(ts) == tl.size(t)


@pytest.mark.parametrize("t", ALL)
def test_parse_encode_roundtrip(t):
    """parse → encode_rooted at the root reproduces the encoding."""
    assert tl.encode_rooted(tl.parse(t), 0) == t


@pytest.mark.parametrize("t", [t for t in ALL if t != tl.SINGLETON])
def test_children_sorted_ascending(t):
    """Canonical encodings list root children in ascending subtree order."""
    ch = tl.children(t)
    assert ch == sorted(ch)
    assert sum(tl.size(c) for c in ch) + 1 == tl.size(t)


@pytest.mark.parametrize("t", [t for t in ALL if t != tl.SINGLETON])
def test_beta_counts_first_child_multiplicity(t):
    """β_T equals the number of root-child subtrees equal to the first."""
    ch = tl.children(t)
    assert tl.beta(t) == sum(1 for c in ch if c == ch[0])
    assert 1 <= tl.beta(t) <= len(ch)


def test_beta_star_and_path():
    # Star rooted at center: all k-1 children are leaves -> beta = k-1.
    for h in range(2, 8):
        assert tl.beta(tl.star_rooted(h)) == h - 1
        assert tl.beta(tl.path_rooted(h)) == 1


def test_path_and_star_shapes():
    for h in range(1, 8):
        assert tl.size(tl.path_rooted(h)) == h
        assert tl.size(tl.star_rooted(h)) == h
    # On <=3 nodes path and star coincide; they differ from 4 on.
    assert tl.path_rooted(3) != tl.star_rooted(3)  # rooted: differ already
    assert tl.unroot(tl.path_rooted(3)) == tl.unroot(tl.star_rooted(3))
    for h in range(4, 8):
        assert tl.unroot(tl.path_rooted(h)) != tl.unroot(tl.star_rooted(h))


@pytest.mark.parametrize("h", range(2, MAXK + 1))
def test_unroot_invariant_under_rerooting(h):
    """unroot() gives the same id no matter which node we root at."""
    for t in SHAPES[h][:6]:
        adj = tl.parse(t)
        ids = {tl.unroot(tl.encode_rooted(adj, r)) for r in range(len(adj))}
        assert len(ids) == 1


def test_merge_table_covers_every_shape_once():
    """One merge-table row per non-singleton shape (unique decomposition)."""
    for k in (4, 5, 6):
        rows = tl.merge_table(k)
        merged = [r[4] for r in rows]
        assert len(merged) == len(set(merged))
        expected = {t for h in range(2, k + 1) for t in tl.rooted_shapes(k)[h]}
        assert set(merged) == expected
        for size_l, size_r, tl_, tr_, tm_, b in rows:
            assert tl.size(tl_) == size_l and tl.size(tr_) == size_r
            assert tl.merge(tl_, tr_) == tm_ and tl.beta(tm_) == b


def test_encoding_fits_machine_word():
    """All encodings on <= 16 nodes fit the paper's 30-bit budget."""
    for t in ALL:
        assert 0 <= t < (1 << tl.WIDTH)


def test_invalid_merges_rejected():
    # Merging a big first child under a root whose current first child is
    # smaller must be rejected (would break canonical child order).
    p3, leaf = tl.path_rooted(3), tl.SINGLETON
    small_first = tl.merge(tl.merge(leaf, leaf), leaf)  # root with leaf child
    big = tl.path_rooted(3)
    if big > tl.children(small_first)[0]:
        assert not tl.is_valid_merge(small_first, big)
    assert tl.is_valid_merge(leaf, p3)  # singleton accepts anything


def test_decomp_singleton_raises():
    with pytest.raises(ValueError):
        tl.decomp(tl.SINGLETON)


def test_total_order_is_strict_on_shapes():
    """Distinct shapes have distinct integers: encoding is injective."""
    assert len(set(ALL)) == len(ALL)


def test_unrooted_map_consistency():
    for k in (3, 4, 5, 6):
        m = tl.unrooted_map(k)
        assert set(m) == set(tl.rooted_shapes(k)[k])
        assert set(m.values()) == set(tl.unrooted_shapes(k))
        # every unrooted shape is itself a valid rooted encoding of size k
        for u in tl.unrooted_shapes(k):
            assert tl.size(u) == k


def test_brute_force_all_labeled_trees_map_to_enumerated_shapes():
    """Every labeled tree on <= 6 nodes canonicalizes into the enumerated
    shape set (Prüfer-free brute force over spanning trees of K_n)."""
    for n in range(2, 7):
        seen = set()
        nodes = range(n)
        for edges in itertools.combinations(itertools.combinations(nodes, 2), n - 1):
            # union-find acyclicity/spanning check
            parent = list(nodes)

            def find(x):
                while parent[x] != x:
                    parent[x] = parent[parent[x]]
                    x = parent[x]
                return x

            ok = True
            for a, b in edges:
                ra, rb = find(a), find(b)
                if ra == rb:
                    ok = False
                    break
                parent[ra] = rb
            if not ok:
                continue
            adj = [[] for _ in nodes]
            for a, b in edges:
                adj[a].append(b)
                adj[b].append(a)
            seen.add(min(tl.encode_rooted(adj, r) for r in nodes))
        assert seen == set(tl.unroot(t) for t in SHAPES[n])
