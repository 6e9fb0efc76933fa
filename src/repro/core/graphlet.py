"""Graphlet substrate: packed adjacency codes and canonical forms.

Motivo (§3.3) packs each k-graphlet's adjacency matrix into a 128-bit
integer — the strict upper triangle reshaped to a ``k(k-1)/2``-bit
vector — and canonicalizes it with the Nauty library. This module is
our from-scratch substitute: the same packing (a Python int; 120 bits
suffice for k <= 16) and an exhaustive-permutation canonical form with
memoization. For the k <= 6 used in this reproduction that is at most
720 relabelings per *distinct* observed code, and the cache keeps it off
the sampling hot path, so behaviourally it plays Nauty's role exactly:
a unique representative per isomorphism class.
"""
from __future__ import annotations

import itertools
from functools import lru_cache

#: Known numbers of distinct connected k-node graphs (graphlet classes),
#: used by AGS's covering threshold; OEIS A001349.
NUM_GRAPHLETS = {1: 1, 2: 1, 3: 2, 4: 6, 5: 21, 6: 112, 7: 853, 8: 11117, 9: 261080}


@lru_cache(maxsize=None)
def pair_index(k: int) -> dict[tuple[int, int], int]:
    """Bijection from vertex pairs ``(i < j)`` to bit positions."""
    return {p: i for i, p in enumerate(itertools.combinations(range(k), 2))}


def encode(edges, k: int) -> int:
    """Pack an undirected edge list over vertices ``0..k-1`` into an int."""
    idx = pair_index(k)
    code = 0
    for a, b in edges:
        if a > b:
            a, b = b, a
        code |= 1 << idx[(a, b)]
    return code


def decode(code: int, k: int) -> list[tuple[int, int]]:
    """Inverse of :func:`encode`."""
    return [p for p, i in pair_index(k).items() if code >> i & 1]


def degree_sequence(code: int, k: int) -> tuple[int, ...]:
    deg = [0] * k
    for a, b in decode(code, k):
        deg[a] += 1
        deg[b] += 1
    return tuple(sorted(deg))


def n_edges(code: int) -> int:
    return bin(code).count("1")


def is_connected(code: int, k: int) -> bool:
    """BFS connectivity over the packed adjacency code."""
    adj = [0] * k
    for a, b in decode(code, k):
        adj[a] |= 1 << b
        adj[b] |= 1 << a
    seen, frontier = 1, 1
    while frontier:
        nxt = 0
        v = frontier
        while v:
            low = v & -v
            nxt |= adj[low.bit_length() - 1]
            v ^= low
        frontier = nxt & ~seen
        seen |= nxt
    return seen == (1 << k) - 1


@lru_cache(maxsize=None)
def _perm_maps(k: int) -> list[list[int]]:
    """For every permutation of [k], the bit-position relabeling map."""
    idx = pair_index(k)
    maps = []
    for perm in itertools.permutations(range(k)):
        m = [0] * len(idx)
        for (a, b), i in idx.items():
            pa, pb = perm[a], perm[b]
            if pa > pb:
                pa, pb = pb, pa
            m[i] = idx[(pa, pb)]
        maps.append(m)
    return maps


@lru_cache(maxsize=1 << 20)
def canonical(code: int, k: int) -> int:
    """Canonical representative of ``code``'s isomorphism class: the
    minimum packed code over all vertex relabelings (memoized)."""
    best = code
    for m in _perm_maps(k):
        new = 0
        c = code
        while c:
            low = c & -c
            new |= 1 << m[low.bit_length() - 1]
            c ^= low
        if new < best:
            best = new
    return best


@lru_cache(maxsize=None)
def all_graphlets(k: int) -> list[int]:
    """Canonical codes of every connected k-node graph, by brute-force
    enumeration over all labeled graphs (practical for k <= 5; k = 6 is
    a few seconds and cached)."""
    out = set()
    nbits_ = k * (k - 1) // 2
    for code in range(1 << nbits_):
        if is_connected(code, k) and canonical(code, k) == code:
            out.add(code)
    return sorted(out)


def clique(k: int) -> int:
    return canonical((1 << (k * (k - 1) // 2)) - 1, k)


def path_graphlet(k: int) -> int:
    return canonical(encode([(i, i + 1) for i in range(k - 1)], k), k)


def cycle_graphlet(k: int) -> int:
    return canonical(encode([(i, (i + 1) % k) for i in range(k)], k), k)


def star_graphlet(k: int) -> int:
    return canonical(encode([(0, i) for i in range(1, k)], k), k)
