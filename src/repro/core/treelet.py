"""Succinct rooted-treelet encodings (Motivo §3.1).

A rooted treelet ``T`` on ``h <= 16`` nodes is encoded as the bit string
``s_T`` of its DFS traversal — bit ``1`` when an edge is traversed away
from the root, ``0`` when traversed back — left-aligned in a fixed
``WIDTH``-bit integer (30 meaningful bits suffice for 16 nodes; trailing
zeros are padding, exactly as in the paper). The canonical encoding
visits the children of every node in ascending order of their subtree
encodings, so every treelet shape has a unique integer id and the
integer order is a total order over shapes.

Supported operations mirror the paper's:

- ``size(t)``      — 1 + popcount, "a single machine instruction";
- ``merge(tp,ts)`` — prepend ``ts`` (the paper's ``T''``) as the first
  child of the root of ``tp`` (``T'``): bit concatenation + shifts;
- ``decomp(t)``    — the unique inverse of ``merge``;
- ``beta(t)``      — the paper's β_T: number of root-child subtrees
  isomorphic to the first one (the ``T''`` of the decomposition).

The module also enumerates all rooted treelet shapes up to a given size
(driver-side; there are only 115 on <= 8 nodes), produces the *merge
table* that the Spark build-up phase broadcasts, and computes canonical
encodings for *unrooted* treelet shapes (needed by AGS's per-shape urns
and by the spanning-tree profiles σ_ij).
"""
from __future__ import annotations

from functools import lru_cache

#: Fixed encoding width: 2*(16-1) = 30 bits covers all treelets on <= 16
#: nodes, as in the paper ("fits nicely in a 4-byte integer type").
WIDTH = 30
_MASK = (1 << WIDTH) - 1

#: The trivial treelet on one node: empty traversal, all-padding string.
SINGLETON = 0


def size(t: int) -> int:
    """Number of vertices of the treelet encoded by ``t`` (1 + popcount)."""
    return 1 + bin(t).count("1")


def nbits(t: int) -> int:
    """Number of meaningful traversal bits: two per edge."""
    return 2 * (size(t) - 1)


def merge(tp: int, ts: int) -> int:
    """Merge ``T'`` (``tp``) and ``T''`` (``ts``): append ``ts`` as the
    *first* child of the root of ``tp``.

    In bit-string terms the result is ``1 · s_T'' · 0 · s_T'`` (the
    closing 0 is implicit in the fixed-width padding when ``tp`` is the
    singleton, explicit otherwise via the extra shift).
    """
    return (1 << (WIDTH - 1)) | (ts >> 1) | (tp >> (2 * size(ts)))


def _first_segment_len(t: int) -> int:
    """Length (in bits) of the first root-child segment ``1 s_T'' 0``.

    Scans from the most significant meaningful bit, tracking DFS depth;
    the segment ends where depth first returns to 0. Thanks to the
    zero padding this also works when the closing 0s are implicit.
    """
    depth = 0
    for i in range(WIDTH):
        bit = (t >> (WIDTH - 1 - i)) & 1
        depth += 1 if bit else -1
        if depth == 0:
            return i + 1
    raise ValueError(f"malformed treelet encoding {t:#x}")


def decomp(t: int) -> tuple[int, int]:
    """Inverse of :func:`merge`: return ``(tp, ts)`` = (T', T'').

    ``ts`` is the subtree hanging off the root's first child; ``tp`` is
    ``t`` with that subtree removed. Raises on the singleton.
    """
    if t == SINGLETON:
        raise ValueError("cannot decompose the singleton treelet")
    seg = _first_segment_len(t)
    ts = (t << 1) & _MASK & ~((1 << (WIDTH - seg + 2)) - 1)
    tp = (t << seg) & _MASK
    return tp, ts


def children(t: int) -> list[int]:
    """Encodings of the root-child subtrees, in canonical (ascending) order."""
    out = []
    while t != SINGLETON:
        t, ts = decomp(t)
        out.append(ts)
    return out


def beta(t: int) -> int:
    """The paper's β_T: number of root-child subtrees of ``t`` isomorphic
    to the first one (= the ``T''`` of the unique decomposition)."""
    ch = children(t)
    b = 0
    for c in ch:
        if c != ch[0]:
            break
        b += 1
    return b


def is_valid_merge(tp: int, ts: int) -> bool:
    """True iff ``merge(tp, ts)`` yields a treelet whose canonical
    decomposition is exactly ``(tp, ts)`` — i.e. ``ts`` is <= the current
    first child of ``tp`` (always true when ``tp`` is the singleton)."""
    if tp == SINGLETON:
        return True
    _, first = decomp(tp)
    return ts <= first


def parse(t: int) -> list[list[int]]:
    """Decode ``t`` into an adjacency list; node 0 is the root, nodes are
    numbered in DFS discovery order."""
    adj: list[list[int]] = [[]]
    stack = [0]
    for i in range(nbits(t)):
        bit = (t >> (WIDTH - 1 - i)) & 1
        if bit:
            v = len(adj)
            adj.append([])
            adj[stack[-1]].append(v)
            adj[v].append(stack[-1])
            stack.append(v)
        else:
            stack.pop()
    return adj


def encode_rooted(adj: list[list[int]], root: int) -> int:
    """Canonical encoding of the tree ``adj`` rooted at ``root``
    (children sorted ascending by subtree encoding)."""

    def rec(v: int, parent: int) -> tuple[int, int]:
        # Returns (right-aligned bits, nbits) of the subtree at v.
        segs = []
        for u in adj[v]:
            if u == parent:
                continue
            cv, cn = rec(u, v)
            # Sort key = left-aligned value, i.e. lexicographic order.
            segs.append((cv << (WIDTH - cn) if cn else 0, cv, cn))
        segs.sort(key=lambda s: s[0])
        acc, n = 0, 0
        for _, cv, cn in segs:
            acc = (acc << (cn + 2)) | (1 << (cn + 1)) | (cv << 1)
            n += cn + 2
        return acc, n

    v, n = rec(root, -1)
    return v << (WIDTH - n) if n else 0


def unroot(t: int) -> int:
    """Canonical encoding of the *unrooted* shape of ``t``: the minimum
    canonical rooted encoding over all possible roots."""
    adj = parse(t)
    return min(encode_rooted(adj, r) for r in range(len(adj)))


@lru_cache(maxsize=None)
def rooted_shapes(max_size: int) -> dict[int, list[int]]:
    """All canonical rooted treelet encodings, keyed by size 1..max_size.

    Generated bottom-up through valid merges; each shape is produced
    exactly once because the canonical decomposition is unique.
    """
    by_size: dict[int, list[int]] = {1: [SINGLETON]}
    for h in range(2, max_size + 1):
        shapes = set()
        for js in range(1, h):  # size of T''
            for ts in by_size[js]:
                for tp in by_size[h - js]:
                    if is_valid_merge(tp, ts):
                        shapes.add(merge(tp, ts))
        by_size[h] = sorted(shapes)
    return by_size


@lru_cache(maxsize=None)
def merge_table(max_size: int) -> tuple[tuple[int, int, int, int, int, int], ...]:
    """Rows ``(size_left, size_right, tl, tr, tm, beta)`` for every valid
    merge producing a treelet of size <= max_size.

    This is the tiny dimension table the Spark build-up phase broadcasts:
    joining the level tables against it replaces CC's per-pair recursive
    check-and-merge with native hash-join lookups.
    """
    by_size = rooted_shapes(max_size)
    rows = []
    for h in range(2, max_size + 1):
        for tm in by_size[h]:
            tp, ts = decomp(tm)
            rows.append((size(tp), size(ts), tp, ts, tm, beta(tm)))
    return tuple(rows)


@lru_cache(maxsize=None)
def unrooted_map(k: int) -> dict[int, int]:
    """Map each rooted k-treelet encoding to its unrooted canonical shape."""
    return {t: unroot(t) for t in rooted_shapes(k)[k]}


@lru_cache(maxsize=None)
def unrooted_shapes(k: int) -> list[int]:
    """Canonical encodings of all unrooted treelet shapes on k nodes."""
    return sorted(set(unrooted_map(k).values()))


def path_rooted(h: int) -> int:
    """The path on ``h`` nodes rooted at an endpoint: bits 1^(h-1) 0^(h-1)."""
    t = SINGLETON
    for _ in range(h - 1):
        t = merge(SINGLETON, t)
    return t


def star_rooted(h: int) -> int:
    """The star on ``h`` nodes rooted at the center: bits (10)^(h-1)."""
    t = SINGLETON
    for _ in range(h - 1):
        t = merge(t, SINGLETON)
    return t
