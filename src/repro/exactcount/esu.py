"""Exact induced-subgraph counting via ESU (the ESCAPE substitute).

The paper computes ground-truth 5-graphlet counts with ESCAPE [19],
which we cannot run offline; we substitute Wernicke's ESU algorithm,
which enumerates every connected induced k-subgraph exactly once, and
classify each occurrence by canonical form. Exactness is what matters
for ground truth, not ESCAPE's speed tricks.

``esu_counts`` distributes the enumeration over root vertices with
``mapInPandas`` and a broadcast adjacency (each subgraph is discovered
only from its minimum vertex, so root-partitioning is disjoint), then
aggregates per-class counts — a straightforward "parallelize the outer
loop" Spark job, mirroring how the paper parallelizes per-vertex work.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, functions as F

from ..graphs.generators import Graph
from ..core import graphlet as gl


def induced_code(adj: dict[int, np.ndarray], nodes: list[int]) -> int:
    """Packed adjacency code of the subgraph induced by ``nodes`` (order
    defines the labeling), using O(log δ) sorted-array membership."""
    k = len(nodes)
    code = 0
    idx = gl.pair_index(k)
    for i in range(k):
        nb = adj[nodes[i]]
        for j in range(i + 1, k):
            p = int(np.searchsorted(nb, nodes[j]))
            if p < len(nb) and nb[p] == nodes[j]:
                code |= 1 << idx[(i, j)]
    return code


def _esu_from_root(adj: dict[int, np.ndarray], root: int, k: int, out: dict[int, int]) -> None:
    """Enumerate all connected induced k-subgraphs whose minimum vertex is
    ``root`` (Wernicke's ESU with the ``u > root`` constraint).

    ``neigh`` always holds ``V_sub ∪ N(V_sub)``; new extension candidates
    must come from the *exclusive* neighborhood of the vertex just added,
    which is what guarantees each subgraph is produced exactly once.
    """
    if k == 1:
        out[0] = out.get(0, 0) + 1
        return
    sub = [root]

    def extend(ext: list[int], neigh: frozenset | set) -> None:
        if len(sub) == k:
            code = gl.canonical(induced_code(adj, sub), k)
            out[code] = out.get(code, 0) + 1
            return
        ext = list(ext)
        while ext:
            w = ext.pop()
            new_ext = list(ext)
            new_neigh = set(neigh)
            for u in adj[w]:
                u = int(u)
                if u > root and u not in neigh:
                    new_ext.append(u)
                new_neigh.add(u)
            sub.append(w)
            extend(new_ext, new_neigh)
            sub.pop()

    neigh0 = {root} | {int(u) for u in adj[root]}
    ext0 = [int(u) for u in adj[root] if u > root]
    extend(ext0, neigh0)


def esu_counts_local(adj: dict[int, np.ndarray], k: int) -> dict[int, int]:
    """Exact per-class induced k-subgraph counts, single-process."""
    out: dict[int, int] = {}
    for root in adj:
        _esu_from_root(adj, root, k, out)
    return out


def esu_colorful_counts_local(
    adj: dict[int, np.ndarray], colors: np.ndarray, k: int
) -> dict[int, int]:
    """Exact per-class counts of *colorful* induced k-subgraph copies
    under the given coloring — the ground truth for c_i (§2.2), free of
    the coloring's own variance. Enumerates via ESU then filters."""
    out: dict[int, int] = {}
    for root in adj:
        _esu_colorful_from_root(adj, colors, root, k, out)
    return out


def _esu_colorful_from_root(
    adj: dict[int, np.ndarray], colors: np.ndarray, root: int, k: int, out: dict[int, int]
) -> None:
    sub = [root]

    def extend(ext: list[int], neigh: set) -> None:
        if len(sub) == k:
            if len({int(colors[v]) for v in sub}) == k:
                code = gl.canonical(induced_code(adj, sub), k)
                out[code] = out.get(code, 0) + 1
            return
        ext = list(ext)
        while ext:
            w = ext.pop()
            new_ext = list(ext)
            new_neigh = set(neigh)
            for u in adj[w]:
                u = int(u)
                if u > root and u not in neigh:
                    new_ext.append(u)
                new_neigh.add(u)
            sub.append(w)
            extend(new_ext, new_neigh)
            sub.pop()

    if k == 1:
        out[0] = out.get(0, 0) + 1
        return
    extend([int(u) for u in adj[root] if u > root], {root} | {int(u) for u in adj[root]})


def esu_counts(spark: SparkSession, graph: Graph, k: int) -> dict[int, int]:
    """Distributed exact counts: ESU over root vertices in parallel."""
    badj = spark.sparkContext.broadcast(graph.adj)

    roots = spark.createDataFrame(pd.DataFrame({"root": np.arange(graph.n)}))
    # Shuffle roots round-robin so high-degree roots spread across tasks.
    roots = roots.repartition(max(spark.sparkContext.defaultParallelism * 2, 8))

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        adj = badj.value
        out: dict[int, int] = {}
        for pdf in batches:
            for root in pdf["root"]:
                _esu_from_root(adj, int(root), k, out)
        if out:
            yield pd.DataFrame(
                {"code": list(out.keys()), "cnt": list(out.values())}
            ).astype({"code": "int64", "cnt": "int64"})

    res = (
        roots.mapInPandas(run, schema="code long, cnt long")
        .groupBy("code")
        .agg(F.sum("cnt").alias("cnt"))
        .toPandas()
    )
    badj.destroy()
    return {int(r.code): int(r.cnt) for r in res.itertuples()}


def brute_force_rooted_treelet_counts(
    adj: dict[int, np.ndarray], colors: np.ndarray, k: int
) -> dict[tuple[int, int, int], int]:
    """Oracle for the build-up DP at tiny scale: enumerate every colorful
    non-induced treelet copy on <= k nodes by recursive growth and count
    it under each rooting, keyed ``(v, rooted-shape enc, colorset)``.

    Exponential — only for graphs with a handful of nodes in tests.
    """
    from ..core import treelet as tl
    from itertools import combinations

    counts: dict[tuple[int, int, int], int] = {}
    n = len(adj)

    # Enumerate connected vertex subsets of size <= k, then all their
    # spanning trees; each spanning tree copy is one treelet occurrence.
    def connected_subsets(size: int):
        for nodes in combinations(range(n), size):
            sub = set(nodes)
            seen = {nodes[0]}
            stack = [nodes[0]]
            while stack:
                x = stack.pop()
                for u in adj[x]:
                    u = int(u)
                    if u in sub and u not in seen:
                        seen.add(u)
                        stack.append(u)
            if len(seen) == size:
                yield nodes

    for size in range(1, k + 1):
        for nodes in connected_subsets(size):
            cset = 0
            distinct = True
            for v in nodes:
                bit = 1 << int(colors[v])
                if cset & bit:
                    distinct = False
                    break
                cset |= bit
            if not distinct:
                continue
            # all spanning trees of the induced subgraph on `nodes`
            sub_edges = [
                (a, b)
                for i, a in enumerate(nodes)
                for b in nodes[i + 1 :]
                if b in {int(u) for u in adj[a]}
            ]
            for tree_edges in combinations(sub_edges, size - 1):
                parent = {v: v for v in nodes}

                def find(x):
                    while parent[x] != x:
                        parent[x] = parent[parent[x]]
                        x = parent[x]
                    return x

                ok = True
                for a, b in tree_edges:
                    ra, rb = find(a), find(b)
                    if ra == rb:
                        ok = False
                        break
                    parent[ra] = rb
                if not ok:
                    continue
                tadj = {v: [] for v in nodes}
                for a, b in tree_edges:
                    tadj[a].append(b)
                    tadj[b].append(a)
                index = {v: i for i, v in enumerate(nodes)}
                lists = [[index[u] for u in tadj[v]] for v in nodes]
                for r, v in enumerate(nodes):
                    enc = tl.encode_rooted(lists, r)
                    key = (v, enc, cset)
                    counts[key] = counts.get(key, 0) + 1
    return counts
