"""Deterministic synthetic graph generators (the paper's data substrate).

Motivo is evaluated on 9 public graphs (SNAP / LAW / MPI-SWS / Yelp,
Table 1) that we cannot download in this offline container, so each is
replaced by a generator reproducing its *structural signature* — density,
degree skew, hub dominance, clustering, star-domination — at a scale a
single local Spark session handles. All generators are deterministic in
``seed`` and produce simple undirected graphs.

A :class:`Graph` wraps the numpy edge array and exposes the two views the
pipeline needs: a symmetric Spark edge DataFrame (both directions, for
Eq. 1's sum over u ~ v) and a driver-side sorted-adjacency dict (the
paper's static sorted arrays with O(log δ) membership queries, §3.3),
which we broadcast for sampling-phase classification.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import cached_property

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class Graph:
    """A simple undirected graph with deterministic construction."""

    name: str
    #: unique undirected edges, shape (m, 2), with u < v per row
    edge_array: np.ndarray = field(repr=False)

    @cached_property
    def n(self) -> int:
        return int(self.edge_array.max()) + 1 if len(self.edge_array) else 0

    @cached_property
    def m(self) -> int:
        return len(self.edge_array)

    @cached_property
    def adj(self) -> dict[int, np.ndarray]:
        """Sorted neighbor arrays per vertex (includes isolated vertices)."""
        src = np.concatenate([self.edge_array[:, 0], self.edge_array[:, 1]])
        dst = np.concatenate([self.edge_array[:, 1], self.edge_array[:, 0]])
        order = np.lexsort((dst, src))
        src, dst = src[order], dst[order]
        bounds = np.searchsorted(src, np.arange(self.n + 1))
        return {v: dst[bounds[v] : bounds[v + 1]] for v in range(self.n)}

    @cached_property
    def degrees(self) -> np.ndarray:
        deg = np.zeros(self.n, dtype=np.int64)
        np.add.at(deg, self.edge_array[:, 0], 1)
        np.add.at(deg, self.edge_array[:, 1], 1)
        return deg

    @cached_property
    def max_degree(self) -> int:
        return int(self.degrees.max())

    def edges_df(self, spark: SparkSession) -> DataFrame:
        """Symmetric (src, dst) DataFrame — both directions of every edge."""
        pdf = pd.DataFrame(
            {
                "src": np.concatenate([self.edge_array[:, 0], self.edge_array[:, 1]]),
                "dst": np.concatenate([self.edge_array[:, 1], self.edge_array[:, 0]]),
            }
        )
        return spark.createDataFrame(pdf)

    def has_edge(self, a: int, b: int) -> bool:
        """O(log δ(a)) membership query on the sorted adjacency array."""
        nb = self.adj[a]
        i = int(np.searchsorted(nb, b))
        return i < len(nb) and nb[i] == b


def _dedup(name: str, pairs: np.ndarray) -> Graph:
    """Drop self-loops and duplicate edges; normalize to u < v rows."""
    pairs = pairs[pairs[:, 0] != pairs[:, 1]]
    lo = pairs.min(axis=1)
    hi = pairs.max(axis=1)
    uniq = np.unique(np.stack([lo, hi], axis=1), axis=0)
    return Graph(name, uniq.astype(np.int64))


def er_graph(n: int, m: int, *, seed: int = 0, name: str = "er") -> Graph:
    """Erdős–Rényi G(n, m): ~m uniform random edges (flat degree profile)."""
    g = np.random.default_rng(seed)
    pairs = g.integers(0, n, size=(int(m * 1.15) + 8, 2))
    out = _dedup(name, pairs)
    return Graph(name, out.edge_array[:m]) if out.m > m else out


def ba_graph(n: int, attach: int, *, seed: int = 0, name: str = "ba") -> Graph:
    """Barabási–Albert preferential attachment: heavy-tailed degrees,
    the signature of the paper's social graphs (Facebook, Orkut, ...).

    Each new node attaches to ``attach`` endpoints drawn from the current
    edge-endpoint multiset (vectorized preferential attachment).
    """
    g = np.random.default_rng(seed)
    core = attach + 1
    edges = [(a, b) for a in range(core) for b in range(a + 1, core)]
    endpoints = np.array([e for pair in edges for e in pair])
    chunks = [np.array(edges)]
    for v in range(core, n):
        targets = g.choice(endpoints, size=attach)
        new = np.stack([np.full(attach, v), targets], axis=1)
        chunks.append(new)
        endpoints = np.concatenate([endpoints, new.ravel()])
    return _dedup(name, np.concatenate(chunks))


def hub_graph(
    n: int, m: int, n_hubs: int, hub_degree: int, *, seed: int = 0, name: str = "hub"
) -> Graph:
    """ER background plus a few very-high-degree hubs: the BerkStan-like
    web-graph signature ("a node v with degree Δ much larger than any
    other node", §3.2) that stresses sampling (neighbor buffering)."""
    g = np.random.default_rng(seed)
    base = er_graph(n, m, seed=seed + 1).edge_array
    hub_edges = []
    for h in range(n_hubs):
        nbrs = g.choice(np.arange(n_hubs, n), size=hub_degree, replace=False)
        hub_edges.append(np.stack([np.full(hub_degree, h), nbrs], axis=1))
    return _dedup(name, np.concatenate([base] + hub_edges))


def star_heavy_graph(
    n_hubs: int, leaves_per_hub: int, extra_edges: int, *, seed: int = 0, name: str = "stars"
) -> Graph:
    """Star-dominated graph: the Yelp signature where >99.999% of
    k-graphlets are stars and everything else is extremely rare (§5.3).

    Hubs get disjoint leaf sets; a sprinkle of random extra edges creates
    the rare non-star graphlets AGS is designed to find.
    """
    g = np.random.default_rng(seed)
    n = n_hubs + n_hubs * leaves_per_hub
    chunks = []
    for h in range(n_hubs):
        lo = n_hubs + h * leaves_per_hub
        leaves = np.arange(lo, lo + leaves_per_hub)
        chunks.append(np.stack([np.full(leaves_per_hub, h), leaves], axis=1))
    # Half the extra edges land anywhere (long paths between stars); the
    # other half land inside a small pocket of vertices, creating the
    # denser rare motifs (triangles, cycles, near-cliques) whose
    # frequencies sit many orders of magnitude below the stars'.
    extra_any = g.integers(0, n, size=(extra_edges // 2, 2))
    pocket = g.choice(np.arange(n), size=min(n, 4 + extra_edges // 6), replace=False)
    extra_pocket = g.choice(pocket, size=(extra_edges - extra_edges // 2, 2))
    return _dedup(name, np.concatenate(chunks + [extra_any, extra_pocket]))


def community_graph(
    n: int, n_comm: int, p_in_deg: float, inter_edges: int, *, seed: int = 0, name: str = "comm"
) -> Graph:
    """Clustered communities with sparse inter-links: the Amazon/DBLP
    signature (low degree, high clustering)."""
    g = np.random.default_rng(seed)
    size = n // n_comm
    chunks = []
    for c in range(n_comm):
        lo = c * size
        m_c = int(size * p_in_deg)
        pairs = g.integers(lo, lo + size, size=(m_c, 2))
        chunks.append(pairs)
    inter = g.integers(0, n_comm * size, size=(inter_edges, 2))
    return _dedup(name, np.concatenate(chunks + [inter]))


def lollipop_graph(n: int, k: int, *, name: str = "lollipop") -> Graph:
    """The (n-k+2, k-2) lollipop of Theorem 5: a clique on n-k+2 nodes
    with a dangling path of k-2 nodes attached by one edge."""
    cn = n - k + 2
    clique_edges = [(a, b) for a in range(cn) for b in range(a + 1, cn)]
    path_nodes = list(range(cn, cn + k - 2))
    path_edges = [(0, cn)] if path_nodes else []
    path_edges += [(path_nodes[i], path_nodes[i + 1]) for i in range(len(path_nodes) - 1)]
    return _dedup(name, np.array(clique_edges + path_edges))


def complete_graph(k: int, *, name: str = "clique") -> Graph:
    return _dedup(name, np.array([(a, b) for a in range(k) for b in range(a + 1, k)]))


def path_graph(n: int, *, name: str = "path") -> Graph:
    return _dedup(name, np.array([(i, i + 1) for i in range(n - 1)]))


def star_graph(n: int, *, name: str = "star") -> Graph:
    return _dedup(name, np.array([(0, i) for i in range(1, n)]))
