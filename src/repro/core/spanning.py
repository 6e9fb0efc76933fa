"""Spanning-tree computations for graphlets (Motivo §3.3, AGS inputs).

- ``num_spanning_trees`` — σ_i via Kirchhoff's matrix-tree theorem
  (determinant of a Laplacian minor), exactly as Motivo computes it.
- ``spanning_profile`` — σ_ij, the number of spanning trees of graphlet
  H_i isomorphic to each unrooted treelet shape T_j, via exhaustive
  enumeration of (k-1)-edge acyclic subsets. Motivo derives these with
  an in-memory run of the build-up phase and caches them to disk; our
  graphlets have <= 15 edges so direct enumeration is at most C(15,5)
  subsets and an lru_cache plays the role of Motivo's on-disk σ_ij cache.
"""
from __future__ import annotations

import itertools
from functools import lru_cache

import numpy as np

from . import graphlet as gl
from . import treelet as tl


@lru_cache(maxsize=None)
def num_spanning_trees(code: int, k: int) -> int:
    """σ_i of the graphlet ``code`` via Kirchhoff's theorem, O(k^3)."""
    L = np.zeros((k, k))
    for a, b in gl.decode(code, k):
        L[a, a] += 1
        L[b, b] += 1
        L[a, b] -= 1
        L[b, a] -= 1
    # Spanning-tree counts of <=16-node graphs are far below 2^53, so a
    # float determinant rounded to int is exact here.
    return round(float(np.linalg.det(L[1:, 1:])))


@lru_cache(maxsize=None)
def spanning_profile(code: int, k: int) -> dict[int, int]:
    """σ_ij: map unrooted-treelet shape encoding -> number of spanning
    trees of graphlet ``code`` with that shape."""
    edges = gl.decode(code, k)
    profile: dict[int, int] = {}
    for subset in itertools.combinations(edges, k - 1):
        parent = list(range(k))

        def find(x: int) -> int:
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        acyclic = True
        for a, b in subset:
            ra, rb = find(a), find(b)
            if ra == rb:
                acyclic = False
                break
            parent[ra] = rb
        if not acyclic:
            continue
        adj: list[list[int]] = [[] for _ in range(k)]
        for a, b in subset:
            adj[a].append(b)
            adj[b].append(a)
        shape = min(tl.encode_rooted(adj, r) for r in range(k))
        profile[shape] = profile.get(shape, 0) + 1
    return profile


def sigma_total(code: int, k: int) -> int:
    """Sum of the spanning profile — must equal Kirchhoff's σ_i."""
    return sum(spanning_profile(code, k).values())
