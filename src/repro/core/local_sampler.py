"""CC-style per-sample sampler (paper §2.2 + §3.2's neighbor buffering).

This is the faithful *sequential* sampling procedure: draw a root
``(v, T_C)``, then recursively unfold, sweeping the whole neighbor list
of ``v`` at every expansion to weight the candidates — the exact code
path whose cost explodes on outlier hubs (BerkStan/Orkut, §3.2). It
exists for two purposes:

- the **CC sampler baseline** of the sampling-speed table (§5.1):
  ``cc_mode=True`` stores the count tables the way CC does — hash maps
  keyed by the treelet's *representative instance* (a structure string
  standing in for CC's pointer) — and pays, per swept candidate, the
  dereference the paper calls out ("the overhead of dereferencing a
  pointer before each operation to retrieve the actual structure of
  T_C"): the instance is re-parsed into a structure before the lookup.
  Motivo mode uses succinct integer keys and bitwise ops throughout;
- measuring **neighbor buffering** (§3.2): with ``buffer_threshold``
  set, a vertex with degree >= threshold gets 100 candidate draws per
  sweep, the other 99 cached for future requests — same distribution
  (i.i.d. draws), ~1% of the sweeps on hubs.

Tables are collected to driver dictionaries, which is exactly CC's
in-memory regime and is feasible at our graph scale.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from ..exactcount.esu import induced_code
from . import graphlet as gl, treelet as tl
from .alias import AliasSampler
from .buildup import CountTables

BUFFER_DRAWS = 100


@dataclass
class LocalSampleStats:
    sweeps: int = 0  #: neighbor-list sweeps performed
    swept_neighbors: int = 0  #: total neighbors visited in sweeps
    buffer_hits: int = 0  #: expansions served from the buffer
    seconds: float = 0.0


@dataclass
class LocalSampler:
    """Driver-side sampler over collected count tables."""

    tables: CountTables
    use_alias: bool = True
    buffer_threshold: int | None = None
    cc_mode: bool = False
    seed: int = 0
    stats: LocalSampleStats = field(default_factory=LocalSampleStats)

    def __post_init__(self):
        k = self.tables.k
        self._rng = np.random.default_rng(self.seed)
        self._adj = self.tables.graph.adj
        root_pdf = self.tables.root_pdf()
        self._root_rows = list(
            zip(root_pdf["v"].astype(int), root_pdf["t"].astype(int), root_pdf["cnt"])
        )
        w = root_pdf["cnt"].to_numpy(dtype=np.float64)
        self._root_alias = AliasSampler(w) if self.use_alias else None
        self._root_cum = np.cumsum(w)
        # (v, t, c) -> count, and (v, t) -> [(c, count)] for sweep splits
        self._cnt: dict[tuple[int, int, int], float] = {}
        self._by_vt: dict[tuple[int, int], list[tuple[int, float]]] = {}
        for h in range(1, k):
            for r in self.tables.levels[h].toPandas().itertuples():
                v, t, c, cnt = int(r.v), int(r.t), int(r.c), float(r.cnt)
                self._cnt[(v, t, c)] = cnt
                self._by_vt.setdefault((v, t), []).append((c, cnt))
        self._decomp = {
            t: tl.decomp(t)
            for h in range(2, k + 1)
            for t in tl.rooted_shapes(k)[h]
        }
        self._buffer: dict[tuple[int, int, int], list[tuple[int, int]]] = {}
        if self.cc_mode:
            # CC's table layout: hash maps keyed by the representative
            # instance string (standing in for CC's treelet pointer).
            from . import baseline as _bl

            self._inst = {
                t: _bl.enc_to_str(t)
                for h in range(1, k + 1)
                for t in tl.rooted_shapes(k)[h]
            }
            self._cnt_cc = {
                (v, self._inst[t], c): cnt for (v, t, c), cnt in self._cnt.items()
            }
            self._parse_inst = _bl.str_to_enc

    def _draw_root(self) -> tuple[int, int]:
        if self._root_alias is not None:
            i = int(self._root_alias.draw(self._rng, 1)[0])
        else:
            # CC-style: binary search on the cumulative weights
            x = self._rng.random() * self._root_cum[-1]
            i = int(np.searchsorted(self._root_cum, x))
        v, t, _ = self._root_rows[i]
        return v, t

    def _expand(self, v: int, t: int, c: int) -> tuple[int, int]:
        """Choose (u, C') ∝ c(T'_C', v)·c(T''_{C∖C'}, u); returns the
        chosen neighbor and left color set."""
        key = (v, t, c)
        buf = self._buffer.get(key)
        if buf:
            self.stats.buffer_hits += 1
            return buf.pop()
        tp, ts = self._decomp[t]
        splits = self._by_vt.get((v, tp), [])
        cands: list[tuple[int, int]] = []
        weights: list[float] = []
        self.stats.sweeps += 1
        if self.cc_mode:
            # CC's sweep: per candidate, dereference the representative
            # instance (re-parse its structure — the overhead §3.1 calls
            # out) and look the count up in the string-keyed hash map.
            ts_inst = self._inst[ts]
            for u in self._adj[v]:
                u = int(u)
                self.stats.swept_neighbors += 1
                for lcol, lcnt in splits:
                    if lcol & ~c:
                        continue
                    self._parse_inst(ts_inst)  # pointer dereference
                    rcnt = self._cnt_cc.get((u, ts_inst, c ^ lcol))
                    if rcnt:
                        cands.append((u, lcol))
                        weights.append(lcnt * rcnt)
        else:
            for u in self._adj[v]:
                u = int(u)
                self.stats.swept_neighbors += 1
                for lcol, lcnt in splits:
                    if lcol & ~c:
                        continue
                    rcnt = self._cnt.get((u, ts, c ^ lcol))
                    if rcnt:
                        cands.append((u, lcol))
                        weights.append(lcnt * rcnt)
        w = np.asarray(weights)
        n_draws = 1
        if (
            self.buffer_threshold is not None
            and len(self._adj[v]) >= self.buffer_threshold
        ):
            n_draws = BUFFER_DRAWS
        idxs = self._rng.choice(len(cands), size=n_draws, p=w / w.sum())
        if n_draws > 1:
            self._buffer[key] = [cands[int(i)] for i in idxs[1:]]
        return cands[int(idxs[0])]

    def sample_one(self) -> tuple[int, tuple[int, ...]]:
        """Draw one colorful k-treelet copy; returns (root shape, nodes)."""
        k = self.tables.k
        v0, t0 = self._draw_root()
        nodes: list[int] = []
        stack = [(v0, t0, (1 << k) - 1)]
        while stack:
            v, t, c = stack.pop()
            if t == tl.SINGLETON:
                nodes.append(v)
                continue
            u, lcol = self._expand(v, t, c)
            tp, ts = self._decomp[t]
            stack.append((v, tp, lcol))
            stack.append((u, ts, c ^ lcol))
        return t0, tuple(sorted(nodes))

    def sample_graphlets(self, n_samples: int) -> dict[int, int]:
        """Per-class hits for ``n_samples`` draws (driver-side classify)."""
        k = self.tables.k
        adj = self._adj
        hits: dict[int, int] = {}
        t0 = time.monotonic()
        for _ in range(n_samples):
            _, nodes = self.sample_one()
            code = gl.canonical(induced_code(adj, list(nodes)), k)
            hits[code] = hits.get(code, 0) + 1
        self.stats.seconds += time.monotonic() - t0
        return hits
