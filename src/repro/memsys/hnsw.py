"""HNSW — Hierarchical Navigable Small World graphs, from scratch.

Implements the construction and search algorithms of Malkov & Yashunin
(TPAMI 2020) [41], the method underlying the paper's ParlayANN-HNSW
comparator (Table I):

* multi-layer structure with geometric level assignment
  (``level ~ floor(-ln(U) · mL)``, ``mL = 1/ln(M)``),
* greedy descent through upper layers (ef = 1),
* best-first beam search (``ef_construction`` / ``ef_search``) on layer 0,
* the diversity-aware neighbour selection heuristic (their Algorithm 4,
  with ``keepPrunedConnections``): a candidate is linked only if it is
  closer to the new node than to any already-selected neighbour, which is
  what preserves inter-cluster bridges under degree pruning and puts the
  graph in the ~0.9 recall regime Table I reports.

Distances are vectorized over a candidate's whole neighbour list with
numpy, which keeps pure-Python construction tractable at the repo's
dataset sizes (10⁴–10⁵ vectors).
"""
from __future__ import annotations

import heapq
from typing import List, Tuple

import numpy as np


class HNSW:
    def __init__(self, dim: int, M: int = 8, ef_construction: int = 64, seed: int = 0):
        if M < 2:
            raise ValueError(f"M must be >= 2, got {M}")
        self.dim = dim
        self.M = M
        self.M0 = 2 * M  # layer-0 degree bound, per the original paper
        self.efc = ef_construction
        self.mL = 1.0 / np.log(M)
        self.rng = np.random.default_rng(seed)
        self.X = np.empty((0, dim))
        self.levels: List[int] = []
        # neighbors[layer][node] -> list[int]
        self.neighbors: List[List[List[int]]] = []
        self.entry: int = -1

    # ------------------------------------------------------------------
    def _dist(self, q: np.ndarray, ids) -> np.ndarray:
        V = self.X[np.asarray(ids, dtype=np.int64)]
        d = V - q[None, :]
        return np.sqrt(np.einsum("ij,ij->i", d, d))

    def _search_layer(self, q: np.ndarray, entry: int, ef: int, layer: int) -> List[Tuple[float, int]]:
        """Best-first beam search; returns up to ef (dist, id) pairs sorted."""
        d0 = float(self._dist(q, [entry])[0])
        visited = {entry}
        candidates = [(d0, entry)]  # min-heap
        results = [(-d0, entry)]  # max-heap of the current best ef
        while candidates:
            d_c, c = heapq.heappop(candidates)
            if d_c > -results[0][0] and len(results) >= ef:
                break
            neigh = [n for n in self.neighbors[layer][c] if n not in visited]
            if not neigh:
                continue
            visited.update(neigh)
            dists = self._dist(q, neigh)
            for d_n, n in zip(dists, neigh):
                if len(results) < ef or d_n < -results[0][0]:
                    heapq.heappush(candidates, (float(d_n), int(n)))
                    heapq.heappush(results, (-float(d_n), int(n)))
                    if len(results) > ef:
                        heapq.heappop(results)
        out = sorted((-d, n) for d, n in results)
        return out

    def _select(self, cands: List[Tuple[float, int]], M: int) -> List[int]:
        """Diversity heuristic (Malkov & Yashunin Alg. 4): admit a candidate
        only if it is closer to the query point than to every neighbour
        already selected; backfill with pruned candidates up to M."""
        selected: List[int] = []
        pruned: List[int] = []
        for d_e, e in sorted(cands):
            if len(selected) >= M:
                break
            if selected:
                d_to_sel = self._dist(self.X[e], selected)
                if (d_to_sel < d_e).any():
                    pruned.append(e)
                    continue
            selected.append(e)
        for e in pruned:  # keepPrunedConnections
            if len(selected) >= M:
                break
            selected.append(e)
        return selected

    # ------------------------------------------------------------------
    def build(self, X: np.ndarray) -> None:
        """Insert all rows of X (N, dim)."""
        X = np.asarray(X, dtype=np.float64)
        if X.ndim != 2 or X.shape[1] != self.dim:
            raise ValueError(f"expected (N, {self.dim}) matrix, got {X.shape}")
        self.X = X
        n = X.shape[0]
        self.levels = [int(-np.log(self.rng.uniform(1e-12, 1.0)) * self.mL) for _ in range(n)]
        max_level = max(self.levels, default=0)
        self.neighbors = [[[] for _ in range(n)] for _ in range(max_level + 1)]
        for i in range(n):
            self._insert(i)

    def _insert(self, i: int) -> None:
        level = self.levels[i]
        if self.entry < 0:
            self.entry = i
            return
        q = self.X[i]
        ep = self.entry
        top = self.levels[self.entry]
        # Greedy descent through layers above the node's level.
        for layer in range(top, level, -1):
            ep = self._search_layer(q, ep, 1, layer)[0][1]
        # Beam search + linking on the node's layers.
        for layer in range(min(level, top), -1, -1):
            cands = self._search_layer(q, ep, self.efc, layer)
            M = self.M0 if layer == 0 else self.M
            chosen = self._select(cands, M)
            self.neighbors[layer][i] = list(chosen)
            for n in chosen:
                lst = self.neighbors[layer][n]
                lst.append(i)
                if len(lst) > M:  # degree prune via the same diversity heuristic
                    d = self._dist(self.X[n], lst)
                    self.neighbors[layer][n] = self._select(list(zip(d.tolist(), lst)), M)
            ep = cands[0][1]
        if level > top:
            self.entry = i

    # ------------------------------------------------------------------
    def search(self, q: np.ndarray, k: int, ef_search: int = 64) -> List[Tuple[int, float]]:
        """Approximate kNN: returns [(id, distance)] ascending, length ≤ k."""
        if self.entry < 0:
            return []
        q = np.asarray(q, dtype=np.float64)
        ep = self.entry
        for layer in range(self.levels[self.entry], 0, -1):
            ep = self._search_layer(q, ep, 1, layer)[0][1]
        res = self._search_layer(q, ep, max(ef_search, k), 0)
        return [(n, d) for d, n in res[:k]]
