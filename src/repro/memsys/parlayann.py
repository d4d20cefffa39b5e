"""ParlayANN-HNSW comparator (Table I) — single-node in-memory graph ANN.

ParlayANN [42] is a multicore shared-memory framework; its HNSW variant
builds the graph over the *entire* dataset held in one node's memory.
Table I's behaviours reproduced here:

* **I.C.T** dominated by graph construction (by far the slowest of the
  three systems — 218 min vs 27/14 at 200 GB in the paper);
* **Q.R.T** the fastest (graph traversal over in-memory vectors);
* **R.R ≈ 0.92** (approximate but high);
* the earliest capacity wall: single-node memory, so it fails before
  Odyssey does (paper: "X" from 600 GB up). A configurable budget raises
  :class:`~repro.memsys.odyssey.CapacityExceeded` accordingly.
"""
from __future__ import annotations

import time
from typing import Dict, List, Tuple

import numpy as np

from .hnsw import HNSW
from .odyssey import CapacityExceeded


class ParlayAnnHnsw:
    def __init__(
        self,
        memory_budget_bytes: int | None = None,
        M: int = 8,
        ef_construction: int = 64,
        ef_search: int = 96,
        seed: int = 0,
    ):
        self.budget = memory_budget_bytes
        self.M = M
        self.efc = ef_construction
        self.efs = ef_search
        self.seed = seed
        self.graph: HNSW | None = None
        self.ids: np.ndarray | None = None
        self.build_s = 0.0

    def build(self, X: np.ndarray, ids: np.ndarray | None = None) -> None:
        t0 = time.perf_counter()
        X = np.ascontiguousarray(X, dtype=np.float64)
        if self.budget is not None and X.nbytes > self.budget:
            raise CapacityExceeded(
                f"dataset of {X.nbytes >> 20} MiB exceeds ParlayANN budget {self.budget >> 20} MiB"
            )
        self.ids = np.arange(X.shape[0]) if ids is None else np.asarray(ids)
        self.graph = HNSW(dim=X.shape[1], M=self.M, ef_construction=self.efc, seed=self.seed)
        self.graph.build(X)
        self.build_s = time.perf_counter() - t0

    def knn_batch(self, Q: np.ndarray, k: int) -> Dict[int, List[Tuple[int, float]]]:
        assert self.graph is not None, "build() first"
        Q = np.atleast_2d(np.asarray(Q, dtype=np.float64))
        return {
            q: [(int(self.ids[i]), float(d)) for i, d in self.graph.search(Q[q], k, self.efs)]
            for q in range(Q.shape[0])
        }
