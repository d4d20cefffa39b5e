"""Odyssey simulation — distributed in-memory *exact* kNN engine (Table I).

Odyssey [16] keeps the entire dataset and its iSAX-tree indexes resident
in main memory and answers batches of kNN queries exactly, with
scheduling/load-balancing across cores. We reproduce the behaviours Table
I measures:

* **I.C.T** — loading the data into memory plus building an in-memory
  iSAX tree over it (Odyssey's per-node index build);
* **Q.R.T** — exact batched kNN over the memory-resident matrix,
  vectorized across cores by numpy (the engine's parallel scan with
  lower-bound pruning is simulated by a chunked exact scan — same answers,
  same "fast while it fits in memory" profile);
* **R.R = 1.0** — exact by construction;
* the hard capacity wall: a configurable memory budget raises
  :class:`CapacityExceeded` when the dataset does not fit, reproducing the
  "X" cells of Table I (Odyssey fails at 1000 GB on the paper's cluster).

See DESIGN.md §4 for the substitution rationale.
"""
from __future__ import annotations

import time
from typing import Dict, List, Tuple

import numpy as np

from ..core.paa import paa_np
from ..baselines.isax import MAX_BITS, coarsen, isax_symbols, word_key


class CapacityExceeded(RuntimeError):
    """Raised when a memory-based system cannot hold the dataset (an 'X' cell)."""


class OdysseyEngine:
    def __init__(self, memory_budget_bytes: int | None = None, w: int = 16, tree_bits: int = 2):
        self.budget = memory_budget_bytes
        self.w = w
        self.tree_bits = tree_bits
        self.X: np.ndarray | None = None
        self.ids: np.ndarray | None = None
        self.tree: Dict[tuple, np.ndarray] = {}
        self.build_s = 0.0

    def build(self, X: np.ndarray, ids: np.ndarray | None = None) -> None:
        """Load the dataset into memory and build the in-memory iSAX tree."""
        t0 = time.perf_counter()
        X = np.ascontiguousarray(X, dtype=np.float64)
        if self.budget is not None and X.nbytes > self.budget:
            raise CapacityExceeded(
                f"dataset of {X.nbytes >> 20} MiB exceeds Odyssey budget {self.budget >> 20} MiB"
            )
        self.X = X
        self.ids = np.arange(X.shape[0]) if ids is None else np.asarray(ids)
        words = coarsen(isax_symbols(paa_np(X, self.w), MAX_BITS), MAX_BITS, self.tree_bits)
        tree: Dict[tuple, List[int]] = {}
        for i in range(words.shape[0]):
            tree.setdefault(word_key(words[i]), []).append(i)
        self.tree = {k: np.asarray(v) for k, v in tree.items()}
        self.build_s = time.perf_counter() - t0

    def knn_batch(self, Q: np.ndarray, k: int, chunk: int = 8192) -> Dict[int, List[Tuple[int, float]]]:
        """Exact kNN for a query batch (chunked vectorized scan)."""
        assert self.X is not None, "build() first"
        Q = np.atleast_2d(np.asarray(Q, dtype=np.float64))
        nq = Q.shape[0]
        best_d = np.full((nq, 0), np.inf)
        best_i = np.empty((nq, 0), dtype=np.int64)
        q2 = (Q * Q).sum(axis=1)
        for lo in range(0, self.X.shape[0], chunk):
            B = self.X[lo : lo + chunk]
            d2 = q2[:, None] + (B * B).sum(axis=1)[None, :] - 2.0 * (Q @ B.T)
            np.maximum(d2, 0.0, out=d2)
            d = np.sqrt(d2)
            cat_d = np.concatenate([best_d, d], axis=1)
            cat_i = np.concatenate(
                [best_i, np.broadcast_to(np.arange(lo, lo + B.shape[0]), (nq, B.shape[0]))], axis=1
            )
            keep = np.argsort(cat_d, axis=1, kind="stable")[:, :k]
            best_d = np.take_along_axis(cat_d, keep, axis=1)
            best_i = np.take_along_axis(cat_i, keep, axis=1)
        return {
            q: [(int(self.ids[i]), float(d)) for i, d in zip(best_i[q], best_d[q])]
            for q in range(nq)
        }
