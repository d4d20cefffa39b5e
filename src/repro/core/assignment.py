"""Algorithm 1 — group-assignment rules (paper §IV-C).

Given a list of group centroids (rank-insensitive signatures) and a data
series object with its dual signatures, assign the object to a group:

1. Compute OD (Def. 7) to every centroid. If **all** ODs equal ``m`` (zero
   overlap with every centroid) → the special fall-back group ``G₀``.
2. A unique smallest OD wins.
3. On a tie, compute WD (Def. 11) over the tied centroids using the
   rank-sensitive signature's decay weights; a unique smallest WD wins.
4. On a second tie, pick uniformly at random among the still-tied
   centroids (seeded per-object here so assignment is reproducible and
   independent of Spark partitioning).

``assign_batch`` is the vectorized kernel used both at index-build time
(Step 3 on the sample, Step 4 on the full data) and — with ``return_ties``
— by the query router, which needs the full tied-group list rather than a
single resolved pick.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from .distances import od_matrix, wd_matrix

FALLBACK_GID = 0


@dataclass(frozen=True)
class AssignmentResult:
    """Per-object outcome of Algorithm 1.

    ``gid`` — chosen group id per object (0 = fall-back ``G₀``; real groups
    are 1-based, matching the order of ``mask`` rows + 1).
    ``od`` — (B, C) OD matrix (diagnostics / router reuse).
    ``tied`` — list of candidate-group-id arrays per object *after* the WD
    tie-break (len 1 unless a second tie occurred; empty for fall-back).
    """

    gid: np.ndarray
    od: np.ndarray
    tied: list


def tied_groups_after_wd(
    sig_rs_row: np.ndarray, od_row: np.ndarray, mask: np.ndarray, weights: np.ndarray
) -> np.ndarray:
    """Candidate group ids (1-based) for one object after OD + WD tie-breaks.

    Returns an empty array when the object overlaps no centroid (fall-back
    case). Used by both assignment and the CLIMBER-kNN router (Algorithm 3
    lines 5–9 are exactly this computation).
    """
    m = sig_rs_row.shape[0]
    best = od_row.min()
    if best >= m:
        return np.empty(0, dtype=np.int64)
    cands = np.flatnonzero(od_row == best)
    if cands.size > 1:
        wd = wd_matrix(sig_rs_row[None, :], mask[cands], weights)[0]
        cands = cands[np.flatnonzero(wd == wd.min())]
    return cands + 1  # group ids are 1-based; 0 is reserved for G₀


def assign_batch(
    sig_rs: np.ndarray,
    mask: np.ndarray,
    weights: np.ndarray,
    *,
    ids: np.ndarray | None = None,
    seed: int = 0,
) -> AssignmentResult:
    """Vectorized Algorithm 1 over a batch of rank-sensitive signatures.

    ``ids`` (optional, one per row) seed the rule-4 random tie-break so the
    result is deterministic per object id regardless of batching.
    """
    S = np.asarray(sig_rs, dtype=np.int64)
    B, m = S.shape
    od = od_matrix(S, mask)
    gid = np.full(B, FALLBACK_GID, dtype=np.int64)
    tied: list = [None] * B

    best = od.min(axis=1)
    overlap_rows = np.flatnonzero(best < m)
    # Fast path: rows whose smallest OD is unique need no WD evaluation.
    if overlap_rows.size:
        counts = (od[overlap_rows] == best[overlap_rows, None]).sum(axis=1)
        unique_rows = overlap_rows[counts == 1]
        gid[unique_rows] = od[unique_rows].argmin(axis=1) + 1
        for b in unique_rows:
            tied[b] = np.array([gid[b]], dtype=np.int64)
        for b in overlap_rows[counts > 1]:
            cands = tied_groups_after_wd(S[b], od[b], mask, weights)
            tied[b] = cands
            if cands.size == 1:
                gid[b] = cands[0]
            else:
                obj_seed = seed if ids is None else (seed * 1_000_003 + int(ids[b])) & 0x7FFFFFFF
                gid[b] = int(np.random.default_rng(obj_seed).choice(cands))
    for b in np.flatnonzero(best >= m):
        tied[b] = np.empty(0, dtype=np.int64)
    return AssignmentResult(gid=gid, od=od, tied=tied)
