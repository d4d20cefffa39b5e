"""Algorithm 2 — data-driven computation of the groups' centroids (paper §V Step 2).

Input: the list ``L = [(P⁴⇉ signature, frequency)]`` aggregated from the
sample's rank-insensitive signatures. The greedy selection:

1. sort ``L`` descending by frequency; the most frequent signature is the
   first centroid;
2. walk down the list, admitting ``L[i]`` as a new centroid iff
   (a) its OD to every already-chosen centroid is ≥ ε (avoid near-duplicate
   centroids / ensure space coverage), and
   (b) its estimated group size — own frequency plus an even share of all
   not-yet-assigned frequency — is at least ``α·c`` (avoid tiny groups;
   the α factor rescales the full-data capacity c to sample units);
   the first candidate failing (b) terminates the scan (the list is
   frequency-sorted, so later candidates only shrink);
3. stop early when ``max_centroids`` is reached;
4. append the special fall-back centroid ``⟨*,*,…⟩`` (group id 0 here).

Centroids are *virtual* rank-insensitive points: they have no
rank-sensitive signature (paper §IV-C).
"""
from __future__ import annotations

from typing import List, Sequence, Tuple

from .distances import overlap_distance


def compute_centroids(
    ri_freqs: Sequence[Tuple[Sequence[int], int]],
    *,
    alpha: float,
    capacity: int,
    eps: int = 2,
    max_centroids: int | None = None,
) -> List[Tuple[int, ...]]:
    """Run Algorithm 2 and return the list of real centroids (gid = index+1).

    Parameters
    ----------
    ri_freqs : ``[(signature, freq)]`` — distinct rank-insensitive
        signatures with sample frequencies (any order).
    alpha : sample fraction in (0, 1].
    capacity : storage capacity constraint ``c`` in series per partition.
    eps : minimum OD between two centroids (Algorithm 2 line 8).
    max_centroids : optional hard cap (Algorithm 2 lines 15-16).

    The fall-back centroid is *not* included in the return value — it is an
    implicit group 0 handled by the assignment/query rules.
    """
    if not ri_freqs:
        return []
    if not 0.0 < alpha <= 1.0:
        raise ValueError(f"alpha must be in (0,1], got {alpha}")
    L = sorted(
        ((tuple(int(p) for p in sig), int(f)) for sig, f in ri_freqs),
        key=lambda t: (-t[1], t[0]),
    )
    total_freq = sum(f for _, f in L)
    centroids: List[Tuple[int, ...]] = [L[0][0]]
    assigned_freq = L[0][1]

    for sig, freq in L[1:]:
        if max_centroids is not None and len(centroids) >= max_centroids:
            break
        if any(overlap_distance(sig, c) < eps for c in centroids):
            continue  # too close to an existing centroid (line 8)
        # Size estimate (line 11): own frequency plus a uniform share of the
        # frequency mass not yet claimed by a centroid.
        non_centroid_freq = total_freq - assigned_freq - freq
        size_est = freq + non_centroid_freq / (len(centroids) + 1)
        if size_est < alpha * capacity:
            break  # the list is frequency-sorted: no later candidate can pass
        centroids.append(sig)
        assigned_freq += freq
    return centroids
