"""Recall (Def. 4) — the paper's accuracy metric.

``recall = |S_approx ∩ S_exact| / |S_exact|``, computed per query on the
id sets and averaged over the query batch (the paper reports averages
over 50 random queries).
"""
from __future__ import annotations

from typing import Dict, List, Sequence, Tuple

Result = Dict[int, List[Tuple[int, float]]]


def recall_one(approx: Sequence[Tuple[int, float]], exact: Sequence[Tuple[int, float]]) -> float:
    """Recall of one query's answer list against the exact top-K."""
    if not exact:
        return 1.0 if not approx else 0.0
    a = {int(i) for i, _ in approx}
    e = {int(i) for i, _ in exact}
    return len(a & e) / len(e)


def recall_batch(approx: Result, exact: Result) -> float:
    """Mean recall over a query batch (queries keyed identically)."""
    if not exact:
        raise ValueError("empty ground truth")
    vals = [recall_one(approx.get(q, []), exact[q]) for q in exact]
    return float(sum(vals) / len(vals))
