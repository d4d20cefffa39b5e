"""CLIMBER query processing (paper §VI) — routing + distributed kNN scan.

Routing (driver side, against the broadcast-size skeleton):

* :func:`route_knn` — Algorithm 3: OD → WD → deepest-trie-path →
  largest-node → random tie-breaks; returns the target trie node's
  partitions.
* :func:`route_adaptive` — CLIMBER-kNN-Adaptive-NX: when the target node
  holds fewer than K objects, expand over the memorized next-best trie
  nodes (within the smallest-OD groups) until the candidate pool covers K,
  capped at ``factor`` × the base algorithm's partition count.
* :func:`route_od_smallest` — the §VII-C comparison point: scan *all*
  groups at the minimum OD.

Scanning (executor side): :func:`knn_scan` is the custom kNN operator —
one Spark job evaluates a whole batch of queries. Query vectors and
per-query plans are broadcast; the parquet read is pruned to the union of
planned partitions; a ``mapInPandas`` kernel computes vectorized ED for
the rows each plan selects (trie-node prefix filter, with full-partition
expansion when the node holds < K records — §VI "Localized Record-Level
Similarity") and emits per-partition partial top-K; the driver merges
partials into the final top-K per query.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, Iterator, List, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from .assignment import FALLBACK_GID, tied_groups_after_wd
from .distances import ed_np, od_matrix
from .skeleton import Skeleton
from .trie import TrieNode, navigate


@dataclass
class QueryPlan:
    """Driver-side routing outcome for one query."""

    pids: Tuple[int, ...]
    prefixes: Tuple[str, ...]  # trie-node path prefixes to filter records by
    expand_full: bool  # scan whole partitions (node smaller than K, or baseline)
    gid: int = -1
    node_path: str = ""
    node_count: float = 0.0

    @property
    def n_partitions(self) -> int:
        return len(self.pids)


def _candidate_groups(sk: Skeleton, sig_rs: np.ndarray, sig_ri: np.ndarray) -> List[int]:
    """Algorithm 3 lines 5–9: groups with smallest OD, WD tie-broken."""
    real_gids = [g for g in sorted(sk.groups) if g != FALLBACK_GID]
    if not real_gids:
        return [FALLBACK_GID]
    od = od_matrix(sig_ri[None, :], sk.mask)[0]
    cands = tied_groups_after_wd(sig_rs, od, sk.mask, sk.weights)
    if cands.size == 0:
        return [FALLBACK_GID]
    return [int(c) for c in cands]


def _groups_at_min_od(sk: Skeleton, sig_ri: np.ndarray) -> List[int]:
    """All groups sharing the smallest OD (no WD tie-break) — OD-Smallest."""
    real_gids = [g for g in sorted(sk.groups) if g != FALLBACK_GID]
    if not real_gids:
        return [FALLBACK_GID]
    od = od_matrix(sig_ri[None, :], sk.mask)[0]
    if od.min() >= sk.m:
        return [FALLBACK_GID]
    return [int(i) + 1 for i in np.flatnonzero(od == od.min())]


def route_knn(sk: Skeleton, series: np.ndarray, k: int, *, qid: int = 0) -> QueryPlan:
    """Algorithm 3 for one raw query series."""
    sig_rs, sig_ri = sk.signatures(series[None, :])
    sig_rs, sig_ri = sig_rs[0], sig_ri[0]
    cands = _candidate_groups(sk, sig_rs, sig_ri)
    # Lines 10–19: traverse each candidate group's trie, prefer the longest
    # matched path, then the largest node, then a seeded random pick.
    best: List[Tuple[int, TrieNode]] = []
    for g in cands:
        node = navigate(sk.groups[g].trie, sig_rs)
        best.append((g, node))
    if len(best) > 1:
        max_len = max(n.depth() for _, n in best)
        best = [(g, n) for g, n in best if n.depth() == max_len]
    if len(best) > 1:
        max_size = max(n.count for _, n in best)
        best = [(g, n) for g, n in best if n.count == max_size]
    if len(best) > 1:
        rng = np.random.default_rng((sk.seed * 7_919 + qid) & 0x7FFFFFFF)
        best = [best[int(rng.integers(len(best)))]]
    gid, node = best[0]
    # §VI localized similarity: compare only the node's records; if the node
    # holds fewer than K, CLIMBER-kNN expands within the same partition(s).
    expand = node.count < k
    return QueryPlan(
        pids=tuple(sorted(node.pids)), prefixes=(node.path,), expand_full=expand,
        gid=gid, node_path=node.path, node_count=node.count,
    )


def route_adaptive(
    sk: Skeleton, series: np.ndarray, k: int, *, factor: int = 4, qid: int = 0
) -> QueryPlan:
    """CLIMBER-kNN-Adaptive-NX (paper §VI).

    The paper triggers expansion when the target trie node "may contain
    less than k high-quality answers". At the paper's density (K=500 of
    10⁹ series) that risk only materializes when the node holds < K
    objects; at this repo's density (K=50 of 10⁴–10⁵) a node numerically
    covering K still routinely misses the true neighbours that a trie
    split or a group tie placed one partition over — so the expansion runs
    on every query and the NX partition budget, not the trigger, bounds
    the cost (see DESIGN.md §4, "query-density adaptation").

    Expansion accumulates the memorized best-matching trie nodes — the
    matched ancestor chain of every smallest-OD group, ranked by (OD, path
    length desc, node size desc) — up to ``factor`` × the base plan's
    partition count (the ``MaxNumPartitions`` cap), and evaluates every
    record of the partitions it loads.
    """
    base = route_knn(sk, series, k, qid=qid)
    sig_rs, sig_ri = sk.signatures(series[None, :])
    sig_rs, sig_ri = sig_rs[0], sig_ri[0]
    groups = _groups_at_min_od(sk, sig_ri)
    od = od_matrix(sig_ri[None, :], sk.mask)[0] if sk.mask.size else np.empty(0)

    # Memorized candidates: the matched ancestor chain (deepest node first,
    # up to the group root) of every tied group — the "longest and 2nd
    # longest best matches" of §VI, generalized to the full chain so the
    # NX partition budget, not the memo depth, is the binding constraint.
    cands: List[Tuple[int, int, float, int, TrieNode]] = []  # sort key + node
    for g in groups:
        trie = sk.groups[g].trie
        node = navigate(trie, sig_rs)
        chain = [node]
        while chain[-1].path:
            parent_path = chain[-1].path.rsplit("/", 1)[0] if "/" in chain[-1].path else ""
            parent = navigate(trie, [int(p) for p in parent_path.split("/")] if parent_path else [])
            chain.append(parent)
        g_od = int(od[g - 1]) if g != FALLBACK_GID and od.size else sk.m
        for n in chain:
            cands.append((g_od, -n.depth(), -n.count, g, n))
    cands.sort(key=lambda t: (t[0], t[1], t[2], t[3]))

    max_parts = max(base.n_partitions, factor * max(1, base.n_partitions))
    pids: List[int] = list(base.pids)
    prefixes: List[str] = list(base.prefixes)
    covered = base.node_count
    for _, _, _, g, n in cands:
        new_pids = [p for p in sorted(n.pids) if p not in pids]
        if len(pids) + len(new_pids) > max_parts:
            continue
        if n.path in prefixes and not new_pids:
            continue
        pids.extend(new_pids)
        if n.path not in prefixes:
            prefixes.append(n.path)
            covered += n.count
    # Expansion already paid the I/O for these partitions; evaluating every
    # loaded record (not just the memorized subtrees) is the paper's
    # "expands the search within the same partition" at zero extra I/O.
    return QueryPlan(
        pids=tuple(sorted(set(pids))), prefixes=("",),
        expand_full=True, gid=base.gid, node_path=base.node_path,
        node_count=base.node_count,
    )


def route_od_smallest(sk: Skeleton, series: np.ndarray, k: int, *, qid: int = 0) -> QueryPlan:
    """Scan every partition of every smallest-OD group (Fig. 11(b) reference)."""
    sig_rs, sig_ri = sk.signatures(series[None, :])
    groups = _groups_at_min_od(sk, sig_ri[0])
    pids: set = set()
    for g in groups:
        pids |= set(sk.groups[g].trie.pids)
    gid = groups[0]
    return QueryPlan(
        pids=tuple(sorted(pids)), prefixes=("",), expand_full=True,
        gid=gid, node_path="", node_count=float("nan"),
    )


# ---------------------------------------------------------------------------
# Distributed scan operator
# ---------------------------------------------------------------------------


def _prefix_mask(nodes: pd.Series, prefixes: Sequence[str]) -> np.ndarray:
    """Rows whose landing node lies in the subtree of any prefix path."""
    mask = np.zeros(len(nodes), dtype=bool)
    vals = nodes.to_numpy()
    for p in prefixes:
        if p == "":
            mask[:] = True
            break
        mask |= (vals == p) | np.char.startswith(vals.astype(str), p + "/")
    return mask


def knn_scan(
    spark: SparkSession,
    data_path: str,
    plans: Dict[int, QueryPlan],
    queries: np.ndarray,
    k: int,
    *,
    id_col: str = "id",
    series_col: str = "series",
) -> Dict[int, List[Tuple[int, float]]]:
    """Execute a batch of planned kNN scans in a single Spark job.

    ``plans[qid]`` indexes row ``qid`` of ``queries`` (Q × n). Returns
    ``qid → [(series id, ED distance)]`` sorted ascending, length ≤ k.
    """
    all_pids = sorted({p for pl in plans.values() for p in pl.pids})
    if not all_pids:
        return {q: [] for q in plans}
    sc = spark.sparkContext
    bc = sc.broadcast(
        {
            "Q": np.asarray(queries, dtype=np.float64),
            "plans": {q: (set(pl.pids), tuple(pl.prefixes), bool(pl.expand_full)) for q, pl in plans.items()},
            "k": int(k),
        }
    )
    df = (
        spark.read.parquet(data_path)
        .where(F.col("pid").isin([int(p) for p in all_pids]))
        .select(id_col, series_col, "node", "pid")
    )

    def scan(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        state = bc.value
        Q, plan_map, kk = state["Q"], state["plans"], state["k"]
        for pdf in batches:
            if not len(pdf):
                continue
            X = np.stack(pdf[series_col].to_numpy())
            ids = pdf[id_col].to_numpy()
            pids_here = set(pdf["pid"].unique().tolist())
            out_q, out_id, out_d = [], [], []
            for qid, (pids, prefixes, expand) in plan_map.items():
                if not (pids & pids_here):
                    continue
                rows = pdf["pid"].isin(list(pids)).to_numpy()
                if not expand:
                    rows &= _prefix_mask(pdf["node"], prefixes)
                if not rows.any():
                    continue
                d = ed_np(X[rows], Q[qid])
                top = np.argsort(d, kind="stable")[:kk]
                out_q.extend([qid] * len(top))
                out_id.extend(ids[rows][top].tolist())
                out_d.extend(d[top].tolist())
            if out_q:
                yield pd.DataFrame({"qid": out_q, "nid": out_id, "dist": out_d})

    partials = df.mapInPandas(scan, schema="qid long, nid long, dist double").toPandas()
    results: Dict[int, List[Tuple[int, float]]] = {q: [] for q in plans}
    if len(partials):
        for qid, grp in partials.groupby("qid"):
            top = grp.nsmallest(k, "dist")
            results[int(qid)] = list(zip(top["nid"].astype(int), top["dist"].astype(float)))
    return results


@dataclass
class QueryStats:
    """Per-batch execution metrics used by the experiment harness."""

    seconds: float = 0.0
    partitions_touched: Dict[int, int] = field(default_factory=dict)
    rows_scanned: Dict[int, int] = field(default_factory=dict)


def timed_knn_scan(spark, data_path, plans, queries, k, pid_counts=None):
    """:func:`knn_scan` plus wall-clock + data-touched accounting."""
    t0 = time.perf_counter()
    res = knn_scan(spark, data_path, plans, queries, k)
    stats = QueryStats(seconds=time.perf_counter() - t0)
    for qid, pl in plans.items():
        stats.partitions_touched[qid] = pl.n_partitions
        if pid_counts:
            stats.rows_scanned[qid] = int(sum(pid_counts.get(p, 0) for p in pl.pids))
    return res, stats
