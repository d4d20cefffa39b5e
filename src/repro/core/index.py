"""CLIMBER-INX build pipeline — paper Fig. 6, Steps 1–4, on Spark DataFrames.

Step 1  sample → PAA → random pivots → rank-sensitive signatures
        (`DataFrame.sample` + ``mapInPandas`` kernels; the ``[(P⁴, freq)]``
        lists are `groupBy(signature).count()` aggregations).
Step 2  Algorithm 2 on the rank-insensitive frequency list → centroids.
Step 3  Algorithm 1 assignment of the sample, per-group tries, FFD packing
        → the index *skeleton* (driver-side, tiny).
Step 4  full-dataset redistribution: the pivots + skeleton ship to
        executors inside the ``mapInPandas`` closure (the paper's
        broadcast); every series gets ``(gid, pid, node)``; a
        ``repartition(pid)`` shuffle + ``write.partitionBy("pid")`` produce
        the physical partitions, with records sorted by trie node so each
        node's records are contiguous (the paper's in-partition layout).

After the write, one cheap aggregation collects exact per-node landing
counts and per-partition occupancies; the skeleton's estimated counts are
refined with them (`Skeleton.refine_counts`) — this is what Algorithm 3's
``Size(G_N)`` and the adaptive expansion consult at query time.
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import dataclass, field
from typing import Dict, Iterator, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .paa import with_paa
from .pivots import select_pivots, with_signatures
from .query import QueryPlan, route_adaptive, route_knn, route_od_smallest, timed_knn_scan
from .skeleton import Skeleton, build_skeleton


@dataclass(frozen=True)
class ClimberParams:
    """Build-time knobs; defaults are the repo's scaled-down paper defaults.

    Paper defaults: r=200 pivots, prefix m=10, K=500, c = one HDFS block.
    Scaled here (see DESIGN.md §4): r=64, m=6, c=1000 series.
    """

    w: int = 16
    r: int = 64
    m: int = 6
    capacity: int = 1000
    alpha: float = 0.25  # sample fraction
    eps: int = 2
    max_centroids: int | None = 64
    decay_kind: str = "exp"
    decay_lam: float = 0.5
    seed: int = 7


@dataclass
class BuildReport:
    """Phase timings for Figs. 8 and 10(a)."""

    sample_s: float = 0.0
    skeleton_s: float = 0.0
    redistribute_s: float = 0.0
    stats_s: float = 0.0

    @property
    def total_s(self) -> float:
        return self.sample_s + self.skeleton_s + self.redistribute_s + self.stats_s


@dataclass
class ClimberIndex:
    """Handle over a built index: skeleton + parquet partitions + stats."""

    out_dir: str
    skeleton: Skeleton
    params: ClimberParams
    pid_counts: Dict[int, int] = field(default_factory=dict)
    n_series: int = 0
    report: BuildReport = field(default_factory=BuildReport)

    @property
    def data_path(self) -> str:
        return os.path.join(self.out_dir, "data")

    def global_index_size_bytes(self) -> int:
        return self.skeleton.size_bytes()

    # ---- query API (paper §VI); all variants share the scan operator ----

    def plan(self, series: np.ndarray, k: int, *, variant: str = "adaptive-4x", qid: int = 0) -> QueryPlan:
        sk = self.skeleton
        if variant == "knn":
            return route_knn(sk, series, k, qid=qid)
        if variant == "adaptive-2x":
            return route_adaptive(sk, series, k, factor=2, qid=qid)
        if variant == "adaptive-4x":
            return route_adaptive(sk, series, k, factor=4, qid=qid)
        if variant == "od-smallest":
            return route_od_smallest(sk, series, k, qid=qid)
        raise ValueError(f"unknown variant {variant!r}")

    def knn_batch(
        self, spark: SparkSession, queries: np.ndarray, k: int, *, variant: str = "adaptive-4x"
    ):
        """Plan + execute a batch of queries; returns (results, stats)."""
        plans = {
            qid: self.plan(np.asarray(q, dtype=np.float64), k, variant=variant, qid=qid)
            for qid, q in enumerate(np.atleast_2d(queries))
        }
        return timed_knn_scan(spark, self.data_path, plans, np.atleast_2d(queries), k, self.pid_counts)

    # ---- persistence ----

    def save(self) -> None:
        with open(os.path.join(self.out_dir, "skeleton.pkl"), "wb") as f:
            f.write(self.skeleton.serialize())
        meta = {
            "params": self.params.__dict__,
            "pid_counts": {str(k): v for k, v in self.pid_counts.items()},
            "n_series": self.n_series,
        }
        with open(os.path.join(self.out_dir, "meta.json"), "w") as f:
            json.dump(meta, f)

    @classmethod
    def load(cls, out_dir: str) -> "ClimberIndex":
        with open(os.path.join(out_dir, "skeleton.pkl"), "rb") as f:
            sk = Skeleton.deserialize(f.read())
        with open(os.path.join(out_dir, "meta.json")) as f:
            meta = json.load(f)
        params = ClimberParams(**meta["params"])
        return cls(
            out_dir=out_dir, skeleton=sk, params=params,
            pid_counts={int(k): v for k, v in meta["pid_counts"].items()},
            n_series=meta["n_series"],
        )


def _with_assignment(df: DataFrame, sk: Skeleton) -> DataFrame:
    """Step 4 kernel: append (gid, pid, node) using the broadcast skeleton."""
    blob = sk.serialize()

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = Skeleton.deserialize(blob)
        for pdf in batches:
            pdf = pdf.copy()
            if len(pdf):
                sig_rs = np.stack(pdf["sig_rs"].to_numpy()).astype(np.int64)
                gid, pid, nodes = local.assign_records(sig_rs, pdf["id"].to_numpy())
                pdf["gid"], pdf["pid"], pdf["node"] = gid, pid, nodes
            else:
                pdf["gid"] = pd.Series([], dtype="int64")
                pdf["pid"] = pd.Series([], dtype="int64")
                pdf["node"] = pd.Series([], dtype="object")
            yield pdf

    schema = ", ".join(f"{f.name} {f.dataType.simpleString()}" for f in df.schema.fields)
    return df.mapInPandas(gen, schema=f"{schema}, gid long, pid long, node string")


def build_index(
    spark: SparkSession,
    series_df: DataFrame,
    out_dir: str,
    params: ClimberParams = ClimberParams(),
) -> ClimberIndex:
    """Run the full CLIMBER-INX construction (Fig. 6) and persist the index."""
    os.makedirs(out_dir, exist_ok=True)
    report = BuildReport()

    # -- Step 1: sample, PAA, pivots, sample signatures ----------------------
    t0 = time.perf_counter()
    sample = series_df.sample(fraction=params.alpha, seed=params.seed)
    sample_paa = with_paa(sample, params.w).select("id", "paa")
    sample_paa_pdf = sample_paa.toPandas()
    if len(sample_paa_pdf) < params.r:
        raise ValueError(
            f"sample of {len(sample_paa_pdf)} rows < r={params.r} pivots; "
            "raise alpha or lower r"
        )
    P = np.stack(sample_paa_pdf["paa"].to_numpy())
    pivots = select_pivots(P, params.r, seed=params.seed)

    sig_freqs_pdf = (
        with_signatures(sample_paa.cache(), pivots, params.m)
        .groupBy("sig_rs")
        .count()
        .toPandas()
    )
    rs_freqs: List[Tuple[Tuple[int, ...], int]] = [
        (tuple(int(p) for p in sig), int(cnt))
        for sig, cnt in zip(sig_freqs_pdf["sig_rs"], sig_freqs_pdf["count"])
    ]
    report.sample_s = time.perf_counter() - t0

    # -- Steps 2 + 3: skeleton (centroids, groups, tries, packing) -----------
    t0 = time.perf_counter()
    sk = build_skeleton(
        rs_freqs, pivots, w=params.w, m=params.m, capacity=params.capacity,
        alpha=params.alpha, eps=params.eps, max_centroids=params.max_centroids,
        decay_kind=params.decay_kind, decay_lam=params.decay_lam, seed=params.seed,
    )
    report.skeleton_s = time.perf_counter() - t0

    # -- Step 4: full-data conversion + redistribution -----------------------
    t0 = time.perf_counter()
    assigned = _with_assignment(
        with_signatures(with_paa(series_df, params.w), pivots, params.m), sk
    )
    data_path = os.path.join(out_dir, "data")
    (
        assigned.repartition("pid")
        .sortWithinPartitions("pid", "node")
        .write.mode("overwrite")
        .partitionBy("pid")
        .parquet(data_path)
    )
    report.redistribute_s = time.perf_counter() - t0

    # -- exact stats: refine trie counts, record partition occupancy ---------
    t0 = time.perf_counter()
    stats = (
        spark.read.parquet(data_path)
        .groupBy("gid", "node", "pid")
        .count()
        .toPandas()
    )
    landing: Dict[Tuple[int, str], int] = {}
    pid_counts: Dict[int, int] = {}
    for row in stats.itertuples(index=False):
        landing[(int(row.gid), str(row.node))] = landing.get((int(row.gid), str(row.node)), 0) + int(row.count)
        pid_counts[int(row.pid)] = pid_counts.get(int(row.pid), 0) + int(row.count)
    sk.refine_counts(landing)
    report.stats_s = time.perf_counter() - t0

    idx = ClimberIndex(
        out_dir=out_dir, skeleton=sk, params=params, pid_counts=pid_counts,
        n_series=sum(pid_counts.values()), report=report,
    )
    idx.save()
    return idx
