"""Shared build/scan scaffolding for the iSAX-based baselines.

TARDIS and DPiSAX follow the same macro-structure as CLIMBER-INX (paper
§VII-A: "they both create a global main-memory index structure and use it
for re-partitioning the data and creating local indexes"):

1. sample → z-norm → PAA → iSAX symbols (driver-side numpy over the
   collected sample, like CLIMBER's skeleton phase),
2. a global partitioning structure built from the sample,
3. full-data redistribution into parquet partitions (``partitionBy(pid)``),
4. query: route to a single partition, scan it with the same distributed
   kNN operator CLIMBER uses (full-partition plans).

Keeping the substrate identical makes the timing/recall comparison about
the *representations and partitioning*, which is what the paper varies.
"""
from __future__ import annotations

import os
import pickle
import time
from dataclasses import dataclass, field
from typing import Callable, Dict, Iterator, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.paa import paa_np, with_paa, znorm_np
from ..core.query import QueryPlan, timed_knn_scan
from .isax import MAX_BITS, isax_symbols


def sample_symbols(series_df: DataFrame, w: int, alpha: float, seed: int) -> np.ndarray:
    """Collect the sample's (B, w) iSAX symbols at MAX_BITS."""
    pdf = with_paa(series_df.sample(fraction=alpha, seed=seed), w).select("paa").toPandas()
    if not len(pdf):
        raise ValueError("empty sample; raise alpha")
    P = np.stack(pdf["paa"].to_numpy())
    return isax_symbols(P, MAX_BITS)


def query_symbols(series: np.ndarray, w: int) -> np.ndarray:
    """Raw query batch → (Q, w) symbols (same transform chain as the data)."""
    return isax_symbols(paa_np(znorm_np(series), w), MAX_BITS)


@dataclass
class BaselineIndex:
    """A built iSAX-baseline index: routing structure + parquet partitions."""

    name: str
    out_dir: str
    w: int
    router: object  # picklable structure with .route(symbols_row) -> pid
    pid_counts: Dict[int, int] = field(default_factory=dict)
    build_s: float = 0.0
    n_series: int = 0

    @property
    def data_path(self) -> str:
        return os.path.join(self.out_dir, "data")

    def global_index_size_bytes(self) -> int:
        return len(pickle.dumps(self.router, protocol=pickle.HIGHEST_PROTOCOL))

    def knn_batch(self, spark: SparkSession, queries: np.ndarray, k: int):
        """Route each query to its single partition and scan (one Spark job)."""
        Q = np.atleast_2d(queries)
        syms = query_symbols(Q, self.w)
        plans = {
            qid: QueryPlan(pids=(int(self.router.route(syms[qid])),), prefixes=("",), expand_full=True)
            for qid in range(Q.shape[0])
        }
        return timed_knn_scan(spark, self.data_path, plans, Q, k, self.pid_counts)


def redistribute(
    spark: SparkSession,
    series_df: DataFrame,
    router: object,
    w: int,
    out_dir: str,
) -> Tuple[Dict[int, int], int]:
    """Step 3: assign every series a pid via the (broadcast) router and write
    the physical parquet partitions. Returns (pid occupancy, total rows)."""
    blob = pickle.dumps(router, protocol=pickle.HIGHEST_PROTOCOL)

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = pickle.loads(blob)
        for pdf in batches:
            pdf = pdf.copy()
            if len(pdf):
                X = np.stack(pdf["series"].to_numpy())
                syms = isax_symbols(paa_np(znorm_np(X), w), MAX_BITS)
                pdf["pid"] = [int(local.route(s)) for s in syms]
                pdf["node"] = ""
            else:
                pdf["pid"] = pd.Series([], dtype="int64")
                pdf["node"] = pd.Series([], dtype="object")
            yield pdf

    schema = ", ".join(f"{f.name} {f.dataType.simpleString()}" for f in series_df.schema.fields)
    assigned = series_df.mapInPandas(gen, schema=f"{schema}, pid long, node string")
    data_path = os.path.join(out_dir, "data")
    assigned.repartition("pid").write.mode("overwrite").partitionBy("pid").parquet(data_path)
    stats = spark.read.parquet(data_path).groupBy("pid").count().toPandas()
    pid_counts = {int(r.pid): int(r["count"]) for _, r in stats.iterrows()}
    return pid_counts, int(stats["count"].sum())


def build_baseline(
    name: str,
    spark: SparkSession,
    series_df: DataFrame,
    out_dir: str,
    make_router: Callable[[np.ndarray, float], object],
    *,
    w: int = 16,
    alpha: float = 0.25,
    seed: int = 7,
) -> BaselineIndex:
    """Common build driver: sample → router → redistribute → stats."""
    os.makedirs(out_dir, exist_ok=True)
    t0 = time.perf_counter()
    syms = sample_symbols(series_df, w, alpha, seed)
    router = make_router(syms, alpha)
    pid_counts, n = redistribute(spark, series_df, router, w, out_dir)
    return BaselineIndex(
        name=name, out_dir=out_dir, w=w, router=router, pid_counts=pid_counts,
        build_s=time.perf_counter() - t0, n_series=n,
    )
