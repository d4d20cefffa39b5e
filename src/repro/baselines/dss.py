"""Dss — Distributed Sequential Scan (paper §VII-A).

The vanilla full-scan baseline: every partition is scanned in parallel,
each task computes vectorized Euclidean distances for the whole query
batch and emits a per-partition partial top-K; the driver merges partials
into the global exact top-K. Dss produces the *exact* answer set and is
therefore also the ground truth against which every approximate system's
recall (Def. 4) is measured.
"""
from __future__ import annotations

import time
from typing import Dict, Iterator, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from ..core.distances import ed_np


def dss_knn(
    series_df: DataFrame,
    queries: np.ndarray,
    k: int,
    *,
    id_col: str = "id",
    series_col: str = "series",
) -> Dict[int, List[Tuple[int, float]]]:
    """Exact kNN for a batch of queries via one full-scan Spark job."""
    Q = np.atleast_2d(np.asarray(queries, dtype=np.float64))
    sc = series_df.sparkSession.sparkContext
    bc = sc.broadcast({"Q": Q, "k": int(k)})

    def scan(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        state = bc.value
        Qm, kk = state["Q"], state["k"]
        for pdf in batches:
            if not len(pdf):
                continue
            X = np.stack(pdf[series_col].to_numpy())
            ids = pdf[id_col].to_numpy()
            d = ed_np(X, Qm)  # (B, Qn)
            top = np.argsort(d, axis=0, kind="stable")[: min(kk, d.shape[0])]
            out = {
                "qid": np.repeat(np.arange(Qm.shape[0]), top.shape[0]),
                "nid": ids[top].T.ravel(),
                "dist": np.take_along_axis(d, top, axis=0).T.ravel(),
            }
            yield pd.DataFrame(out)

    partials = (
        series_df.select(id_col, series_col)
        .mapInPandas(scan, schema="qid long, nid long, dist double")
        .toPandas()
    )
    results: Dict[int, List[Tuple[int, float]]] = {q: [] for q in range(Q.shape[0])}
    for qid, grp in partials.groupby("qid"):
        best = grp.nsmallest(k, "dist")
        results[int(qid)] = list(zip(best["nid"].astype(int), best["dist"].astype(float)))
    return results


def timed_dss_knn(series_df: DataFrame, queries: np.ndarray, k: int):
    """``dss_knn`` plus wall-clock seconds (the Q.R.T of the Dss rows)."""
    t0 = time.perf_counter()
    res = dss_knn(series_df, queries, k)
    return res, time.perf_counter() - t0
