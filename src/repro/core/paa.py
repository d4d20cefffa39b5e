"""Piecewise Aggregate Approximation (PAA) — CLIMBER-FX Step 1 (paper §IV-B).

PAA divides a length-``n`` data series into ``w`` equal-size segments and
represents each segment by its mean value (paper Fig. 3). It is the
dimensionality-reduction front end shared by CLIMBER's P⁴ signatures and by
the iSAX-based baselines (TARDIS, DPiSAX).

Two forms are provided:

* :func:`paa_np` — the vectorized numpy kernel (batch of series → batch of
  PAA vectors). This is the reference implementation used by tests and by
  driver-side query transformation.
* :func:`with_paa` — the Spark operator: adds a ``paa`` column to a
  DataFrame of ``(id, series)`` rows via ``mapInPandas`` so the kernel runs
  Arrow-vectorized on executors.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, DoubleType, StructField, StructType


def segment_bounds(n: int, w: int) -> np.ndarray:
    """Segment boundaries for a length-``n`` series split into ``w`` pieces.

    Returns ``w + 1`` integer offsets. When ``w`` does not divide ``n`` the
    remainder is spread as evenly as possible (linspace rounding), matching
    the standard PAA generalization; every segment is non-empty.
    """
    if not 1 <= w <= n:
        raise ValueError(f"need 1 <= w <= n, got w={w}, n={n}")
    return np.round(np.linspace(0, n, w + 1)).astype(np.int64)


def paa_np(series: np.ndarray, w: int) -> np.ndarray:
    """PAA transform of a batch of series.

    Parameters
    ----------
    series : (B, n) float array — B series of length n.
    w : number of segments.

    Returns
    -------
    (B, w) float64 array of segment means.
    """
    X = np.asarray(series, dtype=np.float64)
    if X.ndim == 1:
        X = X[None, :]
    n = X.shape[1]
    bounds = segment_bounds(n, w)
    lengths = np.diff(bounds).astype(np.float64)
    # reduceat sums each [bounds[i], bounds[i+1]) slice along axis 1.
    sums = np.add.reduceat(X, bounds[:-1], axis=1)
    return sums / lengths


def znorm_np(series: np.ndarray, eps: float = 1e-12) -> np.ndarray:
    """Z-normalize each series (mean 0, std 1); constant series map to 0.

    iSAX breakpoints assume N(0,1)-distributed values, so baselines apply
    this before PAA. CLIMBER's generators already emit z-normalized series
    but the kernel is idempotent and safe to reuse.
    """
    X = np.asarray(series, dtype=np.float64)
    if X.ndim == 1:
        X = X[None, :]
    mu = X.mean(axis=1, keepdims=True)
    sd = X.std(axis=1, keepdims=True)
    sd = np.where(sd < eps, 1.0, sd)
    return (X - mu) / sd


def _series_matrix(col: pd.Series) -> np.ndarray:
    """Stack an Arrow list column (pandas Series of arrays) into a 2-D array."""
    return np.stack(col.to_numpy())


def with_paa(df: DataFrame, w: int, *, series_col: str = "series", out_col: str = "paa") -> DataFrame:
    """Spark operator: append a PAA column computed on executors.

    The output schema is the input schema plus ``out_col: array<double>``.
    """
    out_schema = StructType(df.schema.fields + [StructField(out_col, ArrayType(DoubleType()), False)])

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf):
                X = _series_matrix(pdf[series_col])
                pdf = pdf.copy()
                pdf[out_col] = list(paa_np(X, w))
            else:
                pdf = pdf.copy()
                pdf[out_col] = []
            yield pdf

    return df.mapInPandas(gen, schema=out_schema)
