"""Benchmark fixtures: one bench-scale workload shared across bench files.

Bench scale (SF~0.1-equivalent): n=4000 RandomWalk series of length 128 —
big enough that the Spark shuffle/parquet paths dominate, small enough
that the whole `pytest benchmarks/ --benchmark-only` run stays in minutes.
The full paper-scale tables are produced by the ``jobs/`` entrypoints
(see EXPERIMENTS.md); every benchmark here regenerates a miniature of one
table/figure and records recall values in ``extra_info``.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.dpisax import build_dpisax
from repro.baselines.dss import dss_knn
from repro.baselines.tardis import build_tardis
from repro.core.index import ClimberParams, build_index
from repro.synth_data import random_walk_series

N_BENCH = 4000
LEN_BENCH = 128
K_BENCH = 20
BENCH_PARAMS = ClimberParams(w=16, r=48, m=6, capacity=400, alpha=0.25, seed=7)


@pytest.fixture(scope="session")
def bench_df(spark):
    df = random_walk_series(spark, n=N_BENCH, length=LEN_BENCH).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def bench_matrix(bench_df):
    pdf = bench_df.orderBy("id").toPandas()
    return pdf["id"].to_numpy(), np.stack(pdf["series"].to_numpy())


@pytest.fixture(scope="session")
def bench_queries(bench_matrix):
    ids, X = bench_matrix
    rng = np.random.default_rng(42)
    qids = rng.choice(X.shape[0], size=5, replace=False)
    return X[qids]


@pytest.fixture(scope="session")
def bench_gt(bench_df, bench_queries):
    return dss_knn(bench_df, bench_queries, K_BENCH)


@pytest.fixture(scope="session")
def bench_climber(spark, bench_df, tmp_path_factory):
    d = tmp_path_factory.mktemp("bench-climber")
    return build_index(spark, bench_df, str(d), BENCH_PARAMS)


@pytest.fixture(scope="session")
def bench_tardis(spark, bench_df, tmp_path_factory):
    d = tmp_path_factory.mktemp("bench-tardis")
    return build_tardis(spark, bench_df, str(d), w=BENCH_PARAMS.w,
                        capacity=BENCH_PARAMS.capacity, alpha=BENCH_PARAMS.alpha,
                        seed=BENCH_PARAMS.seed)


@pytest.fixture(scope="session")
def bench_dpisax(spark, bench_df, tmp_path_factory):
    d = tmp_path_factory.mktemp("bench-dpisax")
    return build_dpisax(spark, bench_df, str(d), w=BENCH_PARAMS.w,
                        capacity=BENCH_PARAMS.capacity, alpha=BENCH_PARAMS.alpha,
                        seed=BENCH_PARAMS.seed)


def once(benchmark, fn, *args, **kwargs):
    """Run a heavyweight (Spark) target exactly once under pytest-benchmark."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1,
                              warmup_rounds=0)
