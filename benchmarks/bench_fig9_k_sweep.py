"""Fig. 9(b) miniature — the query-time table under varying K.

One benchmark per (algorithm, K) cell of the paper's Fig. 9(b) table,
with the Fig. 9(a) recall recorded in ``extra_info``.
"""
import pytest

from repro.baselines.dss import dss_knn
from repro.harness.recall import recall_batch

from .conftest import once

KS = [5, 20, 80]


@pytest.mark.parametrize("k", KS)
def test_k_sweep_dss(benchmark, bench_df, bench_queries, k):
    res = once(benchmark, dss_knn, bench_df, bench_queries, k)
    benchmark.extra_info["recall"] = 1.0


@pytest.mark.parametrize("k", KS)
@pytest.mark.parametrize("variant", ["knn", "adaptive-2x", "adaptive-4x"])
def test_k_sweep_climber(benchmark, spark, bench_df, bench_climber, bench_queries, variant, k):
    gt = dss_knn(bench_df, bench_queries, k)
    res, _ = once(benchmark, bench_climber.knn_batch, spark, bench_queries, k, variant=variant)
    benchmark.extra_info["recall"] = recall_batch(res, gt)


@pytest.mark.parametrize("k", KS)
def test_k_sweep_tardis(benchmark, spark, bench_df, bench_tardis, bench_queries, k):
    gt = dss_knn(bench_df, bench_queries, k)
    res, _ = once(benchmark, bench_tardis.knn_batch, spark, bench_queries, k)
    benchmark.extra_info["recall"] = recall_batch(res, gt)


@pytest.mark.parametrize("k", KS)
def test_k_sweep_dpisax(benchmark, spark, bench_df, bench_dpisax, bench_queries, k):
    gt = dss_knn(bench_df, bench_queries, k)
    res, _ = once(benchmark, bench_dpisax.knn_batch, spark, bench_queries, k)
    benchmark.extra_info["recall"] = recall_batch(res, gt)
