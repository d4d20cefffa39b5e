"""Fig. 7 miniature — query execution time + recall per system.

Each benchmark runs the system's whole 5-query batch once and records the
batch recall in ``extra_info`` — the paper shape to check: Dss is exact
but slowest-per-candidate; CLIMBER (default Adaptive-4X) beats TARDIS
beats DPiSAX on recall at comparable query times.
"""
from repro.baselines.dss import dss_knn
from repro.harness.recall import recall_batch

from .conftest import K_BENCH, once


def test_query_dss(benchmark, bench_df, bench_queries, bench_gt):
    res = once(benchmark, dss_knn, bench_df, bench_queries, K_BENCH)
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)


def test_query_climber_knn(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="knn")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)


def test_query_climber_adaptive4x(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="adaptive-4x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)


def test_query_tardis(benchmark, spark, bench_tardis, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_tardis.knn_batch, spark, bench_queries, K_BENCH)
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)


def test_query_dpisax(benchmark, spark, bench_dpisax, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_dpisax.knn_batch, spark, bench_queries, K_BENCH)
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
