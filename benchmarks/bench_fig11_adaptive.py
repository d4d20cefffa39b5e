"""Fig. 11 miniature — adaptive variants vs CLIMBER-kNN vs OD-Smallest."""
from repro.harness.recall import recall_batch

from .conftest import K_BENCH, once


def test_variant_knn(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="knn")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["rows_scanned"] = sum(stats.rows_scanned.values())


def test_variant_adaptive2x(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="adaptive-2x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["rows_scanned"] = sum(stats.rows_scanned.values())


def test_variant_adaptive4x(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="adaptive-4x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["rows_scanned"] = sum(stats.rows_scanned.values())


def test_variant_od_smallest(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, stats = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                      K_BENCH, variant="od-smallest")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["rows_scanned"] = sum(stats.rows_scanned.values())
