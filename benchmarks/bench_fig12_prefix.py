"""Fig. 12 miniature — pivot-prefix-length impact on build/query/recall/size."""
import pytest

from repro.core.index import ClimberParams, build_index
from repro.harness.recall import recall_batch

from .conftest import BENCH_PARAMS, K_BENCH, once


@pytest.mark.parametrize("m", [3, 6, 10])
def test_prefix_sweep(benchmark, spark, bench_df, bench_queries, bench_gt, tmp_path, m):
    params = ClimberParams(**{**BENCH_PARAMS.__dict__, "m": m})
    idx = once(benchmark, build_index, spark, bench_df, str(tmp_path / f"m{m}"), params)
    res, _ = idx.knn_batch(spark, bench_queries, K_BENCH, variant="adaptive-4x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["prefix"] = m
    benchmark.extra_info["index_bytes"] = idx.global_index_size_bytes()
