"""Fig. 10 miniature — number-of-pivots impact on build time and recall."""
import pytest

from repro.core.index import ClimberParams, build_index
from repro.harness.recall import recall_batch

from .conftest import BENCH_PARAMS, K_BENCH, once


@pytest.mark.parametrize("r", [16, 48, 128])
def test_pivot_sweep_build_and_recall(benchmark, spark, bench_df, bench_queries,
                                      bench_gt, tmp_path, r):
    params = ClimberParams(**{**BENCH_PARAMS.__dict__, "r": r})
    idx = once(benchmark, build_index, spark, bench_df, str(tmp_path / f"r{r}"), params)
    res, _ = idx.knn_batch(spark, bench_queries, K_BENCH, variant="adaptive-4x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
    benchmark.extra_info["pivots"] = r
    benchmark.extra_info["index_bytes"] = idx.global_index_size_bytes()
