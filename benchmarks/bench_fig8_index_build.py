"""Fig. 8 miniature — index construction time + global index size.

Builds each system once (pedantic single round) on the bench workload;
paper shape: DPiSAX slowest per unit in the paper's cluster, CLIMBER
slightly above TARDIS, all global indexes tiny.
"""
from repro.baselines.dpisax import build_dpisax
from repro.baselines.tardis import build_tardis
from repro.core.index import build_index

from .conftest import BENCH_PARAMS, once


def test_build_climber(benchmark, spark, bench_df, tmp_path):
    idx = once(benchmark, build_index, spark, bench_df, str(tmp_path / "c"), BENCH_PARAMS)
    benchmark.extra_info["index_bytes"] = idx.global_index_size_bytes()
    benchmark.extra_info["partitions"] = idx.skeleton.n_partitions
    benchmark.extra_info["phases"] = {
        "sample_s": round(idx.report.sample_s, 3),
        "skeleton_s": round(idx.report.skeleton_s, 3),
        "redistribute_s": round(idx.report.redistribute_s, 3),
    }


def test_build_tardis(benchmark, spark, bench_df, tmp_path):
    idx = once(benchmark, build_tardis, spark, bench_df, str(tmp_path / "t"),
               w=BENCH_PARAMS.w, capacity=BENCH_PARAMS.capacity,
               alpha=BENCH_PARAMS.alpha, seed=BENCH_PARAMS.seed)
    benchmark.extra_info["index_bytes"] = idx.global_index_size_bytes()


def test_build_dpisax(benchmark, spark, bench_df, tmp_path):
    idx = once(benchmark, build_dpisax, spark, bench_df, str(tmp_path / "d"),
               w=BENCH_PARAMS.w, capacity=BENCH_PARAMS.capacity,
               alpha=BENCH_PARAMS.alpha, seed=BENCH_PARAMS.seed)
    benchmark.extra_info["index_bytes"] = idx.global_index_size_bytes()
