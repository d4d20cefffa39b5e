"""DPiSAX baseline tests (split-table partitioning of the iSAX space)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.dpisax import build_split_table
from repro.baselines.isax import MAX_BITS, isax_symbols
from tests.conftest import K_SMALL, N_SMALL


def sample_syms(seed=0, n=400, w=8):
    x = np.random.default_rng(seed).standard_normal((n, w))
    return isax_symbols(x, MAX_BITS)


class TestSplitTable:
    def test_full_coverage_any_symbol_routes(self):
        table = build_split_table(sample_syms(), alpha=1.0, capacity=50)
        rng = np.random.default_rng(1)
        for _ in range(200):
            row = rng.integers(0, 256, size=8).astype(np.uint16)
            pid = table.route(row)
            assert 0 <= pid < table.n_partitions

    def test_partition_count_near_target(self):
        S = sample_syms(n=1000)
        table = build_split_table(S, alpha=1.0, capacity=100)
        assert table.n_partitions >= 1000 // 100
        assert table.n_partitions <= 6 * (1000 // 100)  # splits halve, not equalize

    def test_capacity_bound_on_sample(self):
        S = sample_syms(n=600)
        cap = 80
        table = build_split_table(S, alpha=1.0, capacity=cap)
        counts = np.bincount([table.route(s) for s in S], minlength=table.n_partitions)
        assert counts.max() <= cap

    def test_alpha_scales_estimates(self):
        S = sample_syms(n=100)
        # alpha=0.1 → each sample row represents 10 rows → more splits
        t_small = build_split_table(S, alpha=1.0, capacity=50)
        t_big = build_split_table(S, alpha=0.1, capacity=50)
        assert t_big.n_partitions > t_small.n_partitions

    def test_single_partition_when_under_capacity(self):
        S = sample_syms(n=20)
        table = build_split_table(S, alpha=1.0, capacity=100)
        assert table.n_partitions == 1

    def test_deterministic(self):
        S = sample_syms(3)
        a = build_split_table(S, alpha=1.0, capacity=40)
        b = build_split_table(S, alpha=1.0, capacity=40)
        for s in S[:50]:
            assert a.route(s) == b.route(s)

    @given(st.integers(0, 200))
    @settings(max_examples=15, deadline=None)
    def test_route_is_function_of_symbols(self, seed):
        table = build_split_table(sample_syms(seed, n=200), alpha=1.0, capacity=30)
        row = np.random.default_rng(seed + 1).integers(0, 256, size=8).astype(np.uint16)
        assert table.route(row) == table.route(row.copy())


class TestSparkIndex:
    def test_all_rows_stored(self, dpisax_index):
        assert dpisax_index.n_series == N_SMALL
        assert sum(dpisax_index.pid_counts.values()) == N_SMALL

    def test_build_time_recorded(self, dpisax_index):
        assert dpisax_index.build_s > 0

    def test_global_index_is_small(self, dpisax_index):
        assert 0 < dpisax_index.global_index_size_bytes() < 500_000

    def test_query_single_partition(self, spark, dpisax_index, queries):
        _, Q = queries
        res, stats = dpisax_index.knn_batch(spark, Q, K_SMALL)
        assert all(p == 1 for p in stats.partitions_touched.values())

    def test_self_query_found_when_routed_home(self, spark, dpisax_index, queries, ground_truth):
        """DPiSAX routes a dataset member to its own partition → rank-1 self."""
        qids, Q = queries
        res, _ = dpisax_index.knn_batch(spark, Q, K_SMALL)
        for i, qid in enumerate(qids):
            ids = [j for j, _ in res[i]]
            assert res[i], "empty result"
            assert ids[0] == qid and res[i][0][1] == pytest.approx(0.0, abs=1e-5)

    def test_recall_between_0_and_1(self, spark, dpisax_index, queries, ground_truth):
        from repro.harness.recall import recall_batch

        _, Q = queries
        res, _ = dpisax_index.knn_batch(spark, Q, K_SMALL)
        assert 0.0 <= recall_batch(res, ground_truth) <= 1.0
