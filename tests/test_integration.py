"""End-to-end integration: all systems on one workload, paper-shape checks."""
import numpy as np
import pytest

from repro.harness.recall import recall_batch
from tests.conftest import K_SMALL


class TestAllSystemsAgree:
    """Every system, asked for the 1-NN of a dataset member, finds it."""

    def test_climber(self, spark, climber_index, queries):
        qids, Q = queries
        res, _ = climber_index.knn_batch(spark, Q, 1, variant="adaptive-4x")
        assert [res[i][0][0] for i in range(len(Q))] == list(qids)

    def test_tardis(self, spark, tardis_index, queries):
        qids, Q = queries
        res, _ = tardis_index.knn_batch(spark, Q, 1)
        assert [res[i][0][0] for i in range(len(Q))] == list(qids)

    def test_dpisax(self, spark, dpisax_index, queries):
        qids, Q = queries
        res, _ = dpisax_index.knn_batch(spark, Q, 1)
        assert [res[i][0][0] for i in range(len(Q))] == list(qids)


class TestRecallShape:
    """Soft shape assertions at tiny scale (hard ones live in benchmarks)."""

    def test_all_recalls_valid(self, spark, climber_index, tardis_index,
                               dpisax_index, queries, ground_truth):
        _, Q = queries
        for idx in (tardis_index, dpisax_index):
            res, _ = idx.knn_batch(spark, Q, K_SMALL)
            assert 0.0 <= recall_batch(res, ground_truth) <= 1.0
        for v in ("knn", "adaptive-2x", "adaptive-4x", "od-smallest"):
            res, _ = climber_index.knn_batch(spark, Q, K_SMALL, variant=v)
            assert 0.0 <= recall_batch(res, ground_truth) <= 1.0

    def test_od_smallest_at_least_knn(self, spark, climber_index, queries, ground_truth):
        _, Q = queries
        r_knn, _ = climber_index.knn_batch(spark, Q, K_SMALL, variant="knn")
        r_ods, _ = climber_index.knn_batch(spark, Q, K_SMALL, variant="od-smallest")
        assert recall_batch(r_ods, ground_truth) >= recall_batch(r_knn, ground_truth) - 1e-9

    def test_climber_adaptive_beats_random_partition(self, spark, climber_index,
                                                     queries, ground_truth):
        """The routed partitions must beat a size-matched random baseline:
        recall far above the expected value of scanning the same number of
        random rows."""
        _, Q = queries
        res, stats = climber_index.knn_batch(spark, Q, K_SMALL, variant="adaptive-4x")
        rec = recall_batch(res, ground_truth)
        frac = np.mean(list(stats.rows_scanned.values())) / climber_index.n_series
        assert rec > min(1.0, 2.0 * frac)


class TestCrossSystemConsistency:
    def test_same_distance_for_same_pair(self, spark, climber_index, tardis_index, queries):
        """CLIMBER and TARDIS must report identical ED for any id both return."""
        _, Q = queries
        rc, _ = climber_index.knn_batch(spark, Q, K_SMALL, variant="od-smallest")
        rt, _ = tardis_index.knn_batch(spark, Q, K_SMALL)
        for qi in range(len(Q)):
            dc = dict(rc[qi])
            dt = dict(rt[qi])
            for sid in set(dc) & set(dt):
                assert dc[sid] == pytest.approx(dt[sid], abs=1e-6)
