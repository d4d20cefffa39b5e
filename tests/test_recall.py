"""Recall metric tests (paper Def. 4)."""
import pytest

from repro.harness.recall import recall_batch, recall_one


class TestRecallOne:
    def test_perfect(self):
        e = [(1, 0.1), (2, 0.2)]
        assert recall_one(e, e) == 1.0

    def test_zero(self):
        assert recall_one([(9, 0.1)], [(1, 0.1), (2, 0.2)]) == 0.0

    def test_partial(self):
        assert recall_one([(1, 0.1), (9, 0.9)], [(1, 0.1), (2, 0.2)]) == 0.5

    def test_distances_ignored(self):
        assert recall_one([(1, 999.0)], [(1, 0.0)]) == 1.0

    def test_empty_exact_empty_approx(self):
        assert recall_one([], []) == 1.0

    def test_empty_exact_nonempty_approx(self):
        assert recall_one([(1, 0.0)], []) == 0.0

    def test_empty_approx(self):
        assert recall_one([], [(1, 0.0)]) == 0.0

    def test_duplicates_not_double_counted(self):
        assert recall_one([(1, 0.1), (1, 0.1)], [(1, 0.1), (2, 0.2)]) == 0.5


class TestRecallBatch:
    def test_average(self):
        exact = {0: [(1, 0.0), (2, 0.0)], 1: [(3, 0.0), (4, 0.0)]}
        approx = {0: [(1, 0.0), (2, 0.0)], 1: [(3, 0.0), (9, 0.0)]}
        assert recall_batch(approx, exact) == pytest.approx(0.75)

    def test_missing_query_counts_zero(self):
        exact = {0: [(1, 0.0)], 1: [(2, 0.0)]}
        assert recall_batch({0: [(1, 0.0)]}, exact) == pytest.approx(0.5)

    def test_empty_ground_truth_raises(self):
        with pytest.raises(ValueError):
            recall_batch({}, {})
