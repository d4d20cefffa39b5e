"""Algorithm 2 (centroid computation) tests."""
import pytest

from repro.core.centroids import compute_centroids


def L(*pairs):
    return [(sig, f) for sig, f in pairs]


class TestBasics:
    def test_highest_frequency_first(self):
        out = compute_centroids(
            L(((1, 2, 3), 5), ((4, 5, 6), 50), ((7, 8, 9), 20)),
            alpha=1.0, capacity=1,
        )
        assert out[0] == (4, 5, 6)

    def test_empty_input(self):
        assert compute_centroids([], alpha=0.5, capacity=10) == []

    def test_single_signature(self):
        assert compute_centroids(L(((1, 2), 3)), alpha=0.5, capacity=10) == [(1, 2)]

    def test_signatures_canonicalized_to_tuples(self):
        out = compute_centroids(L(([3, 1, 2], 4)), alpha=1.0, capacity=1)
        assert out == [(3, 1, 2)]

    @pytest.mark.parametrize("alpha", [0.0, -0.1, 1.5])
    def test_invalid_alpha(self, alpha):
        with pytest.raises(ValueError):
            compute_centroids(L(((1, 2), 1)), alpha=alpha, capacity=10)


class TestEpsilonSeparation:
    def test_too_close_candidate_skipped(self):
        # second signature shares 2 of 3 pivots → OD=1 < eps=2 → skipped.
        out = compute_centroids(
            L(((1, 2, 3), 50), ((1, 2, 4), 40), ((7, 8, 9), 30)),
            alpha=1.0, capacity=1, eps=2,
        )
        assert (1, 2, 4) not in out and (7, 8, 9) in out

    def test_eps_zero_admits_near_duplicates(self):
        out = compute_centroids(
            L(((1, 2, 3), 50), ((1, 2, 4), 40)), alpha=1.0, capacity=1, eps=0
        )
        assert out == [(1, 2, 3), (1, 2, 4)]

    def test_eps_m_forces_disjoint_centroids(self):
        out = compute_centroids(
            L(((1, 2, 3), 50), ((3, 4, 5), 40), ((7, 8, 9), 30)),
            alpha=1.0, capacity=1, eps=3,
        )
        assert out == [(1, 2, 3), (7, 8, 9)]  # (3,4,5) overlaps pivot 3


class TestSizeStop:
    def test_tiny_group_terminates_scan(self):
        # capacity high → the size estimate of the 2nd candidate is below
        # alpha*c → the scan stops after the first centroid.
        out = compute_centroids(
            L(((1, 2, 3), 100), ((4, 5, 6), 1), ((7, 8, 9), 1)),
            alpha=1.0, capacity=1000, eps=2,
        )
        assert out == [(1, 2, 3)]

    def test_alpha_rescales_threshold(self):
        pairs = L(((1, 2, 3), 30), ((4, 5, 6), 25), ((7, 8, 9), 20))
        # With alpha=1.0 capacity 60 → size estimates ~45 < 60 → stop at 1.
        assert len(compute_centroids(pairs, alpha=1.0, capacity=60, eps=2)) == 1
        # With alpha=0.1 the sample-side threshold is only 6 → all admitted.
        assert len(compute_centroids(pairs, alpha=0.1, capacity=60, eps=2)) == 3


class TestMaxCentroids:
    def test_cap_respected(self):
        pairs = L(*(((3 * i, 3 * i + 1, 3 * i + 2), 10) for i in range(10)))
        out = compute_centroids(pairs, alpha=1.0, capacity=1, max_centroids=4)
        assert len(out) == 4

    def test_no_cap_admits_all_disjoint(self):
        pairs = L(*(((3 * i, 3 * i + 1, 3 * i + 2), 10) for i in range(6)))
        out = compute_centroids(pairs, alpha=1.0, capacity=1)
        assert len(out) == 6


class TestDeterminism:
    def test_order_independent_of_input_order(self):
        pairs = L(((1, 2, 3), 9), ((4, 5, 6), 7), ((7, 8, 9), 8))
        a = compute_centroids(pairs, alpha=1.0, capacity=1)
        b = compute_centroids(list(reversed(pairs)), alpha=1.0, capacity=1)
        assert a == b

    def test_frequency_tie_broken_by_signature(self):
        out = compute_centroids(
            L(((7, 8, 9), 5), ((1, 2, 3), 5)), alpha=1.0, capacity=1
        )
        assert out[0] == (1, 2, 3)
