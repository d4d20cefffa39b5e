"""Algorithm 1 (group assignment) tests, including the paper's Example 1."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.assignment import FALLBACK_GID, assign_batch, tied_groups_after_wd
from repro.core.distances import centroid_mask, decay_weights, od_matrix


@pytest.fixture()
def example1():
    """Paper Example 1: centroids G1=<1,2,3>, G2=<2,4,5>; X,Y,Z objects."""
    mask = centroid_mask([(1, 2, 3), (2, 4, 5)], r=10)
    w = decay_weights(3, "exp", 0.5)
    sigs = np.array([[3, 4, 1], [4, 2, 1], [6, 2, 7]])  # X, Y, Z rank-sensitive
    return mask, w, sigs


class TestExample1:
    def test_X_assigned_to_G1(self, example1):
        mask, w, sigs = example1
        res = assign_batch(sigs[:1], mask, w)
        assert res.gid[0] == 1  # OD(X,G1)=1 < OD(X,G2)=2 — unique smallest

    def test_Y_assigned_to_G2_via_WD(self, example1):
        mask, w, sigs = example1
        res = assign_batch(sigs[1:2], mask, w)
        # OD tie (both 1); WD(Y,G1)=1 > WD(Y,G2)=0.25 → G2.
        assert res.gid[0] == 2

    def test_Z_random_between_G1_G2(self, example1):
        mask, w, sigs = example1
        res = assign_batch(sigs[2:3], mask, w, ids=np.array([99]))
        assert res.gid[0] in (1, 2)
        assert set(res.tied[0].tolist()) == {1, 2}

    def test_Z_assignment_deterministic_per_id(self, example1):
        mask, w, sigs = example1
        a = assign_batch(sigs[2:3], mask, w, ids=np.array([5]), seed=1)
        b = assign_batch(sigs[2:3], mask, w, ids=np.array([5]), seed=1)
        assert a.gid[0] == b.gid[0]

    def test_Z_varies_across_ids(self, example1):
        mask, w, sigs = example1
        picks = {
            int(assign_batch(sigs[2:3], mask, w, ids=np.array([i]), seed=1).gid[0])
            for i in range(40)
        }
        assert picks == {1, 2}  # rule 4 really is random over the tied pair


class TestFallback:
    def test_zero_overlap_goes_to_G0(self, example1):
        mask, w, _ = example1
        res = assign_batch(np.array([[7, 8, 9]]), mask, w)
        assert res.gid[0] == FALLBACK_GID
        assert res.tied[0].size == 0

    def test_mixed_batch(self, example1):
        mask, w, sigs = example1
        batch = np.vstack([sigs, [[7, 8, 9]]])
        res = assign_batch(batch, mask, w, ids=np.arange(4))
        assert res.gid[3] == FALLBACK_GID
        assert res.gid[0] == 1 and res.gid[1] == 2


class TestTiedGroups:
    def test_unique_min_single_candidate(self, example1):
        mask, w, sigs = example1
        od = od_matrix(sigs[:1], mask)[0]
        cands = tied_groups_after_wd(sigs[0], od, mask, w)
        assert list(cands) == [1]

    def test_wd_resolves_tie(self, example1):
        mask, w, sigs = example1
        od = od_matrix(sigs[1:2], mask)[0]
        cands = tied_groups_after_wd(sigs[1], od, mask, w)
        assert list(cands) == [2]

    def test_double_tie_returns_both(self, example1):
        mask, w, sigs = example1
        od = od_matrix(sigs[2:3], mask)[0]
        cands = tied_groups_after_wd(sigs[2], od, mask, w)
        assert sorted(cands.tolist()) == [1, 2]

    def test_no_overlap_empty(self, example1):
        mask, w, _ = example1
        sig = np.array([7, 8, 9])
        od = od_matrix(sig[None], mask)[0]
        assert tied_groups_after_wd(sig, od, mask, w).size == 0


class TestBatchSemantics:
    def _reference(self, sigs, mask, w, ids, seed):
        """Row-at-a-time Algorithm 1 as an independent reference."""
        from repro.core.distances import overlap_distance, weight_distance

        m = sigs.shape[1]
        cents = [tuple(np.flatnonzero(mask[c])) for c in range(mask.shape[0])]
        out = []
        for b in range(sigs.shape[0]):
            ods = [overlap_distance(sigs[b], c) for c in cents]
            if min(ods) >= m:
                out.append(FALLBACK_GID)
                continue
            best = [i for i, d in enumerate(ods) if d == min(ods)]
            if len(best) == 1:
                out.append(best[0] + 1)
                continue
            wds = [weight_distance(sigs[b], cents[i], w) for i in best]
            tied = [best[i] for i, d in enumerate(wds) if d == min(wds)]
            if len(tied) == 1:
                out.append(tied[0] + 1)
            else:
                obj_seed = (seed * 1_000_003 + int(ids[b])) & 0x7FFFFFFF
                out.append(
                    int(np.random.default_rng(obj_seed).choice(np.asarray(tied) + 1))
                )
        return np.asarray(out)

    @given(st.integers(0, 200))
    @settings(max_examples=25, deadline=None)
    def test_matches_reference(self, seed):
        rng = np.random.default_rng(seed)
        r, m, B, C = 9, 3, 12, 4
        sigs = np.stack([rng.choice(r, m, replace=False) for _ in range(B)])
        cents = [tuple(sorted(rng.choice(r, m, replace=False))) for _ in range(C)]
        mask = centroid_mask(cents, r)
        w = decay_weights(m, "exp", 0.5)
        ids = np.arange(B)
        got = assign_batch(sigs, mask, w, ids=ids, seed=seed).gid
        np.testing.assert_array_equal(got, self._reference(sigs, mask, w, ids, seed))

    def test_batching_invariance(self):
        rng = np.random.default_rng(11)
        sigs = np.stack([rng.choice(8, 3, replace=False) for _ in range(10)])
        mask = centroid_mask([(0, 1, 2), (2, 3, 4), (4, 5, 6)], r=8)
        w = decay_weights(3, "exp", 0.5)
        ids = np.arange(10)
        whole = assign_batch(sigs, mask, w, ids=ids).gid
        parts = np.concatenate(
            [assign_batch(sigs[i : i + 3], mask, w, ids=ids[i : i + 3]).gid for i in range(0, 10, 3)]
        )
        np.testing.assert_array_equal(whole, parts)
