"""HNSW graph tests (memsys substrate for ParlayANN, Table I)."""
import numpy as np
import pytest

from repro.memsys.hnsw import HNSW


@pytest.fixture(scope="module")
def clustered():
    rng = np.random.default_rng(0)
    centers = rng.normal(size=(10, 16)) * 5
    X = np.concatenate([c + rng.normal(size=(80, 16)) for c in centers])
    return X


@pytest.fixture(scope="module")
def built(clustered):
    g = HNSW(dim=16, M=8, ef_construction=64, seed=1)
    g.build(clustered)
    return g


class TestConstruction:
    def test_all_nodes_linked_on_layer0(self, built, clustered):
        n = clustered.shape[0]
        # every node except possibly the very first has layer-0 neighbors
        missing = [i for i in range(n) if not built.neighbors[0][i]]
        assert len(missing) <= 1

    def test_degree_bounds_respected(self, built):
        for layer, adj in enumerate(built.neighbors):
            bound = built.M0 if layer == 0 else built.M
            for lst in adj:
                assert len(lst) <= bound + 1  # +1 transient before prune

    def test_levels_geometric(self, clustered):
        g = HNSW(dim=16, M=8, seed=2)
        g.build(clustered)
        levels = np.asarray(g.levels)
        assert levels.min() == 0
        assert (levels == 0).mean() > 0.5  # most nodes only on layer 0

    def test_entry_is_top_level(self, built):
        assert built.levels[built.entry] == max(built.levels)

    def test_invalid_dim_raises(self):
        g = HNSW(dim=4)
        with pytest.raises(ValueError):
            g.build(np.zeros((5, 3)))

    def test_invalid_M(self):
        with pytest.raises(ValueError):
            HNSW(dim=4, M=1)


class TestSearch:
    def test_self_query_returns_self(self, built, clustered):
        for i in (0, 100, 400, 799):
            res = built.search(clustered[i], 1, ef_search=32)
            assert res[0][0] == i and res[0][1] == pytest.approx(0, abs=1e-9)

    def test_results_sorted(self, built, clustered):
        res = built.search(clustered[5], 10, ef_search=64)
        d = [x for _, x in res]
        assert d == sorted(d)

    def test_recall_at_10(self, built, clustered):
        rng = np.random.default_rng(3)
        hits = total = 0
        for qi in rng.choice(clustered.shape[0], 20, replace=False):
            q = clustered[qi]
            exact = set(np.argsort(np.linalg.norm(clustered - q, axis=1))[:10].tolist())
            got = {i for i, _ in built.search(q, 10, ef_search=96)}
            hits += len(exact & got)
            total += 10
        assert hits / total >= 0.8  # graph ANN should be in the high-recall regime

    def test_k_larger_than_ef_uses_k(self, built, clustered):
        res = built.search(clustered[0], 50, ef_search=10)
        assert len(res) == 50

    def test_empty_graph(self):
        g = HNSW(dim=4)
        assert g.search(np.zeros(4), 3) == []

    def test_deterministic_given_seed(self, clustered):
        a = HNSW(dim=16, M=6, ef_construction=32, seed=7)
        b = HNSW(dim=16, M=6, ef_construction=32, seed=7)
        a.build(clustered[:200])
        b.build(clustered[:200])
        q = clustered[300]
        assert a.search(q, 5) == b.search(q, 5)
