"""Data-series generator tests (paper §VII-A datasets, synthesized)."""
import numpy as np
import pytest

from repro.synth_data import (
    SERIES_DATASETS,
    dna_series,
    eeg_series,
    random_walk_series,
    sift_like_series,
)

GENS = [random_walk_series, sift_like_series, dna_series, eeg_series]
LENGTHS = {"randomwalk": 256, "sift": 128, "dna": 192, "eeg": 256}


def collect(df):
    pdf = df.orderBy("id").toPandas()
    return np.stack(pdf["series"].to_numpy()), pdf["id"].to_numpy()


class TestCommonProperties:
    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_row_count_and_ids(self, spark, gen):
        X, ids = collect(gen(spark, n=100, length=32))
        assert X.shape[0] == 100
        assert sorted(ids) == list(range(100))

    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_length_respected(self, spark, gen):
        X, _ = collect(gen(spark, n=20, length=48))
        assert X.shape[1] == 48

    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_z_normalized(self, spark, gen):
        X, _ = collect(gen(spark, n=30, length=64))
        np.testing.assert_allclose(X.mean(axis=1), 0, atol=1e-8)
        np.testing.assert_allclose(X.std(axis=1), 1, atol=1e-6)

    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_deterministic_same_seed(self, spark, gen):
        A, _ = collect(gen(spark, n=25, length=32, seed=5))
        B, _ = collect(gen(spark, n=25, length=32, seed=5))
        np.testing.assert_array_equal(A, B)

    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_seed_changes_data(self, spark, gen):
        A, _ = collect(gen(spark, n=25, length=32, seed=1))
        B, _ = collect(gen(spark, n=25, length=32, seed=2))
        assert not np.array_equal(A, B)

    @pytest.mark.parametrize("gen", GENS, ids=[g.__name__ for g in GENS])
    def test_rows_distinct(self, spark, gen):
        X, _ = collect(gen(spark, n=40, length=32))
        assert len({tuple(np.round(r, 6)) for r in X}) == 40


class TestPartitioningInvariance:
    def test_prefix_stability(self, spark):
        """Row i is identical whether generated in an n=50 or n=200 dataset —
        generation is keyed on (seed, id), not on partition layout."""
        A, _ = collect(random_walk_series(spark, n=50, length=32, seed=3))
        B, _ = collect(random_walk_series(spark, n=200, length=32, seed=3))
        np.testing.assert_array_equal(A, B[:50])


class TestRegistry:
    def test_all_four_paper_datasets(self):
        assert set(SERIES_DATASETS) == {"randomwalk", "sift", "dna", "eeg"}

    @pytest.mark.parametrize("name", sorted(SERIES_DATASETS))
    def test_registry_callable(self, spark, name):
        df = SERIES_DATASETS[name](spark, n=10)
        pdf = df.toPandas()
        assert len(pdf) == 10
        assert len(pdf["series"][0]) == LENGTHS[name]  # paper lengths by default


class TestDatasetCharacter:
    def test_random_walk_autocorrelated(self, spark):
        X, _ = collect(random_walk_series(spark, n=50, length=128))
        # successive values of a (normalized) random walk are highly correlated
        r = np.mean([np.corrcoef(x[:-1], x[1:])[0, 1] for x in X])
        assert r > 0.8

    def test_sift_clustered(self, spark):
        X, ids = collect(sift_like_series(spark, n=128, length=64, n_clusters=8))
        # same-cluster pairs are closer than cross-cluster pairs on average
        same = [
            np.linalg.norm(X[i] - X[j])
            for i in range(64)
            for j in range(i + 1, 64)
            if ids[i] % 8 == ids[j] % 8
        ]
        diff = [
            np.linalg.norm(X[i] - X[j])
            for i in range(64)
            for j in range(i + 1, 64)
            if ids[i] % 8 != ids[j] % 8
        ]
        assert np.mean(same) < np.mean(diff)

    def test_dna_is_step_process(self, spark):
        X, _ = collect(dna_series(spark, n=20, length=64))
        # cumulative ±{1,2} steps → few distinct normalized increments
        diffs = np.round(np.diff(X, axis=1), 6)
        assert all(len(np.unique(d)) <= 8 for d in diffs)

    def test_eeg_oscillatory(self, spark):
        X, _ = collect(eeg_series(spark, n=30, length=256))
        # dominant spectral power below 40 Hz (EEG bands) for most records
        ps = np.abs(np.fft.rfft(X, axis=1)) ** 2
        freqs = np.fft.rfftfreq(256, d=1 / 400.0)
        frac = (ps[:, freqs < 40].sum(axis=1) / ps.sum(axis=1))
        assert np.median(frac) > 0.5
