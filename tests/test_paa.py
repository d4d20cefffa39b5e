"""PAA segmentation tests (paper §IV-B Step 1, Fig. 3)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.paa import paa_np, segment_bounds, with_paa, znorm_np
from repro.oracle import assert_equivalent


class TestSegmentBounds:
    @pytest.mark.parametrize("n,w", [(12, 4), (16, 4), (64, 8), (256, 16), (10, 10), (7, 1)])
    def test_covers_range(self, n, w):
        b = segment_bounds(n, w)
        assert b[0] == 0 and b[-1] == n and len(b) == w + 1

    @pytest.mark.parametrize("n,w", [(12, 4), (13, 4), (100, 7), (256, 16)])
    def test_segments_nonempty_and_balanced(self, n, w):
        lengths = np.diff(segment_bounds(n, w))
        assert lengths.min() >= 1
        assert lengths.max() - lengths.min() <= 1

    @pytest.mark.parametrize("n,w", [(4, 5), (4, 0), (4, -1)])
    def test_invalid_w_raises(self, n, w):
        with pytest.raises(ValueError):
            segment_bounds(n, w)


class TestPaaNp:
    def test_paper_figure3_shape(self):
        # Fig. 3: n=12 → w=4, each PAA value is the mean of 3 readings.
        x = np.arange(12.0)
        out = paa_np(x, 4)
        assert out.shape == (1, 4)
        np.testing.assert_allclose(out[0], [1.0, 4.0, 7.0, 10.0])

    def test_single_segment_is_global_mean(self):
        x = np.random.default_rng(0).normal(size=(5, 32))
        np.testing.assert_allclose(paa_np(x, 1)[:, 0], x.mean(axis=1))

    def test_w_equals_n_is_identity(self):
        x = np.random.default_rng(1).normal(size=(3, 8))
        np.testing.assert_allclose(paa_np(x, 8), x)

    def test_1d_input_promoted(self):
        assert paa_np(np.ones(8), 2).shape == (1, 2)

    def test_constant_series(self):
        np.testing.assert_allclose(paa_np(np.full((2, 12), 3.5), 4), 3.5)

    @pytest.mark.parametrize("n,w", [(12, 4), (13, 5), (100, 16), (256, 16)])
    def test_matches_manual_segmentation(self, n, w):
        x = np.random.default_rng(2).normal(size=(4, n))
        b = segment_bounds(n, w)
        expect = np.stack([[x[i, b[j]:b[j + 1]].mean() for j in range(w)] for i in range(4)])
        np.testing.assert_allclose(paa_np(x, w), expect)

    @given(st.integers(2, 40), st.integers(1, 10), st.integers(0, 1000))
    @settings(max_examples=40, deadline=None)
    def test_mean_preservation_property(self, n, w, seed):
        # Length-weighted mean of PAA values equals the series mean.
        w = min(w, n)
        x = np.random.default_rng(seed).normal(size=(2, n))
        lengths = np.diff(segment_bounds(n, w))
        approx = (paa_np(x, w) * lengths).sum(axis=1) / n
        np.testing.assert_allclose(approx, x.mean(axis=1), atol=1e-9)

    @given(st.integers(4, 32), st.floats(-5, 5), st.floats(0.1, 3))
    @settings(max_examples=30, deadline=None)
    def test_affine_equivariance(self, n, shift, scale):
        x = np.random.default_rng(3).normal(size=(2, n))
        np.testing.assert_allclose(
            paa_np(scale * x + shift, 4), scale * paa_np(x, 4) + shift, atol=1e-9
        )


class TestZnorm:
    def test_zero_mean_unit_std(self):
        x = np.random.default_rng(4).normal(5, 3, size=(6, 50))
        z = znorm_np(x)
        np.testing.assert_allclose(z.mean(axis=1), 0, atol=1e-9)
        np.testing.assert_allclose(z.std(axis=1), 1, atol=1e-9)

    def test_constant_series_maps_to_zero(self):
        np.testing.assert_allclose(znorm_np(np.full((2, 10), 7.0)), 0.0)

    def test_idempotent(self):
        x = np.random.default_rng(5).normal(size=(3, 20))
        np.testing.assert_allclose(znorm_np(znorm_np(x)), znorm_np(x), atol=1e-9)


class TestWithPaaSpark:
    def test_matches_numpy(self, spark, small_df, small_matrix):
        pdf = with_paa(small_df, 8).orderBy("id").toPandas()
        got = np.stack(pdf["paa"].to_numpy())
        np.testing.assert_allclose(got, paa_np(small_matrix, 8), atol=1e-9)

    def test_schema_appended(self, small_df):
        df = with_paa(small_df, 4, out_col="mypaa")
        assert "mypaa" in df.columns and "series" in df.columns

    def test_oracle_segment_means(self, spark, small_df):
        """DuckDB oracle: PAA segment means == SQL AVG over exploded points."""
        out = with_paa(small_df.limit(50), 4)
        pdf = out.toPandas()
        long_rows = []
        for _, row in pdf.iterrows():
            for j, v in enumerate(row["series"]):
                long_rows.append((int(row["id"]), j // (len(row["series"]) // 4), float(v)))
        long_df = pd.DataFrame(long_rows, columns=["id", "seg", "val"])
        spark_long = pd.DataFrame(
            [
                (int(row["id"]), seg, float(v))
                for _, row in pdf.iterrows()
                for seg, v in enumerate(row["paa"])
            ],
            columns=["id", "seg", "paa_val"],
        )
        assert_equivalent(
            spark.createDataFrame(spark_long),
            "SELECT id, seg, avg(val) AS paa_val FROM long GROUP BY id, seg",
            long=long_df,
        )
