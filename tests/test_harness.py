"""Experiment-harness tests: table rendering, scale mapping, mini runs."""
import numpy as np
import pytest

from repro.harness.experiments import (
    GB_TO_N,
    dataset_df,
    eval_distributed,
    pick_queries,
)
from repro.harness.tables import render_table


class TestScaleMapping:
    def test_gb_mapping_monotone(self):
        gbs = sorted(GB_TO_N)
        ns = [GB_TO_N[g] for g in gbs]
        assert ns == sorted(ns)

    def test_paper_sizes_present(self):
        assert set(GB_TO_N) == {200, 400, 600, 800, 1000, 1500}

    def test_linear_in_gb(self):
        assert GB_TO_N[400] == 2 * GB_TO_N[200]
        assert GB_TO_N[1000] == 5 * GB_TO_N[200]


class TestRenderTable:
    def test_alignment_and_header(self):
        rows = [dict(a=1, b=2.5), dict(a=10, b=None)]
        out = render_table(rows, ["a", "b"], "t")
        lines = out.splitlines()
        assert lines[0] == "== t =="
        assert "a" in lines[1] and "b" in lines[1]
        assert "X" in lines[4]  # None renders as the paper's X marker

    def test_missing_column_rendered_as_x(self):
        out = render_table([dict(a=1)], ["a", "missing"])
        assert "X" in out

    def test_float_formatting(self):
        out = render_table([dict(v=0.123456)], ["v"])
        assert "0.123" in out
        out2 = render_table([dict(v=123.456)], ["v"])
        assert "123.5" in out2


class TestDatasetHelpers:
    def test_dataset_df_unknown_name(self, spark):
        with pytest.raises(ValueError):
            dataset_df(spark, "nope", 10)

    def test_pick_queries_members_of_dataset(self, spark, small_df, small_matrix):
        Q = pick_queries(small_df, 5, seed=1)
        assert Q.shape == (5, small_matrix.shape[1])
        for q in Q:
            assert any(np.allclose(q, row) for row in small_matrix)

    def test_pick_queries_deterministic(self, small_df):
        a = pick_queries(small_df, 3, seed=9)
        b = pick_queries(small_df, 3, seed=9)
        np.testing.assert_array_equal(a, b)


class TestMiniEval:
    def test_eval_distributed_rows(self, spark, small_df, queries, ground_truth, tmp_path):
        from tests.conftest import K_SMALL, SMALL_PARAMS

        _, Q = queries
        rows = eval_distributed(
            spark, small_df, Q, K_SMALL, str(tmp_path / "mini"),
            params=SMALL_PARAMS, climber_variants=("adaptive-4x",),
            include_baselines=False, ground_truth=(ground_truth, 0.5),
        )
        systems = {r["system"] for r in rows}
        assert systems == {"Dss", "CLIMBER-adaptive-4x"}
        for r in rows:
            assert 0.0 <= r["recall"] <= 1.0
            assert r["query_s"] >= 0
        dss = next(r for r in rows if r["system"] == "Dss")
        assert dss["recall"] == 1.0
