"""Dss (exact distributed scan) tests — the ground-truth engine."""
import numpy as np
import pandas as pd

from repro.baselines.dss import dss_knn, timed_dss_knn
from repro.oracle import assert_equivalent
from tests.conftest import K_SMALL


class TestExactness:
    def test_matches_numpy_bruteforce(self, small_df, queries, small_matrix):
        _, Q = queries
        res = dss_knn(small_df, Q, K_SMALL)
        for qi in range(Q.shape[0]):
            d = np.linalg.norm(small_matrix - Q[qi], axis=1)
            expect = np.argsort(d, kind="stable")[:K_SMALL]
            got_ids = [i for i, _ in res[qi]]
            assert got_ids == expect.tolist()
            got_d = [x for _, x in res[qi]]
            np.testing.assert_allclose(got_d, d[expect], atol=1e-6)

    def test_self_is_rank1(self, small_df, queries):
        qids, Q = queries
        res = dss_knn(small_df, Q, K_SMALL)
        for i, qid in enumerate(qids):
            assert res[i][0][0] == qid

    def test_oracle_sql_topk(self, spark, small_df, queries):
        """DuckDB oracle: exact kNN expressed as long-format SQL."""
        _, Q = queries
        res = dss_knn(small_df, Q, K_SMALL)
        pdf = small_df.toPandas()
        long = pd.DataFrame(
            [
                (int(r["id"]), j, float(v))
                for _, r in pdf.iterrows()
                for j, v in enumerate(r["series"])
            ],
            columns=["id", "idx", "val"],
        )
        qlong = pd.DataFrame([(j, float(v)) for j, v in enumerate(Q[0])], columns=["idx", "qval"])
        got = spark.createDataFrame(
            pd.DataFrame(res[0], columns=["id", "dist"]).astype({"id": "int64"})
        )
        assert_equivalent(
            got,
            f"""
            SELECT l.id AS id, sqrt(sum((l.val - q.qval) * (l.val - q.qval))) AS dist
            FROM long l JOIN qlong q ON l.idx = q.idx
            GROUP BY l.id ORDER BY dist, id LIMIT {K_SMALL}
            """,
            long=long, qlong=qlong,
        )


class TestBatching:
    def test_k_larger_than_dataset(self, spark):
        from repro.synth_data import random_walk_series

        tiny = random_walk_series(spark, n=5, length=16)
        res = dss_knn(tiny, np.zeros((1, 16)), 50)
        assert len(res[0]) == 5

    def test_single_query_1d_promoted(self, small_df, queries):
        _, Q = queries
        res = dss_knn(small_df, Q[0], 3)
        assert set(res) == {0} and len(res[0]) == 3

    def test_timed_wrapper(self, small_df, queries):
        _, Q = queries
        res, secs = timed_dss_knn(small_df, Q, 5)
        assert secs > 0 and len(res) == Q.shape[0]

    def test_many_queries(self, small_df, small_matrix):
        Q = small_matrix[:7]
        res = dss_knn(small_df, Q, 4)
        assert set(res) == set(range(7))
        for i in range(7):
            assert res[i][0][0] == i  # each query is its own NN
