"""CLIMBER-INX end-to-end build tests on Spark (paper Fig. 6)."""
import os

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.index import ClimberIndex, ClimberParams, build_index
from repro.oracle import assert_equivalent
from tests.conftest import N_SMALL, SMALL_PARAMS


class TestBuildOutputs:
    def test_no_rows_lost(self, climber_index):
        """Def. 12 full coverage at dataset scale: every series lands somewhere."""
        assert climber_index.n_series == N_SMALL
        assert sum(climber_index.pid_counts.values()) == N_SMALL

    def test_partition_dirs_on_disk(self, climber_index):
        dirs = {
            int(d.split("=")[1])
            for d in os.listdir(climber_index.data_path)
            if d.startswith("pid=")
        }
        assert dirs == set(climber_index.pid_counts)

    def test_pids_within_skeleton_range(self, climber_index):
        assert all(0 <= p < climber_index.skeleton.n_partitions for p in climber_index.pid_counts)

    def test_capacity_soft_constraint(self, climber_index):
        # c is soft (paper §V): allow 3x overshoot but not unbounded blowup.
        assert max(climber_index.pid_counts.values()) <= 3 * SMALL_PARAMS.capacity

    def test_build_report_phases_positive(self, climber_index):
        r = climber_index.report
        assert r.sample_s > 0 and r.skeleton_s >= 0 and r.redistribute_s > 0
        assert r.total_s == pytest.approx(r.sample_s + r.skeleton_s + r.redistribute_s + r.stats_s)

    def test_global_index_small(self, climber_index):
        assert 0 < climber_index.global_index_size_bytes() < 1_000_000

    def test_refined_counts_match_data(self, spark, climber_index):
        total = sum(g.trie.count for g in climber_index.skeleton.groups.values())
        assert total == pytest.approx(N_SMALL)


class TestDataLayout:
    def test_stored_columns(self, spark, climber_index):
        df = spark.read.parquet(climber_index.data_path)
        assert {"id", "series", "sig_rs", "sig_ri", "gid", "node", "pid"} <= set(df.columns)

    def test_ids_unique_and_complete(self, spark, climber_index):
        ids = spark.read.parquet(climber_index.data_path).select("id").toPandas()["id"]
        assert sorted(ids) == list(range(N_SMALL))

    def test_assignment_reproducible(self, spark, climber_index):
        """Re-running the skeleton's assignment on stored sigs matches stored pids."""
        pdf = (
            spark.read.parquet(climber_index.data_path)
            .select("id", "sig_rs", "gid", "pid")
            .orderBy("id")
            .limit(200)
            .toPandas()
        )
        sig_rs = np.stack(pdf["sig_rs"].to_numpy()).astype(np.int64)
        gid, pid, _ = climber_index.skeleton.assign_records(sig_rs, pdf["id"].to_numpy())
        np.testing.assert_array_equal(gid, pdf["gid"].to_numpy())
        np.testing.assert_array_equal(pid, pdf["pid"].to_numpy())

    def test_group_of_each_pid_unique(self, spark, climber_index):
        """Partitions are per-group physical units (paper Fig. 5)."""
        pdf = (
            spark.read.parquet(climber_index.data_path)
            .groupBy("pid")
            .agg(F.countDistinct("gid").alias("ng"))
            .toPandas()
        )
        assert (pdf["ng"] == 1).all()


class TestOracleChecks:
    def test_partition_counts_oracle(self, spark, climber_index):
        """DuckDB oracle: per-partition occupancy as a SQL aggregation."""
        stored = spark.read.parquet(climber_index.data_path).select("id", "pid", "gid")
        got = stored.groupBy("pid").agg(F.count("*").alias("cnt"))
        assert_equivalent(
            got, "SELECT pid, count(*) AS cnt FROM assigned GROUP BY pid",
            assigned=stored.toPandas(),
        )

    def test_group_counts_oracle(self, spark, climber_index):
        stored = spark.read.parquet(climber_index.data_path).select("id", "pid", "gid")
        got = stored.groupBy("gid").agg(F.count("*").alias("cnt"))
        assert_equivalent(
            got, "SELECT gid, count(*) AS cnt FROM assigned GROUP BY gid",
            assigned=stored.toPandas(),
        )

    def test_signature_frequency_oracle(self, spark, climber_index):
        """Step 2's [(P⁴, freq)] aggregation ≡ DuckDB group-by on strings."""
        sigs = (
            spark.read.parquet(climber_index.data_path)
            .select(F.concat_ws("-", F.col("sig_ri")).alias("sig"))
        )
        got = sigs.groupBy("sig").agg(F.count("*").alias("freq"))
        assert_equivalent(
            got, "SELECT sig, count(*) AS freq FROM sigs GROUP BY sig",
            sigs=sigs.toPandas(),
        )


class TestPersistence:
    def test_load_round_trip(self, spark, climber_index):
        loaded = ClimberIndex.load(climber_index.out_dir)
        assert loaded.n_series == climber_index.n_series
        assert loaded.pid_counts == climber_index.pid_counts
        assert loaded.params == climber_index.params
        assert loaded.skeleton.n_partitions == climber_index.skeleton.n_partitions

    def test_loaded_index_answers_queries(self, spark, climber_index, queries, ground_truth):
        from tests.conftest import K_SMALL

        _, Q = queries
        loaded = ClimberIndex.load(climber_index.out_dir)
        res, _ = loaded.knn_batch(spark, Q, K_SMALL, variant="adaptive-4x")
        assert all(len(v) == K_SMALL for v in res.values())


class TestParamValidation:
    def test_sample_smaller_than_r_raises(self, spark, small_df):
        bad = ClimberParams(w=8, r=5000, m=4, capacity=100, alpha=0.01)
        with pytest.raises(ValueError, match="pivots"):
            build_index(spark, small_df, "/tmp/should-not-exist-idx", bad)
