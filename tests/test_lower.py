"""Tests of the Spark (Catalyst) lowering: the same plan objects that run
on the simulated MPI cluster execute as Spark stages, validated against the
DuckDB oracle and against the SimCluster execution."""
import pandas as pd
import pytest

from repro.core.lower import lower_distributed_plan, run_distributed_on_spark
from repro.modular.common import JoinConfig
from repro.modular.groupby import distributed_groupby_plan
from repro.modular.join import distributed_join_plan
from repro.modular.join_sequence import optimized_sequence_plan, relation_fields, value_fields
from repro.mpi.thread_backend import run_on_sim
from repro.oracle import assert_equivalent
from repro.synth_data import dense_kv_pdf


N = 1 << 11


@pytest.fixture(scope="module")
def kv_frames():
    r = dense_kv_pdf(N, value_field="vr", seed=60)
    s = dense_kv_pdf(N, value_field="vs", multiplicity=2, seed=61)
    return r, s


class TestJoinLowering:
    def test_join_matches_duckdb(self, spark, kv_frames):
        r, s = kv_frames
        cfg = JoinConfig(n_net=4, loc_bits=2)
        plan = distributed_join_plan(cfg)
        out = run_distributed_on_spark(
            spark, plan, {"R": spark.createDataFrame(r), "S": spark.createDataFrame(s)}
        )
        assert_equivalent(
            out, "SELECT r.k AS k, vr, vs FROM r JOIN s ON r.k = s.k", r=r, s=s
        )

    def test_compressed_join_matches_duckdb(self, spark, kv_frames):
        r, s = kv_frames
        cfg = JoinConfig(n_net=4, loc_bits=2, compress=True, p_bits=22)
        plan = distributed_join_plan(cfg)
        out = run_distributed_on_spark(
            spark, plan, {"R": spark.createDataFrame(r), "S": spark.createDataFrame(s)}
        )
        assert_equivalent(
            out, "SELECT r.k AS k, vr, vs FROM r JOIN s ON r.k = s.k", r=r, s=s
        )

    def test_spark_and_sim_agree(self, spark, kv_frames):
        r, s = kv_frames
        cfg = JoinConfig(n_net=2, loc_bits=1)
        plan = distributed_join_plan(cfg)
        spark_out = run_distributed_on_spark(
            spark, plan, {"R": spark.createDataFrame(r), "S": spark.createDataFrame(s)}
        ).toPandas()
        sim_out, _ = run_on_sim(plan, 2, {"R": r, "S": s})
        cols = ["k", "vr", "vs"]
        a = spark_out[cols].sort_values(cols).reset_index(drop=True).astype("int64")
        b = sim_out[cols].sort_values(cols).reset_index(drop=True).astype("int64")
        pd.testing.assert_frame_equal(a, b)

    def test_semi_join(self, spark, kv_frames):
        r, s = kv_frames
        r_half = r.iloc[: N // 2]
        cfg = JoinConfig(n_net=4, loc_bits=2)
        plan = distributed_join_plan(cfg, join_type="semi")
        out = run_distributed_on_spark(
            spark, plan,
            {"R": spark.createDataFrame(r_half), "S": spark.createDataFrame(s)},
        )
        assert_equivalent(
            out,
            "SELECT k, vs FROM s WHERE EXISTS (SELECT 1 FROM r WHERE r.k = s.k)",
            r=r_half, s=s,
        )

    def test_stage_handles_exposed(self, spark, kv_frames):
        r, s = kv_frames
        cfg = JoinConfig(n_net=4, loc_bits=2)
        lowered = lower_distributed_plan(
            spark, distributed_join_plan(cfg),
            {"R": spark.createDataFrame(r), "S": spark.createDataFrame(s)},
        )
        assert len(lowered.pre) == 2 and len(lowered.histograms) == 2
        # the histogram stage is the lowered LocalHistogram+MpiHistogram:
        hist = {row["__pid"]: row["count"] for row in lowered.histograms[0].collect()}
        assert sum(hist.values()) == N
        expect = (r["k"] % cfg.n_net).value_counts().to_dict()
        assert hist == expect

    def test_missing_relation_rejected(self, spark, kv_frames):
        r, _ = kv_frames
        cfg = JoinConfig(n_net=2, loc_bits=1)
        with pytest.raises(KeyError, match="'S'"):
            lower_distributed_plan(
                spark, distributed_join_plan(cfg), {"R": spark.createDataFrame(r)}
            )


class TestGroupByLowering:
    def test_groupby_matches_duckdb(self, spark):
        t = dense_kv_pdf(N, multiplicity=4, seed=62)
        cfg = JoinConfig(n_net=4, loc_bits=2)
        out = run_distributed_on_spark(
            spark, distributed_groupby_plan(cfg), {"T": spark.createDataFrame(t)}
        )
        assert_equivalent(out, "SELECT k, SUM(v) AS v FROM t GROUP BY k", t=t)

    def test_compressed_groupby(self, spark):
        t = dense_kv_pdf(N, multiplicity=4, seed=63)
        cfg = JoinConfig(n_net=4, loc_bits=2, compress=True, p_bits=22)
        out = run_distributed_on_spark(
            spark, distributed_groupby_plan(cfg), {"T": spark.createDataFrame(t)}
        )
        assert_equivalent(out, "SELECT k, SUM(v) AS v FROM t GROUP BY k", t=t)


class TestSequenceLowering:
    def test_three_way_optimized_sequence(self, spark):
        cfg = JoinConfig(n_net=4, loc_bits=1)
        n_joins = 2
        rels_pdf = {
            f: dense_kv_pdf(512, value_field=v, seed=64 + i)
            for i, (f, v) in enumerate(zip(relation_fields(n_joins), value_fields(n_joins)))
        }
        rels = {k: spark.createDataFrame(v) for k, v in rels_pdf.items()}
        out = run_distributed_on_spark(spark, optimized_sequence_plan(cfg, n_joins), rels)
        assert_equivalent(
            out,
            "SELECT r0.k AS k, v0, v1, v2 FROM r0 JOIN r1 ON r0.k = r1.k "
            "JOIN r2 ON r0.k = r2.k",
            r0=rels_pdf["R0"], r1=rels_pdf["R1"], r2=rels_pdf["R2"],
        )


class TestInterpretedEngine:
    def test_interpreted_join_same_result(self, spark):
        r = dense_kv_pdf(256, value_field="vr", seed=66)
        s = dense_kv_pdf(256, value_field="vs", seed=67)
        cfg = JoinConfig(n_net=2, loc_bits=1)
        out = run_distributed_on_spark(
            spark, distributed_join_plan(cfg),
            {"R": spark.createDataFrame(r), "S": spark.createDataFrame(s)},
            engine="interpreted",
        )
        assert_equivalent(
            out, "SELECT r.k AS k, vr, vs FROM r JOIN s ON r.k = s.k", r=r, s=s
        )
