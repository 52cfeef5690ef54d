"""Benchmark: Fig. 6b — distributed join total runtime on the Spark
lowering, monolithic (hand-fused kernels) vs Modularis (generic
sub-operator plan), 8 'machines' (network partitions)."""
import pytest

from repro.core.lower import run_distributed_on_spark
from repro.modular.common import JoinConfig
from repro.modular.join import distributed_join_plan
from repro.monolithic.spark import run_monolithic_join_spark
from repro.synth_data import dense_kv_pdf

N = 1 << 19
CFG = JoinConfig(n_net=8, loc_bits=3, compress=True, p_bits=27)


@pytest.fixture(scope="module")
def frames(spark):
    r = spark.createDataFrame(dense_kv_pdf(N, value_field="vr", seed=82)).cache()
    s = spark.createDataFrame(dense_kv_pdf(N, value_field="vs", seed=83)).cache()
    r.count(), s.count()
    yield r, s
    r.unpersist(), s.unpersist()


def test_fig6b_monolithic_spark(benchmark, spark, frames):
    r, s = frames
    n = benchmark.pedantic(
        lambda: run_monolithic_join_spark(spark, r, s, CFG).count(),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert n == N


def test_fig6b_modularis_spark(benchmark, spark, frames):
    r, s = frames
    plan = distributed_join_plan(CFG)
    n = benchmark.pedantic(
        lambda: run_distributed_on_spark(spark, plan, {"R": r, "S": s}).count(),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert n == N
