"""Benchmark: Fig. 7 — distributed GROUP BY on the Spark lowering across
cluster sizes and key multiplicities."""
import pytest

from repro.core.lower import run_distributed_on_spark
from repro.modular.common import JoinConfig
from repro.modular.groupby import distributed_groupby_plan
from repro.synth_data import dense_kv_pdf

N = 1 << 19


@pytest.mark.parametrize("machines", [2, 8])
def test_fig7_machines(benchmark, spark, machines):
    t = spark.createDataFrame(dense_kv_pdf(N, seed=84)).cache()
    t.count()
    try:
        cfg = JoinConfig(n_net=machines, loc_bits=3, compress=True, p_bits=27)
        plan = distributed_groupby_plan(cfg)
        n = benchmark.pedantic(
            lambda: run_distributed_on_spark(spark, plan, {"T": t}).count(),
            rounds=3, iterations=1, warmup_rounds=1,
        )
        assert n == N
    finally:
        t.unpersist()


@pytest.mark.parametrize("multiplicity", [1, 8])
def test_fig7_multiplicity(benchmark, spark, multiplicity):
    t = spark.createDataFrame(dense_kv_pdf(N, multiplicity=multiplicity, seed=85)).cache()
    t.count()
    try:
        cfg = JoinConfig(n_net=8, loc_bits=3, compress=True, p_bits=27)
        plan = distributed_groupby_plan(cfg)
        n = benchmark.pedantic(
            lambda: run_distributed_on_spark(spark, plan, {"T": t}).count(),
            rounds=3, iterations=1, warmup_rounds=1,
        )
        assert n == N // multiplicity
    finally:
        t.unpersist()
