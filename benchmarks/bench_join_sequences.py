"""Benchmark: Fig. 8 — sequences of two joins, naive (2N shuffles) vs
optimized (N+1 shuffles), on the simulated MPI substrate."""
import pytest

from repro.modular.common import JoinConfig
from repro.modular.join_sequence import naive_sequence_plan, optimized_sequence_plan
from repro.mpi.thread_backend import run_on_sim
from repro.synth_data import dense_kv_pdf

N = 1 << 16
MACHINES = 4
CFG = JoinConfig(n_net=MACHINES, loc_bits=2)


@pytest.fixture(scope="module")
def relations():
    return {
        "R0": dense_kv_pdf(N, value_field="v0", seed=90, multiplicity=4),
        "R1": dense_kv_pdf(N, value_field="v1", seed=91, multiplicity=4),
        "R2": dense_kv_pdf(N, value_field="v2", seed=92),
    }


def test_fig8_naive_sequence(benchmark, relations):
    out, _ = benchmark.pedantic(
        lambda: run_on_sim(naive_sequence_plan(CFG, 2), MACHINES, relations),
        rounds=3, iterations=1,
    )
    assert len(out) == 4 * N  # join-1 output grows 4x, join-2 preserves it


def test_fig8_optimized_sequence(benchmark, relations):
    out, _ = benchmark.pedantic(
        lambda: run_on_sim(optimized_sequence_plan(CFG, 2), MACHINES, relations),
        rounds=3, iterations=1,
    )
    assert len(out) == 4 * N
