"""End-to-end tests of the modular distributed GROUP BY (Fig. 5)."""
import numpy as np
import pandas as pd
import pytest

from repro.modular.common import JoinConfig
from repro.modular.groupby import distributed_groupby_plan
from repro.mpi.thread_backend import run_on_sim
from repro.synth_data import dense_kv_pdf


def reference(t):
    return t.groupby("k", as_index=False)["v"].sum()


def run_gb(t, n_ranks, cfg):
    plan = distributed_groupby_plan(cfg)
    return run_on_sim(plan, n_ranks, {"T": t})


def check(out, t):
    expect = reference(t).sort_values("k").reset_index(drop=True)
    got = out.sort_values("k").reset_index(drop=True)[["k", "v"]]
    pd.testing.assert_frame_equal(got.astype("int64"), expect.astype("int64"))


@pytest.mark.parametrize("n_ranks", [1, 2, 4])
@pytest.mark.parametrize("compress", [False, True])
def test_groupby_matches_reference(n_ranks, compress):
    t = dense_kv_pdf(1 << 10, multiplicity=4, seed=20)
    cfg = JoinConfig(n_net=max(n_ranks, 2), loc_bits=2, compress=compress, p_bits=20)
    out, _ = run_gb(t, n_ranks, cfg)
    check(out, t)


def test_every_key_unique():
    t = dense_kv_pdf(512, multiplicity=1, seed=21)
    cfg = JoinConfig(n_net=4, loc_bits=2)
    out, _ = run_gb(t, 4, cfg)
    assert len(out) == 512
    check(out, t)


def test_single_group():
    t = pd.DataFrame({"k": np.zeros(100, dtype=np.int64), "v": np.arange(100)})
    cfg = JoinConfig(n_net=2, loc_bits=1)
    out, _ = run_gb(t, 2, cfg)
    assert len(out) == 1 and int(out["v"].iloc[0]) == 4950


def test_custom_aggregate_max():
    t = dense_kv_pdf(256, multiplicity=4, seed=22)
    cfg = JoinConfig(n_net=2, loc_bits=1)
    plan = distributed_groupby_plan(
        cfg, row_fn=lambda a, b: {"v": max(a["v"], b["v"])}, agg_spec={"v": "max"}
    )
    out, _ = run_on_sim(plan, 2, {"T": t})
    expect = t.groupby("k", as_index=False)["v"].max()
    got = out.sort_values("k").reset_index(drop=True)[["k", "v"]]
    pd.testing.assert_frame_equal(
        got.astype("int64"), expect.sort_values("k").reset_index(drop=True).astype("int64")
    )


def test_groupby_phase_breakdown():
    t = dense_kv_pdf(1 << 10, multiplicity=2, seed=23)
    cfg = JoinConfig(n_net=2, loc_bits=2)
    plan = distributed_groupby_plan(cfg)
    _, info = run_on_sim(plan, 2, {"T": t}, profile=True)
    assert "network_partitioning" in info["phase_seconds"]
    assert "local_partitioning" in info["phase_seconds"]
