"""Tests for naive vs optimized join sequences (Fig. 4): result equality,
shuffle counts (2N vs N+1), and network-volume ordering."""
import numpy as np
import pandas as pd
import pytest

from repro.modular.common import JoinConfig
from repro.modular.join_sequence import (
    count_exchanges,
    naive_sequence_plan,
    optimized_sequence_plan,
    relation_fields,
    value_fields,
)
from repro.mpi.thread_backend import run_on_sim
from repro.synth_data import dense_kv_pdf


def make_relations(n_joins, n, mult_first=1):
    """R0..RN dense relations; key multiplicity m on *both* sides of the
    first join makes its output grow by m (m x m matches per key over n/m
    keys) — the Fig. 8b/8c experiment."""
    rels = {}
    for i, (f, v) in enumerate(zip(relation_fields(n_joins), value_fields(n_joins))):
        rels[f] = dense_kv_pdf(n, value_field=v, seed=50 + i,
                               multiplicity=mult_first if i <= 1 else 1)
    return rels


def reference(rels, n_joins):
    out = rels["R0"]
    for i in range(1, n_joins + 1):
        out = out.merge(rels[f"R{i}"], on="k")
    return out


def sorted_frame(pdf):
    cols = sorted(pdf.columns)
    return pdf[cols].sort_values(cols).reset_index(drop=True).astype("int64")


class TestShuffleCounts:
    @pytest.mark.parametrize("n_joins", [1, 2, 3, 4])
    def test_naive_has_2n_exchanges(self, n_joins):
        plan = naive_sequence_plan(JoinConfig(n_net=2, loc_bits=1), n_joins)
        assert count_exchanges(plan) == 2 * n_joins

    @pytest.mark.parametrize("n_joins", [1, 2, 3, 4])
    def test_optimized_has_n_plus_1_exchanges(self, n_joins):
        plan = optimized_sequence_plan(JoinConfig(n_net=2, loc_bits=1), n_joins)
        assert count_exchanges(plan) == n_joins + 1


class TestCorrectness:
    @pytest.mark.parametrize("n_joins", [1, 2, 3])
    @pytest.mark.parametrize("variant", ["naive", "optimized"])
    def test_sequence_matches_pandas_cascade(self, n_joins, variant):
        cfg = JoinConfig(n_net=2, loc_bits=1)
        rels = make_relations(n_joins, 256)
        build = naive_sequence_plan if variant == "naive" else optimized_sequence_plan
        out, _ = run_on_sim(build(cfg, n_joins), 2, rels)
        expect = reference(rels, n_joins)
        assert len(out) == len(expect)
        pd.testing.assert_frame_equal(sorted_frame(out), sorted_frame(expect))

    def test_naive_and_optimized_agree_with_growing_output(self):
        cfg = JoinConfig(n_net=2, loc_bits=1)
        rels = make_relations(2, 256, mult_first=4)  # join-1 output 4x
        naive, _ = run_on_sim(naive_sequence_plan(cfg, 2), 2, rels)
        opt, _ = run_on_sim(optimized_sequence_plan(cfg, 2), 2, rels)
        pd.testing.assert_frame_equal(sorted_frame(naive), sorted_frame(opt))

    def test_four_ranks(self):
        cfg = JoinConfig(n_net=4, loc_bits=2)
        rels = make_relations(2, 512)
        naive, _ = run_on_sim(naive_sequence_plan(cfg, 2), 4, rels)
        opt, _ = run_on_sim(optimized_sequence_plan(cfg, 2), 4, rels)
        pd.testing.assert_frame_equal(sorted_frame(naive), sorted_frame(opt))


class TestNetworkVolume:
    def test_optimized_shuffles_fewer_bytes(self):
        cfg = JoinConfig(n_net=2, loc_bits=1)
        rels = make_relations(2, 512)
        _, naive_info = run_on_sim(naive_sequence_plan(cfg, 2), 2, rels)
        _, opt_info = run_on_sim(optimized_sequence_plan(cfg, 2), 2, rels)
        assert opt_info["bytes_put"] < naive_info["bytes_put"]

    def test_optimized_network_volume_constant_in_join_output(self):
        cfg = JoinConfig(n_net=2, loc_bits=1)
        small = make_relations(2, 512, mult_first=1)
        big = make_relations(2, 512, mult_first=8)
        _, a = run_on_sim(optimized_sequence_plan(cfg, 2), 2, small)
        _, b = run_on_sim(optimized_sequence_plan(cfg, 2), 2, big)
        assert a["bytes_put"] == b["bytes_put"]  # pre-partitioned once

    def test_naive_network_volume_grows_with_join_output(self):
        cfg = JoinConfig(n_net=2, loc_bits=1)
        small = make_relations(2, 512, mult_first=1)
        big = make_relations(2, 512, mult_first=8)
        _, a = run_on_sim(naive_sequence_plan(cfg, 2), 2, small)
        _, b = run_on_sim(naive_sequence_plan(cfg, 2), 2, big)
        assert b["bytes_put"] > a["bytes_put"]
