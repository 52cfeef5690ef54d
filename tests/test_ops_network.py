"""Unit tests for the network sub-operators on the simulated MPI cluster."""
import numpy as np
import pandas as pd
import pytest

from repro.core import Plan, RowVector
from repro.core import vectorized
from repro.core.compression import CompressionSpec
from repro.core.ops import (
    LocalHistogram,
    MaterializeRowVector,
    MpiBroadcast,
    MpiExchange,
    MpiExecutor,
    MpiHistogram,
    RowScan,
)
from repro.core.ops.base import ExecContext
from repro.core.ops.network import owner_of
from repro.mpi.simcluster import SimCluster
from repro.mpi.thread_backend import make_rank_inputs, split_relation
from tests.helpers import params_of, source


def kv(n, seed=0):
    g = np.random.default_rng(seed)
    return pd.DataFrame({"k": g.integers(0, 64, n), "v": np.arange(n)})


def hist_plan(n_buckets):
    lh = LocalHistogram(
        source("T"), n_buckets,
        bucket_fn=lambda t: t["k"] % n_buckets,
        bucket_batch_fn=lambda pdf: (pdf["k"] % n_buckets).to_numpy(),
    )
    return lh


class TestMpiHistogram:
    def test_single_rank_equals_local(self):
        plan = Plan(MpiHistogram(hist_plan(4), 4))
        data = kv(100)
        rows = vectorized.run_rows(plan, params=params_of(T=data))
        expect = np.bincount(data["k"] % 4, minlength=4)
        assert [r["count"] for r in rows] == list(expect)

    def test_allreduce_across_ranks(self):
        data = kv(100)
        parts = split_relation(data, 4)
        cluster = SimCluster(4)

        def prog(comm, pdf):
            ctx = ExecContext(comm=comm)
            plan = Plan(MpiHistogram(hist_plan(8), 8))
            return vectorized.run_to_pdf(plan, ctx, params=params_of(T=pdf))

        outs = cluster.run(prog, parts)
        expect = list(np.bincount(data["k"] % 8, minlength=8))
        for out in outs:
            assert list(out["count"]) == expect

    def test_wrong_histogram_size_rejected(self):
        plan = Plan(MpiHistogram(hist_plan(4), 8))
        with pytest.raises(RuntimeError, match="exactly 8"):
            vectorized.run_rows(plan, params=params_of(T=kv(10)))


def exchange_plan(n_parts, compression=None):
    data = source("T")
    lh = LocalHistogram(
        data, n_parts,
        bucket_fn=lambda t: t["k"] % n_parts,
        bucket_batch_fn=lambda pdf: (pdf["k"] % n_parts).to_numpy(),
    )
    gh = MpiHistogram(lh, n_parts)
    ex = MpiExchange(
        data, lh, gh, n_parts,
        bucket_fn=lambda t: t["k"] % n_parts,
        bucket_batch_fn=lambda pdf: (pdf["k"] % n_parts).to_numpy(),
        compression=compression,
    )
    return Plan(ex)


class TestMpiExchange:
    def run_exchange(self, n_ranks, n_parts, data, compression=None):
        cluster = SimCluster(n_ranks)
        parts = split_relation(data, n_ranks)

        def prog(comm, pdf):
            ctx = ExecContext(comm=comm)
            return vectorized.run_rows(
                exchange_plan(n_parts, compression), ctx, params=params_of(T=pdf)
            )

        return cluster.run(prog, parts), cluster

    def test_partitions_land_on_owner(self):
        data = kv(200)
        outs, _ = self.run_exchange(4, 8, data)
        for rank, rows in enumerate(outs):
            assert [r["partition_id"] for r in rows] == [p for p in range(8) if owner_of(p, 4) == rank]

    def test_no_tuples_lost_and_keys_match_partition(self):
        data = kv(333)
        outs, _ = self.run_exchange(3, 5, data)
        total = 0
        for rows in outs:
            for r in rows:
                ks = r["partition_data"].df["k"].to_numpy()
                total += len(ks)
                assert (ks % 5 == r["partition_id"]).all()
        assert total == len(data)

    def test_single_rank_local_fallback(self):
        data = kv(50)
        rows = vectorized.run_rows(exchange_plan(4), params=params_of(T=data))
        assert [r["partition_id"] for r in rows] == [0, 1, 2, 3]
        assert sum(len(r["partition_data"]) for r in rows) == 50

    def test_compressed_wire_format(self):
        spec = CompressionSpec(p_bits=20, f_bits=2, key_field="k", value_field="v")
        data = kv(100)
        outs, cluster = self.run_exchange(2, 4, data, compression=spec)
        seen = []
        for rows in outs:
            for r in rows:
                pdf = r["partition_data"].df
                assert list(pdf.columns) == ["kv"]
                k, v = spec.decompress(pdf["kv"].to_numpy(), r["partition_id"])
                assert (k % 4 == r["partition_id"]).all()
                seen.append(pd.DataFrame({"k": k, "v": v}))
        merged = pd.concat(seen).sort_values(["k", "v"]).reset_index(drop=True)
        expect = data.sort_values(["k", "v"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(merged, expect, check_dtype=False)

    def test_compression_halves_wire_bytes(self):
        spec = CompressionSpec(p_bits=20, f_bits=2, key_field="k", value_field="v")
        data = kv(400)
        _, c_plain = self.run_exchange(2, 4, data)
        _, c_comp = self.run_exchange(2, 4, data, compression=spec)
        assert c_comp.total_bytes_put() * 2 == c_plain.total_bytes_put()

    def test_fanout_mismatch_rejected(self):
        spec = CompressionSpec(p_bits=20, f_bits=2)
        with pytest.raises(ValueError, match="fan-out"):
            exchange_plan(8, compression=spec)


class TestMpiBroadcast:
    def test_all_ranks_receive_everything(self):
        data = kv(60)
        cluster = SimCluster(3)
        parts = split_relation(data, 3)

        def prog(comm, pdf):
            d = source("T")
            lh = LocalHistogram(d, 1, bucket_fn=lambda t: 0,
                                bucket_batch_fn=lambda p: np.zeros(len(p), dtype=np.int64))
            gh = MpiHistogram(lh, 1)
            plan = Plan(MpiBroadcast(d, lh, gh))
            ctx = ExecContext(comm=comm)
            return vectorized.run_to_pdf(plan, ctx, params=params_of(T=pdf))

        outs = cluster.run(prog, parts)
        expect = data.sort_values(["k", "v"]).reset_index(drop=True)
        for out in outs:
            got = out.sort_values(["k", "v"]).reset_index(drop=True)
            pd.testing.assert_frame_equal(got, expect, check_dtype=False)


class TestMpiExecutor:
    def test_runs_nested_plan_per_rank_in_order(self):
        from repro.core.ops import Map, ParameterLookup, Projection, ReduceByKey

        # nested plan: count rows of this rank's slice
        scan = RowScan(Projection(ParameterLookup(), ["T"]), "T")
        cnt = Map(scan, row_fn=lambda t: {"one": 1})
        from repro.core.ops import Reduce

        red = Reduce(cnt, row_fn=lambda a, b: {"one": a["one"] + b["one"]},
                     batch_fn=lambda pdf: {"one": len(pdf)})
        nested = Plan(MaterializeRowVector(red, field="rank_result"))

        me = MpiExecutor(source("rank_inputs"), nested)
        plan = Plan(RowScan(me, "rank_result"))
        data = kv(100)
        params = make_rank_inputs(4, T=data)
        rows = vectorized.run_rows(plan, params=params)
        assert len(rows) == 4 and sum(r["one"] for r in rows) == 100

    def test_nested_plan_must_return_one_tuple(self):
        from repro.core.ops import ParameterLookup, Projection

        scan = RowScan(Projection(ParameterLookup(), ["T"]), "T")
        nested = Plan(scan)
        me = MpiExecutor(source("rank_inputs"), nested)
        with pytest.raises(RuntimeError, match="exactly one"):
            vectorized.run_rows(Plan(me), params=make_rank_inputs(2, T=kv(10)))
