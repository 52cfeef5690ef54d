"""Network sub-operators (paper Section 3.3.3) — the only platform-specific
operators.

On the simulated MPI substrate (``repro.mpi.simcluster``) they execute the
exact RDMA protocol of Barthels et al.: histogram-driven offset computation
(exscan over ranks), collective window registration, synchronization-free
one-sided puts, and a fence epoch. On Spark, ``repro.core.lower`` replaces
them with Catalyst stages (aggregate + collect = AllReduce; shuffle =
exchange) — same plan, different platform, which is the paper's whole point.
"""
from __future__ import annotations

from typing import Callable, Iterator, Optional, Sequence

import numpy as np
import pandas as pd

from repro.core.compression import CompressionSpec
from repro.core.ops.base import ExecContext, SubOperator, concat_batches
from repro.core.types import INT64, RowVector, RowVectorType, TupleType


def owner_of(partition_id: int, n_ranks: int) -> int:
    """Round-robin partition placement used by exchange and lowering alike."""
    return partition_id % n_ranks


class MpiExecutor(SubOperator):
    """Executes a nested plan concurrently on the ranks of an MPI cluster.

    NestedMap semantics, but each input tuple is dispatched to its own rank
    (the mpirun analogue): the operator starts the cluster, passes the input
    tuples to the ranks, triggers the nested plan, and collects one result
    tuple per rank in rank order.
    """

    op_name = "ME"

    def __init__(self, upstream: SubOperator, nested_plan) -> None:
        super().__init__([upstream])
        self.nested_plan = nested_plan

    def out_type(self, in_types) -> Optional[TupleType]:
        return self.nested_plan.out_type(param_type=in_types[0])

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        from repro.mpi.simcluster import SimCluster

        params = list(RowVector(concat_batches(list(ups[0]))).iter_rows())
        cluster = SimCluster(len(params))
        ctx.extra["last_cluster"] = cluster  # exposes network stats to harnesses

        def rank_main(comm, param):
            out = ctx.run_nested_batches(self.nested_plan, ctx.child(param).with_comm(comm))
            out = list(out)
            if len(out) != 1:
                raise RuntimeError(
                    f"nested plan of MpiExecutor must produce exactly one tuple, got {len(out)}"
                )
            return out[0]

        results = cluster.run(rank_main, params)
        yield pd.DataFrame(
            {k: pd.Series([r[k] for r in results], dtype=object) for k in results[0]}
        )


class MpiHistogram(SubOperator):
    """Global histogram via MPI_Allreduce: consumes dense local
    ``<bucket_id, count>`` pairs, returns the global counts in the same
    shape."""

    op_name = "MH"
    phase = "global_histogram"

    def __init__(self, upstream: SubOperator, n_buckets: int) -> None:
        super().__init__([upstream])
        self.n_buckets = n_buckets

    def out_type(self, in_types) -> TupleType:
        return TupleType([("bucket_id", INT64), ("count", INT64)])

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        counts = _dense_counts(concat_batches(list(ups[0])), self.n_buckets, "MpiHistogram")
        if ctx.comm is not None:
            counts = ctx.comm.allreduce_sum(counts)
        yield pd.DataFrame(
            {"bucket_id": np.arange(self.n_buckets, dtype=np.int64), "count": counts}
        )


class MpiExchange(SubOperator):
    """Partitions tuples across ranks through registered RMA windows.

    Consumes (1) this rank's local histogram and (2) the global histogram
    from two dedicated upstreams, computes synchronization-free write
    offsets (region base from the global sizes, intra-region offset from an
    exscan of the local counts — exactly Barthels et al.), writes each
    partition's tuples into its owner's window with one-sided puts, fences,
    and returns this rank's ``<partition_id, partition_data>`` pairs.

    With a ``CompressionSpec`` the <key,value> payload is compressed to one
    64-bit word on the wire (fan-out must be 2**F); partition data stays
    compressed downstream until a ParametrizedMap restores the bits.
    """

    op_name = "EX"
    phase = "network_partitioning"

    def __init__(
        self,
        data_upstream: SubOperator,
        local_hist_upstream: SubOperator,
        global_hist_upstream: SubOperator,
        n_partitions: int,
        bucket_fn: Callable[[dict], int],
        bucket_batch_fn: Optional[Callable[[pd.DataFrame], np.ndarray]] = None,
        compression: Optional[CompressionSpec] = None,
        pid_field: str = "partition_id",
        data_field: str = "partition_data",
    ) -> None:
        super().__init__([data_upstream, local_hist_upstream, global_hist_upstream])
        if compression is not None and compression.fanout != n_partitions:
            raise ValueError(
                f"compression fan-out {compression.fanout} != n_partitions {n_partitions}"
            )
        self.n_partitions = n_partitions
        self.bucket_fn = bucket_fn
        self.bucket_batch_fn = bucket_batch_fn
        self.compression = compression
        self.pid_field = pid_field
        self.data_field = data_field

    def out_type(self, in_types) -> Optional[TupleType]:
        t = in_types[0]
        if t is None:
            return None
        if self.compression is not None:
            t = TupleType([(self.compression.out_field, INT64)])
        return TupleType([(self.pid_field, INT64), (self.data_field, RowVectorType(t))])

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        from repro.core import radix
        from repro.mpi.simcluster import LocalComm

        comm = ctx.comm or LocalComm()
        n = self.n_partitions
        local_hist = _dense_counts(concat_batches(list(ups[1])), n, "MpiExchange local")
        global_hist = _dense_counts(concat_batches(list(ups[2])), n, "MpiExchange global")

        data = concat_batches(list(ups[0]))
        pids = self._pids(data)
        if self.compression is not None:
            data = self.compression.compress_pdf(data)

        # Window layout on each rank: its owned partitions' regions in
        # increasing partition id, sized by the global histogram.
        owners = np.array([owner_of(p, comm.size) for p in range(n)])
        my_parts = np.flatnonzero(owners == comm.rank)
        base = np.zeros(n, dtype=np.int64)
        for r in range(comm.size):
            parts_r = np.flatnonzero(owners == r)
            base[parts_r] = np.concatenate([[0], np.cumsum(global_hist[parts_r])[:-1]])
        my_slots = int(global_hist[my_parts].sum())

        dtypes = {c: data[c].dtype for c in data.columns}
        win = comm.win_create(my_slots, list(data.columns), dtypes=dtypes)
        my_offsets = comm.exscan_sum(local_hist)  # offset inside each region

        frames = radix.scatter(data, pids, n)
        for p in range(n):
            if len(frames[p]):
                comm.put(win, int(owners[p]), int(base[p] + my_offsets[p]), frames[p])
        comm.fence(win)

        rows = {self.pid_field: [], self.data_field: []}
        start = 0
        for p in my_parts:
            stop = start + int(global_hist[p])
            rows[self.pid_field].append(int(p))
            rows[self.data_field].append(RowVector(win.local_frame(comm.rank, start, stop)))
            start = stop
        yield pd.DataFrame(
            {
                self.pid_field: pd.array(rows[self.pid_field], dtype="int64"),
                self.data_field: pd.Series(rows[self.data_field], dtype=object),
            }
        )

    def _pids(self, data: pd.DataFrame) -> np.ndarray:
        if self.bucket_batch_fn is not None and len(data):
            return np.asarray(self.bucket_batch_fn(data))
        return np.fromiter(
            (self.bucket_fn(t) for t in RowVector(data).iter_rows()),
            dtype=np.int64,
            count=len(data),
        )


class MpiBroadcast(SubOperator):
    """Sends all tuples from upstream to every rank via the same
    histogram-offset window protocol as MpiExchange (n_buckets = 1), and
    returns the gathered tuples directly (no partition id)."""

    op_name = "MB"
    phase = "network_partitioning"

    def __init__(
        self,
        data_upstream: SubOperator,
        local_hist_upstream: SubOperator,
        global_hist_upstream: SubOperator,
    ) -> None:
        super().__init__([data_upstream, local_hist_upstream, global_hist_upstream])

    def out_type(self, in_types) -> Optional[TupleType]:
        return in_types[0]

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        from repro.mpi.simcluster import LocalComm

        comm = ctx.comm or LocalComm()
        local_total = int(_dense_counts(concat_batches(list(ups[1])), 1, "MpiBroadcast local")[0])
        global_total = int(
            _dense_counts(concat_batches(list(ups[2])), 1, "MpiBroadcast global")[0]
        )
        data = concat_batches(list(ups[0]))
        if len(data) != local_total:
            raise RuntimeError(
                f"MpiBroadcast local histogram says {local_total} tuples, saw {len(data)}"
            )
        dtypes = {c: data[c].dtype for c in data.columns}
        win = comm.win_create(global_total, list(data.columns), dtypes=dtypes)
        offset = int(comm.exscan_sum(np.array([local_total]))[0])
        if len(data):
            for r in range(comm.size):
                comm.put(win, r, offset, data)
        comm.fence(win)
        yield win.local_frame(comm.rank, 0, global_total)


def _dense_counts(pdf: pd.DataFrame, n: int, who: str) -> np.ndarray:
    """Validate and read a dense <bucket_id, count> histogram frame."""
    if len(pdf) != n:
        raise RuntimeError(f"{who} histogram must have exactly {n} tuples, got {len(pdf)}")
    counts = np.zeros(n, dtype=np.int64)
    counts[pdf["bucket_id"].to_numpy(dtype=np.int64)] = pdf["count"].to_numpy(dtype=np.int64)
    return counts
