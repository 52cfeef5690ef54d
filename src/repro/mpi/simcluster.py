"""In-process MPI/RDMA simulation: ranks, windows, one-sided ops, collectives.

Faithful to the MPI-3 RMA subset the paper uses (Section 2):

* ``win_create`` is a *collective* that registers a per-rank memory region;
* ``put`` writes rows one-sidedly into a remote rank's window at a given
  offset (the receiver's "CPU" is not involved — no locking, no handshake;
  offsets are computed from histograms exactly as in Barthels et al.);
* ``fence`` delimits RMA epochs (collective barrier; after it, all incoming
  and outgoing puts are visible);
* ``allreduce_sum`` / ``exscan_sum`` / ``allgather`` back MPI_Allreduce /
  MPI_Exscan / MPI_Allgather.

Ranks are Python threads (numpy releases the GIL for bulk work). Per-rank
statistics (bytes put, puts, windows, collective calls) feed the
network-volume accounting of the experiments.
"""
from __future__ import annotations

import threading
from dataclasses import dataclass, field
from typing import Any, Callable, Dict, List, Optional, Sequence

import numpy as np
import pandas as pd


@dataclass
class RankStats:
    """Per-rank accounting of simulated network activity."""

    bytes_put: int = 0
    puts: int = 0
    windows_created: int = 0
    collectives: int = 0
    barriers: int = 0


class Window:
    """A collectively created, per-rank registered memory region.

    Each rank's region holds ``n_slots[rank]`` fixed-layout records with the
    given columns; buffers are preallocated numpy arrays (uint64 for the
    compressed wire format, object otherwise), mirroring RDMA's requirement
    that the target region be registered and sized up front.
    """

    def __init__(self, wid: int, n_slots: Sequence[int], columns: Sequence[str], dtypes: Dict[str, Any]):
        self.wid = wid
        self.columns = list(columns)
        self.buffers: List[Dict[str, np.ndarray]] = [
            {c: np.empty(n, dtype=dtypes.get(c, object)) for c in columns} for n in n_slots
        ]
        self.n_slots = list(n_slots)

    def local_frame(self, rank: int, start: int = 0, stop: Optional[int] = None) -> pd.DataFrame:
        stop = self.n_slots[rank] if stop is None else stop
        return pd.DataFrame({c: self.buffers[rank][c][start:stop] for c in self.columns})


class SimCluster:
    """N-rank simulated MPI cluster; create once per SPMD program run."""

    def __init__(self, n_ranks: int) -> None:
        if n_ranks < 1:
            raise ValueError("need at least one rank")
        self.n_ranks = n_ranks
        self._barrier = threading.Barrier(n_ranks)
        self._slots: List[Any] = [None] * n_ranks
        self._win_lock = threading.Lock()
        self._windows: Dict[int, Window] = {}
        self._wid = 0
        self.stats = [RankStats() for _ in range(n_ranks)]

    def comm(self, rank: int) -> "Comm":
        return Comm(self, rank)

    def run(self, fn: Callable[["Comm", Any], Any], args: Sequence[Any]) -> List[Any]:
        """SPMD dispatch (the mpirun analogue): run ``fn(comm, args[rank])``
        on every rank concurrently; re-raise the first rank failure."""
        if len(args) != self.n_ranks:
            raise ValueError(f"got {len(args)} inputs for {self.n_ranks} ranks")
        results: List[Any] = [None] * self.n_ranks
        errors: List[Any] = [None] * self.n_ranks

        def worker(rank: int) -> None:
            try:
                results[rank] = fn(self.comm(rank), args[rank])
            except BaseException as e:  # propagate to the driver
                errors[rank] = e
                self._barrier.abort()

        threads = [threading.Thread(target=worker, args=(r,)) for r in range(self.n_ranks)]
        for t in threads:
            t.start()
        for t in threads:
            t.join()
        # A failing rank aborts the barrier; peers then die with
        # BrokenBarrierError — surface the root cause, not the fallout.
        root_causes = [e for e in errors if e is not None and not isinstance(e, threading.BrokenBarrierError)]
        for e in root_causes or [e for e in errors if e is not None]:
            raise e
        self._barrier.reset()
        return results

    def total_bytes_put(self) -> int:
        return sum(s.bytes_put for s in self.stats)


class Comm:
    """Per-rank communicator handle (MPI_COMM_WORLD view of one rank)."""

    def __init__(self, cluster: SimCluster, rank: int) -> None:
        self.cluster = cluster
        self.rank = rank

    @property
    def size(self) -> int:
        return self.cluster.n_ranks

    @property
    def stats(self) -> RankStats:
        return self.cluster.stats[self.rank]

    # -- collectives --------------------------------------------------------
    def barrier(self) -> None:
        self.stats.barriers += 1
        self.cluster._barrier.wait()

    def _exchange(self, value: Any) -> List[Any]:
        """Deposit ``value``, gather everyone's (two-phase with barriers)."""
        self.stats.collectives += 1
        self.cluster._slots[self.rank] = value
        self.cluster._barrier.wait()
        gathered = list(self.cluster._slots)
        self.cluster._barrier.wait()
        return gathered

    def allgather(self, value: Any) -> List[Any]:
        return self._exchange(value)

    def allreduce_sum(self, arr: np.ndarray) -> np.ndarray:
        parts = self._exchange(np.asarray(arr))
        return np.sum(parts, axis=0)

    def exscan_sum(self, arr: np.ndarray) -> np.ndarray:
        """Elementwise sum over ranks below this one (MPI_Exscan); rank 0
        gets zeros. This yields each rank's write offset inside a partition."""
        parts = self._exchange(np.asarray(arr))
        if self.rank == 0:
            return np.zeros_like(np.asarray(arr))
        return np.sum(parts[: self.rank], axis=0)

    # -- one-sided RMA -------------------------------------------------------
    def win_create(
        self,
        n_slots: int,
        columns: Sequence[str],
        dtypes: Optional[Dict[str, Any]] = None,
    ) -> Window:
        """Collective window registration (MPI_Win_create): every rank
        contributes its local region size."""
        sizes = self._exchange(int(n_slots))
        self.stats.windows_created += 1
        if self.rank == 0:
            with self.cluster._win_lock:
                wid = self.cluster._wid
                self.cluster._wid += 1
                self.cluster._windows[wid] = Window(
                    wid, sizes, columns, dtypes or {}
                )
        self.cluster._barrier.wait()
        with self.cluster._win_lock:
            wid = self.cluster._wid - 1
            win = self.cluster._windows[wid]
        self.cluster._barrier.wait()
        return win

    def put(self, win: Window, target_rank: int, offset: int, pdf: pd.DataFrame) -> None:
        """One-sided write of ``pdf`` rows into ``target_rank``'s region at
        ``offset`` — no involvement of the target rank (RDMA write)."""
        n = len(pdf)
        if offset + n > win.n_slots[target_rank]:
            raise RuntimeError(
                f"put overflows window of rank {target_rank}: "
                f"{offset}+{n} > {win.n_slots[target_rank]}"
            )
        buf = win.buffers[target_rank]
        for c in win.columns:
            buf[c][offset : offset + n] = pdf[c].to_numpy()
        self.stats.puts += 1
        self.stats.bytes_put += _frame_bytes(pdf)

    def fence(self, win: Window) -> None:
        """Collective epoch boundary (MPI_Win_fence): all pending RMA
        operations complete before it returns."""
        self.barrier()


class LocalComm(Comm):
    """Single-rank communicator for running SPMD code without a cluster."""

    def __init__(self) -> None:
        super().__init__(SimCluster(1), 0)


def _frame_bytes(pdf: pd.DataFrame) -> int:
    """Wire-size estimate: 8 bytes per numeric cell, string lengths for
    object cells."""
    total = 0
    for c in pdf.columns:
        col = pdf[c]
        if col.dtype == object:
            total += int(col.map(lambda v: len(str(v))).sum())
        else:
            total += 8 * len(col)
    return total
