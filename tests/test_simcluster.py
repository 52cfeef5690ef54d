"""Unit tests for the simulated MPI/RDMA substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.mpi.simcluster import LocalComm, SimCluster


class TestCollectives:
    def test_allgather(self):
        c = SimCluster(4)
        out = c.run(lambda comm, x: comm.allgather(x), [10, 11, 12, 13])
        assert all(o == [10, 11, 12, 13] for o in out)

    def test_allreduce_sum(self):
        c = SimCluster(3)
        out = c.run(
            lambda comm, x: comm.allreduce_sum(np.array([x, 2 * x])),
            [1, 2, 3],
        )
        assert all(list(o) == [6, 12] for o in out)

    def test_exscan_sum(self):
        c = SimCluster(4)
        out = c.run(lambda comm, x: comm.exscan_sum(np.array([x])), [5, 6, 7, 8])
        assert [int(o[0]) for o in out] == [0, 5, 11, 18]

    def test_repeated_collectives_do_not_interfere(self):
        c = SimCluster(3)

        def prog(comm, x):
            a = comm.allreduce_sum(np.array([x]))
            b = comm.allreduce_sum(np.array([x * 10]))
            return int(a[0]), int(b[0])

        out = c.run(prog, [1, 2, 3])
        assert all(o == (6, 60) for o in out)

    def test_rank_error_propagates(self):
        c = SimCluster(2)

        def prog(comm, x):
            if comm.rank == 1:
                raise ValueError("boom")
            comm.barrier()  # would deadlock without barrier abort
            return x

        with pytest.raises(ValueError, match="boom"):
            c.run(prog, [0, 1])

    def test_input_arity_checked(self):
        with pytest.raises(ValueError, match="2 ranks"):
            SimCluster(2).run(lambda comm, x: x, [1])


class TestWindows:
    def test_put_visible_after_fence(self):
        c = SimCluster(2)

        def prog(comm, x):
            win = comm.win_create(2, ["v"], dtypes={"v": np.int64})
            # slot layout: slot r belongs to writer rank r (disjoint offsets,
            # exactly how histogram-derived offsets avoid synchronization)
            other = 1 - comm.rank
            comm.put(win, other, comm.rank, pd.DataFrame({"v": [x]}))
            comm.put(win, comm.rank, comm.rank, pd.DataFrame({"v": [x * 100]}))
            comm.fence(win)
            return list(win.local_frame(comm.rank)["v"])

        out = c.run(prog, [7, 8])
        assert out[0] == [700, 8]
        assert out[1] == [7, 800]

    def test_put_overflow_rejected(self):
        c = SimCluster(1)

        def prog(comm, _):
            win = comm.win_create(1, ["v"], dtypes={"v": np.int64})
            comm.put(win, 0, 1, pd.DataFrame({"v": [1]}))

        with pytest.raises(RuntimeError, match="overflows"):
            c.run(prog, [None])

    def test_heterogeneous_window_sizes(self):
        c = SimCluster(2)

        def prog(comm, _):
            win = comm.win_create(comm.rank + 1, ["v"], dtypes={"v": np.int64})
            comm.fence(win)
            return win.n_slots

        out = c.run(prog, [None, None])
        assert out[0] == [1, 2]

    def test_stats_accounting(self):
        c = SimCluster(2)

        def prog(comm, _):
            win = comm.win_create(4, ["v"], dtypes={"v": np.int64})
            comm.put(win, comm.rank, 0, pd.DataFrame({"v": [1, 2]}))
            comm.fence(win)
            return None

        c.run(prog, [None, None])
        assert c.total_bytes_put() == 2 * 2 * 8
        assert all(s.puts == 1 and s.windows_created == 1 for s in c.stats)


class TestLocalComm:
    def test_single_rank_semantics(self):
        comm = LocalComm()
        assert comm.size == 1 and comm.rank == 0
        assert list(comm.allreduce_sum(np.array([3]))) == [3]
        assert list(comm.exscan_sum(np.array([3]))) == [0]
        win = comm.win_create(2, ["v"], dtypes={"v": np.int64})
        comm.put(win, 0, 0, pd.DataFrame({"v": [1, 2]}))
        comm.fence(win)
        assert list(win.local_frame(0)["v"]) == [1, 2]
