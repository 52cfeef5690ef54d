"""Monolithic distributed radix hash join (the Barthels et al. baseline).

One imperative code path per rank, phases fused over raw numpy arrays and
the raw MPI window API — the "highly engineered, monolithic operator" the
paper compares against. The algorithm is exactly Section 4.1.1:

  (1) local histograms of both relations in one pass, one combined
      MPI_Allreduce for the global histogram;
  (2) network partitioning through RMA windows with histogram-derived,
      synchronization-free offsets, with the 16B->8B key/value compression;
  (3) cache-sized local radix re-partitioning;
  (4) per-partition build & probe with inline decompression.

Returns per-phase wall times so the Fig. 6 breakdown can be reproduced.
"""
from __future__ import annotations

from time import perf_counter
from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd

from repro.core import radix
from repro.core.ops.network import owner_of
from repro.modular.common import JoinConfig
from repro.mpi.simcluster import Comm, SimCluster


def _np_hash_join(bk, bv, pk, pv):
    """Fused sort/searchsorted equi-join over raw arrays (duplicates in the
    build side supported); returns (keys, build values, probe values)."""
    order = np.argsort(bk, kind="stable")
    bks, bvs = bk[order], bv[order]
    lo = np.searchsorted(bks, pk, "left")
    hi = np.searchsorted(bks, pk, "right")
    cnt = hi - lo
    probe_idx = np.repeat(np.arange(len(pk)), cnt)
    total = int(cnt.sum())
    start = np.repeat(lo, cnt)
    step = np.arange(total) - np.repeat(np.cumsum(cnt) - cnt, cnt)
    build_idx = start + step
    return pk[probe_idx], bvs[build_idx], pv[probe_idx]


def _exchange(comm: Comm, cfg: JoinConfig, keys, vals, local_hist, global_hist, spec):
    """Fused network-partitioning phase: compress, scatter, window, puts."""
    n = cfg.n_net
    pids = keys % n
    wire = spec.compress(keys, vals) if spec else None
    owners = np.array([owner_of(p, comm.size) for p in range(n)])
    my_parts = np.flatnonzero(owners == comm.rank)
    base = np.zeros(n, dtype=np.int64)
    for r in range(comm.size):
        parts_r = np.flatnonzero(owners == r)
        base[parts_r] = np.concatenate([[0], np.cumsum(global_hist[parts_r])[:-1]])
    cols = ["kv"] if spec else ["k", "v"]
    dtypes = {c: np.int64 for c in cols}
    if spec:
        dtypes["kv"] = np.uint64
    win = comm.win_create(int(global_hist[my_parts].sum()), cols, dtypes=dtypes)
    offsets = comm.exscan_sum(local_hist)
    arrays = [wire] if spec else [keys, vals]
    scattered = radix.scatter_arrays(arrays, pids, n)
    for p in range(n):
        rows = scattered[p]
        if len(rows[0]):
            pdf = pd.DataFrame(dict(zip(cols, rows)))
            comm.put(win, int(owners[p]), int(base[p] + offsets[p]), pdf)
    comm.fence(win)
    out = []
    startpos = 0
    for p in my_parts:
        stop = startpos + int(global_hist[p])
        buf = win.buffers[comm.rank]
        out.append((int(p), tuple(buf[c][startpos:stop] for c in cols)))
        startpos = stop
    return out


def _rank_join(comm: Comm, inputs, cfg: JoinConfig) -> Tuple[pd.DataFrame, Dict[str, float]]:
    r_pdf, s_pdf = inputs
    t: Dict[str, float] = {}
    n = cfg.n_net
    spec_r = cfg.spec("vr")
    spec_s = cfg.spec("vs")

    # -- phase 1a: local histograms, both relations in one pass ------------
    t0 = perf_counter()
    rk = r_pdf["k"].to_numpy().astype(np.int64)
    rv = r_pdf["vr"].to_numpy().astype(np.int64)
    sk = s_pdf["k"].to_numpy().astype(np.int64)
    sv = s_pdf["vs"].to_numpy().astype(np.int64)
    hist_r = radix.histogram(rk % n, n)
    hist_s = radix.histogram(sk % n, n)
    t["local_histogram"] = perf_counter() - t0

    # -- phase 1b: one combined allreduce for both global histograms -------
    t0 = perf_counter()
    both = comm.allreduce_sum(np.concatenate([hist_r, hist_s]))
    ghist_r, ghist_s = both[:n], both[n:]
    t["global_histogram"] = perf_counter() - t0

    # -- phase 2: network partitioning (compressed wire format) ------------
    t0 = perf_counter()
    parts_r = _exchange(comm, cfg, rk, rv, hist_r, ghist_r, spec_r)
    parts_s = _exchange(comm, cfg, sk, sv, hist_s, ghist_s, spec_s)
    t["network_partitioning"] = perf_counter() - t0

    # -- phase 3: local radix re-partitioning -------------------------------
    t0 = perf_counter()
    n_loc = cfg.n_loc
    sub_pairs: List[Tuple[int, tuple, tuple]] = []
    for (pid_r, data_r), (pid_s, data_s) in zip(parts_r, parts_s):
        assert pid_r == pid_s

        def local_split(data, spec):
            if spec:
                (wire,) = data
                loc = ((wire >> np.uint64(spec.p_bits)).astype(np.int64)) & (n_loc - 1)
                return radix.scatter_arrays([wire], loc, n_loc)
            k, v = data
            loc = (k >> cfg.net_bits) & (n_loc - 1)
            return radix.scatter_arrays([k, v], loc, n_loc)

        subs_r = local_split(data_r, spec_r)
        subs_s = local_split(data_s, spec_s)
        for i in range(n_loc):
            sub_pairs.append((pid_r, tuple(subs_r[i]), tuple(subs_s[i])))
    t["local_partitioning"] = perf_counter() - t0

    # -- phase 4: build & probe with inline decompression -------------------
    t0 = perf_counter()
    outs = []
    for pid, sub_r, sub_s in sub_pairs:
        if spec_r:
            (wr,) = sub_r
            (ws,) = sub_s
            bk = (wr >> np.uint64(spec_r.p_bits)).astype(np.int64)
            bv = (wr & np.uint64((1 << spec_r.p_bits) - 1)).astype(np.int64)
            pk = (ws >> np.uint64(spec_s.p_bits)).astype(np.int64)
            pv = (ws & np.uint64((1 << spec_s.p_bits) - 1)).astype(np.int64)
            jk, jl, jr = _np_hash_join(bk, bv, pk, pv)
            jk = (jk << cfg.net_bits) | pid  # recover dropped bits
        else:
            jk, jl, jr = _np_hash_join(sub_r[0], sub_r[1], sub_s[0], sub_s[1])
        outs.append((jk, jl, jr))
    t["build_probe"] = perf_counter() - t0

    # -- phase 5: materialize (added for parity with MaterializeRowVector) --
    t0 = perf_counter()
    result = pd.DataFrame(
        {
            "k": np.concatenate([o[0] for o in outs]) if outs else np.array([], np.int64),
            "vr": np.concatenate([o[1] for o in outs]) if outs else np.array([], np.int64),
            "vs": np.concatenate([o[2] for o in outs]) if outs else np.array([], np.int64),
        }
    )
    t["materialize"] = perf_counter() - t0
    return result, t


def run_monolithic_join(
    n_ranks: int, r: pd.DataFrame, s: pd.DataFrame, cfg: JoinConfig
) -> Tuple[pd.DataFrame, dict]:
    """Driver: slice inputs per rank, run the fused SPMD join, merge results.

    Returns ``(result, info)`` with per-phase seconds (average across
    ranks) and network accounting in ``info``.
    """
    from repro.mpi.thread_backend import split_relation

    cluster = SimCluster(n_ranks)
    args = list(zip(split_relation(r, n_ranks), split_relation(s, n_ranks)))
    outs = cluster.run(lambda comm, inp: _rank_join(comm, inp, cfg), args)
    result = pd.concat([o[0] for o in outs], ignore_index=True)
    phases: Dict[str, float] = {}
    for _, tt in outs:
        for k, v in tt.items():
            phases[k] = phases.get(k, 0.0) + v / n_ranks
    info = {
        "phase_seconds": phases,
        "bytes_put": cluster.total_bytes_put(),
        "windows": sum(st.windows_created for st in cluster.stats),
    }
    return result, info
