"""Monolithic distributed GROUP BY baseline.

Same structure as the monolithic join (histogram -> network partitioning
-> local partitioning) but the last phase aggregates each partition with a
fused unique+bincount kernel instead of probing a hash table.
"""
from __future__ import annotations

from time import perf_counter
from typing import Dict, Tuple

import numpy as np
import pandas as pd

from repro.core import radix
from repro.modular.common import JoinConfig
from repro.monolithic.join import _exchange
from repro.mpi.simcluster import Comm, SimCluster


def _rank_groupby(comm: Comm, t_pdf: pd.DataFrame, cfg: JoinConfig) -> Tuple[pd.DataFrame, Dict[str, float]]:
    t: Dict[str, float] = {}
    n = cfg.n_net
    spec = cfg.spec("v")

    t0 = perf_counter()
    keys = t_pdf["k"].to_numpy().astype(np.int64)
    vals = t_pdf["v"].to_numpy().astype(np.int64)
    hist = radix.histogram(keys % n, n)
    t["local_histogram"] = perf_counter() - t0

    t0 = perf_counter()
    ghist = comm.allreduce_sum(hist)
    t["global_histogram"] = perf_counter() - t0

    t0 = perf_counter()
    parts = _exchange(comm, cfg, keys, vals, hist, ghist, spec)
    t["network_partitioning"] = perf_counter() - t0

    t0 = perf_counter()
    n_loc = cfg.n_loc
    subs = []
    for pid, data in parts:
        if spec:
            (wire,) = data
            loc = ((wire >> np.uint64(spec.p_bits)).astype(np.int64)) & (n_loc - 1)
            for arrs in radix.scatter_arrays([wire], loc, n_loc):
                subs.append((pid, arrs))
        else:
            k, v = data
            loc = (k >> cfg.net_bits) & (n_loc - 1)
            for arrs in radix.scatter_arrays([k, v], loc, n_loc):
                subs.append((pid, arrs))
    t["local_partitioning"] = perf_counter() - t0

    t0 = perf_counter()
    outs = []
    for pid, arrs in subs:
        if spec:
            (wire,) = arrs
            k = (wire >> np.uint64(spec.p_bits)).astype(np.int64)
            v = (wire & np.uint64((1 << spec.p_bits) - 1)).astype(np.int64)
            uk, inv = np.unique(k, return_inverse=True)
            sums = np.bincount(inv, weights=v).astype(np.int64)
            uk = (uk << cfg.net_bits) | pid  # recover dropped bits
        else:
            k, v = arrs
            uk, inv = np.unique(k, return_inverse=True)
            sums = np.bincount(inv, weights=v).astype(np.int64)
        outs.append((uk, sums))
    t["build_probe"] = perf_counter() - t0  # aggregation phase slot

    t0 = perf_counter()
    result = pd.DataFrame(
        {
            "k": np.concatenate([o[0] for o in outs]) if outs else np.array([], np.int64),
            "v": np.concatenate([o[1] for o in outs]) if outs else np.array([], np.int64),
        }
    )
    t["materialize"] = perf_counter() - t0
    return result, t


def run_monolithic_groupby(
    n_ranks: int, t_pdf: pd.DataFrame, cfg: JoinConfig
) -> Tuple[pd.DataFrame, dict]:
    """Driver: SPMD fused GROUP BY; per-key results are already disjoint
    across ranks after the exchange, so the merge is a plain concat."""
    from repro.mpi.thread_backend import split_relation

    cluster = SimCluster(n_ranks)
    outs = cluster.run(
        lambda comm, inp: _rank_groupby(comm, inp, cfg), split_relation(t_pdf, n_ranks)
    )
    result = pd.concat([o[0] for o in outs], ignore_index=True)
    phases: Dict[str, float] = {}
    for _, tt in outs:
        for k, v in tt.items():
            phases[k] = phases.get(k, 0.0) + v / n_ranks
    info = {"phase_seconds": phases, "bytes_put": cluster.total_bytes_put()}
    return result, info
