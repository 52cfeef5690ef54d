"""Run distributed sub-operator plans SPMD on the simulated MPI cluster.

``MpiExecutor`` spawns the SimCluster itself; this module provides the
driver-side conveniences: slicing input relations into per-rank frames
(the paper's NFS-read inputs), packaging them as the plan's parameter
structure, executing through the vectorized evaluator, and extracting the
cluster's network statistics afterwards.
"""
from __future__ import annotations

from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd

from repro.core import Plan, RowVector
from repro.core.ops.base import ExecContext
from repro.core.profiling import Profiler
from repro.core import vectorized


def split_relation(pdf: pd.DataFrame, n_ranks: int) -> List[pd.DataFrame]:
    """Contiguous near-equal slices, one per rank (each process reads its
    part of the input, paper Section 4.1.1)."""
    bounds = np.linspace(0, len(pdf), n_ranks + 1).astype(int)
    return [pdf.iloc[bounds[r] : bounds[r + 1]].reset_index(drop=True) for r in range(n_ranks)]


def make_rank_inputs(n_ranks: int, **relations: pd.DataFrame) -> dict:
    """Build the plan parameter structure: one tuple per rank, each field a
    RowVector slice of the named relation."""
    slices = {name: split_relation(pdf, n_ranks) for name, pdf in relations.items()}
    frame = pd.DataFrame(
        {
            name: pd.Series([RowVector(parts[r]) for r in range(n_ranks)], dtype=object)
            for name, parts in slices.items()
        }
    )
    return {"rank_inputs": RowVector(frame)}


def run_on_sim(
    plan: Plan,
    n_ranks: int,
    relations: Dict[str, pd.DataFrame],
    profile: bool = False,
) -> Tuple[pd.DataFrame, dict]:
    """Execute a distributed plan on the simulated MPI cluster.

    Returns ``(result frame, info)`` where ``info`` carries the per-phase
    exclusive-time breakdown (seconds, averaged per rank) and the
    cluster's network accounting.
    """
    profiler = Profiler() if profile else None
    ctx = ExecContext(profiler=profiler)
    params = make_rank_inputs(n_ranks, **relations)
    out = vectorized.run_to_pdf(plan, ctx, params=params)
    info: dict = {}
    cluster = ctx.extra.get("last_cluster")
    if cluster is not None:
        info["bytes_put"] = cluster.total_bytes_put()
        info["puts"] = sum(s.puts for s in cluster.stats)
        info["windows"] = sum(s.windows_created for s in cluster.stats)
    if profiler is not None:
        info["phase_seconds"] = {
            k: v / n_ranks for k, v in profiler.breakdown().items()
        }
    return out, info
