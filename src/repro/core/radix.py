"""Radix partitioning primitives.

The paper's monolithic join uses software-write-combining radix
partitioning; the numpy equivalent here is a stable counting scatter:
``partition_ids`` extracts the low ``bits`` of the key (identity hash, as in
the compression scheme of Barthels et al.), and ``scatter`` reorders rows so
each partition is a contiguous slice whose extent comes from a histogram.
"""
from __future__ import annotations

from typing import List, Sequence

import numpy as np
import pandas as pd


def partition_ids(keys: np.ndarray, bits: int) -> np.ndarray:
    """Radix partition id = low ``bits`` bits of the (identity-hashed) key."""
    return (np.asarray(keys).astype(np.int64, copy=False)) & ((1 << bits) - 1)


def hash_partition_ids(keys: np.ndarray, n: int) -> np.ndarray:
    """Generic partition id for non-dense keys: multiplicative hash mod n."""
    k = np.asarray(keys).astype(np.uint64, copy=False)
    h = (k * np.uint64(0x9E3779B97F4A7C15)) >> np.uint64(32)
    return (h % np.uint64(n)).astype(np.int64)


def histogram(pids: np.ndarray, n: int) -> np.ndarray:
    """Dense partition-size histogram of length ``n``."""
    if len(pids) == 0:
        return np.zeros(n, dtype=np.int64)
    return np.bincount(pids, minlength=n).astype(np.int64)


def scatter(pdf: pd.DataFrame, pids: np.ndarray, n: int) -> List[pd.DataFrame]:
    """Stable-partition ``pdf`` into ``n`` frames ordered by partition id.

    Works column-wise on raw numpy arrays (one fancy-index per column, then
    zero-copy views per partition) — the frame-level equivalent of the
    monolithic ``scatter_arrays``."""
    if not len(pdf):
        return [pdf.iloc[:0] for _ in range(n)]
    order = np.argsort(pids, kind="stable")
    sizes = histogram(pids, n)
    bounds = np.concatenate([[0], np.cumsum(sizes)])
    cols = {c: pdf[c].to_numpy()[order] for c in pdf.columns}
    return [
        pd.DataFrame({c: a[bounds[p] : bounds[p + 1]] for c, a in cols.items()})
        for p in range(n)
    ]


def scatter_arrays(
    arrays: Sequence[np.ndarray], pids: np.ndarray, n: int
) -> List[List[np.ndarray]]:
    """Like :func:`scatter` but over raw numpy columns (monolithic fast path)."""
    order = np.argsort(pids, kind="stable")
    sizes = histogram(pids, n)
    bounds = np.concatenate([[0], np.cumsum(sizes)])
    reordered = [a[order] for a in arrays]
    return [[a[bounds[p] : bounds[p + 1]] for a in reordered] for p in range(n)]
