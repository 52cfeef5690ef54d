"""Shared pieces of the modular distributed plans.

All of Fig. 3/4/5 use the same skeleton per input relation:
scan -> {LocalHistogram -> MpiHistogram} + MpiExchange (radix on the key,
optionally compressed), and the same local step inside the first NestedMap:
RowScan -> LocalHistogram -> LocalPartitioning -> CartesianProduct with the
network partition id. Factoring these out *is* the paper's reuse claim.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, List, Optional

import numpy as np
import pandas as pd

from repro.core.compression import CompressionSpec
from repro.core.ops import (
    CartesianProduct,
    LocalHistogram,
    LocalPartitioning,
    MpiExchange,
    MpiHistogram,
    ParameterLookup,
    Projection,
    RowScan,
)
from repro.core.ops.base import SubOperator


@dataclass(frozen=True)
class JoinConfig:
    """Partitioning geometry shared by all distributed plans.

    ``n_net`` network partitions radix-partition the key's low
    ``net_bits`` bits across ranks; ``n_loc`` local partitions use the next
    ``loc_bits`` bits (cache-sized sub-partitions in the paper).
    Compression (one 64-bit word on the wire) requires dense <key,value>
    inputs and ``n_net == 2**net_bits``.
    """

    n_net: int
    loc_bits: int = 3
    key: str = "k"
    compress: bool = False
    p_bits: int = 27

    @property
    def net_bits(self) -> int:
        b = int(self.n_net - 1).bit_length()
        if self.compress and (1 << b) != self.n_net:
            raise ValueError("compression requires a power-of-two network fan-out")
        return b

    @property
    def n_loc(self) -> int:
        return 1 << self.loc_bits

    def spec(self, value_field: str) -> Optional[CompressionSpec]:
        if not self.compress:
            return None
        return CompressionSpec(
            p_bits=self.p_bits, f_bits=self.net_bits,
            key_field=self.key, value_field=value_field,
        )

    # -- partition-id functions (identity hash + radix, as in the paper) ----
    def net_pid_row(self) -> Callable[[dict], int]:
        n, key = self.n_net, self.key
        return lambda t: int(t[key]) % n

    def net_pid_batch(self) -> Callable[[pd.DataFrame], np.ndarray]:
        n, key = self.n_net, self.key
        return lambda pdf: (pdf[key].to_numpy() % n).astype(np.int64)

    def loc_pid_batch(self, compressed: bool, value_field: str) -> Callable[[pd.DataFrame], np.ndarray]:
        """Local radix on the bits above the network bits. On compressed
        data those bits sit just above the value's P bits."""
        mask = self.n_loc - 1
        if compressed:
            spec = self.spec(value_field)
            shift = np.uint64(spec.p_bits)

            def fn(pdf: pd.DataFrame) -> np.ndarray:
                return (((pdf[spec.out_field].to_numpy() >> shift)).astype(np.int64)) & mask

            return fn
        nb, key = self.net_bits, self.key

        def fn2(pdf: pd.DataFrame) -> np.ndarray:
            return ((pdf[key].to_numpy().astype(np.int64) >> nb)) & mask

        return fn2

    def loc_pid_row(self, compressed: bool, value_field: str) -> Callable[[dict], int]:
        batch = self.loc_pid_batch(compressed, value_field)

        def fn(t: dict) -> int:
            return int(batch(pd.DataFrame([t]))[0])

        return fn


def rank_input(field: str) -> RowScan:
    """Per-rank input reader: ParameterLookup -> Projection -> RowScan."""
    return RowScan(Projection(ParameterLookup(), [field]), field)


def network_partition(
    cfg: JoinConfig,
    data: SubOperator,
    value_field: str,
    pid_field: str,
    data_field: str,
) -> MpiExchange:
    """The reusable histogram + exchange skeleton of one relation side."""
    lh = LocalHistogram(
        data, cfg.n_net, bucket_fn=cfg.net_pid_row(), bucket_batch_fn=cfg.net_pid_batch()
    )
    gh = MpiHistogram(lh, cfg.n_net)
    return MpiExchange(
        data, lh, gh, cfg.n_net,
        bucket_fn=cfg.net_pid_row(), bucket_batch_fn=cfg.net_pid_batch(),
        compression=cfg.spec(value_field),
        pid_field=pid_field, data_field=data_field,
    )


def local_partition_side(
    cfg: JoinConfig,
    pl: ParameterLookup,
    value_field: str,
    net_pid_field: str,
    net_data_field: str,
    loc_pid_field: str,
    loc_data_field: str,
) -> CartesianProduct:
    """Inside the first NestedMap: re-partition one side locally and tag
    every local partition with the network partition id (Fig. 3)."""
    pid_tuple = Projection(pl, [net_pid_field])
    data = RowScan(Projection(pl, [net_data_field]), net_data_field)
    lh = LocalHistogram(
        data, cfg.n_loc,
        bucket_fn=cfg.loc_pid_row(cfg.compress, value_field),
        bucket_batch_fn=cfg.loc_pid_batch(cfg.compress, value_field),
    )
    lp = LocalPartitioning(
        data, lh, cfg.n_loc,
        bucket_fn=cfg.loc_pid_row(cfg.compress, value_field),
        bucket_batch_fn=cfg.loc_pid_batch(cfg.compress, value_field),
        pid_field=loc_pid_field, data_field=loc_data_field,
    )
    return CartesianProduct(pid_tuple, lp)
