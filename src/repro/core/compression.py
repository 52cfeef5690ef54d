"""Key/value compression used in the network-partitioning phase.

Reimplements the scheme of Barthels et al. (paper Section 4.1.1): with
identity hashing and radix partitioning of fan-out 2**F, the low F bits of
every key in a partition equal the partition id and can be dropped. If keys
and values come from a dense domain representable in P bits each, key and
value fit one 64-bit word when 2*P - F <= 64:

    word = ((key >> F) << P) | value
    key  = ((word >> P) << F) | partition_id
    value = word & (2**P - 1)

This halves the 16-byte <key, value> workload on the wire, exactly as in
the paper; the dropped bits are restored downstream by a ParametrizedMap.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class CompressionSpec:
    """Parameters of the drop-F-bits compression.

    ``p_bits`` — domain width of keys and values (dense domain);
    ``f_bits`` — radix fan-out bits (partition count must be 2**f_bits);
    ``key_field``/``value_field`` — input columns; ``out_field`` — the
    single compressed uint64 column on the wire.
    """

    p_bits: int
    f_bits: int
    key_field: str = "k"
    value_field: str = "v"
    out_field: str = "kv"

    def __post_init__(self) -> None:
        if 2 * self.p_bits - self.f_bits > 64:
            raise ValueError(
                f"2*P - F = {2 * self.p_bits - self.f_bits} > 64: "
                "key/value do not fit one 64-bit word"
            )
        # f_bits == 0 is the degenerate single-partition case: no bits are
        # dropped, key and value still pack into one word if 2*P <= 64.
        if not (0 <= self.f_bits <= self.p_bits):
            raise ValueError("need 0 <= f_bits <= p_bits")

    @property
    def fanout(self) -> int:
        return 1 << self.f_bits

    def compress(self, keys: np.ndarray, values: np.ndarray) -> np.ndarray:
        k = np.asarray(keys).astype(np.uint64, copy=False)
        v = np.asarray(values).astype(np.uint64, copy=False)
        if len(k) and int(k.max()) >= (1 << self.p_bits):
            raise ValueError(f"key outside dense {self.p_bits}-bit domain")
        if len(v) and int(v.max()) >= (1 << self.p_bits):
            raise ValueError(f"value outside dense {self.p_bits}-bit domain")
        return ((k >> np.uint64(self.f_bits)) << np.uint64(self.p_bits)) | v

    def decompress(self, words: np.ndarray, partition_id: int) -> tuple[np.ndarray, np.ndarray]:
        w = np.asarray(words).astype(np.uint64, copy=False)
        keys = ((w >> np.uint64(self.p_bits)) << np.uint64(self.f_bits)) | np.uint64(
            partition_id
        )
        values = w & np.uint64((1 << self.p_bits) - 1)
        return keys.astype(np.int64), values.astype(np.int64)

    def compress_pdf(self, pdf: pd.DataFrame) -> pd.DataFrame:
        """Replace <key, value> columns by the single compressed column."""
        extra = [c for c in pdf.columns if c not in (self.key_field, self.value_field)]
        if extra:
            raise ValueError(
                f"compression applies to pure <key,value> workloads, extra cols: {extra}"
            )
        kv = self.compress(pdf[self.key_field].to_numpy(), pdf[self.value_field].to_numpy())
        return pd.DataFrame({self.out_field: kv})

    def decompress_pdf(self, pdf: pd.DataFrame, partition_id: int) -> pd.DataFrame:
        keys, values = self.decompress(pdf[self.out_field].to_numpy(), partition_id)
        return pd.DataFrame({self.key_field: keys, self.value_field: values})
