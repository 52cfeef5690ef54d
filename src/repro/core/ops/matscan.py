"""Materialize & scan sub-operators (paper Section 3.3.4).

Each physical materialization format gets a dedicated read/write pair
(design principle 2): ``RowScan`` reads tuples out of a ``RowVector``
collection, ``MaterializeRowVector`` writes a tuple stream into one, and
``LocalPartitioning`` materializes a tuple stream into histogram-sized
contiguous partitions.
"""
from __future__ import annotations

from typing import Callable, Iterator, Optional, Sequence

import numpy as np
import pandas as pd

from repro.core import radix
from repro.core.ops.base import ExecContext, SubOperator, concat_batches
from repro.core.types import INT64, RowVector, RowVectorType, TupleType


class RowScan(SubOperator):
    """Reads a nested RowVector collection one tuple at a time.

    The upstream produces tuples containing a RowVector field (``field``, or
    the single field if omitted); RowScan unnests it — the basic input
    reader of Modularis.
    """

    op_name = "RS"

    def __init__(self, upstream: SubOperator, field: Optional[str] = None) -> None:
        super().__init__([upstream])
        self.field = field

    def out_type(self, in_types) -> Optional[TupleType]:
        t = in_types[0]
        if t is None:
            return None
        name = self.field or self._single_name(t.names)
        item = t.field_type(name)
        if not isinstance(item, RowVectorType):
            raise TypeError(f"RowScan field {name!r} is not a collection: {item!r}")
        return item.tuple_type

    @staticmethod
    def _single_name(names: Sequence[str]) -> str:
        if len(names) != 1:
            raise RuntimeError(
                f"RowScan without explicit field requires a single-field tuple, got {list(names)}"
            )
        return names[0]

    def _vector(self, t: dict) -> RowVector:
        name = self.field or self._single_name(list(t.keys()))
        rv = t[name]
        if not isinstance(rv, RowVector):
            raise RuntimeError(f"RowScan field {name!r} does not hold a RowVector")
        return rv

    def rows(self, ctx, ups) -> Iterator[dict]:
        for t in ups[0]:
            yield from self._vector(t).iter_rows()

    def batches(self, ctx, ups) -> Iterator[pd.DataFrame]:
        for pdf in ups[0]:
            for t in RowVector(pdf).iter_rows():
                yield self._vector(t).df


class MaterializeRowVector(SubOperator):
    """Encapsulates the full upstream tuple stream into one RowVector tuple
    — the counterpart of RowScan and the mandatory final operator of every
    nested plan."""

    op_name = "MR"
    phase = "materialize"

    def __init__(
        self,
        upstream: SubOperator,
        field: str = "data",
        columns: Optional[Sequence[str]] = None,
    ) -> None:
        super().__init__([upstream])
        self.field = field
        self.columns = list(columns) if columns is not None else None

    def out_type(self, in_types) -> Optional[TupleType]:
        if in_types[0] is None:
            return None
        return TupleType([(self.field, RowVectorType(in_types[0]))])

    def rows(self, ctx, ups) -> Iterator[dict]:
        yield {self.field: RowVector.from_rows(list(ups[0]), columns=self.columns)}

    def batches(self, ctx, ups) -> Iterator[pd.DataFrame]:
        pdf = concat_batches(list(ups[0]), columns=self.columns)
        yield pd.DataFrame({self.field: pd.Series([RowVector(pdf)], dtype=object)})


class LocalPartitioning(SubOperator):
    """Partitions a tuple sequence into histogram-sized contiguous runs.

    Consumes the data from one upstream and its dense histogram from a
    second (the prefix sums of the histogram give each partition's extent),
    then emits ``<partition_id, partition_data>`` pairs in dense order —
    reused verbatim by joins and GROUP BY (design principle 1).
    """

    op_name = "LP"
    phase = "local_partitioning"

    def __init__(
        self,
        data_upstream: SubOperator,
        histogram_upstream: SubOperator,
        n_partitions: int,
        bucket_fn: Callable[[dict], int],
        bucket_batch_fn: Optional[Callable[[pd.DataFrame], np.ndarray]] = None,
        pid_field: str = "partition_id",
        data_field: str = "partition_data",
    ) -> None:
        super().__init__([data_upstream, histogram_upstream])
        self.n_partitions = n_partitions
        self.bucket_fn = bucket_fn
        self.bucket_batch_fn = bucket_batch_fn
        self.pid_field = pid_field
        self.data_field = data_field

    def out_type(self, in_types) -> Optional[TupleType]:
        if in_types[0] is None:
            return None
        return TupleType(
            [(self.pid_field, INT64), (self.data_field, RowVectorType(in_types[0]))]
        )

    def _sizes(self, hist_rows) -> np.ndarray:
        sizes = np.zeros(self.n_partitions, dtype=np.int64)
        seen = 0
        for h in hist_rows:
            sizes[int(h["bucket_id"])] = int(h["count"])
            seen += 1
        if seen != self.n_partitions:
            raise RuntimeError(
                f"LocalPartitioning histogram has {seen} buckets, expected {self.n_partitions}"
            )
        return sizes

    def rows(self, ctx, ups) -> Iterator[dict]:
        sizes = self._sizes(ups[1])
        parts: list = [[] for _ in range(self.n_partitions)]
        columns: Optional[list] = None
        for t in ups[0]:
            if columns is None:
                columns = list(t.keys())
            parts[self.bucket_fn(t)].append(t)
        for p in range(self.n_partitions):
            if len(parts[p]) != sizes[p]:
                raise RuntimeError(
                    f"partition {p}: histogram says {sizes[p]} tuples, saw {len(parts[p])}"
                )
            yield {
                self.pid_field: p,
                self.data_field: RowVector.from_rows(parts[p], columns=columns or []),
            }

    def batches(self, ctx, ups) -> Iterator[pd.DataFrame]:
        from repro.core.types import RowVector as RV

        pdf = concat_batches(list(ups[1]))
        sizes = self._sizes(RV(pdf).iter_rows())
        data = concat_batches(list(ups[0]))
        if self.bucket_batch_fn is not None and len(data):
            pids = np.asarray(self.bucket_batch_fn(data))
        else:
            pids = np.fromiter(
                (self.bucket_fn(t) for t in RV(data).iter_rows()),
                dtype=np.int64,
                count=len(data),
            )
        frames = radix.scatter(data, pids, self.n_partitions)
        for p, f in enumerate(frames):
            if len(f) != sizes[p]:
                raise RuntimeError(
                    f"partition {p}: histogram says {sizes[p]} tuples, saw {len(f)}"
                )
        yield pd.DataFrame(
            {
                self.pid_field: np.arange(self.n_partitions, dtype=np.int64),
                self.data_field: pd.Series([RowVector(f) for f in frames], dtype=object),
            }
        )
