"""Orchestration sub-operators: ParameterLookup and NestedMap.

These express high-level control flow *as operators* (design principle 3):
nested plans replace imperative loops over partitions, so partition-unaware
sub-operators can be reused at any nesting level.
"""
from __future__ import annotations

from typing import Iterator, Optional, Sequence

import pandas as pd

from repro.core.ops.base import ExecContext, SubOperator
from repro.core.types import TupleType


class ParameterLookup(SubOperator):
    """Returns the plan input (the parameter tuple of the enclosing scope).

    The only operator aware of plan inputs; has no upstreams and produces a
    single tuple of arbitrary type (paper Section 3.3.1).
    """

    op_name = "PL"

    def __init__(self, declared_type: Optional[TupleType] = None) -> None:
        super().__init__(())
        self.declared_type = declared_type

    def out_type(self, in_types) -> Optional[TupleType]:
        return self.declared_type

    def rows(self, ctx: ExecContext, ups) -> Iterator[dict]:
        if ctx.params is None:
            raise RuntimeError("ParameterLookup evaluated without plan parameters")
        yield dict(ctx.params)

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        if ctx.params is None:
            raise RuntimeError("ParameterLookup evaluated without plan parameters")
        yield pd.DataFrame({k: pd.Series([v], dtype=object) for k, v in ctx.params.items()})


class NestedMap(SubOperator):
    """Executes a nested plan independently on each input tuple.

    Each invocation produces exactly one output tuple (the nested plan must
    end in ``MaterializeRowVector``), so NestedMap emits one tuple per input
    tuple; nested collections in the result are unnested downstream with
    ``RowScan``.
    """

    op_name = "NM"

    def __init__(self, upstream: SubOperator, nested_plan) -> None:
        super().__init__([upstream])
        self.nested_plan = nested_plan

    def out_type(self, in_types) -> Optional[TupleType]:
        return self.nested_plan.out_type(param_type=in_types[0])

    def rows(self, ctx: ExecContext, ups) -> Iterator[dict]:
        for t in ups[0]:
            out = ctx.run_nested_rows(self.nested_plan, ctx.child(t))
            yield _single(out, self)

    def batches(self, ctx: ExecContext, ups) -> Iterator[pd.DataFrame]:
        from repro.core.types import RowVector

        for pdf in ups[0]:
            outs = []
            for t in RowVector(pdf).iter_rows():
                out = ctx.run_nested_batches(self.nested_plan, ctx.child(t))
                outs.append(_single(out, self))
            if outs:
                yield pd.DataFrame(
                    {k: pd.Series([o[k] for o in outs], dtype=object) for k in outs[0]}
                )


def _single(out_rows, op) -> dict:
    out_rows = list(out_rows)
    if len(out_rows) != 1:
        raise RuntimeError(
            f"nested plan of {type(op).__name__} must produce exactly one "
            f"tuple (got {len(out_rows)}); end nested plans with "
            "MaterializeRowVector"
        )
    return out_rows[0]
