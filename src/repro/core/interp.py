"""Row-at-a-time Volcano interpreter — the reference evaluator.

Executes a sub-operator plan by pulling Python dict tuples through the
operator tree, materializing at multi-consumer points (pipeline cutting).
Deliberately interpreted: it carries per-tuple dynamic dispatch, just like
a generic non-compiling engine. The Presto stand-in (``engines.presto_sim``)
runs query plans through this evaluator to reproduce the paper's
interpreted-vs-compiled gap.
"""
from __future__ import annotations

from typing import Dict, Iterator, List, Optional

from repro.core.ops.base import ExecContext, SubOperator
from repro.core.plan import Plan


def run_rows(plan: Plan, ctx: Optional[ExecContext] = None, params: Optional[dict] = None) -> List[dict]:
    """Execute ``plan`` and return all result tuples as dicts."""
    return list(iter_rows(plan, ctx, params))


def iter_rows(plan: Plan, ctx: Optional[ExecContext] = None, params: Optional[dict] = None) -> Iterator[dict]:
    ctx = ctx or ExecContext()
    if params is not None:
        ctx = ctx.child(params)
    if ctx.run_nested_rows is None:
        ctx.run_nested_rows = lambda p, c: run_rows(p, c)
    consumers = plan.consumer_counts()
    cache: Dict[SubOperator, List[dict]] = {}

    def stream(op: SubOperator) -> Iterator[dict]:
        if consumers[op] > 1:
            if op not in cache:
                cache[op] = list(generate(op))
            return iter(cache[op])
        return generate(op)

    def generate(op: SubOperator) -> Iterator[dict]:
        ups = [stream(u) for u in op.upstreams]
        gen = op.rows(ctx, ups)
        if ctx.profiler is not None:
            gen = ctx.profiler.wrap(op, gen)
        return gen

    return stream(plan.root)
