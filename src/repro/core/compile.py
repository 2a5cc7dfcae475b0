"""Physical compilation: logical plan → Spark DataFrame (Catalyst executes).

This is the HS2 "physical plan" stage (Figure 2). Scans are delegated to an
:class:`ExecutionContext` so the same plan can execute against the ACID
snapshot reader (container mode), the LLAP elevator (cached, row-group
skipping), or a federated system (``ForeignQuery``). Shared-work reuse
(§4.5) hooks in here: subtrees whose fingerprints are listed in
``shared_fingerprints`` are compiled once, persisted, and reused.
"""
from __future__ import annotations

from typing import Protocol

from pyspark.sql import DataFrame

from repro.core.plan import (
    Aggregate,
    Filter,
    ForeignQuery,
    Join,
    Limit,
    Plan,
    Project,
    Scan,
    SetOp,
    Sort,
    Union,
)

__all__ = ["ExecutionContext", "compile_plan"]


class ExecutionContext(Protocol):
    """What the compiler needs from the runtime."""

    def resolve_scan(self, scan: Scan) -> DataFrame:  # pragma: no cover
        ...

    def resolve_foreign(self, fq: ForeignQuery) -> DataFrame:  # pragma: no cover
        ...


_JOIN_HOW = {
    "inner": "inner",
    "left": "left",
    "left_semi": "left_semi",
    "left_anti": "left_anti",
}


def compile_plan(
    plan: Plan,
    ctx: ExecutionContext,
    shared_fingerprints: set[str] | None = None,
    _memo: dict[str, DataFrame] | None = None,
) -> DataFrame:
    """Compile ``plan`` to a (lazy) DataFrame.

    ``shared_fingerprints`` marks subtrees the shared-work optimizer decided
    to compute only once: their compiled DataFrame is persisted and memoized
    so every occurrence reuses the same (cached) result.
    """
    memo = _memo if _memo is not None else {}
    shared = shared_fingerprints or set()

    fp = plan.fingerprint() if shared else None
    if fp is not None and fp in memo:
        return memo[fp]

    df = _compile(plan, ctx, shared, memo)

    if fp is not None and fp in shared:
        df = df.persist()
        memo[fp] = df
    return df


def _compile(plan, ctx, shared, memo) -> DataFrame:
    rec = lambda p: compile_plan(p, ctx, shared, memo)  # noqa: E731

    if isinstance(plan, Scan):
        return ctx.resolve_scan(plan)
    if isinstance(plan, ForeignQuery):
        return ctx.resolve_foreign(plan)
    if isinstance(plan, Filter):
        return rec(plan.child).filter(plan.cond.to_spark())
    if isinstance(plan, Project):
        return rec(plan.child).select(
            *[e.to_spark().alias(n) for n, e in plan.exprs]
        )
    if isinstance(plan, Join):
        left, right = rec(plan.left), rec(plan.right)
        if plan.how == "cross" or plan.cond is None:
            return left.crossJoin(right)
        return left.join(right, on=plan.cond.to_spark(), how=_JOIN_HOW[plan.how])
    if isinstance(plan, Aggregate):
        df = rec(plan.child)
        aggs = [a.to_spark() for a in plan.aggs]
        if plan.keys:
            return df.groupBy(*plan.keys).agg(*aggs)
        return df.agg(*aggs)
    if isinstance(plan, Sort):
        df = rec(plan.child)
        from pyspark.sql import functions as F

        cols = [F.col(c).asc() if asc else F.col(c).desc() for c, asc in plan.keys]
        return df.orderBy(*cols)
    if isinstance(plan, Limit):
        return rec(plan.child).limit(plan.n)
    if isinstance(plan, Union):
        out = rec(plan.inputs[0])
        for inp in plan.inputs[1:]:
            out = out.unionByName(rec(inp))
        return out if plan.all else out.distinct()
    if isinstance(plan, SetOp):
        left, right = rec(plan.left), rec(plan.right)
        # SQL INTERSECT/EXCEPT have DISTINCT semantics.
        return left.intersect(right) if plan.op == "intersect" else left.subtract(right)
    raise TypeError(f"cannot compile {type(plan).__name__}")
