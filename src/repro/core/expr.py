"""Scalar expression algebra for the Calcite-like plan layer (§4.1).

Immutable dataclass nodes with three backends:

* ``to_spark()`` — a PySpark ``Column`` (execution via Catalyst);
* ``to_sql()``  — ANSI-ish SQL accepted by DuckDB (the correctness oracle)
  and by "JDBC" federation targets;
* ``evaluate(row)`` / ``evaluate_vector(pdf)`` — direct evaluation, used by
  the LLAP I/O elevator (row-group skipping) and the mini-Druid engine.

Column names are assumed globally unique across the tables of a query
(true for TPC-H/TPC-DS/SSB-style schemas); self-joins must rename first.
"""
from __future__ import annotations

import datetime as _dt
from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F

__all__ = [
    "Expr",
    "Col",
    "Lit",
    "BinOp",
    "And",
    "Or",
    "Not",
    "InList",
    "IsNull",
    "Func",
    "AggCall",
    "col",
    "lit",
    "between",
    "TRUE",
    "FALSE",
    "NON_DETERMINISTIC_FUNCS",
    "RUNTIME_CONSTANT_FUNCS",
]

_CMP_OPS = {"=", "!=", "<", "<=", ">", ">="}
_ARITH_OPS = {"+", "-", "*", "/"}

# §4.3: queries containing these cannot populate the result cache.
NON_DETERMINISTIC_FUNCS = {"rand"}
RUNTIME_CONSTANT_FUNCS = {"current_date", "current_timestamp"}


class Expr:
    """Base class; subclasses are frozen dataclasses (hashable, reprable)."""

    def children(self) -> tuple["Expr", ...]:
        return ()

    def walk(self) -> Iterator["Expr"]:
        yield self
        for c in self.children():
            yield from c.walk()

    def columns(self) -> set[str]:
        return {e.name for e in self.walk() if isinstance(e, Col)}

    def function_names(self) -> set[str]:
        return {e.name for e in self.walk() if isinstance(e, Func)}

    def substitute(self, mapping: dict[str, "Expr"]) -> "Expr":
        """Replace column references by expressions (used by MV rewriting)."""
        raise NotImplementedError

    # convenience builders --------------------------------------------------

    def __eq__(self, other):  # dataclass eq is regenerated in subclasses
        return NotImplemented

    def eq(self, other) -> "BinOp":
        return BinOp("=", self, _wrap(other))

    def ne(self, other) -> "BinOp":
        return BinOp("!=", self, _wrap(other))

    def lt(self, other) -> "BinOp":
        return BinOp("<", self, _wrap(other))

    def le(self, other) -> "BinOp":
        return BinOp("<=", self, _wrap(other))

    def gt(self, other) -> "BinOp":
        return BinOp(">", self, _wrap(other))

    def ge(self, other) -> "BinOp":
        return BinOp(">=", self, _wrap(other))

    def isin(self, *values) -> "InList":
        return InList(self, tuple(values))

    def add(self, other) -> "BinOp":
        return BinOp("+", self, _wrap(other))

    def sub(self, other) -> "BinOp":
        return BinOp("-", self, _wrap(other))

    def mul(self, other) -> "BinOp":
        return BinOp("*", self, _wrap(other))

    def div(self, other) -> "BinOp":
        return BinOp("/", self, _wrap(other))


def _wrap(v) -> Expr:
    return v if isinstance(v, Expr) else Lit(v)


def _sql_literal(v) -> str:
    if v is None:
        return "NULL"
    if isinstance(v, bool):
        return "TRUE" if v else "FALSE"
    if isinstance(v, str):
        escaped = v.replace("'", "''")
        return f"'{escaped}'"
    if isinstance(v, _dt.datetime):
        return f"TIMESTAMP '{v.isoformat(sep=' ')}'"
    if isinstance(v, _dt.date):
        return f"DATE '{v.isoformat()}'"
    return repr(v)


def _spark_literal(v) -> Column:
    if isinstance(v, _dt.datetime):
        return F.lit(v)
    if isinstance(v, _dt.date):
        return F.lit(str(v)).cast("date")
    return F.lit(v)


@dataclass(frozen=True, eq=True, repr=True)
class Col(Expr):
    name: str

    def substitute(self, mapping):
        return mapping.get(self.name, self)

    def to_spark(self) -> Column:
        return F.col(self.name)

    def to_sql(self) -> str:
        return self.name

    def evaluate(self, row) -> object:
        return row[self.name]

    def evaluate_vector(self, pdf: pd.DataFrame):
        return pdf[self.name]


@dataclass(frozen=True, eq=True, repr=True)
class Lit(Expr):
    value: object

    def substitute(self, mapping):
        return self

    def to_spark(self) -> Column:
        return _spark_literal(self.value)

    def to_sql(self) -> str:
        return _sql_literal(self.value)

    def evaluate(self, row):
        return self.value

    def evaluate_vector(self, pdf):
        return self.value


def _coerce_for_cmp(series, value):
    """Align a pandas series and a literal for comparison (dates vs strings)."""
    if pd.api.types.is_datetime64_any_dtype(series) and isinstance(
        value, (str, _dt.date, _dt.datetime)
    ):
        return series, pd.Timestamp(value)
    return series, value


@dataclass(frozen=True, eq=True, repr=True)
class BinOp(Expr):
    op: str
    left: Expr
    right: Expr

    def __post_init__(self):
        if self.op not in _CMP_OPS | _ARITH_OPS:
            raise ValueError(f"unknown operator {self.op!r}")

    def children(self):
        return (self.left, self.right)

    def substitute(self, mapping):
        return BinOp(self.op, self.left.substitute(mapping), self.right.substitute(mapping))

    def to_spark(self) -> Column:
        l, r = self.left.to_spark(), self.right.to_spark()
        return {
            "=": l == r, "!=": l != r, "<": l < r, "<=": l <= r,
            ">": l > r, ">=": l >= r, "+": l + r, "-": l - r,
            "*": l * r, "/": l / r,
        }[self.op]

    def to_sql(self) -> str:
        op = "<>" if self.op == "!=" else self.op
        return f"({self.left.to_sql()} {op} {self.right.to_sql()})"

    def evaluate(self, row):
        l, r = self.left.evaluate(row), self.right.evaluate(row)
        if l is None or r is None:
            return None
        import operator as _op

        return {
            "=": _op.eq, "!=": _op.ne, "<": _op.lt, "<=": _op.le,
            ">": _op.gt, ">=": _op.ge, "+": _op.add, "-": _op.sub,
            "*": _op.mul, "/": _op.truediv,
        }[self.op](l, r)

    def evaluate_vector(self, pdf):
        l = self.left.evaluate_vector(pdf)
        r = self.right.evaluate_vector(pdf)
        if isinstance(l, pd.Series) and not isinstance(r, pd.Series):
            l, r = _coerce_for_cmp(l, r)
        elif isinstance(r, pd.Series) and not isinstance(l, pd.Series):
            r, l = _coerce_for_cmp(r, l)
        import operator as _op

        return {
            "=": _op.eq, "!=": _op.ne, "<": _op.lt, "<=": _op.le,
            ">": _op.gt, ">=": _op.ge, "+": _op.add, "-": _op.sub,
            "*": _op.mul, "/": _op.truediv,
        }[self.op](l, r)


@dataclass(frozen=True, eq=True, repr=True)
class And(Expr):
    args: tuple[Expr, ...]

    def __init__(self, *args: Expr):
        flat: list[Expr] = []
        for a in args:
            if isinstance(a, And):
                flat.extend(a.args)
            else:
                flat.append(a)
        object.__setattr__(self, "args", tuple(flat))

    def children(self):
        return self.args

    def substitute(self, mapping):
        return And(*[a.substitute(mapping) for a in self.args])

    def to_spark(self) -> Column:
        out = self.args[0].to_spark()
        for a in self.args[1:]:
            out = out & a.to_spark()
        return out

    def to_sql(self) -> str:
        return "(" + " AND ".join(a.to_sql() for a in self.args) + ")"

    def evaluate(self, row):
        return all(bool(a.evaluate(row)) for a in self.args)

    def evaluate_vector(self, pdf):
        out = self.args[0].evaluate_vector(pdf)
        for a in self.args[1:]:
            out = out & a.evaluate_vector(pdf)
        return out


@dataclass(frozen=True, eq=True, repr=True)
class Or(Expr):
    args: tuple[Expr, ...]

    def __init__(self, *args: Expr):
        flat: list[Expr] = []
        for a in args:
            if isinstance(a, Or):
                flat.extend(a.args)
            else:
                flat.append(a)
        object.__setattr__(self, "args", tuple(flat))

    def children(self):
        return self.args

    def substitute(self, mapping):
        return Or(*[a.substitute(mapping) for a in self.args])

    def to_spark(self) -> Column:
        out = self.args[0].to_spark()
        for a in self.args[1:]:
            out = out | a.to_spark()
        return out

    def to_sql(self) -> str:
        return "(" + " OR ".join(a.to_sql() for a in self.args) + ")"

    def evaluate(self, row):
        return any(bool(a.evaluate(row)) for a in self.args)

    def evaluate_vector(self, pdf):
        out = self.args[0].evaluate_vector(pdf)
        for a in self.args[1:]:
            out = out | a.evaluate_vector(pdf)
        return out


@dataclass(frozen=True, eq=True, repr=True)
class Not(Expr):
    arg: Expr

    def children(self):
        return (self.arg,)

    def substitute(self, mapping):
        return Not(self.arg.substitute(mapping))

    def to_spark(self) -> Column:
        return ~self.arg.to_spark()

    def to_sql(self) -> str:
        return f"(NOT {self.arg.to_sql()})"

    def evaluate(self, row):
        return not bool(self.arg.evaluate(row))

    def evaluate_vector(self, pdf):
        return ~self.arg.evaluate_vector(pdf)


@dataclass(frozen=True, eq=True, repr=True)
class InList(Expr):
    arg: Expr
    values: tuple

    def children(self):
        return (self.arg,)

    def substitute(self, mapping):
        return InList(self.arg.substitute(mapping), self.values)

    def to_spark(self) -> Column:
        return self.arg.to_spark().isin(list(self.values))

    def to_sql(self) -> str:
        vals = ", ".join(_sql_literal(v) for v in self.values)
        return f"({self.arg.to_sql()} IN ({vals}))"

    def evaluate(self, row):
        return self.arg.evaluate(row) in self.values

    def evaluate_vector(self, pdf):
        s = self.arg.evaluate_vector(pdf)
        vals = self.values
        if isinstance(s, pd.Series) and pd.api.types.is_datetime64_any_dtype(s):
            vals = tuple(pd.Timestamp(v) for v in vals)
        return s.isin(vals)


@dataclass(frozen=True, eq=True, repr=True)
class IsNull(Expr):
    arg: Expr
    negated: bool = False

    def children(self):
        return (self.arg,)

    def substitute(self, mapping):
        return IsNull(self.arg.substitute(mapping), self.negated)

    def to_spark(self) -> Column:
        c = self.arg.to_spark()
        return c.isNotNull() if self.negated else c.isNull()

    def to_sql(self) -> str:
        suffix = "IS NOT NULL" if self.negated else "IS NULL"
        return f"({self.arg.to_sql()} {suffix})"

    def evaluate(self, row):
        v = self.arg.evaluate(row)
        return (v is not None) if self.negated else (v is None)

    def evaluate_vector(self, pdf):
        s = self.arg.evaluate_vector(pdf)
        return s.notna() if self.negated else s.isna()


@dataclass(frozen=True, eq=True, repr=True)
class Func(Expr):
    """Scalar function call. Supported: year/month/day (date parts),
    rand/current_date/current_timestamp (determinism markers, §4.3)."""

    name: str
    args: tuple[Expr, ...] = ()

    def children(self):
        return self.args

    def substitute(self, mapping):
        return Func(self.name, tuple(a.substitute(mapping) for a in self.args))

    def to_spark(self) -> Column:
        n = self.name
        if n in ("year", "month", "day"):
            return getattr(F, "dayofmonth" if n == "day" else n)(self.args[0].to_spark())
        if n == "rand":
            return F.rand()
        if n == "current_date":
            return F.current_date()
        if n == "current_timestamp":
            return F.current_timestamp()
        raise ValueError(f"unsupported function {n!r}")

    def to_sql(self) -> str:
        n = self.name
        if n in ("year", "month", "day"):
            return f"EXTRACT({n} FROM {self.args[0].to_sql()})"
        if n == "rand":
            return "RANDOM()"
        if n in ("current_date", "current_timestamp"):
            return n.upper()
        raise ValueError(f"unsupported function {n!r}")

    def evaluate(self, row):
        if self.name in ("year", "month", "day"):
            v = self.args[0].evaluate(row)
            if v is None:
                return None
            v = pd.Timestamp(v)
            return {"year": v.year, "month": v.month, "day": v.day}[self.name]
        raise ValueError(f"cannot evaluate {self.name!r} outside the engine")

    def evaluate_vector(self, pdf):
        if self.name in ("year", "month", "day"):
            s = pd.to_datetime(self.args[0].evaluate_vector(pdf))
            return getattr(s.dt, self.name)
        raise ValueError(f"cannot evaluate {self.name!r} outside the engine")


@dataclass(frozen=True, eq=True, repr=True)
class AggCall:
    """An aggregate call: ``func`` over ``arg`` aliased as ``name``.

    ``func`` ∈ {sum, count, min, max, avg, count_star}. ``count_star`` takes
    ``arg=None``.
    """

    func: str
    arg: Expr | None
    name: str

    def __post_init__(self):
        if self.func not in ("sum", "count", "min", "max", "avg", "count_star"):
            raise ValueError(f"unsupported aggregate {self.func!r}")

    def to_spark(self) -> Column:
        if self.func == "count_star":
            return F.count(F.lit(1)).alias(self.name)
        spark_fn = {"sum": F.sum, "count": F.count, "min": F.min, "max": F.max, "avg": F.avg}
        return spark_fn[self.func](self.arg.to_spark()).alias(self.name)

    def to_sql(self) -> str:
        if self.func == "count_star":
            return f"COUNT(*) AS {self.name}"
        return f"{self.func.upper()}({self.arg.to_sql()}) AS {self.name}"

    def columns(self) -> set[str]:
        return self.arg.columns() if self.arg is not None else set()


# -- convenience ----------------------------------------------------------

def col(name: str) -> Col:
    return Col(name)


def lit(v) -> Lit:
    return Lit(v)


def between(e: Expr, lo, hi) -> And:
    return And(e.ge(lo), e.le(hi))


TRUE = Lit(True)
FALSE = Lit(False)
