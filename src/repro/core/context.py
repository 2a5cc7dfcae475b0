"""Execution contexts binding plan Scans to actual data.

:class:`PandasContext` serves scans from in-memory pandas frames — used by
unit tests and by small dimension tables. The production path (ACID reader /
LLAP elevator / federation) lives in :mod:`repro.core.hs2`; both implement
the :class:`repro.core.compile.ExecutionContext` protocol.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.plan import ForeignQuery, Scan
from repro.metastore import Column, HiveMetastore, Table, collect_stats

__all__ = ["infer_columns", "register_pandas_table", "PandasContext"]


def infer_columns(pdf: pd.DataFrame) -> list[Column]:
    """Catalog column list from pandas dtypes."""
    out = []
    for name, dtype in pdf.dtypes.items():
        if pd.api.types.is_integer_dtype(dtype):
            t = "bigint"
        elif pd.api.types.is_float_dtype(dtype):
            t = "double"
        elif pd.api.types.is_datetime64_any_dtype(dtype):
            t = "timestamp"
        elif pd.api.types.is_bool_dtype(dtype):
            t = "boolean"
        else:
            t = "string"
        out.append(Column(str(name), t))
    return out


def register_pandas_table(
    hms: HiveMetastore,
    name: str,
    pdf: pd.DataFrame,
    partitioned_by: list[str] | None = None,
    with_stats: bool = True,
    **table_kwargs,
) -> Table:
    """Create a catalog entry (and stats) for an in-memory table."""
    table = Table(
        name=name,
        columns=infer_columns(pdf),
        partitioned_by=partitioned_by or [],
        **table_kwargs,
    )
    hms.create_table(table)
    if with_stats:
        hms.update_stats(name, collect_stats(pdf))
    return table


@dataclass
class PandasContext:
    """Scans resolve to ``spark.createDataFrame`` over registered frames."""

    spark: SparkSession
    hms: HiveMetastore
    tables: dict[str, pd.DataFrame] = field(default_factory=dict)
    _cache: dict[str, DataFrame] = field(default_factory=dict)

    def add(self, name: str, pdf: pd.DataFrame, **kwargs) -> None:
        register_pandas_table(self.hms, name, pdf, **kwargs)
        self.tables[name] = pdf

    def resolve_scan(self, scan: Scan) -> DataFrame:
        if scan.table not in self._cache:
            self._cache[scan.table] = self.spark.createDataFrame(
                self.tables[scan.table]
            )
        df = self._cache[scan.table]
        if scan.columns is not None:
            df = df.select(*scan.columns)
        return df

    def resolve_foreign(self, fq: ForeignQuery) -> DataFrame:
        raise NotImplementedError("PandasContext does not execute foreign queries")
