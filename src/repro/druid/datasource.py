"""Mini-Druid datasources and the in-process "cluster" (§6).

A datasource ingests a pandas frame: rows are rolled up at query
granularity and split into time-partitioned segments. The cluster is the
handle the Druid storage handler talks to (standing in for the REST/HTTP
endpoint of a real Druid deployment).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd

from repro.druid.segment import (
    COUNT_METRIC,
    TIME_COL,
    MetricSpec,
    Segment,
    rollup,
)

__all__ = ["DruidDatasource", "DruidCluster"]


@dataclass
class DruidDatasource:
    name: str
    time_column: str
    dimensions: list[str]
    metrics: list[MetricSpec]
    query_granularity: str = "day"
    segment_granularity: str = "month"
    segments: list[Segment] = field(default_factory=list)

    @classmethod
    def ingest(
        cls,
        name: str,
        pdf: pd.DataFrame,
        time_column: str,
        dimensions: list[str],
        metrics: list[MetricSpec],
        query_granularity: str = "day",
        segment_granularity: str = "month",
    ) -> "DruidDatasource":
        rolled = rollup(pdf, time_column, dimensions, metrics, query_granularity)
        ds = cls(name, time_column, list(dimensions), list(metrics), query_granularity, segment_granularity)
        if rolled.empty:
            return ds
        period = {"day": "D", "month": "M", "year": "Y"}[segment_granularity]
        for p, group in rolled.groupby(rolled[TIME_COL].dt.to_period(period), sort=True):
            start, end = p.start_time, (p + 1).start_time
            ds.segments.append(
                Segment(start, end, group.reset_index(drop=True), list(dimensions))
            )
        return ds

    # -- metadata (what the storage handler auto-infers, §6.1) -------------

    def schema(self) -> dict[str, str]:
        """Column name → Hive-ish type, inferred from Druid metadata."""
        out = {TIME_COL: "timestamp"}
        for d in self.dimensions:
            out[d] = "string"
        for m in self.metrics:
            out[m.name] = "double" if m.agg.startswith("double") else "bigint"
        out[COUNT_METRIC] = "bigint"
        return out

    @property
    def n_rows(self) -> int:
        return sum(s.n_rows for s in self.segments)


@dataclass
class DruidCluster:
    datasources: dict[str, DruidDatasource] = field(default_factory=dict)

    def add(self, ds: DruidDatasource) -> None:
        self.datasources[ds.name] = ds

    def get(self, name: str) -> DruidDatasource:
        try:
            return self.datasources[name]
        except KeyError:
            raise KeyError(f"druid datasource {name!r} not found") from None

    def __contains__(self, name: str) -> bool:
        return name in self.datasources
