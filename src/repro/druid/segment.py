"""Mini-Druid segments (§6, substrate).

Druid stores event data in *segments* partitioned by time interval. At
ingestion, rows are *rolled up*: grouped by (query-granularity-truncated
time, dimensions) with metrics pre-aggregated — that roll-up plus inverted
per-dimension value indexes is where Druid's interactive-OLAP speed comes
from, and is exactly what §7.3's federation experiment leans on.

A segment here is a pandas frame of rolled-up rows plus:

* the segment's half-open time interval (for interval pruning);
* inverted indexes: dimension value → row positions;
* an implicit ``__count`` metric counting ingested raw rows, so COUNT(*)
  over the raw data remains answerable after roll-up (standard Druid
  practice).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

__all__ = ["TIME_COL", "COUNT_METRIC", "MetricSpec", "Segment", "rollup"]

TIME_COL = "__time"
COUNT_METRIC = "__count"


@dataclass(frozen=True)
class MetricSpec:
    """Druid ingestion metric: ``{"type": "doubleSum", "name": "m1",
    "fieldName": "m1"}`` equivalent."""

    agg: str  # 'doubleSum' | 'longSum' | 'doubleMin' | 'doubleMax'
    name: str
    field: str

    def pandas_agg(self) -> str:
        return {"doubleSum": "sum", "longSum": "sum", "doubleMin": "min", "doubleMax": "max"}[self.agg]


@dataclass
class Segment:
    start: pd.Timestamp
    end: pd.Timestamp  # half-open [start, end)
    data: pd.DataFrame  # rolled-up rows: __time, dims..., metrics..., __count
    dimensions: list[str]
    indexes: dict[str, dict[object, np.ndarray]] = field(default_factory=dict)

    def __post_init__(self) -> None:
        if not self.indexes:
            for d in self.dimensions:
                self.indexes[d] = {
                    v: g.to_numpy() for v, g in self.data.groupby(d).groups.items()
                }

    def overlaps(self, start: pd.Timestamp | None, end: pd.Timestamp | None) -> bool:
        if start is not None and self.end <= start:
            return False
        if end is not None and self.start >= end:
            return False
        return True

    @property
    def n_rows(self) -> int:
        return len(self.data)


def _truncate(ts: pd.Series, granularity: str) -> pd.Series:
    return {
        "none": ts,
        "day": ts.dt.floor("D"),
        "month": ts.dt.to_period("M").dt.to_timestamp(),
        "year": ts.dt.to_period("Y").dt.to_timestamp(),
        "all": pd.Series(pd.Timestamp(0), index=ts.index),
    }[granularity]


def rollup(
    pdf: pd.DataFrame,
    time_column: str,
    dimensions: list[str],
    metrics: list[MetricSpec],
    query_granularity: str = "day",
) -> pd.DataFrame:
    """Ingestion-time roll-up: one row per (time granule, dimension combo)."""
    out = pdf.copy()
    out[TIME_COL] = _truncate(pd.to_datetime(out[time_column]), query_granularity)
    agg_spec: dict[str, tuple[str, str]] = {
        m.name: (m.field, m.pandas_agg()) for m in metrics
    }
    agg_spec[COUNT_METRIC] = (TIME_COL, "size")
    grouped = out.groupby([TIME_COL] + list(dimensions), as_index=False, sort=True).agg(
        **{name: spec for name, spec in agg_spec.items()}
    )
    return grouped


def segment_intervals(
    times: pd.Series, granularity: str = "month"
) -> list[tuple[pd.Timestamp, pd.Timestamp]]:
    """The segment boundaries covering ``times`` at the given granularity."""
    t = pd.to_datetime(times)
    offsets = {"day": "D", "month": "MS", "year": "YS"}
    freq = offsets[granularity]
    starts = sorted(set(_truncate(t, granularity)))
    out = []
    for s in starts:
        nxt = (
            s + pd.Timedelta(days=1)
            if granularity == "day"
            else (s + pd.offsets.MonthBegin(1) if granularity == "month" else s + pd.offsets.YearBegin(1))
        )
        out.append((s, nxt))
    return out
