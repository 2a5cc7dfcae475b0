"""Mini-Druid substrate: segments, rollup, datasources, JSON query engine."""
from .datasource import DruidCluster, DruidDatasource
from .query import DruidQueryError, execute_query
from .segment import COUNT_METRIC, TIME_COL, MetricSpec, Segment, rollup

__all__ = [
    "DruidCluster",
    "DruidDatasource",
    "DruidQueryError",
    "execute_query",
    "COUNT_METRIC",
    "TIME_COL",
    "MetricSpec",
    "Segment",
    "rollup",
]
