"""Mini-Druid substrate: rollup, segments, JSON query engine."""
import numpy as np
import pandas as pd
import pytest

from repro.druid import (
    COUNT_METRIC,
    TIME_COL,
    DruidDatasource,
    DruidQueryError,
    MetricSpec,
    execute_query,
    rollup,
)


def events(n=2000, seed=5):
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "ts": pd.to_datetime("2017-01-01")
            + pd.to_timedelta(g.integers(0, 730, n), unit="D"),
            "d1": g.choice(["a", "b", "c"], n),
            "m1": g.random(n).round(4),
        }
    )


@pytest.fixture
def ds():
    return DruidDatasource.ingest(
        "my_druid_source",
        events(),
        time_column="ts",
        dimensions=["d1"],
        metrics=[MetricSpec("doubleSum", "m1", "m1")],
        query_granularity="day",
        segment_granularity="month",
    )


class TestIngestion:
    def test_rollup_preaggregates(self):
        pdf = pd.DataFrame(
            {
                "ts": pd.to_datetime(
                    ["2017-01-01 05:00", "2017-01-01 09:00", "2017-01-02 00:00"]
                ),
                "d1": ["a", "a", "a"],
                "m1": [1.0, 2.0, 3.0],
            }
        )
        rolled = rollup(pdf, "ts", ["d1"], [MetricSpec("doubleSum", "m1", "m1")], "day")
        assert len(rolled) == 2  # two distinct days
        assert rolled.loc[0, "m1"] == 3.0
        assert rolled.loc[0, COUNT_METRIC] == 2

    def test_segments_partitioned_by_month(self, ds):
        assert len(ds.segments) == 24  # 2017 + 2018 by month
        s0 = ds.segments[0]
        assert s0.start == pd.Timestamp("2017-01-01")
        assert (s0.data[TIME_COL] < s0.end).all()

    def test_inverted_indexes(self, ds):
        seg = ds.segments[0]
        for v, rows in seg.indexes["d1"].items():
            assert (seg.data.iloc[rows]["d1"] == v).all()

    def test_schema_inference_metadata(self, ds):
        schema = ds.schema()
        assert schema[TIME_COL] == "timestamp"
        assert schema["d1"] == "string"
        assert schema["m1"] == "double"


class TestQueries:
    def test_group_by_matches_pandas(self, ds):
        out = execute_query(
            ds,
            {
                "queryType": "groupBy",
                "dimensions": ["d1"],
                "granularity": "all",
                "aggregations": [{"type": "doubleSum", "name": "s", "fieldName": "m1"}],
            },
        )
        raw = events()
        expected = raw.groupby("d1", as_index=False)["m1"].sum()
        merged = out.merge(expected, on="d1")
        assert np.allclose(merged["s"], merged["m1"])

    def test_count_counts_raw_rows(self, ds):
        """count over rolled-up segments must count *ingested* rows."""
        out = execute_query(
            ds,
            {
                "queryType": "timeseries",
                "granularity": "all",
                "aggregations": [{"type": "count", "name": "c"}],
            },
        )
        assert out["c"].tolist() == [2000]

    def test_selector_filter(self, ds):
        out = execute_query(
            ds,
            {
                "queryType": "timeseries",
                "granularity": "all",
                "filter": {"type": "selector", "dimension": "d1", "value": "a"},
                "aggregations": [{"type": "count", "name": "c"}],
            },
        )
        assert out["c"].tolist() == [int((events()["d1"] == "a").sum())]

    def test_in_and_bound_filters(self, ds):
        q = {
            "queryType": "timeseries",
            "granularity": "all",
            "filter": {
                "type": "and",
                "fields": [
                    {"type": "in", "dimension": "d1", "values": ["a", "b"]},
                ],
            },
            "aggregations": [{"type": "count", "name": "c"}],
        }
        out = execute_query(ds, q)
        assert out["c"].tolist() == [int(events()["d1"].isin(["a", "b"]).sum())]

    def test_not_filter(self, ds):
        out = execute_query(
            ds,
            {
                "queryType": "timeseries",
                "granularity": "all",
                "filter": {
                    "type": "not",
                    "field": {"type": "selector", "dimension": "d1", "value": "a"},
                },
                "aggregations": [{"type": "count", "name": "c"}],
            },
        )
        assert out["c"].tolist() == [int((events()["d1"] != "a").sum())]

    def test_interval_pruning(self, ds):
        """intervals restrict both segment selection and rows."""
        out = execute_query(
            ds,
            {
                "queryType": "timeseries",
                "granularity": "all",
                "intervals": ["2017-01-01T00:00:00.000/2018-01-01T00:00:00.000"],
                "aggregations": [{"type": "count", "name": "c"}],
            },
        )
        raw = events()
        assert out["c"].tolist() == [int((raw["ts"] < "2018-01-01").sum())]

    def test_granularity_year(self, ds):
        out = execute_query(
            ds,
            {
                "queryType": "timeseries",
                "granularity": "year",
                "aggregations": [{"type": "doubleSum", "name": "s", "fieldName": "m1"}],
            },
        )
        assert len(out) == 2
        assert set(out[TIME_COL].dt.year) == {2017, 2018}

    def test_limit_spec_figure6(self, ds):
        """The Figure 6 query shape: top-10 d1 by descending sum."""
        out = execute_query(
            ds,
            {
                "queryType": "groupBy",
                "dataSource": "my_druid_source",
                "granularity": "all",
                "dimension": "d1",
                "aggregations": [{"type": "doubleSum", "name": "s", "fieldName": "m1"}],
                "limitSpec": {
                    "limit": 2,
                    "columns": [{"dimension": "s", "direction": "descending"}],
                },
                "intervals": ["2017-01-01T00:00:00.000/2019-01-01T00:00:00.000"],
            },
        )
        assert len(out) == 2
        assert out["s"].is_monotonic_decreasing

    def test_scan_query(self, ds):
        out = execute_query(ds, {"queryType": "scan", "columns": ["d1", "m1"]})
        assert list(out.columns) == ["d1", "m1"]
        assert len(out) == ds.n_rows

    def test_empty_result_schema(self, ds):
        out = execute_query(
            ds,
            {
                "queryType": "groupBy",
                "dimensions": ["d1"],
                "granularity": "all",
                "filter": {"type": "selector", "dimension": "d1", "value": "zzz"},
                "aggregations": [{"type": "doubleSum", "name": "s", "fieldName": "m1"}],
            },
        )
        assert out.empty and list(out.columns) == ["d1", "s"]

    def test_unknown_query_type(self, ds):
        with pytest.raises(DruidQueryError):
            execute_query(ds, {"queryType": "topN"})

    def test_unknown_filter_type(self, ds):
        with pytest.raises(DruidQueryError):
            execute_query(
                ds,
                {
                    "queryType": "scan",
                    "filter": {"type": "regex", "dimension": "d1", "pattern": ".*"},
                },
            )
