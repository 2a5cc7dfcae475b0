"""HiveServer2 driver: the full pipeline of Figure 2, per engine config."""
import numpy as np
import pandas as pd
import pytest

from repro.core.expr import AggCall, And, Col, Func, InList, col
from repro.core.features import EngineConfig, SQLFeature, UnsupportedSQLError
from repro.core.hs2 import HiveServer2, QuerySpec
from repro.core.plan import Aggregate, Filter, Join, Scan, SetOp, Project
from repro.core.reopt import ExecutionError
from repro.metastore import Column, Table
from repro.oracle import assert_equivalent


def make_server(spark, tmp_path, config=None) -> HiveServer2:
    hs2 = HiveServer2(spark, str(tmp_path / "wh"), config or EngineConfig.v3_1(container_startup_s=0.0))
    hs2.create_table(
        Table(
            "sales",
            [
                Column("item_sk", "bigint"),
                Column("price", "double"),
                Column("month", "bigint"),
            ],
            partitioned_by=["month"],
            properties={"bloom.filter.columns": "item_sk"},
        )
    )
    hs2.create_table(
        Table("item", [Column("i_item_sk", "bigint"), Column("i_cat", "string")])
    )
    g = np.random.default_rng(21)
    n = 2000
    hs2.insert(
        "sales",
        pd.DataFrame(
            {
                "item_sk": g.integers(0, 50, n),
                "price": g.random(n).round(3),
                "month": g.integers(1, 13, n),
            }
        ),
    )
    hs2.insert(
        "item",
        pd.DataFrame(
            {
                "i_item_sk": range(50),
                "i_cat": [("Sports" if i % 5 == 0 else "Other") for i in range(50)],
            }
        ),
    )
    return hs2


def star_query():
    return QuerySpec(
        "q_star",
        Aggregate(
            Filter(
                Join(Scan("sales"), Scan("item"), col("item_sk").eq(col("i_item_sk"))),
                col("i_cat").eq("Sports"),
            ),
            (),
            (AggCall("sum", col("price"), "total"),),
        ),
    )


def oracle_tables(hs2):
    return {
        "sales": hs2.reader.scan("sales").toPandas(),
        "item": hs2.reader.scan("item").toPandas(),
    }


@pytest.fixture(params=["v3.1-llap", "v3.1-container", "v1.2"])
def any_server(request, spark, tmp_path):
    cfg = {
        "v3.1-llap": EngineConfig.v3_1(container_startup_s=0.0),
        "v3.1-container": EngineConfig.v3_1_container(container_startup_s=0.0),
        "v1.2": EngineConfig.v1_2(container_startup_s=0.0),
    }[request.param]
    return make_server(spark, tmp_path, cfg)


class TestEndToEnd:
    def test_star_query_all_configs(self, any_server):
        hs2 = any_server
        r = hs2.execute(star_query())
        t = oracle_tables(hs2)
        expected = t["sales"].merge(
            t["item"][t["item"]["i_cat"] == "Sports"],
            left_on="item_sk",
            right_on="i_item_sk",
        )["price"].sum()
        assert r.result["total"].iloc[0] == pytest.approx(expected)

    def test_projection_query(self, any_server):
        r = any_server.execute(
            QuerySpec(
                "p",
                Project(
                    Filter(Scan("sales"), col("month").eq(3)),
                    (("x", col("price").mul(2)),),
                ),
            )
        )
        assert (r.result["x"] >= 0).all()


class TestFeatureGate:
    def test_v12_rejects_intersect(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path, EngineConfig.v1_2(container_startup_s=0.0))
        q = QuerySpec(
            "qi",
            SetOp(
                "intersect",
                Project(Scan("sales"), (("k", col("item_sk")),)),
                Project(Scan("item"), (("k", col("i_item_sk")),)),
            ),
            features=frozenset({SQLFeature.INTERSECT}),
        )
        with pytest.raises(UnsupportedSQLError):
            hs2.execute(q)

    def test_v31_runs_intersect(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        q = QuerySpec(
            "qi",
            SetOp(
                "intersect",
                Project(Scan("sales"), (("k", col("item_sk")),)),
                Project(Scan("item"), (("k", col("i_item_sk")),)),
            ),
            features=frozenset({SQLFeature.INTERSECT}),
        )
        r = hs2.execute(q)
        assert len(r.result) == 50  # all item_sks appear in sales


class TestResultCache:
    def test_second_execution_hits(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        q = star_query()
        r1 = hs2.execute(q)
        r2 = hs2.execute(q)
        assert not r1.cache_hit and r2.cache_hit
        pd.testing.assert_frame_equal(r1.result, r2.result)

    def test_insert_invalidates(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        q = star_query()
        hs2.execute(q)
        hs2.insert(
            "sales", pd.DataFrame({"item_sk": [0], "price": [100.0], "month": [1]})
        )
        r = hs2.execute(q)
        assert not r.cache_hit

    def test_v12_has_no_cache(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path, EngineConfig.v1_2(container_startup_s=0.0))
        q = star_query()
        hs2.execute(q)
        assert not hs2.execute(q).cache_hit


class TestSemijoinIntegration:
    def test_semijoin_report_present(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        r = hs2.execute(star_query())
        assert r.semijoin is not None
        assert len(r.semijoin.runtime_filters) == 1

    def test_row_groups_skipped_with_llap(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        q = QuerySpec("narrow", Filter(Scan("sales"), col("item_sk").eq(1)))
        hs2.execute(q)
        assert hs2.daemon.elevator.stats.row_groups_total > 0


class TestDML:
    def test_delete_where(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        before = len(hs2.reader.scan("sales").toPandas())
        hs2.delete_where("sales", col("month").eq(5))
        after = hs2.reader.scan("sales").toPandas()
        assert len(after) < before
        assert (after["month"] != 5).all()

    def test_update_where(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        hs2.update_where(
            "sales", col("month").eq(2), {"price": col("price").mul(0)}
        )
        after = hs2.reader.scan("sales").toPandas()
        assert (after.loc[after["month"] == 2, "price"] == 0).all()

    def test_merge_upsert(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path, EngineConfig.v3_1(container_startup_s=0.0))
        hs2.create_table(
            Table("dim", [Column("k", "bigint"), Column("v", "double")])
        )
        hs2.insert("dim", pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]}))
        hs2.merge(
            "dim",
            pd.DataFrame({"k": [2, 3], "v": [20.0, 30.0]}),
            on="k",
            update_cols=["v"],
        )
        out = hs2.reader.scan("dim").toPandas().sort_values("k")
        assert out["k"].tolist() == [1, 2, 3]
        assert out["v"].tolist() == [1.0, 20.0, 30.0]


class TestMaterializedViews:
    def _mv_def(self):
        return Aggregate(
            Join(Scan("sales"), Scan("item"), col("item_sk").eq(col("i_item_sk"))),
            ("i_cat",),
            (
                AggCall("sum", col("price"), "total"),
                AggCall("count_star", None, "cnt"),
            ),
        )

    def test_create_and_rewrite(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        hs2.create_materialized_view("mv_cat", self._mv_def())
        q = QuerySpec(
            "by_cat",
            Aggregate(
                Join(Scan("sales"), Scan("item"), col("item_sk").eq(col("i_item_sk"))),
                ("i_cat",),
                (AggCall("sum", col("price"), "total"),),
            ),
        )
        r = hs2.execute(q)
        assert r.mv_used == "mv_cat"
        t = oracle_tables(hs2)
        expected = (
            t["sales"]
            .merge(t["item"], left_on="item_sk", right_on="i_item_sk")
            .groupby("i_cat")["price"]
            .sum()
        )
        got = r.result.set_index("i_cat")["total"]
        for k in expected.index:
            assert got[k] == pytest.approx(expected[k])

    def test_stale_view_not_used_then_rebuild(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        hs2.create_materialized_view("mv_cat", self._mv_def())
        hs2.insert(
            "sales", pd.DataFrame({"item_sk": [0], "price": [5.0], "month": [1]})
        )
        q = QuerySpec(
            "by_cat",
            Aggregate(
                Join(Scan("sales"), Scan("item"), col("item_sk").eq(col("i_item_sk"))),
                ("i_cat",),
                (AggCall("sum", col("price"), "total"),),
            ),
        )
        r = hs2.execute(q)
        assert r.mv_used is None  # stale → skipped
        assert hs2.rebuild_materialized_view("mv_cat") == "incremental"
        # bypass the (still-valid) result cache to observe the MV rewrite
        hs2.result_cache.clear()
        r2 = hs2.execute(q)
        assert r2.mv_used == "mv_cat"
        # contents reflect the new row
        t = oracle_tables(hs2)
        expected = (
            t["sales"]
            .merge(t["item"], left_on="item_sk", right_on="i_item_sk")
            .groupby("i_cat")["price"]
            .sum()
        )
        got = r2.result.set_index("i_cat")["total"]
        assert got["Sports"] == pytest.approx(expected["Sports"])

    def test_update_forces_full_rebuild(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        hs2.create_materialized_view("mv_cat", self._mv_def())
        hs2.update_where("sales", col("month").eq(1), {"price": col("price").mul(2)})
        assert hs2.rebuild_materialized_view("mv_cat") == "full"

    def test_rebuild_noop_when_fresh(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        hs2.create_materialized_view("mv_cat", self._mv_def())
        assert hs2.rebuild_materialized_view("mv_cat") == "noop"


class TestReoptimization:
    def test_injected_failure_triggers_reopt(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path)
        calls = {"n": 0}

        def injector(plan, result):
            calls["n"] += 1
            if calls["n"] == 1:
                raise ExecutionError(
                    "simulated OOM", runtime_stats={plan.fingerprint(): 1e9}
                )

        hs2.failure_injector = injector
        r = hs2.execute(star_query())
        assert r.attempts == 2
        assert len(r.result) == 1

    def test_v12_fails_without_reopt(self, spark, tmp_path):
        hs2 = make_server(spark, tmp_path, EngineConfig.v1_2(container_startup_s=0.0))

        def injector(plan, result):
            raise ExecutionError("boom")

        hs2.failure_injector = injector
        with pytest.raises(ExecutionError):
            hs2.execute(star_query())
