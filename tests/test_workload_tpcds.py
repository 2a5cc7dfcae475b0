"""TPC-DS-lite workload through the full driver, oracle-checked (§7.1)."""
import pandas as pd
import pytest

from repro.core.features import EngineConfig, UnsupportedSQLError
from repro.core.hs2 import HiveServer2
from repro.oracle import assert_equivalent
from repro.workloads import tpcds_lite

SF = 0.002


@pytest.fixture(scope="module")
def env(spark, tmp_path_factory):
    hs2 = HiveServer2(
        spark,
        str(tmp_path_factory.mktemp("tpcds") / "wh"),
        EngineConfig.v3_1(container_startup_s=0.0),
    )
    frames = tpcds_lite.load_into(hs2, sf=SF)
    return hs2, frames


ALL_QUERIES = tpcds_lite.queries()
V12_OK = [q for q in ALL_QUERIES if not q.features]
V12_BLOCKED = [q for q in ALL_QUERIES if q.features]


class TestV31:
    @pytest.mark.parametrize("q", ALL_QUERIES, ids=[q.name for q in ALL_QUERIES])
    def test_query_matches_oracle(self, env, q):
        hs2, frames = env
        r = hs2.execute(q)
        df = hs2.spark.createDataFrame(r.result) if len(r.result) else None
        if df is None:
            # empty result: oracle must be empty too
            import duckdb

            con = duckdb.connect()
            for name, t in frames.items():
                con.register(name, t)
            assert len(con.execute(q.plan.to_sql()).fetchdf()) == 0
            return
        assert_equivalent(df, q.plan.to_sql(), **frames)


class TestV12Gate:
    def test_exactly_six_queries_blocked(self):
        assert len(V12_BLOCKED) == 6
        assert len(ALL_QUERIES) == 20

    @pytest.mark.parametrize("q", V12_BLOCKED, ids=[q.name for q in V12_BLOCKED])
    def test_blocked_queries_raise(self, spark, tmp_path, q):
        hs2 = HiveServer2(
            spark, str(tmp_path / "wh"), EngineConfig.v1_2(container_startup_s=0.0)
        )
        with pytest.raises(UnsupportedSQLError):
            hs2.execute(q)


class TestV12Runs:
    """The 14 supported queries also run (and agree) on the v1.2 config."""

    @pytest.fixture(scope="class")
    def v12(self, spark, tmp_path_factory):
        hs2 = HiveServer2(
            spark,
            str(tmp_path_factory.mktemp("tpcds12") / "wh"),
            EngineConfig.v1_2(container_startup_s=0.0),
        )
        frames = tpcds_lite.load_into(hs2, sf=SF)
        return hs2, frames

    @pytest.mark.parametrize(
        "q", V12_OK[:5], ids=[q.name for q in V12_OK[:5]]
    )
    def test_sample_queries_match_oracle(self, v12, q):
        hs2, frames = v12
        r = hs2.execute(q)
        assert_equivalent(
            hs2.spark.createDataFrame(r.result), q.plan.to_sql(), **frames
        )
