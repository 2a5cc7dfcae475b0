"""SSB-lite workload: schema, loader, the 13 SSB queries, and the
denormalizing materialized view of §7.3.

The 13 queries follow O'Neil et al.'s four flights. Each query's plan is
its own oracle via ``plan.to_sql()``. The §7.3 experiment builds the MV
with :func:`mv_definition` — a full denormalization aggregated over every
dimension attribute the queries touch (plus ``__time`` from the date
dimension so the same MV can be ingested into Druid) — then lets the
rewriting algorithm answer all 13 queries from it, natively or federated.
"""
from __future__ import annotations

from repro.core.expr import AggCall, And, Col, InList, between, col
from repro.core.hs2 import HiveServer2, QuerySpec
from repro.core.plan import Aggregate, Filter, Join, Plan, Scan, Sort
from repro.metastore import Column, Constraint, Table
from repro.synth_data import ssb_lite_pandas

__all__ = ["TABLES", "load_into", "queries", "mv_definition", "MV_KEYS"]

# PK/FK constraints are *declared* (not enforced), exactly as in Hive —
# the MV rewriting algorithm uses them to prove that the denormalized
# view's extra dimension joins are lossless (§4.4).
TABLES = [
    Table(
        "lineorder",
        [
            Column("lo_orderkey", "bigint"),
            Column("lo_custkey", "bigint"),
            Column("lo_partkey", "bigint"),
            Column("lo_suppkey", "bigint"),
            Column("lo_orderdate", "bigint"),
            Column("lo_quantity", "bigint"),
            Column("lo_extendedprice", "double"),
            Column("lo_discount", "bigint"),
            Column("lo_revenue", "double"),
            Column("lo_supplycost", "double"),
        ],
        properties={"bloom.filter.columns": "lo_partkey,lo_suppkey"},
        constraints=[
            Constraint("foreign_key", ("lo_custkey",), "customer_s", ("c_custkey",)),
            Constraint("foreign_key", ("lo_suppkey",), "supplier", ("s_suppkey",)),
            Constraint("foreign_key", ("lo_partkey",), "part", ("p_partkey",)),
            Constraint("foreign_key", ("lo_orderdate",), "ddate", ("d_datekey",)),
        ],
    ),
    Table(
        "ddate",
        [
            Column("d_datekey", "bigint"),
            Column("__time", "timestamp"),  # d_date, pre-named for Druid
            Column("d_year", "bigint"),
            Column("d_yearmonthnum", "bigint"),
            Column("d_weeknuminyear", "bigint"),
        ],
        constraints=[Constraint("primary_key", ("d_datekey",))],
    ),
    Table(
        "customer_s",
        [
            Column("c_custkey", "bigint"),
            Column("c_city", "string"),
            Column("c_nation", "string"),
            Column("c_region", "string"),
        ],
        constraints=[Constraint("primary_key", ("c_custkey",))],
    ),
    Table(
        "supplier",
        [
            Column("s_suppkey", "bigint"),
            Column("s_city", "string"),
            Column("s_nation", "string"),
            Column("s_region", "string"),
        ],
        constraints=[Constraint("primary_key", ("s_suppkey",))],
    ),
    Table(
        "part",
        [
            Column("p_partkey", "bigint"),
            Column("p_mfgr", "string"),
            Column("p_category", "string"),
            Column("p_brand1", "string"),
        ],
        constraints=[Constraint("primary_key", ("p_partkey",))],
    ),
]


def load_into(hs2: HiveServer2, sf: float = 0.01, seed: int = 13) -> dict:
    frames = ssb_lite_pandas(sf=sf, seed=seed)
    frames["ddate"] = frames.pop("date").rename(columns={"d_date": "__time"})
    for t in TABLES:
        hs2.create_table(
            Table(
                t.name,
                list(t.columns),
                properties=dict(t.properties),
                constraints=list(t.constraints),
            )
        )
        hs2.insert(t.name, frames[t.name])
    return frames


# -- the denormalized join + aggregates all queries roll up from -----------

MV_KEYS = (
    "__time",
    "d_year",
    "d_yearmonthnum",
    "d_weeknuminyear",
    "c_city",
    "c_nation",
    "c_region",
    "s_city",
    "s_nation",
    "s_region",
    "p_mfgr",
    "p_category",
    "p_brand1",
    "lo_discount",
    "lo_quantity",
)

_REVENUE = AggCall("sum", col("lo_revenue"), "revenue")
_DISCOUNTED = AggCall(
    "sum", col("lo_extendedprice").mul(col("lo_discount")), "discounted"
)
_PROFIT = AggCall("sum", col("lo_revenue").sub(col("lo_supplycost")), "profit")


def _denorm_join() -> Plan:
    plan: Plan = Join(
        Scan("lineorder"), Scan("ddate"), col("lo_orderdate").eq(col("d_datekey"))
    )
    plan = Join(plan, Scan("customer_s"), col("lo_custkey").eq(col("c_custkey")))
    plan = Join(plan, Scan("supplier"), col("lo_suppkey").eq(col("s_suppkey")))
    plan = Join(plan, Scan("part"), col("lo_partkey").eq(col("p_partkey")))
    return plan


def mv_definition() -> Plan:
    """CREATE MATERIALIZED VIEW over the denormalized star (§7.3).

    The date dimension already exposes its timestamp as ``__time``, so the
    same aggregate can be stored natively or ingested into Druid."""
    return Aggregate(
        _denorm_join(),
        MV_KEYS,
        (_REVENUE, _DISCOUNTED, _PROFIT, AggCall("count_star", None, "cnt")),
    )


# -- the 13 SSB queries ----------------------------------------------------


def _q1(name: str, date_pred, disc_lo, disc_hi, qty_pred) -> QuerySpec:
    return QuerySpec(
        name,
        Aggregate(
            Filter(
                Join(Scan("lineorder"), Scan("ddate"), col("lo_orderdate").eq(col("d_datekey"))),
                And(date_pred, between(col("lo_discount"), disc_lo, disc_hi), qty_pred),
            ),
            (),
            (_DISCOUNTED,),
        ),
    )


def _q2(name: str, part_pred) -> QuerySpec:
    plan = Aggregate(
        Filter(
            Join(
                Join(
                    Join(Scan("lineorder"), Scan("ddate"), col("lo_orderdate").eq(col("d_datekey"))),
                    Scan("supplier"),
                    col("lo_suppkey").eq(col("s_suppkey")),
                ),
                Scan("part"),
                col("lo_partkey").eq(col("p_partkey")),
            ),
            And(part_pred, col("s_region").eq("AMERICA")),
        ),
        ("d_year", "p_brand1"),
        (_REVENUE,),
    )
    return QuerySpec(name, Sort(plan, (("d_year", True), ("p_brand1", True))))


def _cs_join() -> Plan:
    return Join(
        Join(
            Join(Scan("lineorder"), Scan("ddate"), col("lo_orderdate").eq(col("d_datekey"))),
            Scan("customer_s"),
            col("lo_custkey").eq(col("c_custkey")),
        ),
        Scan("supplier"),
        col("lo_suppkey").eq(col("s_suppkey")),
    )


def _q3(name: str, pred, keys) -> QuerySpec:
    plan = Aggregate(Filter(_cs_join(), pred), keys, (_REVENUE,))
    return QuerySpec(name, Sort(plan, (("d_year", True), ("revenue", False))))


def _q4(name: str, pred, keys) -> QuerySpec:
    plan = Aggregate(Filter(_denorm_join(), pred), keys, (_PROFIT,))
    return QuerySpec(name, Sort(plan, tuple((k, True) for k in keys)))


def queries() -> list[QuerySpec]:
    return [
        _q1("ssb_q1_1", col("d_year").eq(1993), 1, 3, col("lo_quantity").lt(25)),
        _q1(
            "ssb_q1_2",
            col("d_yearmonthnum").eq(199401),
            4,
            6,
            between(col("lo_quantity"), 26, 35),
        ),
        _q1(
            "ssb_q1_3",
            And(col("d_weeknuminyear").eq(6), col("d_year").eq(1994)),
            5,
            7,
            between(col("lo_quantity"), 26, 35),
        ),
        _q2("ssb_q2_1", col("p_category").eq("MFGR#12")),
        _q2("ssb_q2_2", between(col("p_brand1"), "MFGR#221", "MFGR#228")),
        _q2("ssb_q2_3", col("p_brand1").eq("MFGR#229")),
        _q3(
            "ssb_q3_1",
            And(
                col("c_region").eq("ASIA"),
                col("s_region").eq("ASIA"),
                between(col("d_year"), 1992, 1997),
            ),
            ("c_nation", "s_nation", "d_year"),
        ),
        _q3(
            "ssb_q3_2",
            And(
                col("c_nation").eq("UNITED STATES"),
                col("s_nation").eq("UNITED STATES"),
                between(col("d_year"), 1992, 1997),
            ),
            ("c_city", "s_city", "d_year"),
        ),
        _q3(
            "ssb_q3_3",
            And(
                InList(Col("c_city"), ("UNITED ST0", "UNITED ST1")),
                InList(Col("s_city"), ("UNITED ST0", "UNITED ST1")),
                between(col("d_year"), 1992, 1997),
            ),
            ("c_city", "s_city", "d_year"),
        ),
        _q3(
            "ssb_q3_4",
            And(
                InList(Col("c_city"), ("UNITED ST0", "UNITED ST1")),
                InList(Col("s_city"), ("UNITED ST0", "UNITED ST1")),
                col("d_yearmonthnum").eq(199712),
            ),
            ("c_city", "s_city", "d_year"),
        ),
        _q4(
            "ssb_q4_1",
            And(col("c_region").eq("AMERICA"), col("s_region").eq("AMERICA")),
            ("d_year", "c_nation"),
        ),
        _q4(
            "ssb_q4_2",
            And(
                col("c_region").eq("AMERICA"),
                col("s_region").eq("AMERICA"),
                InList(Col("d_year"), (1997, 1998)),
                InList(Col("p_mfgr"), ("MFGR#1", "MFGR#2")),
            ),
            ("d_year", "s_nation", "p_category"),
        ),
        _q4(
            "ssb_q4_3",
            And(
                col("c_region").eq("AMERICA"),
                col("s_nation").eq("UNITED STATES"),
                InList(Col("d_year"), (1997, 1998)),
                col("p_category").eq("MFGR#14"),
            ),
            ("d_year", "s_city", "p_brand1"),
        ),
    ]
