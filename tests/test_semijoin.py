"""Dynamic semijoin reduction (§4.6): detection, both variants, correctness."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compile import compile_plan
from repro.core.context import PandasContext
from repro.core.cost import CostModel
from repro.core.expr import And, col
from repro.core.optimizer import OptimizerContext
from repro.core.plan import Filter, Join, Scan
from repro.core.semijoin import apply_reduction, find_opportunities
from repro.metastore import HiveMetastore
from repro.oracle import assert_equivalent


@pytest.fixture
def env(spark):
    g = np.random.default_rng(11)
    pc = PandasContext(spark, HiveMetastore())
    pc.add(
        "store_sales",
        pd.DataFrame(
            {
                "ss_item_sk": g.integers(0, 100, 1000),
                "ss_price": g.random(1000).round(3),
            }
        ),
    )
    pc.add(
        "item",
        pd.DataFrame(
            {
                "i_item_sk": range(100),
                "i_category": [("Sports" if i % 10 == 0 else "Other") for i in range(100)],
            }
        ),
    )
    ctx = OptimizerContext(pc.hms, CostModel(pc.hms))
    return pc, ctx


def star_query():
    return Join(
        Scan("store_sales"),
        Filter(Scan("item"), col("i_category").eq("Sports")),
        col("ss_item_sk").eq(col("i_item_sk")),
    )


class TestDetection:
    def test_finds_filtered_dim_opportunity(self, env):
        _, ctx = env
        opps = find_opportunities(star_query(), ctx)
        assert len(opps) == 1
        o = opps[0]
        assert o.target_table == "store_sales"
        assert o.target_column == "ss_item_sk"
        assert o.source_column == "i_item_sk"
        assert o.kind == "index_semijoin"

    def test_partition_pruning_variant_detected(self, env):
        pc, ctx = env
        pc.hms.get_table("store_sales").partitioned_by.append("ss_item_sk")
        opps = find_opportunities(star_query(), ctx)
        assert opps[0].kind == "partition_pruning"

    def test_no_opportunity_without_dim_filter(self, env):
        _, ctx = env
        plan = Join(
            Scan("store_sales"), Scan("item"), col("ss_item_sk").eq(col("i_item_sk"))
        )
        assert find_opportunities(plan, ctx) == []

    def test_large_build_side_skipped(self, env):
        _, ctx = env
        opps = find_opportunities(star_query(), ctx, max_build_rows=1)
        assert opps == []


class TestIndexSemijoin:
    def test_runtime_filter_built(self, env):
        pc, ctx = env
        plan, report = apply_reduction(star_query(), ctx, pc)
        assert len(report.runtime_filters) == 1
        rf = report.runtime_filters[0]
        assert rf.min_value == 0 and rf.max_value == 90
        assert rf.n_values == 10
        assert rf.bloom.might_contain(10)
        assert not rf.bloom.might_contain(11)

    def test_scan_annotated_with_range(self, env):
        pc, ctx = env
        plan, _ = apply_reduction(star_query(), ctx, pc)
        scans = [n for n in plan.walk() if isinstance(n, Scan) and n.table == "store_sales"]
        assert len(scans[0].pushed_filters) == 2  # >= min and <= max

    def test_result_unchanged(self, env):
        pc, ctx = env
        original = star_query()
        plan, _ = apply_reduction(original, ctx, pc)
        df = compile_plan(plan, pc)
        assert_equivalent(
            df,
            original.to_sql(),
            store_sales=pc.tables["store_sales"],
            item=pc.tables["item"],
        )

    def test_empty_dim_side_yields_empty_filter(self, env):
        pc, ctx = env
        plan = Join(
            Scan("store_sales"),
            Filter(Scan("item"), col("i_category").eq("DoesNotExist")),
            col("ss_item_sk").eq(col("i_item_sk")),
        )
        new_plan, report = apply_reduction(plan, ctx, pc)
        assert report.runtime_filters[0].n_values == 0


class TestPartitionPruning:
    def test_partitions_restricted(self, env):
        pc, ctx = env
        t = pc.hms.get_table("store_sales")
        t.partitioned_by.append("ss_item_sk")
        for v in sorted(pc.tables["store_sales"]["ss_item_sk"].unique()):
            pc.hms.add_partition("store_sales", f"ss_item_sk={v}")
        plan, report = apply_reduction(star_query(), ctx, pc)
        scan = [n for n in plan.walk() if isinstance(n, Scan) and n.table == "store_sales"][0]
        assert scan.partitions is not None
        assert report.partitions_after < report.partitions_before
        # only Sports item_sks (multiples of 10 present in the fact data)
        assert all("ss_item_sk=" in p for p in scan.partitions)
        kept_vals = {int(p.split("=")[1]) for p in scan.partitions}
        assert kept_vals <= {0, 10, 20, 30, 40, 50, 60, 70, 80, 90}
