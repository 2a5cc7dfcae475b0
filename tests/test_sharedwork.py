"""Shared work optimizer (§4.5): maximal equal-subtree detection + reuse."""
import pandas as pd
import pytest

from repro.core.compile import compile_plan
from repro.core.context import PandasContext
from repro.core.expr import AggCall, col
from repro.core.plan import Aggregate, Filter, Join, Project, Scan, Union
from repro.core.sharedwork import count_shared_occurrences, find_shared_subtrees
from repro.metastore import HiveMetastore
from repro.oracle import assert_equivalent


def q88_shape(n_branches=4):
    """The q88 pattern: many aggregations over the same filtered scan,
    unioned — the query where shared work gave Hive 2.7x (§7.1)."""
    base = Filter(Scan("fact"), col("v").gt(0.1))
    branches = tuple(
        Project(
            Aggregate(
                Filter(base, col("h").eq(i)),
                (),
                (AggCall("count_star", None, "c"),),
            ),
            (("branch", col("c").mul(0)), ("c", col("c"))),
        )
        for i in range(n_branches)
    )
    return Union(branches, all=True)


class TestDetection:
    def test_repeated_filtered_scan_found(self):
        base = Filter(Scan("fact"), col("v").gt(0.1))
        plan = Union((Aggregate(base, (), (AggCall("count_star", None, "c"),)),
                      Aggregate(base, ("h",), (AggCall("count_star", None, "c"),))))
        shared = find_shared_subtrees(plan)
        assert base.fingerprint() in shared

    def test_maximality(self):
        """When the whole branch repeats, only the branch is shared — not
        its inner scan too."""
        branch = Aggregate(
            Filter(Scan("fact"), col("v").gt(0.1)), (), (AggCall("count_star", None, "c"),)
        )
        plan = Union((branch, branch))
        shared = find_shared_subtrees(plan)
        assert shared == {branch.fingerprint()}

    def test_no_sharing_when_subtrees_differ(self):
        plan = Union(
            (
                Aggregate(Filter(Scan("fact"), col("v").gt(0.1)), (), (AggCall("count_star", None, "c"),)),
                Aggregate(Filter(Scan("fact"), col("v").gt(0.2)), (), (AggCall("count_star", None, "c"),)),
            )
        )
        shared = find_shared_subtrees(plan, min_size=2)
        assert shared == set()

    def test_bare_scan_shared_by_default(self):
        plan = Union(
            (
                Aggregate(Filter(Scan("fact"), col("v").gt(0.1)), (), (AggCall("count_star", None, "c"),)),
                Aggregate(Filter(Scan("fact"), col("v").gt(0.2)), (), (AggCall("count_star", None, "c"),)),
            )
        )
        assert Scan("fact").fingerprint() in find_shared_subtrees(plan)

    def test_q88_counts(self):
        plan = q88_shape(4)
        shared = find_shared_subtrees(plan, min_size=2)
        base = Filter(Scan("fact"), col("v").gt(0.1))
        occ = count_shared_occurrences(plan, shared)
        assert occ[base.fingerprint()] == 4


class TestExecution:
    @pytest.fixture
    def pc(self, spark):
        pc = PandasContext(spark, HiveMetastore())
        pc.add(
            "fact",
            pd.DataFrame(
                {"v": [0.05, 0.2, 0.5, 0.9] * 25, "h": [0, 1, 2, 3] * 25}
            ),
        )
        return pc

    def test_shared_execution_correct(self, pc):
        plan = q88_shape(4)
        shared = find_shared_subtrees(plan, min_size=2)
        df = compile_plan(plan, pc, shared_fingerprints=shared)
        assert_equivalent(df, plan.to_sql(), fact=pc.tables["fact"])

    def test_shared_compiles_subtree_once(self, pc):
        plan = q88_shape(3)
        shared = find_shared_subtrees(plan, min_size=2)
        calls = []
        orig = pc.resolve_scan

        def counting(scan):
            calls.append(scan.table)
            return orig(scan)

        pc.resolve_scan = counting
        memo: dict = {}
        compile_plan(plan, pc, shared_fingerprints=shared, _memo=memo)
        # the shared filtered scan resolves its Scan exactly once
        assert calls.count("fact") == 1
        assert len(memo) >= 1


class TestMergeEquivalentScans:
    def test_merges_differently_annotated_scans(self):
        from repro.core.sharedwork import merge_equivalent_scans

        a = Scan("fact", pushed_filters=(col("v").gt(0.1), col("h").eq(1)))
        b = Scan("fact", pushed_filters=(col("v").gt(0.1), col("h").eq(2)))
        plan = Union(
            (
                Aggregate(Filter(a, col("h").eq(1)), (), (AggCall("count_star", None, "c"),)),
                Aggregate(Filter(b, col("h").eq(2)), (), (AggCall("count_star", None, "c"),)),
            )
        )
        out = merge_equivalent_scans(plan)
        scans = [n for n in out.walk() if isinstance(n, Scan)]
        assert scans[0] == scans[1]
        # the common conjunct survives; the divergent ones are dropped
        assert scans[0].pushed_filters == (col("v").gt(0.1),)

    def test_merge_unions_partitions_and_columns(self):
        from repro.core.sharedwork import merge_equivalent_scans

        a = Scan("fact", columns=("x", "y"), partitions=("p=1",))
        b = Scan("fact", columns=("y", "z"), partitions=("p=2",))
        out = merge_equivalent_scans(Union((a, b)))
        s = next(n for n in out.walk() if isinstance(n, Scan))
        assert set(s.columns) == {"x", "y", "z"}
        assert s.partitions == ("p=1", "p=2")

    def test_identical_scans_untouched(self):
        from repro.core.sharedwork import merge_equivalent_scans

        plan = Union((Scan("fact"), Scan("fact")))
        assert merge_equivalent_scans(plan) == plan

    def test_single_scan_untouched(self):
        from repro.core.sharedwork import merge_equivalent_scans

        plan = Filter(Scan("fact"), col("v").gt(0.1))
        assert merge_equivalent_scans(plan) is plan

    def test_none_partitions_wins(self):
        from repro.core.sharedwork import merge_equivalent_scans

        a = Scan("fact", partitions=("p=1",))
        b = Scan("fact")  # unpruned
        out = merge_equivalent_scans(Union((a, b)))
        s = next(n for n in out.walk() if isinstance(n, Scan))
        assert s.partitions is None
