"""Query result cache (§4.3): snapshot-validated hits, pending-entry mode."""
import threading

import pandas as pd
import pytest

from repro.core.cache import QueryResultCache
from repro.core.expr import Func, col
from repro.core.plan import Filter, Scan
from repro.metastore import Column, HiveMetastore, Table


@pytest.fixture
def hms():
    h = HiveMetastore()
    h.create_table(Table("t", [Column("k", "bigint")]))
    return h


@pytest.fixture
def cache(hms):
    return QueryResultCache(hms)


def plan():
    return Filter(Scan("t"), col("k").gt(1))


def result():
    return pd.DataFrame({"k": [2, 3]})


def commit_write(hms, table="t"):
    t = hms.txns.open_txn()
    hms.txns.allocate_write_id(t, table)
    hms.txns.commit(t)


class TestBasics:
    def test_miss_then_hit(self, cache):
        assert cache.lookup(plan()) is None
        cache.fill(plan(), result())
        got = cache.lookup(plan())
        assert got["k"].tolist() == [2, 3]
        assert cache.hit_count == 1 and cache.miss_count == 1

    def test_different_plans_do_not_collide(self, cache):
        cache.fill(plan(), result())
        other = Filter(Scan("t"), col("k").gt(2))
        assert cache.lookup(other) is None

    def test_hit_after_unrelated_table_write(self, cache, hms):
        hms.create_table(Table("other", [Column("x", "bigint")]))
        cache.fill(plan(), result())
        commit_write(hms, "other")
        assert cache.lookup(plan()) is not None

    def test_stale_after_table_write(self, cache, hms):
        """New data in a participating table invalidates the entry."""
        cache.fill(plan(), result())
        commit_write(hms)
        assert cache.lookup(plan()) is None

    def test_lru_eviction(self, cache):
        cache.capacity = 2
        p1, p2, p3 = (Filter(Scan("t"), col("k").gt(i)) for i in range(3))
        cache.fill(p1, result())
        cache.fill(p2, result())
        cache.lookup(p1)  # p1 most recent
        cache.fill(p3, result())  # evicts p2
        assert cache.lookup(p1) is not None
        assert cache.lookup(p2) is None

    def test_expunge_stale(self, cache, hms):
        cache.fill(plan(), result())
        commit_write(hms)
        assert cache.expunge_stale() == 1
        assert len(cache) == 0


class TestCacheability:
    def test_rand_not_cacheable(self, cache):
        p = Filter(Scan("t"), Func("rand", ()).gt(0.5))
        assert not cache.is_cacheable(p)
        cache.fill(p, result())
        assert cache.lookup(p) is None

    def test_current_date_not_cacheable(self, cache):
        p = Filter(Scan("t"), col("k").gt(Func("current_date", ())))
        assert not cache.is_cacheable(p)

    def test_deterministic_cacheable(self, cache):
        assert cache.is_cacheable(plan())


class TestPendingEntry:
    def test_first_computes_others_wait(self, cache):
        state1, _ = cache.lookup_or_begin(plan())
        assert state1 == "compute"
        state2, ev = cache.lookup_or_begin(plan())
        assert state2 == "wait"

        served = []

        def waiter():
            ev.wait(timeout=5)
            served.append(cache.lookup(plan()))

        th = threading.Thread(target=waiter)
        th.start()
        cache.fill(plan(), result())
        th.join(timeout=5)
        assert served and served[0] is not None

    def test_fail_releases_waiters(self, cache):
        cache.lookup_or_begin(plan())
        state, ev = cache.lookup_or_begin(plan())
        assert state == "wait"
        cache.fail(plan())
        assert ev.is_set()
        # the retrying query becomes the new computer
        state3, _ = cache.lookup_or_begin(plan())
        assert state3 == "compute"

    def test_hit_path_skips_pending(self, cache):
        cache.fill(plan(), result())
        state, res = cache.lookup_or_begin(plan())
        assert state == "hit"
        assert res["k"].tolist() == [2, 3]

    def test_non_cacheable_never_pends(self, cache):
        p = Filter(Scan("t"), Func("rand", ()).gt(0.5))
        assert cache.lookup_or_begin(p) == ("compute", None)
        assert cache.lookup_or_begin(p) == ("compute", None)  # no pending entry
