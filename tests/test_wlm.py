"""Workload manager (§5.2): plans, routing, admission, triggers, borrowing."""
import pytest

from repro.metastore import HiveMetastore
from repro.wlm import QueryTask, ResourcePlan, WorkloadManager


def daytime_plan() -> ResourcePlan:
    """The paper's example resource plan, statement for statement."""
    plan = ResourcePlan("daytime")
    plan.create_pool("bi", alloc_fraction=0.8, query_parallelism=5)
    plan.create_pool("etl", alloc_fraction=0.2, query_parallelism=20)
    plan.create_trigger("downgrade", "total_runtime", 3.0, "MOVE", "etl")
    plan.add_trigger_to_pool("downgrade", "bi")
    plan.create_application_mapping("interactive_bi", "bi")
    plan.set_default_pool("etl")
    return plan.validate()


class TestPlanDefinition:
    def test_paper_example_validates(self):
        plan = daytime_plan()
        assert plan.pools["bi"].alloc_fraction == 0.8
        assert plan.pools["etl"].query_parallelism == 20

    def test_fractions_over_one_rejected(self):
        plan = ResourcePlan("bad")
        plan.create_pool("a", 0.7, 1)
        plan.create_pool("b", 0.6, 1)
        with pytest.raises(ValueError, match="> 1"):
            plan.validate()

    def test_duplicate_pool_rejected(self):
        plan = ResourcePlan("p")
        plan.create_pool("a", 0.5, 1)
        with pytest.raises(ValueError):
            plan.create_pool("a", 0.5, 1)

    def test_move_requires_target(self):
        plan = ResourcePlan("p")
        with pytest.raises(ValueError):
            plan.create_trigger("t", "total_runtime", 1.0, "MOVE")

    def test_trigger_unknown_target_rejected(self):
        plan = ResourcePlan("p")
        plan.create_pool("a", 0.5, 1)
        plan.create_trigger("t", "total_runtime", 1.0, "MOVE", "nope")
        plan.add_trigger_to_pool("t", "a")
        with pytest.raises(ValueError, match="unknown pool"):
            plan.validate()

    def test_unknown_default_pool_rejected(self):
        plan = ResourcePlan("p")
        plan.create_pool("a", 0.5, 1)
        plan.set_default_pool("zzz")
        with pytest.raises(ValueError):
            plan.validate()


class TestRouting:
    def test_application_mapping(self):
        assert daytime_plan().route(application="interactive_bi") == "bi"

    def test_default_pool(self):
        assert daytime_plan().route(application="random_job") == "etl"

    def test_user_mapping(self):
        plan = ResourcePlan("p")
        plan.create_pool("a", 1.0, 1)
        plan.create_user_mapping("alice", "a")
        assert plan.route(user="alice") == "a"

    def test_no_default_raises(self):
        plan = ResourcePlan("p")
        plan.create_pool("a", 1.0, 1)
        with pytest.raises(ValueError):
            plan.route(application="x")


class TestPersistence:
    def test_plans_persisted_and_activated_in_hms(self):
        hms = HiveMetastore()
        plan = daytime_plan()
        hms.save_resource_plan(plan.name, plan)
        hms.activate_resource_plan("daytime")
        assert hms.active_resource_plan() is plan


class TestAdmission:
    def test_parallelism_cap(self):
        wm = WorkloadManager(daytime_plan())
        tasks = [QueryTask(duration=1.0, application="interactive_bi") for _ in range(7)]
        for t in tasks:
            wm.submit(t)
        assert len(wm.running["bi"]) == 5
        assert len(wm.queues["bi"]) == 2

    def test_queue_drains_as_queries_finish(self):
        wm = WorkloadManager(daytime_plan())
        for _ in range(7):
            wm.submit(QueryTask(duration=0.2, application="interactive_bi"))
        wm.run_until_idle(dt=0.1)
        assert len(wm.finished) == 7
        assert not wm.queues["bi"] and not wm.running["bi"]

    def test_pools_run_concurrently(self):
        wm = WorkloadManager(daytime_plan())
        wm.submit(QueryTask(duration=1.0, application="interactive_bi"))
        wm.submit(QueryTask(duration=1.0))
        assert len(wm.running["bi"]) == 1 and len(wm.running["etl"]) == 1


class TestResourceShares:
    def test_guaranteed_fractions(self):
        wm = WorkloadManager(daytime_plan())
        a = QueryTask(duration=10, application="interactive_bi")
        b = QueryTask(duration=10)
        wm.submit(a)
        wm.submit(b)
        shares = wm.shares()
        assert shares[a.id] == pytest.approx(0.8)
        assert shares[b.id] == pytest.approx(0.2)

    def test_idle_pool_resources_borrowed(self):
        """A lone etl query gets the whole cluster while bi is idle."""
        wm = WorkloadManager(daytime_plan())
        b = QueryTask(duration=10)
        wm.submit(b)
        assert wm.shares()[b.id] == pytest.approx(1.0)

    def test_borrowed_resources_reclaimed(self):
        wm = WorkloadManager(daytime_plan())
        b = QueryTask(duration=10)
        wm.submit(b)
        assert wm.shares()[b.id] == pytest.approx(1.0)
        a = QueryTask(duration=10, application="interactive_bi")
        wm.submit(a)
        shares = wm.shares()
        assert shares[b.id] == pytest.approx(0.2)
        assert shares[a.id] == pytest.approx(0.8)

    def test_share_splits_within_pool(self):
        wm = WorkloadManager(daytime_plan())
        a = QueryTask(duration=10, application="interactive_bi")
        b = QueryTask(duration=10, application="interactive_bi")
        wm.submit(a)
        wm.submit(b)
        shares = wm.shares()
        # 0.8 / 2 guaranteed each, plus half of etl's idle 0.2 borrowed
        assert shares[a.id] == pytest.approx(0.5)
        assert shares[b.id] == pytest.approx(0.5)

    def test_more_resources_run_faster(self):
        """A query alone on the cluster finishes sooner than one sharing."""
        solo = WorkloadManager(daytime_plan())
        t1 = QueryTask(duration=1.0)
        solo.submit(t1)
        elapsed_solo = solo.run_until_idle(dt=0.05)

        shared = WorkloadManager(daytime_plan())
        t2 = QueryTask(duration=1.0)
        shared.submit(t2)
        shared.submit(QueryTask(duration=50.0, application="interactive_bi"))
        shared.tick(0.05)
        # t2 now only gets 0.2 of the cluster
        assert shared.shares()[t2.id] == pytest.approx(0.2)


class TestTriggers:
    def test_downgrade_moves_long_query(self):
        """The paper's rule: bi queries running > 3s move to etl."""
        wm = WorkloadManager(daytime_plan())
        long_q = QueryTask(duration=100.0, application="interactive_bi")
        wm.submit(long_q)
        for _ in range(40):  # 4 simulated seconds
            wm.tick(0.1)
        assert long_q.pool == "etl"
        assert long_q.moves == ["bi->etl"]

    def test_short_query_not_moved(self):
        wm = WorkloadManager(daytime_plan())
        short_q = QueryTask(duration=0.5, application="interactive_bi")
        wm.submit(short_q)
        wm.run_until_idle(dt=0.1)
        assert short_q.moves == []
        assert short_q.state == "finished"

    def test_kill_trigger(self):
        plan = ResourcePlan("strict")
        plan.create_pool("bi", 1.0, 5)
        plan.create_trigger("slayer", "total_runtime", 1.0, "KILL")
        plan.add_trigger_to_pool("slayer", "bi")
        plan.set_default_pool("bi")
        wm = WorkloadManager(plan.validate())
        victim = QueryTask(duration=100.0)
        wm.submit(victim)
        for _ in range(15):
            wm.tick(0.1)
        assert victim.state == "killed"
        assert wm.killed == [victim]

    def test_move_to_full_pool_queues(self):
        plan = ResourcePlan("p")
        plan.create_pool("bi", 0.5, 1)
        plan.create_pool("etl", 0.5, 1)
        plan.create_trigger("mv", "total_runtime", 0.3, "MOVE", "etl")
        plan.add_trigger_to_pool("mv", "bi")
        plan.set_default_pool("etl")
        wm = WorkloadManager(plan.validate())
        blocker = QueryTask(duration=100.0)
        mover = QueryTask(duration=100.0, application=None, user=None)
        wm.submit(blocker)  # fills etl
        mover_pool = ResourcePlan  # noqa: F841 (readability)
        bi_q = QueryTask(duration=100.0)
        # route bi_q into bi via explicit mapping-free submit
        bi_q.application = "x"
        plan.create_application_mapping("x", "bi")
        wm.submit(bi_q)
        for _ in range(6):
            wm.tick(0.1)
        assert bi_q.pool == "etl"
        assert bi_q in wm.queues["etl"]
